"""Active-window semantics (Section 3.1 definitions + Algorithm 1).

W_t membership, A_t = W_t ∪ referred-parents, t_e bookkeeping, child
expiry shrinking I_t(e), score refresh on reference arrival/expiry, and
re-activation of expired-but-referred elements — checked against
definition-level recomputation at every bucket of a replayed stream.
"""
import numpy as np
import pytest

from repro.core import ActiveWindow, SIRStream, build_elements, make_element
from repro.core.scoring import influence_set_score, semantic_set_score
from repro.corpus import AMINER, generate_stream

from stream_fixtures import TINY, TINY_T, TINY_L

LAM, ETA = AMINER.lam, AMINER.eta


def _expected_active(stream, t, T):
    """A_t from the paper's definition, recomputed from scratch."""
    in_w = {e for e in range(stream.n) if t - T + 1 <= stream.ts[e] <= t}
    parents = {int(p) for e in in_w for p in stream.refs[e]}
    return in_w | parents


def _expected_children(stream, eid, t, T):
    return sorted(
        c for c in range(stream.n)
        if t - T + 1 <= stream.ts[c] <= t and eid in stream.refs[c]
    )


@pytest.fixture(scope="module")
def stream():
    return generate_stream(AMINER, **TINY)


def test_active_set_matches_definition_at_every_bucket(stream):
    st = SIRStream(T=TINY_T, L=TINY_L, lam=LAM, eta=ETA)
    st.load(build_elements(stream))
    t_end = ((stream.t_end + TINY_L - 1) // TINY_L) * TINY_L
    for b in range(TINY_L, t_end + 1, TINY_L):
        st.advance_to(b)
        assert st.window.active == _expected_active(stream, b, TINY_T), f"t={b}"


def test_children_match_definition_at_every_bucket(stream):
    st = SIRStream(T=TINY_T, L=TINY_L, lam=LAM, eta=ETA)
    st.load(build_elements(stream))
    t_end = ((stream.t_end + TINY_L - 1) // TINY_L) * TINY_L
    for b in range(TINY_L, t_end + 1, TINY_L):
        st.advance_to(b)
        for eid in st.window.active:
            got = sorted(c.eid for c in st.window.children_of(eid))
            assert got == _expected_children(stream, eid, b, TINY_T), f"t={b} e={eid}"


def test_delta_matches_definition_at_final_bucket(stream, tiny_state):
    w = tiny_state.window
    for eid in w.active:
        e = w.store[eid]
        ch = {eid: w.children_of(eid)}
        for i in e.tp:
            expected = LAM * semantic_set_score([e], i) + (1 - LAM) / ETA * (
                influence_set_score([e], i, ch)
            )
            assert w.delta_of(eid)[i] == pytest.approx(expected, rel=1e-9, abs=1e-12)


def test_ranked_lists_contain_exactly_active_topics(tiny_state):
    w = tiny_state.window
    rl = tiny_state.rl
    expected = {(i, eid) for eid in w.active for i in w.store[eid].tp}
    got = {(i, eid) for i, lst in rl.lists.items() for _, eid in lst}
    assert got == expected


def _mini_elements(phi, specs):
    """specs: (eid, ts, words, (topics, probs), refs)."""
    return [
        make_element(
            eid, ts, np.array(ws), np.ones(len(ws)), tps, pps, np.array(refs), phi
        )
        for eid, ts, ws, (tps, pps), refs in specs
    ]


@pytest.fixture()
def mini_phi():
    phi = np.zeros((2, 4))
    phi[0] = [0.5, 0.5, 0.0, 0.0]
    phi[1] = [0.0, 0.0, 0.5, 0.5]
    return phi


def test_reference_resurrects_expired_element(mini_phi):
    """An element out of W_t re-enters A_t when newly referred to."""
    els = _mini_elements(
        mini_phi,
        [
            (0, 1, [0, 1], ([0], [1.0]), []),
            (1, 10, [2, 3], ([1], [1.0]), []),
            (2, 12, [0], ([0], [1.0]), [0]),  # refers to long-expired e0
        ],
    )
    w = ActiveWindow(T=4, lam=0.5, eta=2.0)
    w.ingest([els[0]], 2)
    w.ingest([], 6)
    assert 0 not in w.active  # e0 expired
    w.ingest([els[1]], 10)
    w.ingest([els[2]], 12)
    assert 0 in w.active  # resurrected by e2's reference
    assert [c.eid for c in w.children_of(0)] == [2]
    # and it expires again T after the last reference
    w.ingest([], 17)
    assert 0 not in w.active


def test_child_expiry_shrinks_influence(mini_phi):
    """δ_i(parent) drops when a referring child leaves the window."""
    els = _mini_elements(
        mini_phi,
        [
            (0, 1, [0, 1], ([0], [1.0]), []),
            (1, 2, [1], ([0], [1.0]), [0]),
            (2, 4, [0], ([0], [1.0]), [0]),
        ],
    )
    w = ActiveWindow(T=6, lam=0.5, eta=2.0)
    w.ingest(els, 4)
    d_both = w.delta_of(0)[0]
    w.ingest([], 8)  # child e1 (ts=2) leaves W_8 = [3, 8]
    assert 0 in w.active  # e0 still referred by e2 at ts=4
    d_one = w.delta_of(0)[0]
    assert d_one < d_both
    # semantic part only once e2 also leaves: at t=10, t_e(e0)=4 ≤ 10−6
    w.ingest([], 10)
    assert 0 not in w.active


def test_t_e_is_last_reference_time(mini_phi):
    els = _mini_elements(
        mini_phi,
        [
            (0, 1, [0], ([0], [1.0]), []),
            (1, 3, [1], ([0], [1.0]), [0]),
            (2, 5, [1], ([0], [1.0]), [0]),
        ],
    )
    w = ActiveWindow(T=10, lam=0.5, eta=2.0)
    w.ingest(els, 5)
    assert w.t_e[0] == 5  # last referred at e2.ts


def test_monotone_time_enforced(mini_phi):
    w = ActiveWindow(T=5, lam=0.5, eta=2.0)
    w.ingest([], 10)
    with pytest.raises(ValueError):
        w.ingest([], 9)


def test_update_time_accounting(stream):
    st = SIRStream(T=TINY_T, L=TINY_L, lam=LAM, eta=ETA)
    st.load(build_elements(stream))
    st.run_all()
    assert st.n_ingested == stream.n
    assert st.update_seconds > 0
