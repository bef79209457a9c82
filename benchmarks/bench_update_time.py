"""Ranked-list maintenance cost per arrival element (Figure 14).

Benchmarks the full stream replay (active-window + ranked-list updates,
Algorithm 1) and reports the per-element update time via extra_info —
the paper's claim is < 0.3 ms/element on its Java testbed; ours is the
same order despite Python (EXPERIMENTS.md).
"""
import pytest

from repro.core import SIRStream, build_elements
from repro.corpus import PROFILES, generate_stream


def _replay(profile_name, n, z, T):
    stream = generate_stream(
        PROFILES[profile_name], n_elements=n, z=z, duration=2880, seed=1
    )
    elements = build_elements(stream)

    def run():
        st = SIRStream(T=T, L=15, lam=stream.profile.lam, eta=stream.profile.eta)
        st.load(elements)
        st.run_all()
        return st

    return run, len(elements)


@pytest.mark.parametrize("profile", ["aminer", "reddit", "twitter"])
def test_update_time_default(benchmark, profile):
    run, n = _replay(profile, 8_000, 50, 1440)
    st = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    benchmark.extra_info["us_per_element"] = round(1e6 * st.update_seconds / n, 2)
    benchmark.extra_info["n_active"] = st.window.n_active


@pytest.mark.parametrize("z", [50, 150, 250])
def test_update_time_vs_z(benchmark, z):
    """Figure 14a: maintenance cost grows with the number of topics."""
    run, n = _replay("reddit", 8_000, z, 1440)
    st = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["us_per_element"] = round(1e6 * st.update_seconds / n, 2)


@pytest.mark.parametrize("T", [360, 1440, 1800])
def test_update_time_vs_T(benchmark, T):
    """Figure 14b: maintenance cost grows with the window length."""
    run, n = _replay("reddit", 8_000, 50, T)
    st = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["us_per_element"] = round(1e6 * st.update_seconds / n, 2)
    benchmark.extra_info["n_active"] = st.window.n_active
