"""Driver state ≡ Catalyst δ pipeline at mid-stream snapshots.

The end-of-stream comparison in test_spark_scores can miss expiry bugs
that only show while the window is actively sliding; here the driver
replays to several intermediate bucket boundaries and the Spark δ table
is recomputed for the same t — they must agree exactly, including which
(eid, topic) pairs exist.
"""
import pytest

from repro.core import SIRStream, build_elements
from repro.corpus import TWITTER
from repro.spark.scores_df import delta_scores_df
from repro.spark.tables import spark_tables

from stream_fixtures import SMALL_L, SMALL_T

LAM, ETA = TWITTER.lam, TWITTER.eta


@pytest.fixture(scope="module")
def tbl(spark, small_stream):
    d = spark_tables(spark, small_stream)
    for v in d.values():
        v.cache().count()
    return d


@pytest.mark.parametrize("t", [255, 300, 375, 420])
def test_driver_equals_spark_midstream(spark, small_stream, tbl, t):
    st = SIRStream(T=SMALL_T, L=SMALL_L, lam=LAM, eta=ETA)
    st.load(build_elements(small_stream))
    st.advance_to(t)
    assert st.t == t
    got = delta_scores_df(
        tbl["elems"], tbl["tokens"], tbl["elem_topics"], tbl["topic_words"],
        tbl["refs"], t, SMALL_T, LAM, ETA,
    ).collect()
    spark_delta = {(r["eid"], r["topic"]): r["delta"] for r in got}
    w = st.window
    driver_delta = {
        (eid, i): d
        for eid, dd in w.delta.items() if eid in w.active
        for i, d in dd.items()
    }
    assert set(spark_delta) == set(driver_delta), f"t={t}"
    for key, v in driver_delta.items():
        assert spark_delta[key] == pytest.approx(v, rel=1e-9, abs=1e-12), (t, key)
