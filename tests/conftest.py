"""Shared stream fixtures for the test suite.

``small_stream`` is sized for Spark/oracle round-trips (SF ≈ 0.0005 of
the Twitter profile); ``tiny_stream`` for brute-force comparisons.  Both
are session-scoped: generation is deterministic and read-only.
"""
import pytest

from repro.core import SIRStream, build_elements
from repro.corpus import TWITTER, AMINER, generate_stream, generate_queries

from stream_fixtures import SMALL, SMALL_T, SMALL_L, TINY, TINY_T, TINY_L  # noqa: F401


@pytest.fixture(scope="session")
def small_stream():
    return generate_stream(TWITTER, **SMALL)


@pytest.fixture(scope="session")
def small_state(small_stream):
    st = SIRStream(T=SMALL_T, L=SMALL_L, lam=TWITTER.lam, eta=TWITTER.eta)
    st.load(build_elements(small_stream))
    st.run_all()
    return st


@pytest.fixture(scope="session")
def small_queries(small_stream):
    return generate_queries(small_stream, 12, seed=5, t_min=SMALL_T)


@pytest.fixture(scope="session")
def tiny_stream():
    return generate_stream(AMINER, **TINY)


@pytest.fixture(scope="session")
def tiny_state(tiny_stream):
    st = SIRStream(T=TINY_T, L=TINY_L, lam=AMINER.lam, eta=AMINER.eta)
    st.load(build_elements(tiny_stream))
    st.run_all()
    return st


@pytest.fixture(scope="session")
def tiny_queries(tiny_stream):
    return generate_queries(tiny_stream, 8, seed=7, t_min=TINY_T)
