"""Benchmark fixtures: SF≈0.1-scale streams shared across bench modules.

Sizes are chosen so the whole ``pytest benchmarks/ --benchmark-only``
run finishes in minutes while active windows are large enough (≈10⁴
elements) for the paper's efficiency shape — ranked-list pruning vs
full-scan baselines — to be visible.  The ``jobs/`` entrypoints run the
same harnesses at larger scale.
"""
import pytest

from repro.corpus import PROFILES, generate_queries, generate_stream
from repro.eval.common import build_state

BENCH = {
    # per-profile: (n_elements, z, duration_minutes, T, L)
    "aminer": (12_000, 50, 4320, 1440, 15),
    "reddit": (30_000, 50, 4320, 1440, 15),
    "twitter": (30_000, 50, 4320, 1440, 15),
}


def _make(name: str, seed: int = 0):
    n, z, duration, T, L = BENCH[name]
    stream = generate_stream(PROFILES[name], n_elements=n, z=z, duration=duration, seed=seed)
    state = build_state(stream, T, L)
    return stream, state


@pytest.fixture(scope="session")
def bench_reddit():
    return _make("reddit")


@pytest.fixture(scope="session")
def bench_aminer():
    return _make("aminer")


@pytest.fixture(scope="session")
def bench_twitter():
    return _make("twitter")


@pytest.fixture(scope="session")
def reddit_queries(bench_reddit):
    stream, _ = bench_reddit
    return generate_queries(stream, 20, seed=3, t_min=1440)


@pytest.fixture(scope="session")
def aminer_queries(bench_aminer):
    stream, _ = bench_aminer
    return generate_queries(stream, 20, seed=3, t_min=1440)


@pytest.fixture(scope="session")
def twitter_queries(bench_twitter):
    stream, _ = bench_twitter
    return generate_queries(stream, 20, seed=3, t_min=1440)
