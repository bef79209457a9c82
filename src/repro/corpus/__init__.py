"""Synthetic social-stream substrate.

The paper evaluates on three crawled corpora (AMiner, Reddit, Twitter)
that are unavailable offline; :mod:`repro.corpus.profiles` encodes their
Table-3 shape statistics and :mod:`repro.corpus.generator` produces
deterministic synthetic streams with the same shape (document length,
reference density, topical sparsity, popularity skew).
"""
from repro.corpus.profiles import AMINER, REDDIT, TWITTER, PROFILES, StreamProfile
from repro.corpus.generator import SocialStream, generate_stream, generate_queries, Query

__all__ = [
    "AMINER",
    "REDDIT",
    "TWITTER",
    "PROFILES",
    "StreamProfile",
    "SocialStream",
    "generate_stream",
    "generate_queries",
    "Query",
]
