"""Distributed dataflow layer (PySpark DataFrame / Catalyst).

The paper's stream maintenance — per-topic score computation, window
membership, influence aggregation, ranked-list construction — expressed
as Spark DataFrame pipelines, plus the Table-6 effectiveness metrics and
a Structured-Streaming driver that advances the same
:class:`~repro.core.state.SIRStream` bucket by bucket.
"""
from repro.spark.scores_df import (
    semantic_scores_df,
    window_df,
    active_df,
    influence_scores_df,
    delta_scores_df,
    ranked_lists_df,
)
from repro.spark.metrics import coverage_scores_df, influence_metric_df

__all__ = [
    "semantic_scores_df",
    "window_df",
    "active_df",
    "influence_scores_df",
    "delta_scores_df",
    "ranked_lists_df",
    "coverage_scores_df",
    "influence_metric_df",
]
