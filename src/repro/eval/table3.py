"""Table 3 — dataset statistics, computed with Spark aggregations.

The paper reports, per dataset: number of elements, vocabulary size,
average element length, and average reference count.  We compute the
same statistics over the synthetic streams (post-"preprocessing"
figures: our integer vocabulary corresponds to the cleaned vocabulary).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.corpus.generator import SocialStream
from repro.spark.tables import spark_tables

__all__ = ["table3_stats"]


def table3_stats(spark: SparkSession, stream: SocialStream) -> dict:
    """Statistics of one stream: the columns of the paper's Table 3."""
    t = spark_tables(spark, stream)
    n_elements = t["elems"].count()
    vocab_used = t["tokens"].select("word").distinct().count()
    tokens_per_elem = (
        t["tokens"].groupBy("eid").agg(F.sum("freq").alias("len"))
    )
    # elements can be empty only if the generator emitted none — avg over all
    avg_len = (
        t["elems"].join(tokens_per_elem, "eid", "left").fillna(0, subset=["len"])
        .agg(F.avg("len")).collect()[0][0]
    )
    refs_per_elem = t["refs"].groupBy("child").agg(F.count("*").alias("r"))
    avg_refs = (
        t["elems"].join(refs_per_elem, t["elems"].eid == refs_per_elem.child, "left")
        .fillna(0, subset=["r"]).agg(F.avg("r")).collect()[0][0]
    )
    return {
        "dataset": stream.profile.name,
        "n_elements": n_elements,
        "vocab_size": vocab_used,
        "vocab_model": stream.model.m,
        "avg_length": round(float(avg_len), 2),
        "avg_references": round(float(avg_refs), 2),
    }


def table3_frame(spark: SparkSession, streams: list[SocialStream]) -> pd.DataFrame:
    """The full Table 3 as a pandas frame (one row per dataset)."""
    return pd.DataFrame([table3_stats(spark, s) for s in streams])
