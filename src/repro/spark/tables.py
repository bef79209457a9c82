"""Materialise a :class:`~repro.corpus.generator.SocialStream` as Spark
DataFrames (the long/normalised input tables of the Catalyst pipelines)."""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.corpus.generator import SocialStream

__all__ = ["spark_tables"]


def spark_tables(spark: SparkSession, stream: SocialStream) -> dict[str, DataFrame]:
    """Return {elems, tokens, elem_topics, refs, topic_words} DataFrames."""
    return {
        "elems": spark.createDataFrame(stream.elems_pdf()),
        "tokens": spark.createDataFrame(stream.tokens_pdf()),
        "elem_topics": spark.createDataFrame(stream.elem_topics_pdf()),
        "refs": spark.createDataFrame(stream.refs_pdf()),
        "topic_words": spark.createDataFrame(stream.topic_words_pdf()),
    }
