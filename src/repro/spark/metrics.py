"""Table-6 effectiveness metrics as Catalyst pipelines (Section 5.2).

Quantitative metrics over the result sets of the compared methods at one
window snapshot:

* **coverage** — Σ_{e∈A_t\\S} max_{e'∈S} rel(e,x)·sim(e,e'), with
  rel = cosine(topic vector, query vector) and sim = TF-IDF cosine of
  the two documents (the paper's [3, 20] document-coverage metric),
  normalised by Σ_{e∈A_t\\S} rel(e,x) so scores are comparable across
  queries.
* **influence** — number of in-window elements referring to at least one
  member of S, divided by the same count for the k individually most
  referred-to active elements (the paper's "top-k influential" scaling).

Inputs are long tables; ``results(qid, method, eid)`` carries every
method's result set for every query of the snapshot.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

__all__ = ["coverage_scores_df", "influence_metric_df", "tfidf_weights_df"]


def tfidf_weights_df(tokens: DataFrame, active: DataFrame) -> DataFrame:
    """L2-normalised log-TF-IDF weights per (eid, word) over A_t.

    idf = ln(n / (1 + df)) + 1 with df counted over active elements —
    the same log-normalised scheme the TF-IDF baseline uses.
    """
    act_tokens = tokens.join(active, "eid")
    n = act_tokens.select("eid").distinct().count()
    df_ = act_tokens.groupBy("word").agg(F.countDistinct("eid").alias("df"))
    wt = (
        act_tokens.join(df_, "word")
        .select(
            "eid",
            "word",
            (
                (1.0 + F.log(F.col("freq")))
                * (F.log(F.lit(float(n)) / (1.0 + F.col("df"))) + 1.0)
            ).alias("w"),
        )
    )
    norm = wt.groupBy("eid").agg(F.sqrt(F.sum(F.col("w") * F.col("w"))).alias("nrm"))
    return wt.join(norm, "eid").select(
        "eid", "word", (F.col("w") / F.col("nrm")).alias("w")
    )


def coverage_scores_df(
    elem_topics: DataFrame,
    tokens: DataFrame,
    active: DataFrame,
    queries: DataFrame,
    results: DataFrame,
) -> DataFrame:
    """Normalised topical coverage per (qid, method).

    ``queries(qid, topic, x)`` is the long form of the query vectors;
    ``active(eid)`` the snapshot's A_t.
    """
    et = elem_topics.join(active, "eid")
    e_norm = et.groupBy("eid").agg(
        F.sqrt(F.sum(F.col("p_e") * F.col("p_e"))).alias("e_norm")
    )
    q_norm = queries.groupBy("qid").agg(
        F.sqrt(F.sum(F.col("x") * F.col("x"))).alias("q_norm")
    )
    # rel(e, x): topic-space cosine per (qid, eid) over active elements
    rel = (
        et.join(queries, "topic")
        .groupBy("qid", "eid")
        .agg(F.sum(F.col("p_e") * F.col("x")).alias("dot"))
        .join(e_norm, "eid")
        .join(q_norm, "qid")
        .select("qid", "eid", (F.col("dot") / (F.col("e_norm") * F.col("q_norm"))).alias("rel"))
    )
    # sim(e, e'): TF-IDF cosine between active e and selected e'
    w = tfidf_weights_df(tokens, active)
    sel_w = results.join(
        w.withColumnRenamed("eid", "sel").withColumnRenamed("w", "w_sel"),
        results.eid == F.col("sel"),
    ).select("qid", "method", "sel", "word", "w_sel")
    sim = (
        w.alias("a")
        .join(sel_w.alias("s"), "word")
        .groupBy("qid", "method", F.col("a.eid").alias("eid"), "sel")
        .agg(F.sum(F.col("w") * F.col("w_sel")).alias("sim"))
    )
    # numerator: best rel·sim per non-selected active element
    contrib = (
        sim.join(rel, ["qid", "eid"])
        .join(
            results.select("qid", "method", "eid").withColumn("is_sel", F.lit(1)),
            ["qid", "method", "eid"],
            "left",
        )
        .where(F.col("is_sel").isNull())  # e ∈ A_t \ S
        .groupBy("qid", "method", "eid")
        .agg(F.max(F.col("rel") * F.col("sim")).alias("best"))
    )
    num = contrib.groupBy("qid", "method").agg(F.sum("best").alias("num"))
    # denominator: Σ_{e ∈ A_t\S} rel(e,x) — includes elements with zero
    # similarity to every selected element, so narrow result sets are not
    # flattered by a shrunken denominator
    total_rel = rel.groupBy("qid").agg(F.sum("rel").alias("total"))
    sel_rel = (
        results.join(rel, ["qid", "eid"])
        .groupBy("qid", "method")
        .agg(F.sum("rel").alias("selrel"))
    )
    base = results.select("qid", "method").distinct()
    den = (
        base.join(total_rel, "qid")
        .join(sel_rel, ["qid", "method"], "left")
        .fillna(0.0, subset=["selrel"])
        .select("qid", "method", (F.col("total") - F.col("selrel")).alias("den"))
    )
    return (
        den.join(num, ["qid", "method"], "left")
        .fillna(0.0, subset=["num"])
        .select("qid", "method", (F.col("num") / F.col("den")).alias("coverage"))
    )


def influence_metric_df(
    elems: DataFrame,
    refs: DataFrame,
    active: DataFrame,
    results: DataFrame,
    t: int,
    T: int,
    k: int,
) -> DataFrame:
    """Scaled influence per (qid, method): |referrers(S)| / |referrers(top-k)|.

    Referrers are in-window children; top-k is the k active elements
    with the most distinct in-window referrers, the paper's scaling
    denominator.
    """
    w_refs = refs.join(
        elems.where((F.col("ts") >= t - T + 1) & (F.col("ts") <= t))
        .select(F.col("eid").alias("child")),
        "child",
    )
    # denominator: top-k individually most-referred active elements
    counts = (
        w_refs.join(active.withColumnRenamed("eid", "parent"), "parent")
        .groupBy("parent")
        .agg(F.countDistinct("child").alias("c"))
        .orderBy(F.col("c").desc(), F.col("parent"))
        .limit(k)
    )
    denom = (
        w_refs.join(counts.select("parent"), "parent")
        .select("child")
        .distinct()
        .count()
    )
    denom = max(denom, 1)
    got = (
        results.join(w_refs.withColumnRenamed("parent", "eid"), "eid")
        .groupBy("qid", "method")
        .agg(F.countDistinct("child").alias("n_ref"))
        .select("qid", "method", (F.col("n_ref") / F.lit(float(denom))).alias("influence"))
    )
    # methods whose result set attracts no referrers score 0, not NULL
    base = results.select("qid", "method").distinct()
    return base.join(got, ["qid", "method"], "left").fillna(0.0, subset=["influence"])
