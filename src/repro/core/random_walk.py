"""Distributed random walk over the click graph -> query-doc clusters.

Paper §3.1 / Algorithm 1 steps 1-4: from each seed query q, random-walk
the bipartite graph by the transport probabilities and keep visited
queries/documents whose visiting probability clears δ_v; member queries
must be majority-content (more than half of their tokens non-stop).

We run the walk for *all* seed queries simultaneously as deterministic
power iteration — two hops out and back:

    p1(s, d)  = P(d|s)                      (seed -> doc)
    p2(s, q)  = Σ_d p1(s,d) · P(q|d)        (doc -> query)
    p3(s, d') = Σ_q p2(s,q) · P(d'|q)       (query -> doc)

    doc score   = ½·p1 + ½·p3
    query score = ½·1[q = s] + ½·p2

which is the expected visiting distribution of a 3-step walk averaged
over time, expressed entirely as DataFrame joins/aggregations (so the
DuckDB oracle can check it).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.clickgraph import transport_probabilities
from repro.nlp.tokenize import tokenize, is_stop


@F.pandas_udf(T.BooleanType())
def _majority_content(text: pd.Series) -> pd.Series:
    """True when more than half of the query's tokens are non-stop."""
    def ok(s: str) -> bool:
        toks = tokenize(s)
        if not toks:
            return False
        return sum(0 if is_stop(t) else 1 for t in toks) * 2 > len(toks)

    return text.map(ok)


def walk_scores(clicks: DataFrame) -> tuple[DataFrame, DataFrame]:
    """(doc_scores, query_scores) of the 3-step walk for every seed.

    doc_scores:   seed_qid, doc_id, score
    query_scores: seed_qid, qid, score
    """
    t = transport_probabilities(clicks).cache()
    p1 = t.select(
        F.col("qid").alias("seed_qid"),
        "doc_id",
        F.col("p_d_given_q").alias("p"),
    )
    back = t.select("doc_id", F.col("qid").alias("qid2"), "p_q_given_d")
    p2 = (
        p1.join(back, "doc_id")
        .groupBy("seed_qid", F.col("qid2").alias("qid"))
        .agg(F.sum(F.col("p") * F.col("p_q_given_d")).alias("p"))
    )
    fwd = t.select(F.col("qid").alias("qid"), F.col("doc_id").alias("doc_id2"), "p_d_given_q")
    p3 = (
        p2.join(fwd, "qid")
        .groupBy("seed_qid", F.col("doc_id2").alias("doc_id"))
        .agg(F.sum(F.col("p") * F.col("p_d_given_q")).alias("p"))
    )
    doc_scores = (
        p1.select("seed_qid", "doc_id", (F.col("p") * 0.5).alias("s"))
        .unionByName(p3.select("seed_qid", "doc_id", (F.col("p") * 0.5).alias("s")))
        .groupBy("seed_qid", "doc_id")
        .agg(F.sum("s").alias("score"))
    )
    self_hit = (
        clicks.select("qid").distinct()
        .select(F.col("qid").alias("seed_qid"), F.col("qid"), F.lit(0.5).alias("s"))
    )
    query_scores = (
        p2.select("seed_qid", "qid", (F.col("p") * 0.5).alias("s"))
        .unionByName(self_hit)
        .groupBy("seed_qid", "qid")
        .agg(F.sum("s").alias("score"))
    )
    return doc_scores, query_scores


def query_doc_clusters(
    clicks: DataFrame,
    queries: DataFrame,
    docs: DataFrame,
    *,
    delta_v: float = 0.05,
    max_queries: int = 5,
    max_docs: int = 6,
) -> DataFrame:
    """One row per seed query: ranked member queries and doc titles.

    Output columns: ``seed_qid``, ``queries`` (array<string>, weight-desc,
    seed first on ties), ``titles`` (array<string>, weight-desc). Members
    below ``delta_v`` are dropped; member queries must be majority-content;
    both lists are capped for downstream QTIG size.
    """
    doc_scores, query_scores = walk_scores(clicks)
    q_members = (
        query_scores.where(F.col("score") >= delta_v)
        .join(queries.select("qid", "text"), "qid")
        .where(_majority_content(F.col("text")))
        .withColumn(
            "rank",
            F.row_number().over(
                # Seed query first (it carries score >= 0.5), then weight.
                Window.partitionBy("seed_qid").orderBy(
                    F.desc("score"), F.asc("qid")
                )
            ),
        )
        .where(F.col("rank") <= max_queries)
        .groupBy("seed_qid")
        .agg(F.array_sort(F.collect_list(F.struct("rank", "text"))).alias("qs"))
        .select("seed_qid", F.col("qs.text").alias("queries"))
    )
    d_members = (
        doc_scores.where(F.col("score") >= delta_v)
        .join(docs.select("doc_id", "title"), "doc_id")
        .withColumn(
            "rank",
            F.row_number().over(
                Window.partitionBy("seed_qid").orderBy(
                    F.desc("score"), F.asc("doc_id")
                )
            ),
        )
        .where(F.col("rank") <= max_docs)
        .groupBy("seed_qid")
        .agg(F.array_sort(F.collect_list(F.struct("rank", "title"))).alias("ds"))
        .select("seed_qid", F.col("ds.title").alias("titles"))
    )
    return q_members.join(d_members, "seed_qid", "inner")
