"""Bipartite search click graph and transport probabilities (Eq. 1-2).

``clicks`` is the edge list of the bipartite graph G_sc = (Q, D, E)
with a ``count`` column = c(q_i, d_j). Transport probabilities are
plain windowed normalizations, i.e. Catalyst-friendly DataFrame ETL —
and therefore DuckDB-oracle-checkable.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def transport_probabilities(clicks: DataFrame) -> DataFrame:
    """Add P(d|q) and P(q|d) columns to the click edge list.

    Eq. (1): P(d_j|q_i) = c(q_i,d_j) / sum_k c(q_i,d_k)
    Eq. (2): P(q_i|d_j) = c(q_i,d_j) / sum_k c(q_k,d_j)
    """
    w_q = Window.partitionBy("qid")
    w_d = Window.partitionBy("doc_id")
    return clicks.select(
        "qid",
        "doc_id",
        "count",
        (F.col("count") / F.sum("count").over(w_q)).alias("p_d_given_q"),
        (F.col("count") / F.sum("count").over(w_d)).alias("p_q_given_d"),
    )


def degree_stats(clicks: DataFrame) -> DataFrame:
    """Per-query degree and click mass (diagnostics / tests)."""
    return clicks.groupBy("qid").agg(
        F.count("doc_id").alias("degree"),
        F.sum("count").alias("clicks"),
    )
