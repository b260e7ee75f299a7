"""Transport-probability tests, DuckDB-oracle-checked (Eq. 1-2)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.clickgraph import degree_stats, transport_probabilities
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tiny_clicks(spark):
    pdf = pd.DataFrame(
        {
            "qid": [1, 1, 2, 2, 3],
            "doc_id": [10, 11, 10, 12, 12],
            "count": [3, 1, 2, 2, 5],
        }
    )
    return spark.createDataFrame(pdf), pdf


def test_p_d_given_q_sums_to_one(tiny_clicks):
    df, _ = tiny_clicks
    sums = (
        transport_probabilities(df)
        .groupBy("qid")
        .agg(F.sum("p_d_given_q").alias("s"))
        .collect()
    )
    for r in sums:
        assert abs(r.s - 1.0) < 1e-12


def test_p_q_given_d_sums_to_one(tiny_clicks):
    df, _ = tiny_clicks
    sums = (
        transport_probabilities(df)
        .groupBy("doc_id")
        .agg(F.sum("p_q_given_d").alias("s"))
        .collect()
    )
    for r in sums:
        assert abs(r.s - 1.0) < 1e-12


def test_specific_values(tiny_clicks):
    df, _ = tiny_clicks
    rows = {(r.qid, r.doc_id): r for r in transport_probabilities(df).collect()}
    assert abs(rows[(1, 10)].p_d_given_q - 0.75) < 1e-12
    assert abs(rows[(1, 10)].p_q_given_d - 0.6) < 1e-12
    assert abs(rows[(3, 12)].p_q_given_d - 5 / 7) < 1e-12


def test_oracle_transport(tiny_clicks):
    df, pdf = tiny_clicks
    sql = """
        SELECT qid, doc_id, count,
               count * 1.0 / SUM(count) OVER (PARTITION BY qid)    AS p_d_given_q,
               count * 1.0 / SUM(count) OVER (PARTITION BY doc_id) AS p_q_given_d
        FROM clicks
    """
    assert_equivalent(transport_probabilities(df), sql, clicks=pdf)


def test_oracle_transport_world(world_frames, tiny_world):
    sql = """
        SELECT qid, doc_id, count,
               count * 1.0 / SUM(count) OVER (PARTITION BY qid)    AS p_d_given_q,
               count * 1.0 / SUM(count) OVER (PARTITION BY doc_id) AS p_q_given_d
        FROM clicks
    """
    assert_equivalent(
        transport_probabilities(world_frames["clicks"]),
        sql,
        clicks=tiny_world.clicks,
    )


def test_oracle_degree_stats(tiny_clicks):
    df, pdf = tiny_clicks
    sql = """
        SELECT qid, COUNT(doc_id) AS degree, SUM(count) AS clicks
        FROM clicks GROUP BY qid
    """
    assert_equivalent(degree_stats(df), sql, clicks=pdf)
