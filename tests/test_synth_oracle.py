"""Oracle smoke tests over the provided TPC-H-lite generators.

GIANT's pipeline runs on the click-log world, but these checks keep the
shared harness honest: the DuckDB oracle and the shuffle-path Spark
config are exercised on classic OLAP aggregations too.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.002


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF).cache()


def test_oracle_groupby_aggregation(spark, li):
    out = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"),
        F.count("*").alias("n"),
    )
    assert_equivalent(
        out,
        """
        SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS n
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_oracle_join_path(spark, li, orders):
    out = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        out,
        """
        SELECT o_orderpriority, COUNT(*) AS n
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).groupBy("k").count()
    top = df.orderBy(F.desc("count")).first()["count"]
    assert top > 5000 / 100 * 3  # head key far above uniform share
