"""Oracle checks over the provided TPC-H-lite generators.

Exercises the DuckDB result-equality harness on genuine shuffle-path
Spark SQL (broadcast joins are disabled session-wide by conftest).
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.01


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF).cache()


def test_q1_style_aggregate(spark, li):
    out = (
        li.groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.round(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))), 2).alias("revenue"),
            F.count("*").alias("n"),
        )
    )
    assert_equivalent(
        out,
        """
        SELECT l_returnflag, l_linestatus,
               sum(l_quantity) AS sum_qty,
               round(sum(l_extendedprice * (1 - l_discount)), 2) AS revenue,
               count(*) AS n
        FROM li GROUP BY 1, 2
        """,
        li=li,
    )


def test_join_aggregate_shuffle_path(spark, li, orders):
    out = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty"))
    )
    assert_equivalent(
        out,
        """
        SELECT o_orderpriority, count(*) AS n, round(sum(l_quantity), 2) AS qty
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY 1
        """,
        li=li,
        orders=orders,
    )


def test_windowed_stream_style_aggregate(spark, li):
    """Tumbling windows over a synthetic event-time column — the same
    window-assignment idiom the fingerprint layer uses."""
    with_win = li.withColumn(
        "win", F.floor(F.dayofyear("l_shipdate") / F.lit(30)).cast("long")
    )
    out = with_win.groupBy("win").agg(
        F.round(F.avg("l_extendedprice"), 4).alias("avg_price"),
        F.count("*").alias("n"),
    )
    assert_equivalent(
        out,
        """
        SELECT CAST(floor(dayofyear(l_shipdate) / 30) AS BIGINT) AS win,
               round(avg(l_extendedprice), 4) AS avg_price,
               count(*) AS n
        FROM li GROUP BY 1
        """,
        li=li,
    )
