"""Scaffold smoke tests: the provided TPC-H-lite generators + DuckDB
oracle, exercising Spark SQL aggregation/join paths end to end."""
import pyspark.sql.functions as F
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tables(spark):
    li = synth_data.lineitem(spark, sf=0.005)
    o = synth_data.orders(spark, sf=0.005)
    c = synth_data.customer(spark, sf=0.005)
    return li, o, c


def test_q1_style_aggregate(spark, tables):
    li, _, _ = tables
    got = (
        li.groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias("sum_disc_price"),
            F.count(F.lit(1)).alias("cnt"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, l_linestatus,
               SUM(l_quantity) AS sum_qty,
               SUM(l_extendedprice * (1 - l_discount)) AS sum_disc_price,
               COUNT(*) AS cnt
        FROM lineitem GROUP BY 1, 2
        """,
        lineitem=li,
    )


def test_join_aggregate(spark, tables):
    _, o, c = tables
    got = (
        o.join(c, o.o_custkey == c.c_custkey)
        .groupBy("c_mktsegment")
        .agg(F.sum("o_totalprice").alias("total"), F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        """
        SELECT c_mktsegment, SUM(o_totalprice) AS total, COUNT(*) AS cnt
        FROM orders JOIN customer ON o_custkey = c_custkey
        GROUP BY 1
        """,
        orders=o,
        customer=c,
    )


def test_filtered_join(spark, tables):
    li, o, _ = tables
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .filter(F.col("o_orderstatus") == "F")
        .groupBy("o_orderpriority")
        .agg(F.avg("l_discount").alias("avg_disc"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, AVG(l_discount) AS avg_disc
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        WHERE o_orderstatus = 'F' GROUP BY 1
        """,
        lineitem=li,
        orders=o,
    )
