"""Smoke tests for the provided harness contract: TPC-H-lite generators
+ the DuckDB oracle, exercising Spark SQL over the shuffle path."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tables(spark):
    li = synth_data.lineitem(spark, sf=0.001).cache()
    o = synth_data.orders(spark, sf=0.001).cache()
    li.count(), o.count()
    return li, o


def test_aggregate_matches_duckdb(spark, tables):
    li, _ = tables
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count(F.lit(1)).alias("cnt"),
        )
        .select("l_returnflag", "sum_qty", "cnt")
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS cnt
        FROM lineitem GROUP BY l_returnflag
        """,
        lineitem=li,
    )


def test_join_matches_duckdb(spark, tables):
    li, o = tables
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.round(F.sum("l_extendedprice"), 2).alias("rev"))
        .select("o_orderpriority", "rev")
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, round(sum(l_extendedprice), 2) AS rev
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        lineitem=li,
        orders=o,
    )


def test_generators_deterministic(spark):
    a = synth_data.part(spark, sf=0.001).toPandas()
    b = synth_data.part(spark, sf=0.001).toPandas()
    assert a.equals(b)
