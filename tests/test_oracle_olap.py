"""Keep the provided OLAP scaffolding exercised end-to-end.

The road-network reproduction mostly needs graph oracles, but the repo
policy is that every relational result is DuckDB-checked — these tests
run the provided TPC-H-lite generators through Spark SQL aggregations
and the oracle, proving the scaffolding (Arrow path, shuffle path at
disabled-broadcast settings, oracle canonicalization) stays healthy.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tables(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0).cache()
    o = synth_data.orders(spark, sf=0.001, seed=1).cache()
    return li, o


def test_filter_aggregate(spark, tables):
    li, _ = tables
    got = (
        li.where(F.col("l_quantity") > 25)
        .groupBy("l_returnflag")
        .agg(
            F.count(F.lit(1)).alias("n"),
            F.round(F.sum("l_extendedprice"), 2).alias("revenue"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, count(*) AS n,
               round(sum(l_extendedprice), 2) AS revenue
        FROM lineitem WHERE l_quantity > 25 GROUP BY l_returnflag
        """,
        lineitem=li,
    )


def test_shuffle_join(spark, tables):
    li, o = tables
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("n"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, count(*) AS n
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        lineitem=li,
        orders=o,
    )


def test_key_generators(spark):
    z = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=3)
    got = z.groupBy("k").agg(F.count(F.lit(1)).alias("n"))
    assert_equivalent(
        got,
        "SELECT k, count(*) AS n FROM z GROUP BY k",
        z=z,
    )
    # zipf should be skewed: top key much more frequent than median
    counts = sorted((r["n"] for r in got.collect()), reverse=True)
    assert counts[0] > 5 * counts[len(counts) // 2]
