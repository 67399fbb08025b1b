"""Provided OLAP scaffolding stays green: TPC-H-lite generators +
DuckDB oracle on representative Spark SQL shapes (the same oracle
machinery backs the graph-substrate tests)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.001  # tiny: these tests validate plumbing, not scale


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF).cache()


def test_filter_aggregate(spark, li):
    got = (
        li.where(F.col("l_quantity") > 25)
        .groupBy("l_returnflag")
        .agg(F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty"))
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, COUNT(*) AS n, ROUND(SUM(l_quantity), 2) AS qty
        FROM li WHERE l_quantity > 25 GROUP BY l_returnflag
        """,
        li=li,
    )


def test_join_shuffle_path(spark, li, orders):
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, COUNT(*) AS n
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["k"] == 1  # rank-1 key dominates under zipf


def test_generators_deterministic(spark):
    a = synth_data.customer(spark, sf=SF, seed=2).toPandas()
    b = synth_data.customer(spark, sf=SF, seed=2).toPandas()
    assert a.equals(b)
