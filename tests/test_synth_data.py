"""Provided TPC-H-lite generators: schema, determinism, oracle aggregates."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.002, seed=1).cache()


def test_lineitem_row_count(li):
    assert li.count() == int(6_000_000 * 0.002)


def test_lineitem_value_ranges(li):
    assert li.where((F.col("l_quantity") < 1) | (F.col("l_quantity") > 50)).count() == 0
    assert li.where(F.col("l_discount") > 0.1).count() == 0


def test_orders_keys_are_sequential(orders):
    n = orders.count()
    assert orders.agg(F.min("o_orderkey")).collect()[0][0] == 1
    assert orders.agg(F.max("o_orderkey")).collect()[0][0] == n


def test_generators_deterministic(spark):
    a = synth_data.part(spark, sf=0.002, seed=5).toPandas()
    b = synth_data.part(spark, sf=0.002, seed=5).toPandas()
    assert a.equals(b)


def test_lineitem_orders_join_against_oracle(spark, li, orders):
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"), F.round(F.sum("l_quantity"), 4).alias("qty"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, COUNT(*) AS n, ROUND(SUM(l_quantity), 4) AS qty
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )


def test_pricing_aggregate_against_oracle(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.round(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))), 2).alias("rev")
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, ROUND(SUM(l_extendedprice * (1 - l_discount)), 2) AS rev
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20_000, n_keys=500, alpha=1.2, seed=3)
    top = df.groupBy("k").count().orderBy(F.desc("count")).limit(10)
    share = sum(r["count"] for r in top.collect()) / 20_000
    assert share > 0.3


def test_uniform_keys_are_flat(spark):
    df = synth_data.uniform_keys(spark, n=20_000, n_keys=500, seed=4)
    top = df.groupBy("k").count().orderBy(F.desc("count")).limit(10)
    share = sum(r["count"] for r in top.collect()) / 20_000
    assert share < 0.1
