"""Tests for the provided TPC-H-lite generators and the DuckDB oracle.

These generators are part of the repo scaffolding; the spatial pipeline
does not consume them, but they must stay correct for other reproductions
and they exercise the oracle plumbing end-to-end.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1).cache()


def test_lineitem_shape(li):
    assert li.count() == 6000
    assert "l_orderkey" in li.columns


def test_orders_keys_dense(orders):
    row = orders.agg(F.min("o_orderkey"), F.max("o_orderkey"), F.count("*")).first()
    assert row[0] == 1 and row[1] == row[2]


def test_oracle_agg_roundtrip(spark, li):
    out = (
        li.groupBy("l_returnflag")
        .agg(
            F.count("*").alias("n"),
            F.round(F.sum("l_quantity"), 2).alias("qty"),
        )
    )
    sql = """
        SELECT l_returnflag, COUNT(*) AS n, ROUND(SUM(l_quantity), 2) AS qty
        FROM li GROUP BY l_returnflag
    """
    assert_equivalent(out, sql, li=li)


def test_oracle_join_roundtrip(spark, li, orders):
    out = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    sql = """
        SELECT o_orderpriority, COUNT(*) AS n
        FROM li JOIN o ON li.l_orderkey = o.o_orderkey
        GROUP BY o_orderpriority
    """
    assert_equivalent(out, sql, li=li, o=orders)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20000, n_keys=1000, alpha=1.2, seed=3)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["count"] > 20000 / 1000 * 5  # far above the uniform share


def test_uniform_keys_cover(spark):
    df = synth_data.uniform_keys(spark, n=5000, n_keys=50, seed=4)
    assert df.select("k").distinct().count() == 50


def test_generators_deterministic(spark):
    a = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
    b = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
    assert a.equals(b)
