"""Smoke coverage of the provided substrate: TPC-H-lite generators and the
DuckDB oracle over shuffle aggregation and join paths (broadcast disabled by
the session fixture, so these exercise real shuffles)."""
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


def test_lineitem_aggregation(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("qty"),
        F.count("*").alias("cnt"),
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, sum(l_quantity) AS qty, count(*) AS cnt "
        "FROM li GROUP BY 1",
        li=li,
    )


def test_lineitem_orders_join(spark, li, orders):
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, count(*) AS cnt FROM li "
        "JOIN o ON l_orderkey = o_orderkey GROUP BY 1",
        li=li,
        o=orders,
    )


def test_zipf_keys_skew(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=3)
    counts = df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()
    assert counts[0]["count"] > 5000 / 100  # head key well above uniform share
