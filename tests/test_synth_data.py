"""Sanity + oracle tests for the provided TPC-H-lite generators
(repro.synth_data), which remain available for OLAP-style checks."""
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


def test_lineitem_row_count(li):
    assert li.count() == 6000


def test_lineitem_deterministic(spark, li):
    again = synth_data.lineitem(spark, sf=0.001, seed=0)
    assert li.agg(F.sum("l_extendedprice")).collect()[0][0] == pytest.approx(
        again.agg(F.sum("l_extendedprice")).collect()[0][0]
    )


def test_q1_style_aggregate_oracle(spark, li):
    got = (
        li.groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("cnt"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, l_linestatus,
               SUM(l_quantity) AS sum_qty, COUNT(*) AS cnt
        FROM lineitem GROUP BY 1, 2
        """,
        lineitem=li,
    )


def test_join_oracle(spark, li, orders):
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, COUNT(*) AS cnt
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY 1
        """,
        lineitem=li,
        orders=orders,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=0)
    top = df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]
    assert top["count"] > 5000 / 100 * 3  # far above uniform share


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=1000, n_keys=10, seed=0)
    ks = {r.k for r in df.select("k").distinct().collect()}
    assert ks <= set(range(1, 11))
