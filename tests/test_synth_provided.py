"""Sanity tests for the provided TPC-H-lite generators + oracle wiring."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.002).cache()


def test_lineitem_shape(li):
    assert li.count() == 12000
    assert "l_orderkey" in li.columns


def test_orders_unique_keys(orders):
    n = orders.count()
    assert orders.select("o_orderkey").distinct().count() == n


def test_deterministic_in_seed(spark):
    a = synth_data.customer(spark, sf=0.002, seed=9).toPandas()
    b = synth_data.customer(spark, sf=0.002, seed=9).toPandas()
    assert a.equals(b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    top = df["k"].value_counts().iloc[0]
    assert top > 5000 / 100 * 3  # head key far above uniform share


def test_oracle_join_aggregate(spark, li, orders):
    """A shuffle join + aggregate checked against DuckDB end to end."""
    out = (
        li.join(orders, li["l_orderkey"] == orders["o_orderkey"])
        .groupBy("o_orderpriority")
        .agg(
            F.count("*").alias("cnt"),
            F.round(F.sum("l_extendedprice"), 2).alias("revenue"),
        )
    )
    assert_equivalent(
        out,
        """
        SELECT o_orderpriority, count(*) AS cnt,
               round(sum(l_extendedprice), 2) AS revenue
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )
