"""Tests for the provided TPC-H-lite generators and the DuckDB oracle."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001).cache()


def test_lineitem_rowcount(li):
    assert li.count() == 6000


def test_orders_keys_unique(orders):
    assert orders.select("o_orderkey").distinct().count() == orders.count()


def test_deterministic_in_seed(spark):
    a = synth_data.lineitem(spark, sf=0.0005, seed=1).toPandas()
    b = synth_data.lineitem(spark, sf=0.0005, seed=1).toPandas()
    assert (a["l_extendedprice"] == b["l_extendedprice"]).all()


def test_q1_style_aggregation_oracle(spark, li):
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("cnt"),
        )
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS cnt "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_join_aggregation_oracle(spark, li, orders):
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, COUNT(*) AS cnt FROM lineitem, orders "
        "WHERE l_orderkey = o_orderkey GROUP BY o_orderpriority",
        lineitem=li,
        orders=orders,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 5 * counts.iloc[-1]


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    assert df["k"].between(1, 50).all()
