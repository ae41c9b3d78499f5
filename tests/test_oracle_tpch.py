"""Smoke tests keeping the provided TPC-H-lite generators + oracle exercised
(the repo's shared correctness harness, per the workspace contract)."""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002)


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.002)


def test_lineitem_agg_oracle(spark, li):
    out = (
        li.groupBy("l_returnflag")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("cnt"),
        )
    )
    sql = """
    SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS cnt
    FROM li GROUP BY l_returnflag
    """
    assert_equivalent(out, sql, li=li)


def test_join_oracle(spark, li, orders):
    out = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    sql = """
    SELECT o_orderpriority, COUNT(*) AS cnt
    FROM li JOIN orders ON l_orderkey = o_orderkey
    GROUP BY o_orderpriority
    """
    assert_equivalent(out, sql, li=li, orders=orders)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 5 * counts.iloc[-1]  # heavy head


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    assert df["k"].between(1, 50).all()
