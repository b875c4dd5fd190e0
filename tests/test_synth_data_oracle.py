"""Smoke tests for the provided TPC-H-lite generators + the DuckDB oracle.

These exercise the session fixture's shuffle path (broadcast joins are
disabled) on schemas the oracle was designed for, guarding the harness the
rest of the suite relies on.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.003).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.003).cache()


def test_lineitem_aggregate_matches_duckdb(spark, li):
    q = (
        li.groupBy("l_returnflag")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count(F.lit(1)).alias("cnt"),
        )
    )
    assert_equivalent(
        q,
        """
        SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS cnt
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_join_path_matches_duckdb(spark, li, orders):
    q = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.round(F.sum("l_extendedprice"), 2).alias("rev"))
    )
    assert_equivalent(
        q,
        """
        SELECT o_orderpriority, ROUND(SUM(l_extendedprice), 2) AS rev
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20_000, n_keys=1000).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 5 * counts.median()


def test_generators_deterministic(spark):
    a = synth_data.customer(spark, sf=0.002).toPandas()
    b = synth_data.customer(spark, sf=0.002).toPandas()
    assert a.equals(b)
