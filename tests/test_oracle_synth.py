"""Smoke tests for the provided substrate: synth_data + DuckDB oracle.

These exercise the shipped TPC-H-lite generators and prove the oracle
catches both agreement and disagreement, so its use in the pipeline
tests is trustworthy.
"""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def lineitem(spark):
    return synth_data.lineitem(spark, sf=0.001).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001).cache()


def test_lineitem_aggregate_matches_duckdb(spark, lineitem):
    got = lineitem.groupBy("l_returnflag").agg(
        F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, count(*) AS n, round(sum(l_quantity), 2) AS qty "
        "FROM li GROUP BY l_returnflag",
        li=lineitem,
    )


def test_join_matches_duckdb(spark, lineitem, orders):
    got = (
        lineitem.join(orders, lineitem.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, count(*) AS n FROM li "
        "JOIN o ON li.l_orderkey = o.o_orderkey GROUP BY o_orderpriority",
        li=lineitem,
        o=orders,
    )


def test_oracle_detects_wrong_result(spark, lineitem):
    wrong = lineitem.groupBy("l_returnflag").agg((F.count("*") + 1).alias("n"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*) AS n FROM li GROUP BY l_returnflag",
            li=lineitem,
        )


def test_generators_deterministic(spark):
    a = synth_data.uniform_keys(spark, n=100, n_keys=10).toPandas()
    b = synth_data.uniform_keys(spark, n=100, n_keys=10).toPandas()
    assert (a == b).all().all()


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=2000, n_keys=100).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 3 * counts.iloc[-1]
