"""Smoke tests for the provided substrate: synth_data + DuckDB oracle.

The paper's data are graphs, but the provided TPC-H-lite generators and
oracle are part of the workspace contract — keep them exercised so the
oracle path (used heavily by the Spark-side graph tests) is known-good.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


def test_lineitem_rowcount(spark, li):
    assert li.count() == 6000


def test_simple_aggregation_matches_duckdb(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("cnt"), F.round(F.sum("l_quantity"), 2).alias("qty")
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, COUNT(*) AS cnt, ROUND(SUM(l_quantity), 2) AS qty
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_join_matches_duckdb(spark, li):
    orders = synth_data.orders(spark, sf=0.001, seed=1)
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, COUNT(*) AS cnt
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )


def test_oracle_catches_wrong_result(spark, li):
    wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("cnt"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )
