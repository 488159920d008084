"""Smoke tests for the provided oracle + TPC-H-lite generators.

The paper is a graph paper, but the repo ships a relational oracle and
TPC-H-lite generators; these tests keep both exercised so the oracle's
behaviour (column matching, sorted-row diffing) is known-good where the
graph tests rely on it.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_aggregate_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("cnt"),
        F.round(F.sum("l_quantity"), 2).alias("qty"),
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, COUNT(*) AS cnt,
               ROUND(SUM(l_quantity), 2) AS qty
        FROM lineitem GROUP BY 1
        """,
        lineitem=li,
    )


def test_join_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li["l_orderkey"] == o["o_orderkey"])
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
        orders=o,
    )


def test_oracle_detects_wrong_result(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("cnt"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY 1",
            lineitem=li,
        )


def test_oracle_detects_column_mismatch(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(F.count("*").alias("wrong_name"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY 1",
            lineitem=li,
        )
