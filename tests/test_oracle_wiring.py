"""Sanity checks that the DuckDB oracle wiring catches real issues,
using the provided TPC-H-lite generators."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_groupby_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = (
        li.groupBy("l_returnflag")
        .agg(F.sum("l_quantity").alias("qty"), F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS qty, COUNT(*) AS n "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_join_aggregate_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, COUNT(*) AS n FROM lineitem l "
        "JOIN orders o ON l.l_orderkey = o.o_orderkey GROUP BY o_orderpriority",
        lineitem=li,
        orders=o,
    )


def test_oracle_detects_wrong_result(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    wrong = li.groupBy("l_returnflag").agg(
        (F.sum("l_quantity") + 1).alias("qty")
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, SUM(l_quantity) AS qty FROM lineitem "
            "GROUP BY l_returnflag",
            lineitem=li,
        )
