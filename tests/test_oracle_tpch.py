"""Provided TPC-H-lite generators + DuckDB oracle smoke checks.

The paper's evaluation is graph-analytic, but the repo ships an OLAP oracle
harness; these tests keep that harness exercised (and prove the oracle wiring
catches result mismatches end to end)."""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.synth_data import lineitem, orders


def test_lineitem_aggregate_matches_duckdb(spark):
    li = lineitem(spark, sf=0.002, seed=0)
    q = li.groupBy("l_returnflag").agg(
        F.count("*").alias("n"), F.round(F.sum("l_quantity"), 4).alias("qty")
    )
    assert_equivalent(
        q,
        "SELECT l_returnflag, count(*)::BIGINT AS n, round(sum(l_quantity), 4) AS qty "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_join_matches_duckdb(spark):
    li = lineitem(spark, sf=0.002, seed=0)
    o = orders(spark, sf=0.002, seed=1)
    q = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        q,
        "SELECT o_orderpriority, count(*)::BIGINT AS n FROM li "
        "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        li=li,
        o=o,
    )


def test_oracle_detects_mismatch(spark):
    li = lineitem(spark, sf=0.002, seed=0)
    wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("n"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*)::BIGINT AS n FROM li GROUP BY l_returnflag",
            li=li,
        )
