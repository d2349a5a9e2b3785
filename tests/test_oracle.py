"""The DuckDB oracle itself + the provided TPC-H-lite scaffolding.

Keeps the shipped OLAP scaffolding exercised and demonstrates the oracle
catching a wrong result (so graph tests relying on it are trustworthy).
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.oracle import assert_equivalent


def test_oracle_accepts_correct_aggregate(spark):
    li = sd.lineitem(spark, sf=0.002)
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("n"), F.round(F.sum("l_quantity"), 3).alias("qty")
    )
    assert_equivalent(
        got,
        """SELECT l_returnflag, count(*) AS n, round(sum(l_quantity), 3) AS qty
           FROM li GROUP BY l_returnflag""",
        li=li,
    )


def test_oracle_catches_wrong_result(spark):
    li = sd.lineitem(spark, sf=0.002)
    wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("n"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_catches_column_mismatch(spark):
    li = sd.lineitem(spark, sf=0.002)
    got = li.groupBy("l_returnflag").agg(F.count("*").alias("wrong_name"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_join_query(spark):
    li = sd.lineitem(spark, sf=0.002)
    o = sd.orders(spark, sf=0.002)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """SELECT o_orderpriority, count(*) AS n
           FROM li JOIN o ON l_orderkey = o_orderkey
           GROUP BY o_orderpriority""",
        li=li,
        o=o,
    )
