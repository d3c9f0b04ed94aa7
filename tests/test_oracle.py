"""The DuckDB oracle itself + provided TPC-H-lite generators (smoke)."""
from __future__ import annotations

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.synth_data import lineitem, orders


def test_oracle_accepts_matching_aggregate(spark):
    li = lineitem(spark, sf=0.001, seed=0)
    got = li.groupBy("l_returnflag").agg(
        F.count(F.lit(1)).alias("cnt"),
        F.round(F.sum("l_quantity"), 2).alias("qty"),
    )
    assert_equivalent(
        got,
        """SELECT l_returnflag, count(*) AS cnt, round(sum(l_quantity), 2) AS qty
           FROM li GROUP BY l_returnflag""",
        li=li,
    )


def test_oracle_accepts_join(spark):
    li = lineitem(spark, sf=0.001, seed=0)
    o = orders(spark, sf=0.001, seed=1)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        """SELECT o_orderpriority, count(*) AS cnt
           FROM li JOIN o ON l_orderkey = o_orderkey
           GROUP BY o_orderpriority""",
        li=li,
        o=o,
    )


def test_oracle_rejects_wrong_result(spark):
    li = lineitem(spark, sf=0.001, seed=0)
    wrong = li.groupBy("l_returnflag").agg(
        (F.count(F.lit(1)) + 1).alias("cnt")  # off by one
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_rejects_column_mismatch(spark):
    li = lineitem(spark, sf=0.001, seed=0)
    got = li.groupBy("l_returnflag").agg(F.count(F.lit(1)).alias("n"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_accepts_pandas_tables(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [10.0, 20.0, 30.0]})
    got = spark.createDataFrame(pdf).groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)
