"""Smoke tests for the DuckDB oracle harness itself."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.oracle import assert_equivalent


def test_oracle_accepts_matching_aggregation(spark):
    li = sd.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(
        F.count(F.lit(1)).alias("cnt"), F.sum("l_quantity").alias("qty")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, count(*) AS cnt, sum(l_quantity) AS qty "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_oracle_accepts_join(spark):
    li = sd.lineitem(spark, sf=0.001)
    o = sd.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, count(*) AS cnt FROM lineitem "
        "JOIN orders ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        lineitem=li,
        orders=o,
    )


def test_oracle_rejects_wrong_result(spark):
    li = sd.lineitem(spark, sf=0.001)
    wrong = li.groupBy("l_returnflag").agg((F.count(F.lit(1)) + 1).alias("cnt"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_oracle_rejects_column_mismatch(spark):
    li = sd.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(F.count(F.lit(1)).alias("oops"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_oracle_accepts_pandas_tables(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    got = spark.createDataFrame(pdf).groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)
