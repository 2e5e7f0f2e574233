"""Tests for the DuckDB oracle itself (it must catch wrong results)."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_accepts_matching_result(spark):
    t = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    df = spark.createDataFrame(t).groupBy("k").sum("v").withColumnRenamed("sum(v)", "s")
    assert_equivalent(df, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=t)


def test_rejects_wrong_aggregation(spark):
    t = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    df = spark.createDataFrame(t).groupBy("k").max("v").withColumnRenamed("max(v)", "s")
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=t)


def test_rejects_column_mismatch(spark):
    t = pd.DataFrame({"k": [1], "v": [1.0]})
    df = spark.createDataFrame(t)
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k AS other FROM t", t=t)


def test_row_order_irrelevant(spark):
    t = pd.DataFrame({"k": [3, 1, 2]})
    df = spark.createDataFrame(pd.DataFrame({"k": [2, 3, 1]}))
    assert_equivalent(df, "SELECT k FROM t", t=t)


def test_timestamp_vs_date_comparison(spark):
    t = pd.DataFrame({"d": pd.to_datetime(["1994-01-01", "1995-06-01"]), "v": [1.0, 2.0]})
    df = spark.createDataFrame(t).filter("d >= DATE '1995-01-01'").select("v")
    assert_equivalent(df, "SELECT v FROM t WHERE d >= DATE '1995-01-01'", t=t)


def test_accepts_spark_dataframe_inputs(spark):
    t = pd.DataFrame({"k": [1, 2]})
    sdf = spark.createDataFrame(t)
    assert_equivalent(sdf.selectExpr("k + 1 AS k1"), "SELECT k + 1 AS k1 FROM t", t=sdf)
