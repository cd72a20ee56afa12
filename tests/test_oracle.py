"""Unit tests for the DuckDB result-equality oracle."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_passes_on_equal_results(spark):
    pdf = pd.DataFrame({"k": [1, 2, 2, 3], "v": [10.0, 20.0, 30.0, 40.0]})
    df = spark.createDataFrame(pdf).groupBy("k").sum("v") \
        .withColumnRenamed("sum(v)", "total")
    assert_equivalent(df, "SELECT k, sum(v) AS total FROM t GROUP BY k", t=pdf)


def test_fails_on_wrong_result(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [10.0, 20.0]})
    df = spark.createDataFrame(pdf).selectExpr("k", "v * 2 AS total")
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, v AS total FROM t", t=pdf)


def test_fails_on_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    df = spark.createDataFrame(pdf).selectExpr("k AS wrong_name")
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)


def test_column_order_irrelevant(spark):
    pdf = pd.DataFrame({"a": [1, 2], "b": [3.0, 4.0]})
    df = spark.createDataFrame(pdf).select("b", "a")
    assert_equivalent(df, "SELECT a, b FROM t", t=pdf)


def test_row_order_irrelevant(spark):
    pdf = pd.DataFrame({"a": [3, 1, 2]})
    df = spark.createDataFrame(pdf.sort_values("a"))
    assert_equivalent(df, "SELECT a FROM t", t=pdf)


def test_spark_table_input(spark):
    pdf = pd.DataFrame({"a": [1, 2, 3]})
    sdf = spark.createDataFrame(pdf)
    out = sdf.selectExpr("count(*) AS n")
    assert_equivalent(out, "SELECT count(*) AS n FROM t", t=sdf)
