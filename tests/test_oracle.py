"""Tests for the DuckDB oracle itself (it guards everything else)."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_oracle_accepts_matching_result(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    df = spark.createDataFrame(pdf).groupBy("k").sum("v")
    df = df.withColumnRenamed("sum(v)", "total")
    assert_equivalent(
        df, "SELECT k, sum(v) AS total FROM t GROUP BY k", t=pdf
    )


def test_oracle_rejects_wrong_values(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    df = spark.createDataFrame(
        pd.DataFrame({"k": [1, 2], "total": [1.0, 99.0]})
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            df, "SELECT k, sum(v) AS total FROM t GROUP BY k", t=pdf
        )


def test_oracle_rejects_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1], "v": [1.0]})
    df = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)


def test_oracle_ignores_row_and_column_order(spark):
    pdf = pd.DataFrame({"a": [2, 1], "b": ["y", "x"]})
    df = spark.createDataFrame(
        pd.DataFrame({"b": ["x", "y"], "a": [1, 2]})
    )
    assert_equivalent(df, "SELECT a, b FROM t", t=pdf)


def test_oracle_accepts_spark_input_tables(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2]})
    sdf = spark.createDataFrame(pdf)
    out = sdf.groupBy("k").count()
    assert_equivalent(
        out,
        "SELECT k, count(*) AS count FROM t GROUP BY k",
        t=sdf,
    )
