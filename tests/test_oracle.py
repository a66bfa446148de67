"""Tests for the provided DuckDB oracle (and that it catches wrong results)."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_oracle_passes_on_equal(spark):
    pdf = pd.DataFrame({"k": [1, 2, 3], "v": [10.0, 20.0, 30.0]})
    df = spark.createDataFrame(pdf).selectExpr("k AS k", "v AS v")
    assert_equivalent(df, "SELECT k, v FROM t", t=pdf)


def test_oracle_detects_missing_row(spark):
    pdf = pd.DataFrame({"k": [1, 2, 3]})
    df = spark.createDataFrame(pdf[pdf.k < 3])
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)


def test_oracle_detects_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    df = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)


def test_oracle_ignores_row_and_column_order(spark):
    pdf = pd.DataFrame({"a": [1, 2], "b": ["x", "y"]})
    df = spark.createDataFrame(pd.DataFrame({"b": ["y", "x"], "a": [2, 1]}))
    assert_equivalent(df, "SELECT a, b FROM t", t=pdf)
