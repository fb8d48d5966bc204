"""Sanity tests for the DuckDB result-equality oracle itself."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_oracle_passes_on_equal_results(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "n": [10, 20]}))
    t = pd.DataFrame({"k": [1, 1, 2], "v": [4, 6, 20]})
    assert_equivalent(df, "SELECT k, SUM(v) AS n FROM t GROUP BY k", t=t)


def test_oracle_ignores_row_and_column_order(spark):
    df = spark.createDataFrame(pd.DataFrame({"b": [2, 1], "a": ["y", "x"]}))
    t = pd.DataFrame({"a": ["x", "y"], "b": [1, 2]})
    assert_equivalent(df, "SELECT a, b FROM t", t=t)


def test_oracle_fails_on_wrong_values(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1], "n": [999]}))
    t = pd.DataFrame({"k": [1], "v": [5]})
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, SUM(v) AS n FROM t GROUP BY k", t=t)


def test_oracle_fails_on_column_mismatch(spark):
    df = spark.createDataFrame(pd.DataFrame({"wrong_name": [1]}))
    t = pd.DataFrame({"k": [1]})
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k FROM t", t=t)
