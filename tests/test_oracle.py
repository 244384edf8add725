"""Tests for the DuckDB oracle itself — it must catch wrong results."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_equal_results(self, spark):
        pdf = pd.DataFrame({"a": [1, 2], "b": [3.0, 4.0]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT a, b FROM t", t=pdf)

    def test_rejects_wrong_rows(self, spark):
        pdf = pd.DataFrame({"a": [1, 2]})
        df = spark.createDataFrame(pd.DataFrame({"a": [1, 3]}))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_rejects_missing_rows(self, spark):
        pdf = pd.DataFrame({"a": [1, 2]})
        df = spark.createDataFrame(pd.DataFrame({"a": [1]}))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"a": [1]})
        df = spark.createDataFrame(pd.DataFrame({"b": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_row_order_irrelevant(self, spark):
        pdf = pd.DataFrame({"a": [1, 2, 3]})
        df = spark.createDataFrame(pd.DataFrame({"a": [3, 1, 2]}))
        assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_spark_input_tables_supported(self, spark):
        pdf = pd.DataFrame({"a": [1, 2]})
        sdf = spark.createDataFrame(pdf)
        assert_equivalent(sdf, "SELECT a FROM t", t=sdf)
