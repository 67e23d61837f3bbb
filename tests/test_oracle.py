"""Tests for the DuckDB result-equality oracle (repro.oracle)."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestAssertEquivalent:
    def test_identical_frames_pass(self, spark):
        pdf = pd.DataFrame({"a": [1, 2, 3], "b": [1.5, 2.5, 3.5]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT a, b FROM t", t=pdf)

    def test_row_order_irrelevant(self, spark):
        pdf = pd.DataFrame({"a": [3, 1, 2]})
        df = spark.createDataFrame(pd.DataFrame({"a": [1, 2, 3]}))
        assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_column_order_irrelevant(self, spark):
        pdf = pd.DataFrame({"a": [1], "b": [2]})
        df = spark.createDataFrame(pdf[["b", "a"]])
        assert_equivalent(df, "SELECT a, b FROM t", t=pdf)

    def test_value_mismatch_fails(self, spark):
        pdf = pd.DataFrame({"a": [1, 2]})
        df = spark.createDataFrame(pd.DataFrame({"a": [1, 99]}))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_column_name_mismatch_fails(self, spark):
        pdf = pd.DataFrame({"a": [1]})
        df = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_nan_rows_compare_equal(self, spark):
        pdf = pd.DataFrame({"a": [1.0, np.nan]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_spark_input_tables_accepted(self, spark):
        pdf = pd.DataFrame({"a": [1, 2]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT a FROM t", t=df)

    def test_float_rounding_tolerance(self, spark):
        pdf = pd.DataFrame({"a": [0.1 + 0.2]})
        df = spark.createDataFrame(pd.DataFrame({"a": [0.3]}))
        assert_equivalent(df, "SELECT a FROM t", t=pdf)
