"""Self-checks for the provided DuckDB oracle."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestOracle:
    def test_passes_on_equal_results(self, spark):
        pdf = pd.DataFrame({"k": [1, 2, 3], "v": [1.0, 2.0, 3.0]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT k, v FROM t", t=pdf)

    def test_row_order_irrelevant(self, spark):
        pdf = pd.DataFrame({"k": [3, 1, 2]})
        df = spark.createDataFrame(pdf.sort_values("k"))
        assert_equivalent(df, "SELECT k FROM t", t=pdf)

    def test_detects_wrong_values(self, spark):
        pdf = pd.DataFrame({"k": [1, 2, 3]})
        df = spark.createDataFrame(pd.DataFrame({"k": [1, 2, 4]}))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT k FROM t", t=pdf)

    def test_detects_missing_rows(self, spark):
        pdf = pd.DataFrame({"k": [1, 2, 3]})
        df = spark.createDataFrame(pd.DataFrame({"k": [1, 2]}))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT k FROM t", t=pdf)

    def test_detects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"k": [1]})
        df = spark.createDataFrame(pd.DataFrame({"j": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "SELECT k FROM t", t=pdf)

    def test_accepts_spark_inputs(self, spark):
        pdf = pd.DataFrame({"k": [1, 2]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT k FROM t", t=df)
