"""Self-tests for the DuckDB result-equality oracle."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_matching_result(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": [10, 20]}))
        assert_equivalent(
            df, "SELECT k, v FROM t ORDER BY k",
            t=pd.DataFrame({"k": [2, 1], "v": [20, 10]}),
        )

    def test_rejects_wrong_rows(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"k": [1], "v": [999]}))
        with pytest.raises(AssertionError):
            assert_equivalent(
                df, "SELECT k, v FROM t", t=pd.DataFrame({"k": [1], "v": [10]})
            )

    def test_rejects_column_mismatch(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                df, "SELECT k FROM t", t=pd.DataFrame({"k": [1]})
            )

    def test_projection_order_irrelevant(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"b": [2], "a": [1]}))
        assert_equivalent(
            df, "SELECT a, b FROM t", t=pd.DataFrame({"a": [1], "b": [2]})
        )

    def test_accepts_spark_input_table(self, spark):
        t = spark.createDataFrame(pd.DataFrame({"k": [1, 1, 2]}))
        got = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "c": [2, 1]}))
        assert_equivalent(got, "SELECT k, count(*) AS c FROM t GROUP BY k", t=t)
