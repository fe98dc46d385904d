"""The DuckDB oracle itself: it must catch wrong results, not just run."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_equal_results(self, spark):
        pdf = pd.DataFrame({"k": ["a", "a", "b"], "v": [1.0, 2.0, 3.0]})
        got = spark.createDataFrame(
            pd.DataFrame({"k": ["a", "b"], "s": [3.0, 3.0]})
        )
        assert_equivalent(
            got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf
        )

    def test_rejects_wrong_values(self, spark):
        pdf = pd.DataFrame({"k": ["a", "b"], "v": [1.0, 2.0]})
        got = spark.createDataFrame(
            pd.DataFrame({"k": ["a", "b"], "s": [1.0, 99.0]})
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf
            )

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"k": ["a"]})
        got = spark.createDataFrame(pd.DataFrame({"wrong": ["a"]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "SELECT k FROM t", t=pdf)

    def test_row_order_irrelevant(self, spark):
        pdf = pd.DataFrame({"k": ["b", "a"]})
        got = spark.createDataFrame(pd.DataFrame({"k": ["a", "b"]}))
        assert_equivalent(got, "SELECT k FROM t", t=pdf)

    def test_spark_inputs_accepted(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"x": [1, 2, 3]}))
        got = spark.createDataFrame(pd.DataFrame({"n": [3]}))
        assert_equivalent(got, "SELECT COUNT(*) AS n FROM t", t=df)
