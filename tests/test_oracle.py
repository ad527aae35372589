"""Tests that the DuckDB oracle actually catches wrong results."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_correct_aggregate(self, spark):
        pdf = pd.DataFrame({"a": [1, 1, 2], "b": [10, 20, 5]})
        got = spark.createDataFrame(pdf).groupBy("a").sum("b").withColumnRenamed(
            "sum(b)", "sum_b"
        )
        assert_equivalent(got, "SELECT a, SUM(b) AS sum_b FROM r GROUP BY a", r=pdf)

    def test_rejects_wrong_values(self, spark):
        pdf = pd.DataFrame({"a": [1, 1, 2], "b": [10, 20, 5]})
        wrong = spark.createDataFrame(
            pd.DataFrame({"a": [1, 2], "sum_b": [31, 5]})
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong, "SELECT a, SUM(b) AS sum_b FROM r GROUP BY a", r=pdf
            )

    def test_rejects_missing_group(self, spark):
        pdf = pd.DataFrame({"a": [1, 2], "b": [1, 1]})
        wrong = spark.createDataFrame(pd.DataFrame({"a": [1], "sum_b": [1]}))
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong, "SELECT a, SUM(b) AS sum_b FROM r GROUP BY a", r=pdf
            )

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"a": [1], "b": [1]})
        wrong = spark.createDataFrame(pd.DataFrame({"a": [1], "other": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                wrong, "SELECT a, SUM(b) AS sum_b FROM r GROUP BY a", r=pdf
            )

    def test_spark_inputs_accepted(self, spark):
        sdf = spark.createDataFrame(pd.DataFrame({"a": [3, 3], "b": [1.5, 2.5]}))
        got = sdf.groupBy("a").avg("b").withColumnRenamed("avg(b)", "avg_b")
        assert_equivalent(got, "SELECT a, AVG(b) AS avg_b FROM r GROUP BY a", r=sdf)
