"""Tests for the provided DuckDB oracle (repro.oracle) — it must accept
matching results and reject wrong ones."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestAssertEquivalent:
    def test_accepts_matching_aggregate(self, spark):
        pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
        sdf = (
            spark.createDataFrame(pdf)
            .groupBy("k")
            .sum("v")
            .withColumnRenamed("sum(v)", "s")
        )
        assert_equivalent(sdf, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)

    def test_rejects_wrong_rows(self, spark):
        pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
        sdf = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": [1.0, 99.0]}))
        with pytest.raises(AssertionError):
            assert_equivalent(sdf, "SELECT k, v FROM t", t=pdf)

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"k": [1]})
        sdf = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(sdf, "SELECT k FROM t", t=pdf)

    def test_order_insensitive(self, spark):
        pdf = pd.DataFrame({"k": [3, 1, 2]})
        sdf = spark.createDataFrame(pd.DataFrame({"k": [2, 3, 1]}))
        assert_equivalent(sdf, "SELECT k FROM t", t=pdf)

    def test_accepts_spark_input_tables(self, spark):
        pdf = pd.DataFrame({"k": [1, 2, 2]})
        sdf = spark.createDataFrame(pdf)
        counted = sdf.groupBy("k").count().withColumnRenamed("count", "c")
        assert_equivalent(
            counted, "SELECT k, count(*) AS c FROM t GROUP BY k", t=sdf
        )
