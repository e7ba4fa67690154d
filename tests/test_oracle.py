"""Tests for the DuckDB oracle helper itself."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def pdf():
    return pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})


class TestOracle:
    def test_accepts_matching_aggregate(self, spark, pdf):
        got = spark.createDataFrame(pdf).groupBy("k").sum("v").withColumnRenamed("sum(v)", "s")
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)

    def test_rejects_wrong_result(self, spark, pdf):
        got = spark.createDataFrame(pdf).groupBy("k").count().withColumnRenamed("count", "s")
        with pytest.raises(AssertionError):
            assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)

    def test_rejects_column_mismatch(self, spark, pdf):
        got = spark.createDataFrame(pdf).groupBy("k").sum("v")
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)

    def test_accepts_spark_frames_as_inputs(self, spark, pdf):
        sdf = spark.createDataFrame(pdf)
        got = sdf.select("k").distinct()
        assert_equivalent(got, "SELECT DISTINCT k FROM t", t=sdf)

    def test_row_order_irrelevant(self, spark, pdf):
        got = spark.createDataFrame(pdf.sort_values("v", ascending=False))
        assert_equivalent(got, "SELECT k, v FROM t", t=pdf)
