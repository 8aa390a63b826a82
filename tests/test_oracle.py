"""Tests for the DuckDB oracle itself — it must catch wrong results, not
just run."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def df(spark):
    return spark.createDataFrame(
        pd.DataFrame({"k": [1, 2, 2, 3], "v": [10.0, 20.0, 5.0, 7.5]})
    ).cache()


class TestOracle:
    def test_accepts_correct_aggregate(self, df):
        out = df.groupBy("k").agg(F.sum("v").alias("s"))
        assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=df)

    def test_rejects_wrong_values(self, df):
        out = df.groupBy("k").agg((F.sum("v") + 1).alias("s"))
        with pytest.raises(AssertionError):
            assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=df)

    def test_rejects_missing_rows(self, df):
        out = df.filter("k < 3").groupBy("k").agg(F.sum("v").alias("s"))
        with pytest.raises(AssertionError):
            assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=df)

    def test_rejects_column_mismatch(self, df):
        out = df.groupBy("k").agg(F.sum("v").alias("total"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=df)

    def test_projection_order_irrelevant(self, df):
        out = df.groupBy("k").agg(F.sum("v").alias("s")).select("s", "k")
        assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=df)

    def test_accepts_pandas_inputs(self, df):
        pdf = df.toPandas()
        out = df.groupBy("k").count().withColumnRenamed("count", "n")
        assert_equivalent(out, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", t=pdf)

    def test_float_rounding_tolerated(self, df):
        out = df.groupBy("k").agg((F.sum("v") + 1e-9).alias("s"))
        assert_equivalent(out, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=df)
