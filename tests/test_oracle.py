"""Sanity checks for the provided DuckDB oracle."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_matching_aggregate(self, spark):
        df = spark.createDataFrame([(1, 2.0), (1, 3.0), (2, 4.0)], "k long, v double")
        out = df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "s")
        assert_equivalent(
            out,
            "select k, sum(v) as s from t group by k",
            t=pd.DataFrame({"k": [1, 1, 2], "v": [2.0, 3.0, 4.0]}),
        )

    def test_rejects_wrong_result(self, spark):
        df = spark.createDataFrame([(1, 99.0)], "k long, s double")
        with pytest.raises(AssertionError):
            assert_equivalent(
                df,
                "select k, sum(v) as s from t group by k",
                t=pd.DataFrame({"k": [1], "v": [2.0]}),
            )

    def test_rejects_column_mismatch(self, spark):
        df = spark.createDataFrame([(1,)], "wrong long")
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "select 1 as k")
