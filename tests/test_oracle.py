"""The DuckDB oracle itself: agreement and disagreement detection."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_oracle_passes_on_equal_results(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [10.0, 20.0, 30.0]})
    df = spark.createDataFrame(pdf)
    from pyspark.sql import functions as F

    got = df.groupBy("k").agg(F.sum("v").alias("s"))
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_detects_wrong_rows(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": [1.0, 99.0]}))
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, v FROM t", t=pdf)


def test_oracle_detects_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    df = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)
