"""The DuckDB oracle itself: detects equal results, catches wrong ones."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


def test_accepts_equal_results(spark):
    pdf = pd.DataFrame({"k": [1, 2, 3], "v": [1.5, 2.5, 3.5]})
    df = spark.createDataFrame(pdf)
    assert_equivalent(df, "select k, v from t", t=pdf)


def test_accepts_column_order_differences(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [9.0, 8.0]})
    df = spark.createDataFrame(pdf).select("v", "k")
    assert_equivalent(df, "select k, v from t", t=pdf)


def test_catches_wrong_rows(spark):
    pdf = pd.DataFrame({"k": [1, 2, 3]})
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2, 4]}))
    with pytest.raises(AssertionError):
        assert_equivalent(df, "select k from t", t=pdf)


def test_catches_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    df = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "select k from t", t=pdf)


def test_spark_inputs_accepted(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 1, 2]}))
    out = df.groupBy("k").count().withColumnRenamed("count", "c")
    assert_equivalent(out, "select k, count(*) as c from t group by k", t=df)
