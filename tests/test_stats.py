"""Degree statistics vs pandas ground truth."""
import pandas as pd
import pytest

from repro.core import stats


@pytest.fixture(scope="module")
def df(spark):
    pdf = pd.DataFrame({"k": [1, 1, 1, 2, 2, 3], "v": list("abcdef")})
    return spark.createDataFrame(pdf), pdf


def test_degree_histogram(spark, df):
    sdf, pdf = df
    got = {
        r["k"]: r["deg"] for r in stats.degree_histogram(sdf, "k").collect()
    }
    assert got == {1: 3, 2: 2, 3: 1}


def test_max_degree(spark, df):
    sdf, _ = df
    assert stats.max_degree(sdf, "k") == 3


def test_avg_degree(spark, df):
    sdf, _ = df
    assert stats.avg_degree(sdf, "k") == pytest.approx(2.0)


def test_max_degree_empty(spark):
    sdf = spark.createDataFrame(pd.DataFrame({"k": [1]})).filter("k > 5")
    assert stats.max_degree(sdf, "k") == 0


def test_pair_degree_product_is_exact_join_size(spark):
    a = spark.createDataFrame(pd.DataFrame({"k": [1, 1, 2, 3]}))
    b = spark.createDataFrame(pd.DataFrame({"j": [1, 2, 2, 2, 4]}))
    rows = {r["v"]: r["pairs"] for r in stats.pair_degree_product(a, "k", b, "j").collect()}
    # value 1: 2*1, value 2: 1*3; 3 and 4 unmatched
    assert rows == {1: 2, 2: 3}
    assert sum(rows.values()) == a.join(b, a["k"] == b["j"]).count()


def test_self_degree(spark, df):
    sdf, _ = df
    rows = {r["v"]: r["pairs"] for r in stats.self_degree(sdf, "k").collect()}
    assert rows == {1: 3, 2: 2, 3: 1}
