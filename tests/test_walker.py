"""Random-walk operator: distributions, HT estimation, dead ends."""
import numpy as np
import pandas as pd
import pytest

from repro.core.join_spec import Relation, chain
from repro.core.walker import DPROD, P, ht_estimate, ht_running_stats, run_walks
from repro.core.weights import exact_size, weighted_join
from statutil import assert_uniform


@pytest.fixture(scope="module")
def abc(spark):
    """3-relation chain with skewed degrees and a dead-end tuple."""
    a = Relation("a", spark.createDataFrame(pd.DataFrame({"x": [1, 2, 3], "pa": [10, 20, 30]})))
    b = Relation(
        "b",
        spark.createDataFrame(
            pd.DataFrame({"bx": [1, 1, 1, 2, 9], "y": [4, 5, 5, 6, 7], "pb": [0, 1, 2, 3, 4]})
        ),
    )
    c = Relation(
        "c",
        spark.createDataFrame(pd.DataFrame({"cy": [4, 5, 5, 5, 6], "pc": [0, 1, 2, 3, 4]})),
    )
    return chain("abc", [a, b, c], [("x", "bx"), ("y", "cy")])


@pytest.fixture(scope="module")
def abc_full(spark, abc):
    return abc.full_df().toPandas()


def test_exact_size(abc, abc_full):
    assert exact_size(abc) == len(abc_full)


def test_ew_walks_uniform(spark, abc, abc_full):
    wj = weighted_join(abc)
    res = run_walks(spark, wj, 4000, mode="ew", seed=7)
    assert res.n_failed == 0
    assert_uniform(res.pdf, abc_full, abc.value_cols)


def test_ew_p_is_inverse_size(spark, abc):
    wj = weighted_join(abc)
    res = run_walks(spark, wj, 50, mode="ew", seed=1)
    assert np.allclose(res.pdf[P], 1.0 / exact_size(abc))


def test_uniform_walk_p_matches_frequency(spark, abc):
    """Empirical frequency of each completed walk ≈ its recorded p(t)."""
    res = run_walks(spark, abc, 20000, mode="uniform", seed=3)
    pdf = res.pdf
    grp = pdf.groupby(abc.value_cols, as_index=False).agg(
        n=("__p", "size"), p=("__p", "first")
    )
    emp = grp["n"] / 20000
    assert np.allclose(emp, grp["p"], rtol=0.35)


def test_uniform_walks_never_dead_end(spark, abc):
    """The plan's full (Yannakakis) reduction removes the non-joinable
    tuples (x=3; bx=9/y=7), so walks cannot dead-end — the paper's
    'zero the weights of non-joinable tuples' fix."""
    from repro.core.walker import _walk_plan

    plan = _walk_plan(spark, abc)
    assert len(plan["root"]) < abc.root.relation.df.count()  # x=3 removed
    res = run_walks(spark, abc, 3000, mode="uniform", seed=5)
    assert res.n_failed == 0
    assert len(res.pdf) == 3000


def test_ht_estimate_converges(spark, abc):
    res = run_walks(spark, abc, 20000, mode="uniform", seed=11)
    assert ht_estimate(res) == pytest.approx(exact_size(abc), rel=0.1)


def test_dprod_tracked(spark, abc):
    from repro.core.walker import _walk_plan

    res = run_walks(spark, abc, 200, mode="uniform", seed=2)
    # p = (1 / |reduced root|) / dprod
    n_root = len(_walk_plan(spark, abc)["root"])
    assert np.allclose(res.pdf[P] * res.pdf[DPROD], 1.0 / n_root)


def test_walks_deterministic_in_seed(spark, abc):
    wj = weighted_join(abc)
    r1 = run_walks(spark, wj, 100, mode="ew", seed=42)
    r2 = run_walks(spark, wj, 100, mode="ew", seed=42)
    pd.testing.assert_frame_equal(
        r1.pdf.sort_values(abc.value_cols).reset_index(drop=True),
        r2.pdf.sort_values(abc.value_cols).reset_index(drop=True),
    )


def test_hash_specs_appended(spark, abc):
    wj = weighted_join(abc)
    res = run_walks(
        spark, wj, 20, mode="ew", seed=0, hash_specs={("x", "pa"): "__h0"}
    )
    assert "__h0" in res.pdf.columns
    assert res.pdf["__h0"].dtype == np.int64


def test_ht_running_stats():
    inv = np.array([10.0, 10.0, 10.0, 10.0])
    mean, var = ht_running_stats(inv, 8)  # 4 failures
    assert mean == pytest.approx(5.0)
    assert var > 0
    assert ht_running_stats(np.zeros(0), 0) == (0.0, 0.0)


def test_empty_root(spark):
    a = Relation("a", spark.createDataFrame(pd.DataFrame({"x": [1]})).filter("x > 5"))
    b = Relation("b", spark.createDataFrame(pd.DataFrame({"bx": [1], "z": [2]})))
    j = chain("empty", [a, b], [("x", "bx")])
    res = run_walks(spark, j, 10, mode="uniform", seed=0)
    assert res.n_failed == 10 and len(res.pdf) == 0
