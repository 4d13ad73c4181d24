"""T2 (Fig 4c/4d): union-size estimation runtime — HISTOGRAM-BASED vs the
FullJoinUnion brute-force baseline (the paper's headline speedup)."""
import pytest

from repro.core.exact import full_join_union
from repro.experiments.tables import _hist_estimate


@pytest.mark.parametrize("workload", ["uq1", "uq3"])
def test_t2_histogram_estimation(benchmark, workload_of, workload):
    w = workload_of(workload)
    est = benchmark.pedantic(lambda: _hist_estimate(w), rounds=1, iterations=1)
    benchmark.extra_info["union_estimate"] = est.union


@pytest.mark.parametrize("workload", ["uq1", "uq3"])
def test_t2_fulljoinunion_baseline(benchmark, workload_of, spark, workload):
    w = workload_of(workload)
    ex = benchmark.pedantic(
        lambda: full_join_union(spark, w.joins), rounds=1, iterations=1
    )
    benchmark.extra_info["true_union"] = ex.union
