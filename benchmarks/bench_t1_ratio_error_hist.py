"""T1 (Fig 4a/4b): HISTOGRAM-BASED+EO ratio estimation — time + error.

The benchmark measures one estimation pass; the achieved per-join ratio
errors (the figure's y-axis) are recorded in ``extra_info``.
"""
import pytest

from repro.core.exact import full_join_union
from repro.experiments.tables import _hist_estimate, ratio_errors


@pytest.mark.parametrize("workload", ["uq1", "uq3"])
def test_t1_hist_ratio_estimation(benchmark, workload_of, spark, workload):
    w = workload_of(workload)
    ex = full_join_union(spark, w.joins)
    est = benchmark.pedantic(lambda: _hist_estimate(w), rounds=1, iterations=1)
    errs = ratio_errors(est.ratios, ex.ratios())
    benchmark.extra_info["avg_abs_error"] = sum(errs.values()) / len(errs)
    benchmark.extra_info["per_join_error"] = errs
