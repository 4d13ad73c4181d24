"""T8 (Fig 6b): per-accepted-sample time, reuse phase vs regular phase."""
import pytest

from repro.core.online_union import online_union_sample


@pytest.mark.parametrize("workload", ["uq1", "uq2", "uq3"])
def test_t8_per_sample_time(benchmark, workload_of, workload):
    w = workload_of(workload)
    res = benchmark.pedantic(
        lambda: online_union_sample(w.uctx, 300, reuse=True, seed=4),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["reuse_s_per_sample"] = res.per_sample_time("reuse")
    benchmark.extra_info["regular_s_per_sample"] = res.per_sample_time("regular")
