"""T7 (Fig 6a): ONLINE-UNION with vs without warm-up sample reuse."""
import pytest

from repro.core.online_union import online_union_sample


@pytest.mark.parametrize("reuse", [True, False])
@pytest.mark.parametrize("workload", ["uq1", "uq2", "uq3"])
def test_t7_online_union(benchmark, workload_of, workload, reuse):
    w = workload_of(workload)
    res = benchmark.pedantic(
        lambda: online_union_sample(w.uctx, 300, reuse=reuse, seed=3),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["reuse_accepted"] = res.counts["reuse_accepted"]
    benchmark.extra_info["regular_accepted"] = res.counts["regular_accepted"]
    benchmark.extra_info["sampling_s"] = round(
        res.timings["reuse"] + res.timings["regular"], 3
    )
