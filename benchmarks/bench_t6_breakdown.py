"""T6 (Fig 5f-h): end-to-end run per instantiation; the warm-up /
accepted / rejected time breakdown lands in extra_info."""
import pytest

from repro.core.union_sampler import set_union_sample
from repro.experiments.tables import INSTANTIATIONS


@pytest.mark.parametrize("warm,sampler", INSTANTIATIONS)
@pytest.mark.parametrize("workload", ["uq1", "uq2", "uq3"])
def test_t6_breakdown(benchmark, workload_of, workload, warm, sampler):
    w = workload_of(workload)
    res = benchmark.pedantic(
        lambda: set_union_sample(w.uctx, 200, warmup=warm, sampler=sampler, seed=2),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["warmup_s"] = round(res.timings["warmup"], 3)
    benchmark.extra_info["accepted_s"] = round(res.timings["accepted"], 3)
    benchmark.extra_info["rejected_s"] = round(res.timings["rejected"], 3)
