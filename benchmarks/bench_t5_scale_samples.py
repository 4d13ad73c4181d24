"""T5 (Fig 5c-e): sampling time vs sample count, per workload and
framework instantiation."""
import pytest

from repro.core.union_sampler import set_union_sample, warmup_params
from repro.experiments.tables import INSTANTIATIONS

_est_cache = {}


@pytest.mark.parametrize("n", [100, 400])
@pytest.mark.parametrize("warm,sampler", INSTANTIATIONS)
@pytest.mark.parametrize("workload", ["uq1", "uq2", "uq3"])
def test_t5_sampling_vs_n(benchmark, workload_of, workload, warm, sampler, n):
    w = workload_of(workload)
    key = (workload, warm)
    if key not in _est_cache:
        _est_cache[key] = warmup_params(w.uctx, warm, seed=0)
    est = _est_cache[key]
    res = benchmark.pedantic(
        lambda: set_union_sample(w.uctx, n, warmup=est, sampler=sampler, seed=n),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["drawn"] = res.n_drawn
