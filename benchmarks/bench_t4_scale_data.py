"""T4 (Fig 5b): SetUnion sampling time vs data scale on UQ1.

BENCH_SF provides the largest scale; smaller scales are derived. Only the
sampling phase is measured (warm-up is a separate, cached step).
"""
import pytest

import os

from repro.core.union_sampler import set_union_sample, warmup_params
from repro.experiments.tables import INSTANTIATIONS, build, prewarm

BENCH_SF = float(os.environ.get("BENCH_SF", "0.1"))

_ws = {}


def _scaled(spark, sf):
    if sf not in _ws:
        w = build(spark, "uq1", sf=sf, overlap=0.2)
        prewarm(w.uctx)
        _ws[sf] = w
    return _ws[sf]


@pytest.mark.parametrize("rel_scale", [0.25, 1.0])
@pytest.mark.parametrize("warm,sampler", INSTANTIATIONS)
def test_t4_sampling_vs_scale(benchmark, spark, rel_scale, warm, sampler):
    w = _scaled(spark, BENCH_SF * rel_scale)
    est = warmup_params(w.uctx, warm, seed=0)
    res = benchmark.pedantic(
        lambda: set_union_sample(w.uctx, 200, warmup=est, sampler=sampler, seed=1),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["drawn"] = res.n_drawn
