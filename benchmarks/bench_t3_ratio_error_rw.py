"""T3 (Fig 5a): RANDOM-WALK warm-up — time + per-join ratio error vs the
HISTOGRAM-BASED+EO estimate on UQ1."""
from repro.core.exact import full_join_union
from repro.core.randomwalk_union import randomwalk_warmup
from repro.experiments.tables import _hist_estimate, ratio_errors


def test_t3_randomwalk_warmup(benchmark, uq1_w, spark):
    ex = full_join_union(spark, uq1_w.joins)
    hist = _hist_estimate(uq1_w)
    est, _ = benchmark.pedantic(
        lambda: randomwalk_warmup(uq1_w.uctx, seed=0), rounds=1, iterations=1
    )
    benchmark.extra_info["rw_error"] = ratio_errors(est.ratios, ex.ratios())
    benchmark.extra_info["hist_error"] = ratio_errors(hist.ratios, ex.ratios())
