"""Shared fixtures for the per-table benchmarks.

Benchmarks run at BENCH_SF (default 0.1 ≈ 100 MB of raw inputs, per the
repo contract); override with the BENCH_SF env var for quick runs.
Workload construction and index prewarming happen in session-scoped
fixtures so ``benchmark`` measures the steady-state operation only —
mirroring the paper, which excludes hash-index construction from
sampling time.
"""
import os

import pytest

from repro.experiments.tables import build, prewarm

BENCH_SF = float(os.environ.get("BENCH_SF", "0.1"))
BENCH_OVERLAP = float(os.environ.get("BENCH_OVERLAP", "0.2"))

_cache: dict = {}


def _workload(spark, name: str, *, overlap: float = None, prewarmed: bool = True):
    ov = BENCH_OVERLAP if overlap is None else overlap
    key = (name, ov, prewarmed)
    if key not in _cache:
        w = build(spark, name, sf=BENCH_SF, overlap=ov)
        if prewarmed:
            prewarm(w.uctx)
        _cache[key] = w
    return _cache[key]


@pytest.fixture(scope="session")
def uq1_w(spark):
    return _workload(spark, "uq1")


@pytest.fixture(scope="session")
def uq2_w(spark):
    return _workload(spark, "uq2")


@pytest.fixture(scope="session")
def uq3_w(spark):
    return _workload(spark, "uq3")


@pytest.fixture(scope="session")
def workload_of(spark):
    def get(name: str, **kw):
        return _workload(spark, name, **kw)

    return get
