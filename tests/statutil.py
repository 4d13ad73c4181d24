"""Statistical assertions for sampler tests (no scipy in the container).

``assert_uniform`` runs a chi-square goodness-of-fit test against the
uniform distribution over an enumerated support, using the normal
approximation to the chi-square tail: for df degrees of freedom,
X² ≳ df + z·sqrt(2·df) + z²·2/3 has tail mass ≈ Φ(−z) (Wilson–Hilferty is
overkill here). With z = 5 the false-failure probability per test is
≈ 3e-7, so seeded tests are stable while real non-uniformity (e.g. the
"literal" Algorithm 1 variant) is still caught.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def chi2_stat(counts: np.ndarray, expected: np.ndarray) -> float:
    return float(((counts - expected) ** 2 / expected).sum())


def chi2_threshold(df: int, z: float = 5.0) -> float:
    return df + z * np.sqrt(2 * df) + z * z * 2 / 3


def key_series(pdf: pd.DataFrame, cols: list[str]) -> pd.Series:
    return pd.Series(list(zip(*[pdf[c] for c in cols])), dtype="object")


def uniformity_chi2(
    samples: pd.DataFrame, support: pd.DataFrame, cols: list[str]
) -> tuple[float, float, int]:
    """(statistic, threshold, df) for H0 = uniform over ``support``."""
    keys = key_series(samples, cols)
    support_keys = key_series(support, cols)
    assert set(keys) <= set(support_keys), "sample outside the support!"
    counts = keys.value_counts()
    full = pd.Series(0.0, index=pd.Index(support_keys.unique(), dtype="object"))
    full.loc[counts.index] = counts.values
    n, k = len(samples), len(full)
    expected = np.full(k, n / k)
    return chi2_stat(full.to_numpy(), expected), chi2_threshold(k - 1), k - 1


def assert_uniform(samples: pd.DataFrame, support: pd.DataFrame, cols: list[str]):
    stat, thresh, df = uniformity_chi2(samples, support, cols)
    assert stat < thresh, f"chi2={stat:.1f} > {thresh:.1f} (df={df}) — not uniform"


def assert_not_uniform(samples: pd.DataFrame, support: pd.DataFrame, cols: list[str]):
    stat, thresh, df = uniformity_chi2(samples, support, cols)
    assert stat > thresh, f"chi2={stat:.1f} ≤ {thresh:.1f} — unexpectedly uniform"
