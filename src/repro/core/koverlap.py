"""k-overlap algebra: Theorem 3, union size Eq. 1, and cover sizes (§3.1, §4).

All functions are pure Python over small dictionaries — the number of joins
n is small (the powerset computations are exponential in n, as the paper
notes, and n ≤ 5 in every workload).

Inputs are an ``overlap_fn`` mapping a frozenset Δ of join names to an
(estimate of) |O_Δ| = |∩_{J∈Δ} J|; singletons give |J_j| itself. With exact
overlaps the identities are exact; with upper-bound estimates the results
are clamped at 0 (a bound system need not be self-consistent).
"""
from __future__ import annotations

from itertools import combinations
from math import comb
from typing import Callable, Mapping

OverlapFn = Callable[[frozenset], float]


def k_overlaps(names: list[str], overlap_fn: OverlapFn) -> dict[tuple[str, int], float]:
    """|A_j^k| for every join j and 1 ≤ k ≤ n, per Theorem 3.

    A_j^k = tuples of J_j appearing in exactly k−1 other joins. Computed
    top-down from k = n: A_j^n = |O_S| and

        A_j^k = Σ_{Δ∈P_k, j∈Δ} |O_Δ|  −  Σ_{r=k+1}^n C(r−1, k−1) · A_j^r.
    """
    n = len(names)
    a: dict[tuple[str, int], float] = {}
    for j in names:
        a[(j, n)] = max(0.0, float(overlap_fn(frozenset(names))))
        for k in range(n - 1, 0, -1):
            others = [x for x in names if x != j]
            total = 0.0
            for rest in combinations(others, k - 1):
                total += float(overlap_fn(frozenset((j,) + rest)))
            for r in range(k + 1, n + 1):
                total -= comb(r - 1, k - 1) * a[(j, r)]
            a[(j, k)] = max(0.0, total)
    return a


def union_size(names: list[str], a: Mapping[tuple[str, int], float]) -> float:
    """|U| = Σ_j Σ_k |A_j^k| / k (Eq. 1 — each k-overlap tuple appears in k
    joins, so it is counted k times across the A_j^k)."""
    return sum(a[(j, k)] / k for j in names for k in range(1, len(names) + 1))


def cover_sizes(names: list[str], overlap_fn: OverlapFn) -> dict[str, float]:
    """|J'_i| for the ordering ``names`` via inclusion–exclusion (§3.1):

        |J'_i| = Σ_{Δ ⊆ S_i} (−1)^{|Δ|} |O_{Δ ∪ {J_i}}|

    where S_i is the set of joins preceding J_i. Estimates are clamped ≥ 0.
    """
    out: dict[str, float] = {}
    for i, name in enumerate(names):
        preds = names[:i]
        total = 0.0
        for m in range(0, i + 1):
            for delta in combinations(preds, m):
                total += (-1) ** m * float(overlap_fn(frozenset(delta + (name,))))
        out[name] = max(0.0, total)
    return out


def overlap_fn_from_atoms(atoms: Mapping[frozenset, int]) -> OverlapFn:
    """Exact overlap function from *atom counts* (number of union tuples
    whose membership set is exactly a given set of joins)."""

    def fn(delta: frozenset) -> float:
        return float(sum(c for s, c in atoms.items() if delta <= s))

    return fn


def exact_stats_from_atoms(
    names: list[str], atoms: Mapping[frozenset, int]
) -> dict:
    """Ground-truth |U|, |J_j|, A_j^k and covers straight from atom counts
    (used to cross-check the Theorem 3 / inclusion–exclusion algebra)."""
    u = sum(atoms.values())
    sizes = {
        j: sum(c for s, c in atoms.items() if j in s) for j in names
    }
    a = {
        (j, k): float(
            sum(c for s, c in atoms.items() if j in s and len(s) == k)
        )
        for j in names
        for k in range(1, len(names) + 1)
    }
    covers = {
        j: float(
            sum(
                c
                for s, c in atoms.items()
                if j in s and all(names.index(x) >= names.index(j) for x in s)
            )
        )
        for j in names
    }
    return {"union": float(u), "sizes": sizes, "a_jk": a, "covers": covers}
