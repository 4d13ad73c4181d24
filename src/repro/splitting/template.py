"""Standard template selection (§8.1.1–8.1.2).

A template is an ordering A_1, …, A_m of the output attributes; the split
chain's i-th sub-relation holds the pair (A_i, A_{i+1}). The paper scores a
pair of attributes by the summed tree distance between their relations
across all joins — pairs that live together in the original relations get
low scores — and picks the template minimizing the total score of
consecutive pairs. That is a minimum-cost Hamiltonian path over the
attributes, solved exactly here with Held–Karp (attribute counts are
small).

``zero_weight`` is the §8.1.2 "alternating score" hyper-parameter: the
score contributed by co-located pairs (distance 0), tunable to favour
keeping attributes in their original relations.
"""
from __future__ import annotations

from itertools import combinations

from repro.core.join_spec import Join


def pair_scores(
    joins: list[Join], attrs: list[str], *, zero_weight: float = 0.0
) -> dict[frozenset, float]:
    """score(A, A') = Σ_j Dist_j(A, A'), with distance-0 terms replaced by
    ``zero_weight``."""
    out: dict[frozenset, float] = {}
    for a, b in combinations(attrs, 2):
        s = 0.0
        for j in joins:
            d = j.tree_distance(a, b)
            s += zero_weight if d == 0 else float(d)
        out[frozenset((a, b))] = s
    return out


def best_template(
    joins: list[Join],
    attrs: list[str] | None = None,
    *,
    zero_weight: float = 0.0,
    fixed_prefix: tuple[str, str] | None = None,
) -> list[str]:
    """Minimum-total-score attribute ordering (exact Held–Karp DP).

    ``fixed_prefix=(a, b)`` constrains the path to start a → b; any such
    template still yields a sound Theorem 4 bound, and starting at a join
    condition puts its per-value histogram into the K(1) stage.
    """
    attrs = attrs or joins[0].value_cols
    n = len(attrs)
    if n == 1:
        return list(attrs)
    if n > 18:
        raise ValueError("template search supports up to 18 attributes")
    scores = pair_scores(joins, attrs, zero_weight=zero_weight)

    def cost(i: int, k: int) -> float:
        return scores[frozenset((attrs[i], attrs[k]))]

    # dp[mask][last] = (min cost of a path visiting `mask` ending at `last`)
    dp: list[dict[int, tuple[float, int]]] = [dict() for _ in range(1 << n)]
    if fixed_prefix is not None:
        ia, ib = attrs.index(fixed_prefix[0]), attrs.index(fixed_prefix[1])
        dp[(1 << ia) | (1 << ib)][ib] = (cost(ia, ib), ia)
        dp[1 << ia][ia] = (0.0, -1)  # backtracking terminator
    else:
        for i in range(n):
            dp[1 << i][i] = (0.0, -1)
    for mask in range(1 << n):
        if fixed_prefix is not None and mask == dp_skip_mask(attrs, fixed_prefix):
            continue  # the {a} seed exists only to terminate backtracking
        for last, (c, _) in list(dp[mask].items()):
            for k in range(n):
                if mask & (1 << k):
                    continue
                nm, nc = mask | (1 << k), c + cost(last, k)
                if k not in dp[nm] or nc < dp[nm][k][0]:
                    dp[nm][k] = (nc, last)
    full = (1 << n) - 1
    last = min(dp[full], key=lambda k: dp[full][k][0])
    order = [last]
    mask = full
    while dp[mask][order[-1]][1] != -1:
        prev = dp[mask][order[-1]][1]
        mask ^= 1 << order[-1]
        order.append(prev)
    return [attrs[i] for i in reversed(order)]


def dp_skip_mask(attrs: list[str], fixed_prefix: tuple[str, str]) -> int:
    return 1 << attrs.index(fixed_prefix[0])


def template_cost(joins: list[Join], template: list[str], *, zero_weight: float = 0.0) -> float:
    """Total score of consecutive pairs — for tests against brute force."""
    scores = pair_scores(joins, template, zero_weight=zero_weight)
    return sum(
        scores[frozenset((template[i], template[i + 1]))]
        for i in range(len(template) - 1)
    )
