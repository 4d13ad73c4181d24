"""Property tests of the Theorem 3 / Eq. 1 / cover algebra against brute
force on random set systems (no Spark needed)."""
from itertools import combinations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.koverlap import (
    cover_sizes,
    exact_stats_from_atoms,
    k_overlaps,
    overlap_fn_from_atoms,
    union_size,
)


def random_atoms(n_joins: int, seed: int) -> dict[frozenset, int]:
    """Random atom counts over the powerset of n joins (≥1 per join)."""
    rng = np.random.default_rng(seed)
    names = [f"j{i}" for i in range(n_joins)]
    atoms = {}
    for k in range(1, n_joins + 1):
        for d in combinations(names, k):
            c = int(rng.integers(0, 50))
            if c:
                atoms[frozenset(d)] = c
    for nm in names:  # every join non-empty
        atoms.setdefault(frozenset([nm]), 1)
    return atoms


@pytest.mark.parametrize("n_joins", [2, 3, 4, 5])
@pytest.mark.parametrize("seed", [0, 1, 2, 7])
def test_theorem3_matches_bruteforce(n_joins, seed):
    atoms = random_atoms(n_joins, seed)
    names = sorted({x for s in atoms for x in s})
    fn = overlap_fn_from_atoms(atoms)
    a = k_overlaps(names, fn)
    truth = exact_stats_from_atoms(names, atoms)["a_jk"]
    for key, v in truth.items():
        assert a[key] == pytest.approx(v), f"A_j^k mismatch at {key}"


@pytest.mark.parametrize("n_joins", [2, 3, 4, 5])
@pytest.mark.parametrize("seed", [0, 3, 11])
def test_union_size_eq1(n_joins, seed):
    atoms = random_atoms(n_joins, seed)
    names = sorted({x for s in atoms for x in s})
    a = k_overlaps(names, overlap_fn_from_atoms(atoms))
    assert union_size(names, a) == pytest.approx(sum(atoms.values()))


@pytest.mark.parametrize("n_joins", [2, 3, 4, 5])
@pytest.mark.parametrize("seed", [0, 5, 13])
def test_cover_inclusion_exclusion(n_joins, seed):
    atoms = random_atoms(n_joins, seed)
    names = sorted({x for s in atoms for x in s})
    covers = cover_sizes(names, overlap_fn_from_atoms(atoms))
    truth = exact_stats_from_atoms(names, atoms)["covers"]
    for j in names:
        assert covers[j] == pytest.approx(truth[j]), f"cover mismatch at {j}"


@pytest.mark.parametrize("seed", range(6))
def test_covers_partition_union(seed):
    atoms = random_atoms(4, seed)
    names = sorted({x for s in atoms for x in s})
    covers = cover_sizes(names, overlap_fn_from_atoms(atoms))
    assert sum(covers.values()) == pytest.approx(sum(atoms.values()))


@settings(max_examples=60, deadline=None)
@given(
    st.integers(min_value=2, max_value=5),
    st.integers(min_value=0, max_value=10_000),
)
def test_theorem3_hypothesis(n_joins, seed):
    atoms = random_atoms(n_joins, seed)
    names = sorted({x for s in atoms for x in s})
    fn = overlap_fn_from_atoms(atoms)
    a = k_overlaps(names, fn)
    truth = exact_stats_from_atoms(names, atoms)
    for key, v in truth["a_jk"].items():
        assert a[key] == pytest.approx(v)
    assert union_size(names, a) == pytest.approx(truth["union"])
    covers = cover_sizes(names, fn)
    for j in names:
        assert covers[j] == pytest.approx(truth["covers"][j])


def test_overlap_fn_singleton_is_size():
    atoms = random_atoms(3, 42)
    names = sorted({x for s in atoms for x in s})
    fn = overlap_fn_from_atoms(atoms)
    sizes = exact_stats_from_atoms(names, atoms)["sizes"]
    for j in names:
        assert fn(frozenset([j])) == sizes[j]


def test_k_overlap_clamps_inconsistent_bounds():
    # Upper-bound overlap estimates can be mutually inconsistent; the
    # recursion must not emit negative areas.
    names = ["a", "b", "c"]

    def fn(delta):
        if len(delta) == 1:
            return 100.0
        if len(delta) == 2:
            return 10.0
        return 60.0  # triple overlap "larger" than pairwise — inconsistent

    a = k_overlaps(names, fn)
    assert all(v >= 0 for v in a.values())
