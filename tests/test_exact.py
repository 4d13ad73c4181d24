"""FullJoinUnion ground truth vs pandas brute force."""
import pandas as pd
import pytest

from repro.core.exact import full_join_union, union_tuples
from repro.core.join_spec import Relation, chain


@pytest.fixture(scope="module")
def joins(spark):
    a = pd.DataFrame({"x": [1, 1, 2, 3, 4], "pa": [0, 1, 2, 3, 4]})
    b = pd.DataFrame({"bx": [1, 2, 3, 5], "pb": [9, 8, 7, 6]})
    out = []
    for i, sl in enumerate([(0, 4), (1, 5), (2, 5)]):
        ra = Relation("a", spark.createDataFrame(a.iloc[sl[0] : sl[1]]))
        rb = Relation("b", spark.createDataFrame(b))
        out.append(chain(f"e{i}", [ra, rb], [("x", "bx")]))
    full = [
        a.iloc[sl[0] : sl[1]].merge(b, left_on="x", right_on="bx").drop_duplicates()
        for sl in [(0, 4), (1, 5), (2, 5)]
    ]
    return out, full


def brute_atoms(full: list[pd.DataFrame], names: list[str]) -> dict:
    keysets = [
        set(map(tuple, f[["x", "pa", "bx", "pb"]].itertuples(index=False)))
        for f in full
    ]
    universe = set().union(*keysets)
    atoms = {}
    for u in universe:
        mem = frozenset(n for n, ks in zip(names, keysets) if u in ks)
        atoms[mem] = atoms.get(mem, 0) + 1
    return atoms


def test_atoms_match_bruteforce(spark, joins):
    js, full = joins
    ex = full_join_union(spark, js)
    expected = brute_atoms(full, [j.name for j in js])
    assert ex.atoms == expected


def test_sizes_and_union(spark, joins):
    js, full = joins
    ex = full_join_union(spark, js)
    for j, f in zip(js, full):
        assert ex.sizes[j.name] == len(f)
    u = set()
    for f in full:
        u |= set(map(tuple, f[["x", "pa", "bx", "pb"]].itertuples(index=False)))
    assert ex.union == len(u)
    assert union_tuples(spark, js).count() == len(u)


def test_overlap_queries(spark, joins):
    js, full = joins
    ex = full_join_union(spark, js)
    k0 = set(map(tuple, full[0][["x", "pa", "bx", "pb"]].itertuples(index=False)))
    k1 = set(map(tuple, full[1][["x", "pa", "bx", "pb"]].itertuples(index=False)))
    assert ex.overlap(frozenset([js[0].name, js[1].name])) == len(k0 & k1)


def test_ratios_sum(spark, joins):
    js, _ = joins
    ex = full_join_union(spark, js)
    r = ex.ratios()
    assert all(0 < v <= 1 for v in r.values())


def test_stats_consistent_with_koverlap(spark, joins):
    js, _ = joins
    ex = full_join_union(spark, js)
    st = ex.stats
    assert st["union"] == ex.union
    assert st["sizes"] == ex.sizes
    # Eq. 1 from the A_j^k derived by Theorem 3 must reproduce |U|
    from repro.core.koverlap import k_overlaps, union_size

    a = k_overlaps(ex.names, ex.overlap_fn)
    assert union_size(ex.names, a) == pytest.approx(ex.union)
