"""Spark reference implementations: extended Olken bound, Yannakakis
reduction, and the EW weight DP — on randomized chains and trees."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.core.join_spec import Edge, Join, Node, Relation, chain
from repro.core.olken import olken_bound, reduce_join
from repro.core.weights import exact_size, weighted_join


def random_chain(spark, seed, n_rel=3, fanout=6):
    g = np.random.default_rng(seed)
    rels, conds = [], []
    sizes = g.integers(15, 50, n_rel)
    for i, n in enumerate(sizes):
        data = {f"k{i}": g.integers(1, fanout, n), f"p{i}": np.arange(n)}
        if i + 1 < n_rel:
            data[f"j{i}"] = g.integers(1, fanout, n)
        rels.append(Relation(f"r{i}", spark.createDataFrame(pd.DataFrame(data))))
        if i:
            conds.append((f"j{i-1}", f"k{i}"))
    return chain(f"rc{seed}", rels, conds)


def duck_size(join):
    rels = join.relations()
    frames = {r.name: r.df.toPandas() for r in rels}
    con = duckdb.connect()
    for name, f in frames.items():
        con.register(name, f)
    _, edges = join.as_chain()
    sql = f"select count(*) c from {rels[0].name}"
    prev = rels[0].name
    for e, r in zip(edges, rels[1:]):
        sql += f" join {r.name} on {prev}.{e.parent_col} = {r.name}.{e.child_col}"
        prev = r.name
    out = con.execute(sql).fetchone()[0]
    con.close()
    return out


@pytest.mark.parametrize("seed", [0, 1, 2, 3, 4])
def test_exact_size_random_chains(spark, seed):
    j = random_chain(spark, seed)
    assert exact_size(j) == duck_size(j)


@pytest.mark.parametrize("seed", [0, 1, 2, 3, 4])
def test_olken_bound_random_chains(spark, seed):
    j = random_chain(spark, seed)
    assert olken_bound(j) >= duck_size(j)


@pytest.mark.parametrize("seed", [0, 2])
def test_reduction_tightens_olken(spark, seed):
    j = random_chain(spark, seed)
    assert olken_bound(reduce_join(j, cache=False)) <= olken_bound(j)


@pytest.mark.parametrize("seed", [0, 3])
def test_reduction_preserves_size(spark, seed):
    j = random_chain(spark, seed)
    assert exact_size(reduce_join(j, cache=False)) == exact_size(j)


def test_tree_weights(spark):
    """EW DP on a branching tree: root weight sum = result count."""
    g = np.random.default_rng(7)
    root_pdf = pd.DataFrame({"k": g.integers(1, 5, 20), "m": g.integers(1, 5, 20)})
    l_pdf = pd.DataFrame({"lk": g.integers(1, 5, 15), "pl": np.arange(15)})
    r_pdf = pd.DataFrame({"rm": g.integers(1, 5, 12), "pr": np.arange(12)})
    root = Node(Relation("root", spark.createDataFrame(root_pdf)))
    root.edges.append(Edge("k", "lk", Node(Relation("l", spark.createDataFrame(l_pdf)))))
    root.edges.append(Edge("m", "rm", Node(Relation("r", spark.createDataFrame(r_pdf)))))
    j = Join("t", root)
    expect = (
        root_pdf.merge(l_pdf, left_on="k", right_on="lk")
        .merge(r_pdf, left_on="m", right_on="rm")
        .shape[0]
    )
    assert exact_size(j) == expect


def test_weighted_join_idempotent_size(spark):
    j = random_chain(spark, 9)
    wj = weighted_join(j, cache=False)
    assert exact_size(wj) == exact_size(j)


def test_zero_result_join(spark):
    a = Relation("a", spark.createDataFrame(pd.DataFrame({"x": [1, 2]})))
    b = Relation("b", spark.createDataFrame(pd.DataFrame({"bx": [5, 6], "p": [0, 1]})))
    j = chain("z", [a, b], [("x", "bx")])
    assert exact_size(j) == 0
    assert olken_bound(reduce_join(j, cache=False)) == 0
