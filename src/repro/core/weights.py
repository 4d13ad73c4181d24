"""Exact-Weight (EW) dynamic program of Zhao et al. (§3.2, "exact" weights).

``w(t)`` for a tuple ``t`` of a node is the number of full join results of
the subtree rooted at that node that extend ``t``:

    w(leaf tuple)  = 1
    w(node tuple)  = prod over child edges  sum_{t' joinable} w_child(t')

Computed bottom-up with groupBy-sum + join — aggregations only, the join
itself is never materialized. ``sum(w(root))`` is the *exact* join size,
and top-down sampling proportional to ``w`` is exactly uniform over the
join result (zero rejection) — the EW instantiation of the framework.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .join_spec import Edge, Join, Node, Relation

W = "__w"


def _weight_node(node: Node) -> Node:
    """Return a copy of the subtree whose DataFrames carry ``__w``."""
    new_edges = []
    df = node.relation.df
    factors: list[tuple[str, DataFrame]] = []
    for e in node.edges:
        child = _weight_node(e.child)
        new_edges.append(Edge(e.parent_col, e.child_col, child, e.fake))
        agg = (
            child.relation.df.groupBy(e.child_col)
            .agg(F.sum(W).alias(f"__ws_{len(factors)}"))
            .withColumnRenamed(e.child_col, f"__k_{len(factors)}")
        )
        factors.append((e.parent_col, agg))
    w_expr = F.lit(1).cast("double")
    for i, (pcol, agg) in enumerate(factors):
        df = df.join(agg, on=df[pcol] == agg[f"__k_{i}"], how="left").drop(f"__k_{i}")
        w_expr = w_expr * F.coalesce(F.col(f"__ws_{i}"), F.lit(0.0))
    df = df.withColumn(W, w_expr)
    df = df.drop(*[f"__ws_{i}" for i in range(len(factors))])
    return Node(Relation(node.relation.name, df), new_edges)


def weighted_join(join: Join, cache: bool = True) -> Join:
    """The same join tree with every relation carrying its EW ``__w``."""
    out = Join(join.name, _weight_node(join.root))
    if cache:
        for n in out.nodes():
            n.relation.df.cache()
    return out


def exact_size(join: Join) -> int:
    """Exact |join| — sum of root weights; no join materialization."""
    wj = join if W in join.root.relation.df.columns else weighted_join(join, cache=False)
    row = wj.root.relation.df.agg(F.sum(W).alias("s")).collect()[0]
    return int(row["s"] or 0)
