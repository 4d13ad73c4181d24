"""Column statistics used by the estimators — DataFrame aggregations only.

These are the "histograms DBMSs already maintain" of §5: per-value degree
histograms of join attributes, their maxima and averages. Everything is a
Spark aggregation; nothing materializes a join.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def degree_histogram(df: DataFrame, col: str) -> DataFrame:
    """Per-value degree of ``col``: DataFrame[col, deg]."""
    return df.groupBy(col).agg(F.count(F.lit(1)).alias("deg"))


def max_degree(df: DataFrame, col: str) -> int:
    """Maximum value frequency M_col(df) (Olken's M)."""
    row = degree_histogram(df, col).agg(F.max("deg").alias("m")).collect()[0]
    return int(row["m"] or 0)


def avg_degree(df: DataFrame, col: str) -> float:
    """Average value frequency (used to tighten Theorem 4 when full
    histograms are available)."""
    row = degree_histogram(df, col).agg(F.avg("deg").alias("m")).collect()[0]
    return float(row["m"] or 0.0)


def pair_degree_product(
    df1: DataFrame, col1: str, df2: DataFrame, col2: str
) -> DataFrame:
    """Per-value count of joinable (t1, t2) pairs: d(v, df1) * d(v, df2).

    This is the exact per-value size of df1 ⋈ df2 on col1 = col2, computed
    from the two histograms — the K(1) building block of Theorem 4.
    Returns DataFrame[v, pairs].
    """
    h1 = degree_histogram(df1, col1).withColumnRenamed(col1, "v").withColumnRenamed(
        "deg", "d1"
    )
    h2 = degree_histogram(df2, col2).withColumnRenamed(col2, "v").withColumnRenamed(
        "deg", "d2"
    )
    return h1.join(h2, on="v").select("v", (F.col("d1") * F.col("d2")).alias("pairs"))


def self_degree(df: DataFrame, col: str) -> DataFrame:
    """Per-value pair count of a *fake* first edge: each row matches only
    its own split counterpart, so the pair count at value v is d(v, df).
    Returns DataFrame[v, pairs]."""
    return degree_histogram(df, col).select(
        F.col(col).alias("v"), F.col("deg").alias("pairs")
    )
