"""Undirected-graph substrate on Spark DataFrames.

The paper operates on binary graphs (undirected, unweighted, no self-loops,
no multi-edges). Canonical representation here:

* ``edges``  — one row per undirected edge with ``src < dst``;
* ``adj``    — both directions, one row per (vertex, neighbor);
* ``adjacency`` — one row per vertex with its **sorted** neighbor array.

The sorted neighbor array is load-bearing: Algorithm 1 picks
``src_i^t = nbrs_i[h mod deg_i]``, and sortedness makes the pick a pure
function of the edge *set* (partition- and order-independent), so the Spark
engine and the NumPy reference agree bit-for-bit.
"""
from __future__ import annotations

from typing import Iterable, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def edges_from_pandas(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Load an edge list (columns ``src``, ``dst``) and canonicalize it."""
    return canonical_edges(
        spark.createDataFrame(pdf[["src", "dst"]].astype("int64"))
    )


def edges_from_pairs(
    spark: SparkSession, pairs: Iterable[Tuple[int, int]]
) -> DataFrame:
    """Canonical edges from an iterable of (u, v) pairs (tests/toys)."""
    pdf = pd.DataFrame(list(pairs), columns=["src", "dst"], dtype="int64")
    return edges_from_pandas(spark, pdf)


def canonical_edges(edges: DataFrame) -> DataFrame:
    """Drop self-loops and duplicates; orient every edge ``src < dst``."""
    lo = F.least("src", "dst").alias("src")
    hi = F.greatest("src", "dst").alias("dst")
    return (
        edges.select(lo, hi)
        .where(F.col("src") != F.col("dst"))
        .distinct()
    )


def symmetrize(edges: DataFrame) -> DataFrame:
    """Both directions of each canonical edge: columns ``id``, ``nbr``."""
    fwd = edges.select(F.col("src").alias("id"), F.col("dst").alias("nbr"))
    rev = edges.select(F.col("dst").alias("id"), F.col("src").alias("nbr"))
    return fwd.unionByName(rev)


def degrees(edges: DataFrame) -> DataFrame:
    """Per-vertex degree: columns ``id``, ``degree`` (deg-0 vertices absent)."""
    return symmetrize(edges).groupBy("id").agg(F.count("*").alias("degree"))


def adjacency(edges: DataFrame) -> DataFrame:
    """Per-vertex sorted neighbor array: columns ``id``, ``nbrs``."""
    return (
        symmetrize(edges)
        .groupBy("id")
        .agg(F.array_sort(F.collect_list("nbr")).alias("nbrs"))
    )


def vertices(edges: DataFrame) -> DataFrame:
    """Distinct vertex ids appearing in the edge set: column ``id``."""
    return symmetrize(edges).select("id").distinct()


def apply_edits(
    edges: DataFrame, inserts: DataFrame | None, deletes: DataFrame | None
) -> DataFrame:
    """New canonical edge set after a batch of inserts and deletes.

    Deletes are applied after inserts (an edge both inserted and deleted in
    the same batch ends up absent, matching set semantics of one batch).
    """
    out = edges
    if inserts is not None:
        out = out.unionByName(canonical_edges(inserts)).distinct()
    if deletes is not None:
        out = out.join(canonical_edges(deletes), on=["src", "dst"], how="left_anti")
    return out
