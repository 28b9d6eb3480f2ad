"""Distributed connected components in DataFrames (log-round style).

The paper's post-processing finds connected components of the τ-filtered
similarity graph and cites the logarithmic-round MapReduce CC of Chitnis et
al. [18]. We implement the classic *min-label propagation with pointer
jumping*: every vertex holds a candidate component label (initially its own
id); each round takes the min over its neighborhood and then jumps the
pointer (``comp ← comp(comp)``), which yields the same O(log)-round behavior
on the graphs at hand while being straightforward to prove monotone and
convergent. The union-find oracle in ``repro.cc.reference`` checks it.

Per the paper (Section V-B2) the edge-weight filter is pushed into the
algorithm: ``threshold`` filters ``weight_col >= threshold`` on the fly, so
the τ1 sweep never materializes a filtered graph.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def connected_components(
    edges: DataFrame,
    weight_col: str | None = None,
    threshold: float | None = None,
    vertices: DataFrame | None = None,
    max_rounds: int = 64,
) -> DataFrame:
    """Components of the (optionally weight-filtered) undirected graph.

    Returns ``(id, comp)`` where ``comp`` is the minimum vertex id of the
    component. Vertices incident to no surviving edge appear only if passed
    via ``vertices`` (as singleton components).
    """
    e = edges
    if weight_col is not None and threshold is not None:
        e = e.where(F.col(weight_col) >= F.lit(threshold))
    e = e.select("src", "dst")
    sym = e.unionByName(
        e.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    )
    ids = sym.select(F.col("src").alias("id")).distinct()
    if vertices is not None:
        ids = ids.unionByName(vertices.select("id")).distinct()
    labels = ids.select("id", F.col("id").alias("comp")).localCheckpoint(
        eager=True
    )
    for _ in range(max_rounds):
        nbr_min = (
            sym.join(labels, sym["dst"] == labels["id"], "inner")
            .groupBy(sym["src"].alias("id"))
            .agg(F.min("comp").alias("nbr_comp"))
        )
        stepped = (
            labels.join(nbr_min, "id", "left")
            .select(
                "id",
                F.least(
                    "comp", F.coalesce("nbr_comp", F.col("comp"))
                ).alias("comp"),
            )
        )
        # Pointer jump: comp <- comp(comp). Every comp value is a vertex id,
        # so the self-join is total.
        jump = stepped.select(
            F.col("id").alias("jid"), F.col("comp").alias("jcomp")
        )
        jumped = (
            stepped.join(jump, stepped["comp"] == jump["jid"], "inner")
            .select("id", F.col("jcomp").alias("comp"))
            .localCheckpoint(eager=True)
        )
        changed = (
            jumped.alias("n")
            .join(labels.alias("o"), "id")
            .where(F.col("n.comp") != F.col("o.comp"))
            .limit(1)
            .count()
        )
        labels.unpersist()  # superseded checkpoint
        labels = jumped
        if changed == 0:
            return labels
    raise RuntimeError("connected components did not converge")
