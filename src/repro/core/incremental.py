"""Incremental updating after an edge-edit batch (paper Section IV, Alg. 2).

Dataflow note: the frontier, delta, and affected-vertex frames are small
relative to the label/choice tables, so every join against a big table
broadcasts the small side explicitly (``F.broadcast``). This is the
DataFrame equivalent of the paper's point that Correction Propagation sends
*small messages to receivers* rather than reshuffling global state — and it
is what makes the incremental path cheaper than from-scratch resolution
(whose pointer-doubling self-joins are inherently big-big shuffles). The
session-level broadcast-join ban from conftest stays in force for
everything else.

Two phases, exactly as the paper structures them:

**1. Handling adjacent edge changes** (Section IV-A). Every (vertex,
iteration) row of the choice table is classified into the paper's three
categories and re-picked only when required:

* Category 1 (no neighbor change) — row untouched (vertex not in the
  affected set at all).
* Category 2 (only lost neighbors) — re-pick iff the recorded ``src`` was
  removed; Theorem 4 guarantees a kept ``src`` is still uniform over the
  remaining neighbors. The membership test is ``src ∉ new_nbrs`` (legal
  because ``src ∈ old_nbrs`` by construction).
* Category 3 (gained neighbors, possibly also lost some) — if ``src`` was
  removed, re-pick over all current neighbors; otherwise keep with
  probability ``n_u/(n_u+n_a)`` else pick uniformly among the *added*
  neighbors (Theorem 5's auxiliary process, realized with a fresh
  epoch-keyed coin).

Vertex insertion/deletion follows the paper's reduction: a vertex whose rows
are missing (new, or previously degree-0) re-picks everything; a vertex that
drops to degree 0 loses its rows (its sequence reverts to ``(i)``).

**2. Correction Propagation** (Section IV-B/C, Algorithm 2). Re-picked rows
form the dirty frontier; each round fetches ``l_src^pos`` for the frontier,
applies value changes, and forwards them to the *receivers* — the rows whose
``(src, pos)`` equals a changed ``(id, t)``. The paper materializes receiver
records ``R_i``; here the choice table itself is the record and receivers
are recovered by the reverse equi-join on ``(src, pos)`` — the same
information, maintained for free (DESIGN.md Section 2). Because a receiver's
iteration is strictly larger than its source's, the loop terminates within T
rounds; in practice it runs for the depth of the perturbed propagation
trees, which is O(log T) in expectation.

The final label table provably equals a from-scratch resolution of the
updated choice table — the paper's "same communities as from scratch" claim,
asserted bit-for-bit in tests.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import List

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import graph as G
from repro.core import rand
from repro.core.rslpa import RslpaState
from repro.core.spark_rand import mod_udf, unit_udf


@dataclass
class UpdateStats:
    """Observability of one incremental batch (drives the Fig. 9 table)."""

    m_inserted: int
    m_deleted: int
    n_affected_vertices: int
    n_repicked: int  # rows re-picked in phase 1 (|F0|)
    n_value_changed: int  # rows whose final label differs from the old one
    eta: int  # |F0 ∪ value-changed| — the paper's η (-1 if stats skipped)
    rounds: int  # correction-propagation message rounds until quiescence
    round_deltas: List[int] = field(default_factory=list)  # messages/round


def apply_batch(
    state: RslpaState,
    inserts: DataFrame | None,
    deletes: DataFrame | None,
    materialize: bool = False,
    compute_stats: bool = True,
) -> tuple[RslpaState, UpdateStats]:
    """Evolve ``state`` under one batch of edge inserts/deletes.

    ``materialize=True`` checkpoints the updated label/choice tables (an
    O(T·|V|) rewrite) — useful before a long run of subsequent batches to
    cap lineage depth; by default the new state is a lazy overlay over the
    previous checkpointed state. ``compute_stats=False`` skips the η
    accounting joins (pure timing runs; η then reads -1).
    """
    n_iters, seed = state.n_iters, state.seed
    epoch = state.epoch + 1

    new_edges = G.apply_edits(state.edges, inserts, deletes).localCheckpoint(
        eager=True
    )
    removed_e = state.edges.join(
        new_edges, ["src", "dst"], "left_anti"
    ).localCheckpoint(eager=True)
    added_e = new_edges.join(
        state.edges, ["src", "dst"], "left_anti"
    ).localCheckpoint(eager=True)
    m_d, m_a = removed_e.count(), added_e.count()
    affected = (
        G.vertices(removed_e)
        .unionByName(G.vertices(added_e))
        .distinct()
        .coalesce(8)
        .localCheckpoint(eager=True)
    )
    n_affected = affected.count()
    if n_affected == 0:
        stats = UpdateStats(m_a, m_d, 0, 0, 0, 0, 0)
        return state, stats

    new_adj = G.adjacency(new_edges).coalesce(16).localCheckpoint(eager=True)

    # --- Phase 1: classify & re-pick affected rows -------------------------
    old_aff = (
        state.adjacency.join(F.broadcast(affected), "id")
        .select("id", F.col("nbrs").alias("old_nbrs"))
        .coalesce(8)
        .localCheckpoint(eager=True)
    )
    new_aff = (
        new_adj.join(F.broadcast(affected), "id")
        .select("id", F.col("nbrs").alias("new_nbrs"))
        .coalesce(8)
        .localCheckpoint(eager=True)
    )
    vert_info = new_aff.join(old_aff, "id", "full_outer")
    grid = vert_info.where(F.col("new_nbrs").isNotNull()).select(
        "id",
        "old_nbrs",
        "new_nbrs",
        F.explode(F.sequence(F.lit(1), F.lit(n_iters))).alias("t"),
    )
    old_rows = state.choices.join(F.broadcast(affected), "id")
    dec = (
        grid.join(old_rows, ["id", "t"], "left")
        .withColumn("n_new", F.size("new_nbrs"))
        .withColumn(
            "added",
            F.array_except(
                "new_nbrs",
                F.coalesce("old_nbrs", F.array().cast("array<long>")),
            ),
        )
        .withColumn("n_add", F.size("added"))
        .withColumn(
            "keep_ok",
            F.col("src").isNotNull() & F.array_contains("new_nbrs", F.col("src")),
        )
    )
    u_keep = unit_udf(seed, rand.KEEP, epoch)
    i_src = mod_udf(seed, rand.NSRC, epoch)
    i_pos = mod_udf(seed, rand.NPOS, epoch)
    dec = (
        dec.withColumn("u", u_keep("id", "t"))
        .withColumn("idx_full", i_src(F.col("n_new"), F.col("id"), F.col("t")))
        .withColumn("idx_add", i_src(F.col("n_add"), F.col("id"), F.col("t")))
        .withColumn("new_pos", i_pos(F.col("t"), F.col("id"), F.col("t")))
    )
    keep_prob = (F.col("n_new") - F.col("n_add")) / F.col("n_new")
    switch = F.col("keep_ok") & (F.col("n_add") > 0) & (F.col("u") >= keep_prob)
    repick_full = ~F.col("keep_ok")
    dec = dec.select(
        "id",
        "t",
        F.when(repick_full, F.element_at("new_nbrs", (F.col("idx_full") + 1).cast("int")))
        .when(switch, F.element_at("added", (F.col("idx_add") + 1).cast("int")))
        .otherwise(F.col("src"))
        .alias("src"),
        F.when(repick_full | switch, F.col("new_pos").cast("int"))
        .otherwise(F.col("pos"))
        .alias("pos"),
        (repick_full | switch).alias("changed"),
    ).coalesce(8).localCheckpoint(eager=True)

    # The updated choice table stays LAZY: one broadcast anti-join layer
    # over the old (checkpointed) table plus the small decision frame. Scans
    # remain cheap and nothing O(T*|V|) is rewritten per batch — the paper's
    # "only visit vertices close to the changed edges" at the storage level.
    unaffected = state.choices.join(F.broadcast(affected), "id", "left_anti")
    new_choices = unaffected.unionByName(dec.select("id", "t", "src", "pos"))
    frontier = (
        dec.where("changed")
        .select("id", "t", "src", "pos")
        .coalesce(8)
        .localCheckpoint(eager=True)
    )
    n_repicked = frontier.count()

    # --- Phase 2: Correction Propagation ----------------------------------
    # Inside the loop only *small* frames (the message frontier and the
    # updates overlay) are materialized; each round pays one broadcast-
    # lookup scan of the static choice table (the receiver fan-out) — the
    # dataflow analogue of Algorithm 2's per-message cost. The big tables
    # themselves are never rewritten unless ``materialize`` asks for it.
    spark = new_adj.sparkSession
    # Lazy pre-update snapshot: old labels minus dropped vertices, plus
    # anchor rows for brand-new vertices. Only vertices whose degree changed
    # can join or leave the vertex set, and those are all in `affected`, so
    # the deltas are small frames.
    dropped = (
        affected.join(new_aff.select("id"), "id", "left_anti")
        .coalesce(8)
        .localCheckpoint(eager=True)
    )
    new_vs = (
        new_aff.select("id")
        .join(old_aff.select("id"), "id", "left_anti")
        .coalesce(8)
        .localCheckpoint(eager=True)
    )
    new_vertex_rows = new_vs.select(
        "id",
        F.explode(F.sequence(F.lit(0), F.lit(n_iters))).alias("t"),
        F.col("id").alias("label"),
    )
    labels_init = state.labels.join(
        F.broadcast(dropped), "id", "left_anti"
    ).unionByName(new_vertex_rows)
    init_view = labels_init.select(
        F.col("id").alias("lid"), F.col("t").alias("lt"),
        F.col("label").alias("llabel"),
    )
    updates = spark.createDataFrame([], "id long, t int, label long")
    rounds = 0
    round_deltas: List[int] = []

    # Round 0: re-picked rows fetch their new source label from the snapshot
    # (the overlay is still empty — every other row holds its old value, and
    # stale reads are repaired by the message cascade below, exactly as in
    # Algorithm 2). From here on, messages CARRY the new label value: the
    # receiver fan-out join delivers (receiver_id, receiver_t, new_value) in
    # one pass, so a round needs no label lookups and no compare pass —
    # receivers are simply re-notified whenever their source was rewritten,
    # and the t-monotone receiver DAG bounds the cascade by the propagation
    # tree depth (O(log T) expected, <= T worst case).
    dirty = (
        F.broadcast(frontier)
        .join(
            init_view,
            (frontier["src"] == init_view["lid"])
            & (frontier["pos"] == init_view["lt"]),
        )
        .select("id", "t", F.col("llabel").alias("label"))
        .coalesce(8)
        .localCheckpoint(eager=True)
    )
    n_dirty = dirty.count()
    while n_dirty > 0:
        if rounds > n_iters + 1:
            raise RuntimeError("correction propagation did not converge")
        rounds += 1
        round_deltas.append(n_dirty)
        # Latest write wins: newer rounds overwrite older overlay entries.
        prev_updates = updates
        updates = (
            updates.join(F.broadcast(dirty), ["id", "t"], "left_anti")
            .unionByName(dirty)
            .coalesce(8)
            .localCheckpoint(eager=True)
        )
        prev_updates.unpersist()
        sources = dirty.select(
            F.col("id").alias("sid"),
            F.col("t").alias("st"),
            F.col("label").alias("slabel"),
        )
        prev_dirty = dirty
        dirty = (
            new_choices.join(
                F.broadcast(sources),
                (new_choices["src"] == sources["sid"])
                & (new_choices["pos"] == sources["st"]),
            )
            .select(new_choices["id"], "t", F.col("slabel").alias("label"))
            .coalesce(8)
            .localCheckpoint(eager=True)
        )
        prev_dirty.unpersist()
        n_dirty = dirty.count()

    cur = (
        labels_init.join(
            F.broadcast(
                updates.select(
                    "id", "t", F.col("label").alias("new_label")
                )
            ),
            ["id", "t"],
            "left",
        )
        .select(
            "id", "t", F.coalesce("new_label", "label").alias("label")
        )
    )
    if materialize:
        cur = cur.localCheckpoint(eager=True)
        new_choices = new_choices.localCheckpoint(eager=True)

    if compute_stats:
        # η accounting: final-vs-initial diff restricted to the overlay
        # (only overlaid rows can differ), plus the re-picked frontier.
        value_changed = (
            F.broadcast(
                updates.select("id", "t", F.col("label").alias("new_label"))
            )
            .join(labels_init, ["id", "t"])
            .where(F.col("new_label") != F.col("label"))
            .select("id", "t")
            .coalesce(8)
            .localCheckpoint(eager=True)
        )
        n_value_changed = value_changed.count()
        eta = (
            frontier.select("id", "t")
            .unionByName(value_changed)
            .distinct()
            .count()
        )
    else:
        n_value_changed = -1
        eta = -1

    new_state = RslpaState(
        edges=new_edges,
        adjacency=new_adj,
        choices=new_choices,
        labels=cur,
        n_iters=n_iters,
        seed=seed,
        epoch=epoch,
    )
    stats = UpdateStats(
        m_inserted=m_a,
        m_deleted=m_d,
        n_affected_vertices=n_affected,
        n_repicked=n_repicked,
        n_value_changed=n_value_changed,
        eta=eta,
        rounds=rounds,
        round_deltas=round_deltas,
    )
    return new_state, stats
