"""NumPy reference of the incremental update (paper Section IV).

Applies the identical Category 1/2/3 decision rules with the identical
epoch-keyed hash draws as ``repro.core.incremental``, so the updated choice
table and label table are bit-for-bit equal to the Spark engine's (tested).
Labels are recomputed by the sequential recurrence and diffed to measure the
paper's η (number of labels needing update) — this is the measurement oracle
behind the Fig. 9 η table and the complexity-model validation, where running
the full Spark loop for every (batch size × seed) cell would be wasteful.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, Tuple

import numpy as np
import pandas as pd

from repro.core import rand
from repro.reference.rslpa_ref import (
    RefGraph,
    build_graph,
    draw_choice_matrices,
    resolve_label_matrix,
)


def canon_pdf(edges: pd.DataFrame) -> pd.DataFrame:
    """Canonical (src < dst, deduped, no loops) pandas edge list."""
    src = edges["src"].to_numpy(dtype=np.int64)
    dst = edges["dst"].to_numpy(dtype=np.int64)
    lo, hi = np.minimum(src, dst), np.maximum(src, dst)
    keep = lo != hi
    pairs = np.unique(np.stack([lo[keep], hi[keep]], axis=1), axis=0)
    return pd.DataFrame({"src": pairs[:, 0], "dst": pairs[:, 1]})


def apply_edits_pdf(
    edges: pd.DataFrame,
    inserts: pd.DataFrame | None,
    deletes: pd.DataFrame | None,
) -> pd.DataFrame:
    """Set-semantics batch application, matching ``repro.core.graph``."""
    cur = {tuple(r) for r in canon_pdf(edges).to_numpy()}
    if inserts is not None and len(inserts):
        cur |= {tuple(r) for r in canon_pdf(inserts).to_numpy()}
    if deletes is not None and len(deletes):
        cur -= {tuple(r) for r in canon_pdf(deletes).to_numpy()}
    arr = np.array(sorted(cur), dtype=np.int64).reshape(-1, 2)
    return pd.DataFrame({"src": arr[:, 0], "dst": arr[:, 1]})


@dataclass
class RefState:
    """Reference-engine mirror of ``repro.core.rslpa.RslpaState``."""

    edges: pd.DataFrame  # canonical
    g: RefGraph
    src: np.ndarray  # (n, T)
    pos: np.ndarray  # (n, T)
    labels: np.ndarray  # (n, T+1)
    n_iters: int
    seed: int
    epoch: int


def ref_run_static(edges: pd.DataFrame, n_iters: int, seed: int) -> RefState:
    """Algorithm 1 from scratch (reference engine)."""
    edges = canon_pdf(edges)
    g = build_graph(edges)
    src, pos = draw_choice_matrices(g, n_iters, seed, epoch=0)
    labels = resolve_label_matrix(g, src, pos)
    return RefState(edges, g, src, pos, labels, n_iters, seed, 0)


def ref_apply_batch(
    state: RefState,
    inserts: pd.DataFrame | None,
    deletes: pd.DataFrame | None,
) -> Tuple[RefState, Dict[str, int]]:
    """One incremental batch; returns (new state, η statistics)."""
    T, seed = state.n_iters, state.seed
    epoch = state.epoch + 1
    new_edges = apply_edits_pdf(state.edges, inserts, deletes)
    old_set = {tuple(r) for r in state.edges.to_numpy()}
    new_set = {tuple(r) for r in new_edges.to_numpy()}
    removed = old_set - new_set
    added = new_set - old_set
    affected = {v for e in removed | added for v in e}
    g_new = build_graph(new_edges)
    n_new_g = g_new.n

    old_index = {int(v): i for i, v in enumerate(state.g.ids)}
    old_nbr_sets = state.g.neighbor_sets()

    src_new = np.empty((n_new_g, T), dtype=np.int64)
    pos_new = np.empty((n_new_g, T), dtype=np.int64)
    repicked = np.zeros((n_new_g, T), dtype=bool)
    t_arr = np.arange(1, T + 1, dtype=np.int64)

    for row, vid in enumerate(g_new.ids):
        vid = int(vid)
        if vid not in affected:
            old_row = old_index[vid]  # unaffected => existed with same nbrs
            src_new[row] = state.src[old_row]
            pos_new[row] = state.pos[old_row]
            continue
        new_nbrs = g_new.nbrs_flat[g_new.offsets[row] : g_new.offsets[row + 1]]
        new_set_v = set(new_nbrs.tolist())
        old_set_v = old_nbr_sets.get(vid, set())
        added_v = np.array(
            sorted(new_set_v - old_set_v), dtype=np.int64
        )  # == array_except(new, old) on sorted arrays
        n_new = len(new_nbrs)
        n_add = len(added_v)
        has_old = vid in old_index
        if has_old:
            src_old = state.src[old_index[vid]]
            pos_old = state.pos[old_index[vid]]
            keep_ok = np.isin(src_old, new_nbrs)
        else:
            src_old = np.zeros(T, dtype=np.int64)
            pos_old = np.zeros(T, dtype=np.int64)
            keep_ok = np.zeros(T, dtype=bool)
        u = rand.hash_unit(seed, rand.KEEP, epoch, vid, t_arr)
        idx_full = rand.hash_mod(seed, rand.NSRC, n_new, epoch, vid, t_arr)
        idx_add = rand.hash_mod(
            seed, rand.NSRC, max(n_add, 1), epoch, vid, t_arr
        )
        new_pos = rand.hash_mod(seed, rand.NPOS, t_arr, epoch, vid, t_arr)
        keep_prob = (n_new - n_add) / n_new
        switch = keep_ok & (n_add > 0) & (u >= keep_prob)
        repick_full = ~keep_ok
        s = np.where(
            repick_full,
            new_nbrs[idx_full],
            np.where(switch, added_v[idx_add] if n_add else 0, src_old),
        )
        p = np.where(repick_full | switch, new_pos, pos_old)
        src_new[row] = s
        pos_new[row] = p
        repicked[row] = repick_full | switch

    labels_new = resolve_label_matrix(g_new, src_new, pos_new)
    # labels_init mirrors the Spark engine: old label where the row survived,
    # anchor placeholder (the vertex id) where it is new.
    labels_init = np.repeat(g_new.ids[:, None], T + 1, axis=1)
    for row, vid in enumerate(g_new.ids):
        old_row = old_index.get(int(vid))
        if old_row is not None:
            labels_init[row] = state.labels[old_row]
    value_changed = labels_new != labels_init
    eta = int(np.count_nonzero(repicked | value_changed[:, 1:]))
    stats = {
        "m_inserted": len(added),
        "m_deleted": len(removed),
        "n_affected_vertices": len(affected),
        "n_repicked": int(repicked.sum()),
        "n_value_changed": int(value_changed.sum()),
        "eta": eta,
    }
    new_state = RefState(
        new_edges, g_new, src_new, pos_new, labels_new, T, seed, epoch
    )
    return new_state, stats
