"""NumPy reference engine for SLPA — bit-identical to ``repro.slpa.slpa``.

Consumes the same splitmix64 draws (speaker sampling keyed by
``(t, listener, speaker)``, tie-breaks by ``(t, listener)``) and applies the
same sorted-ascending tie ordering, so the memory matrix equals the Spark
engine's memory arrays exactly. Used for the Table I quality sweeps, where
T=100 over many parameter points would not fit a Spark-local budget.
"""
from __future__ import annotations

from typing import List, Set, Tuple

import numpy as np
import pandas as pd

from repro.core import rand
from repro.reference.rslpa_ref import RefGraph, build_graph
from repro.slpa.slpa import threshold_communities


def plurality_winners(
    listeners: np.ndarray, labels: np.ndarray, seed: int, t: int
) -> Tuple[np.ndarray, np.ndarray]:
    """Per-listener plurality label with uniform tie-break (vectorized).

    Ties are ordered ascending and the pick is
    ``hash_mod(seed, TIE, k, t, listener)`` — byte-compatible with the Spark
    winner kernel. Returns ``(unique_listeners, winners)`` in listener order.
    """
    order = np.lexsort((labels, listeners))
    l = listeners[order]
    lab = labels[order]
    m = len(l)
    grp_new = np.empty(m, dtype=bool)
    grp_new[0] = True
    grp_new[1:] = (l[1:] != l[:-1]) | (lab[1:] != lab[:-1])
    grp_idx = np.cumsum(grp_new) - 1
    counts = np.bincount(grp_idx)
    grp_l = l[grp_new]
    grp_lab = lab[grp_new]
    n_grp = len(grp_l)
    seg_new = np.empty(n_grp, dtype=bool)
    seg_new[0] = True
    seg_new[1:] = grp_l[1:] != grp_l[:-1]
    seg_starts = np.flatnonzero(seg_new)
    seg_idx = np.cumsum(seg_new) - 1
    maxc = np.maximum.reduceat(counts, seg_starts)
    is_tie = counts == maxc[seg_idx]
    k_ties = np.add.reduceat(is_tie.astype(np.int64), seg_starts)
    uniq_l = grp_l[seg_starts]
    pick = rand.hash_mod(seed, rand.TIE, k_ties, t, uniq_l)
    cs = np.cumsum(is_tie.astype(np.int64))
    before = np.zeros(len(seg_starts), dtype=np.int64)
    if len(seg_starts) > 1:
        before[1:] = cs[seg_starts[1:] - 1]
    tie_rank = cs - 1 - before[seg_idx]
    sel = is_tie & (tie_rank == pick[seg_idx])
    return uniq_l, grp_lab[sel]


def run_slpa_ref(
    edges: pd.DataFrame, n_iters: int, seed: int
) -> Tuple[RefGraph, np.ndarray]:
    """T iterations of SLPA; returns ``(graph, memory matrix (n, T+1))``."""
    g = build_graph(edges)
    listeners_row = np.repeat(np.arange(g.n), g.degrees)
    listener_ids = g.ids[listeners_row]
    speaker_ids = g.nbrs_flat
    speaker_rows = g.index_of(speaker_ids)
    mem = np.empty((g.n, n_iters + 1), dtype=np.int64)
    mem[:, 0] = g.ids
    for t in range(1, n_iters + 1):
        idx = rand.hash_mod(seed, rand.SEND, t, t, listener_ids, speaker_ids)
        sent = mem[speaker_rows, idx]
        uniq_l, winners = plurality_winners(listener_ids, sent, seed, t)
        # Every vertex has degree >= 1 in a RefGraph, so uniq_l == g.ids.
        mem[g.index_of(uniq_l), t] = winners
    return g, mem


def memory_counts_ref(g: RefGraph, mem: np.ndarray) -> pd.DataFrame:
    """Per-vertex label histogram (id, label, cnt) from the memory matrix."""
    n, w = mem.shape
    ids = np.repeat(g.ids, w)
    pairs = np.stack([ids, mem.ravel()], axis=1)
    uniq, cnt = np.unique(pairs, axis=0, return_counts=True)
    return pd.DataFrame(
        {"id": uniq[:, 0], "label": uniq[:, 1], "cnt": cnt.astype(np.int64)}
    )


def slpa_communities_ref(
    edges: pd.DataFrame, n_iters: int, seed: int, tau: float
) -> List[Set[int]]:
    """End-to-end SLPA baseline on the reference engine."""
    g, mem = run_slpa_ref(edges, n_iters, seed)
    return threshold_communities(memory_counts_ref(g, mem), tau, n_iters)
