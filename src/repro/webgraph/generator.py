"""Synthetic web-graph substitute for eu-2015-tpd (paper Table II).

The paper's efficiency study runs on the eu-2015-tpd crawl from the
Laboratory for Web Algorithmics (6.65M pages, 170M links), undirected and
deduplicated. The dataset is unavailable offline, so we generate a Chung–Lu
power-law graph with the same *shape* — heavy-tailed degrees (web-like
exponent β ≈ 2.1), comparable average degree — at a laptop scale set by a
size parameter. DESIGN.md Section 4 records the substitution; the Table II
harness prints our statistics next to the paper's.

``edit_batch`` implements the paper's edit workload (Section V-B1): a batch
of b edits, half uniformly-sampled deletions of existing edges and half
uniformly-sampled insertions of non-existing edges.
"""
from __future__ import annotations

from typing import Dict, Tuple

import numpy as np
import pandas as pd


def web_graph(
    n: int = 20_000,
    avg_degree: float = 25.0,
    beta: float = 2.1,
    seed: int = 0,
) -> pd.DataFrame:
    """Chung–Lu power-law graph: canonical pandas edge list (src < dst)."""
    rng = np.random.default_rng(seed)
    ranks = np.arange(1, n + 1, dtype=np.float64)
    w = ranks ** (-1.0 / (beta - 1.0))
    p = w / w.sum()
    m_target = int(n * avg_degree / 2)
    pairs: set = set()
    attempts = 0
    while len(pairs) < m_target and attempts < 6:
        need = int((m_target - len(pairs)) * 1.5) + 16
        u = rng.choice(n, size=need, p=p)
        v = rng.choice(n, size=need, p=p)
        lo, hi = np.minimum(u, v), np.maximum(u, v)
        keep = lo != hi
        for a, b in zip(lo[keep], hi[keep]):
            pairs.add((int(a), int(b)))
            if len(pairs) >= m_target:
                break
        attempts += 1
    arr = np.array(sorted(pairs), dtype=np.int64).reshape(-1, 2)
    return pd.DataFrame({"src": arr[:, 0], "dst": arr[:, 1]})


def graph_stats(edges: pd.DataFrame) -> Dict[str, float]:
    """Table II statistics: nodes, edges, average and max degree."""
    ids, counts = np.unique(
        np.concatenate([edges["src"].to_numpy(), edges["dst"].to_numpy()]),
        return_counts=True,
    )
    return {
        "nodes": int(len(ids)),
        "edges": int(len(edges)),
        "avg_degree": float(counts.mean()) if len(ids) else 0.0,
        "max_degree": int(counts.max()) if len(ids) else 0,
    }


def edit_batch(
    edges: pd.DataFrame, n_edits: int, seed: int = 0
) -> Tuple[pd.DataFrame, pd.DataFrame]:
    """The paper's edit workload: (inserts, deletes), each ``n_edits // 2``.

    Deletions are uniform over existing edges; insertions are uniform over
    vertex pairs not currently present (rejection-sampled).
    """
    rng = np.random.default_rng(seed)
    existing = {(int(a), int(b)) for a, b in edges.to_numpy()}
    vertex_ids = np.unique(
        np.concatenate([edges["src"].to_numpy(), edges["dst"].to_numpy()])
    )
    n_del = n_edits // 2
    n_ins = n_edits - n_del
    del_idx = rng.choice(len(edges), size=min(n_del, len(edges)), replace=False)
    deletes = edges.iloc[np.sort(del_idx)].reset_index(drop=True)
    inserts: set = set()
    while len(inserts) < n_ins:
        need = (n_ins - len(inserts)) * 2 + 8
        u = rng.choice(vertex_ids, size=need)
        v = rng.choice(vertex_ids, size=need)
        lo, hi = np.minimum(u, v), np.maximum(u, v)
        for a, b in zip(lo, hi):
            a, b = int(a), int(b)
            if a != b and (a, b) not in existing and (a, b) not in inserts:
                inserts.add((a, b))
                if len(inserts) >= n_ins:
                    break
    arr = np.array(sorted(inserts), dtype=np.int64).reshape(-1, 2)
    inserts_pdf = pd.DataFrame({"src": arr[:, 0], "dst": arr[:, 1]})
    return inserts_pdf, deletes
