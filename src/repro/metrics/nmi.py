"""Overlapping (cover) Normalized Mutual Information — the LFK variant.

The paper evaluates against LFR ground truth with "the Normalized Mutual
Information (NMI), one of the most widely used measures" — for *overlapping*
covers that is the extension of Lancichinetti, Fortunato & Kertesz (New J.
Phys. 2009, the same authors as the LFR benchmark): each community is a
binary random variable over the vertex set; conditional entropies are
matched between the two covers with the LFK admissibility constraint, and

    NMI(X, Y) = 1 - 0.5 * ( H(X|Y)_norm + H(Y|X)_norm )  in [0, 1].

Implementation is driver-side NumPy over boolean membership matrices —
covers are small relative to the graph, and the metric is an evaluation
artifact, not part of the distributed algorithm.
"""
from __future__ import annotations

from typing import Iterable, Sequence, Set

import numpy as np

Cover = Sequence[Set[int]]


def _h(p: np.ndarray) -> np.ndarray:
    """Elementwise -p*log(p) with h(0) = 0."""
    out = np.zeros_like(p, dtype=np.float64)
    mask = p > 0
    out[mask] = -p[mask] * np.log(p[mask])
    return out


def _membership_matrix(cover: Cover, universe: np.ndarray) -> np.ndarray:
    idx = {int(v): i for i, v in enumerate(universe)}
    m = np.zeros((len(cover), len(universe)), dtype=bool)
    for k, community in enumerate(cover):
        rows = [idx[int(v)] for v in community if int(v) in idx]
        m[k, rows] = True
    return m


def _norm_cond_entropy(mx: np.ndarray, my: np.ndarray) -> float:
    """<H(X_k|Y) / H(X_k)>_k with the LFK admissibility constraint."""
    n = mx.shape[1]
    ax = mx.sum(axis=1)  # |X_k|
    ay = my.sum(axis=1)  # |Y_l|
    # Pairwise confusion counts via boolean matmul.
    n11 = mx.astype(np.int64) @ my.T.astype(np.int64)  # (K, L)
    n10 = ax[:, None] - n11
    n01 = ay[None, :] - n11
    n00 = n - ax[:, None] - ay[None, :] + n11
    p11, p10, p01, p00 = (m / n for m in (n11, n10, n01, n00))
    h11, h10, h01, h00 = _h(p11), _h(p10), _h(p01), _h(p00)
    # Admissible only if h(p11) + h(p00) >= h(p01) + h(p10) (LFK eq. B.14).
    admissible = (h11 + h00) >= (h01 + h10)
    hx = _h(ax / n) + _h(1 - ax / n)  # H(X_k)
    hy = _h(ay / n) + _h(1 - ay / n)  # H(Y_l)
    joint = h11 + h10 + h01 + h00  # H(X_k, Y_l)
    cond = joint - hy[None, :]  # H(X_k | Y_l)
    cond = np.where(admissible, cond, np.inf)
    best = cond.min(axis=1)  # H(X_k | Y) before fallback
    best = np.where(np.isfinite(best), best, hx)  # fallback: H(X_k)
    ratios = np.where(hx > 0, np.clip(best, 0, None) / np.where(hx > 0, hx, 1), 0.0)
    return float(ratios.mean()) if len(ratios) else 0.0


def overlapping_nmi(x: Cover, y: Cover) -> float:
    """LFK NMI between two covers; 1 for identical covers, ~0 for unrelated."""
    x = [set(c) for c in x if len(c) > 0]
    y = [set(c) for c in y if len(c) > 0]
    if not x and not y:
        return 1.0
    if not x or not y:
        return 0.0
    universe = np.array(
        sorted(set().union(*x) | set().union(*y)), dtype=np.int64
    )
    mx = _membership_matrix(x, universe)
    my = _membership_matrix(y, universe)
    return 1.0 - 0.5 * (_norm_cond_entropy(mx, my) + _norm_cond_entropy(my, mx))
