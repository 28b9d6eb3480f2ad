"""The paper's complexity model for Correction Propagation (Section IV-D).

Implements p_c (Eq. 3), Q(t) (Eq. 7), the expected number of labels needing
update η̂ (Eq. 8), and its best/worst-case bounds (Eqs. 10 and 12). Validated
empirically in tests and in the Fig. 9 table: measured η from the reference
incremental engine is compared against η̂ and the bounds.

**Erratum (documented in DESIGN.md Section 5):** Eq. 3 as printed uses the
*keep* probability ``n_u/(n_u+n_a)`` where the text derives the *switch*
probability for Condition (2). As printed p_c ≈ 1 even for an empty batch,
contradicting P(1) = p_c and Q(0) = 1. We implement the corrected

    p_c = m_d/|E| + (1 - m_d/|E|) * m_a / (|E| - m_d + m_a),

which is 0 for empty batches and equals the Category 3 switch probability
with the paper's own estimates n_u = (|E|-m_d)/|V|, n_a = m_a/|V|.
"""
from __future__ import annotations

import numpy as np


def p_c(m_deleted: int, m_inserted: int, n_edges: int) -> float:
    """Probability that one chosen edge is deleted or switched (Eq. 3, fixed)."""
    if n_edges <= 0:
        return 0.0
    f_d = min(m_deleted / n_edges, 1.0)
    remaining = n_edges - m_deleted + m_inserted
    f_switch = m_inserted / remaining if remaining > 0 else 0.0
    return f_d + (1.0 - f_d) * f_switch


def q_series(n_iters: int, pc: float) -> np.ndarray:
    """Q(t) = Π_{k=1..t} (1 - p_c/k) for t = 1..T (Eq. 7)."""
    k = np.arange(1, n_iters + 1, dtype=np.float64)
    return np.cumprod(1.0 - pc / k)


def eta_expected(n_iters: int, n_vertices: int, pc: float) -> float:
    """Expected number of labels needing update, η̂ (Eq. 8)."""
    return float(n_iters * n_vertices - n_vertices * q_series(n_iters, pc).sum())


def eta_lower(n_iters: int, n_vertices: int, pc: float) -> float:
    """Best case: every label picked from an initial label (Eq. 10)."""
    return float(n_iters * n_vertices * pc)


def eta_upper(n_iters: int, n_vertices: int, pc: float) -> float:
    """Worst case: every label picked from the previous iteration (Eq. 12)."""
    if pc <= 0.0:
        return 0.0
    geo = (1.0 - pc - (1.0 - pc) ** (n_iters + 1)) / pc
    return float(n_iters * n_vertices - n_vertices * geo)
