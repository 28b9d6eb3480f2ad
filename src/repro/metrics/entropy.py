"""Community-size information entropy (paper Eq. 1).

Used by the τ1 selection principle "maximize the information": the entropy of
the relative community sizes, ``-Σ (|C_i|/|V|) log(|C_i|/|V|)``. Both engines
(Spark and reference) funnel their component-size lists through this one
function so the argmax decision cannot drift between them.
"""
from __future__ import annotations

from typing import Iterable

import numpy as np


def size_entropy(sizes: Iterable[int], n_vertices: int) -> float:
    """Entropy of community sizes relative to the whole graph (natural log).

    ``sizes`` are the extracted community sizes (components with >= 2
    vertices); communities are not required to partition V, matching Eq. 1.
    """
    s = np.asarray(list(sizes), dtype=np.float64)
    if len(s) == 0 or n_vertices <= 0:
        return 0.0
    p = s / float(n_vertices)
    p = p[p > 0]
    return float(-(p * np.log(p)).sum())
