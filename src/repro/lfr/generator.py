"""LFR-lite: overlapping-community benchmark graphs with ground truth.

Offline substitute for the LFR benchmark binary (Lancichinetti & Fortunato,
Phys. Rev. E 2009) that the paper uses for Table I / the quality study.
Exposes the same knobs (Table I): ``n`` (N), ``k`` (average degree), ``maxk``
(max degree), ``mu`` (mixing parameter), ``on`` (number of overlapping
vertices), ``om`` (memberships per overlapping vertex) — plus the usual
degree / community-size power-law exponents (t1=2, t2=1, LFR defaults).

Construction (configuration-model flavor of the original):

1. degrees ~ truncated power law with exponent t1 on [kmin, maxk], kmin
   chosen numerically so the mean is ≈ k;
2. community sizes ~ truncated power law with exponent t2 on
   [min_c, max_c] until the membership slots (N + on·(om−1)) are covered;
3. memberships assigned capacity-weighted, ``on`` vertices get ``om``
   distinct communities, the rest one;
4. each vertex splits ``round((1−μ)·d)`` internal stubs over its
   communities; stubs are matched within each community
   (configuration-model pairing, self-loops/duplicates re-drawn);
5. remaining ``≈ μ·d`` external stubs are matched globally, rejecting pairs
   that share a community.

DESIGN.md Section 4 documents the substitution; realized μ / degree
statistics are validated in ``tests/test_lfr.py``.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Set, Tuple

import numpy as np
import pandas as pd


@dataclass
class LFRResult:
    """An LFR-lite instance: edges, ground-truth cover, realized stats."""

    edges: pd.DataFrame  # canonical (src < dst)
    communities: List[Set[int]]
    memberships: Dict[int, Set[int]]  # vertex -> community indices
    params: Dict[str, float] = field(default_factory=dict)

    @property
    def n_vertices(self) -> int:
        return int(self.params["n"])

    def realized_mu(self) -> float:
        """Fraction of edges whose endpoints share no community."""
        src = self.edges["src"].to_numpy()
        dst = self.edges["dst"].to_numpy()
        ext = sum(
            1
            for u, v in zip(src, dst)
            if not (self.memberships[int(u)] & self.memberships[int(v)])
        )
        return ext / max(len(src), 1)

    def avg_degree(self) -> float:
        return 2.0 * len(self.edges) / self.n_vertices


def _truncated_powerlaw(
    rng: np.random.Generator, size: int, lo: int, hi: int, exponent: float
) -> np.ndarray:
    support = np.arange(lo, hi + 1, dtype=np.float64)
    p = support**-exponent
    p /= p.sum()
    return rng.choice(np.arange(lo, hi + 1), size=size, p=p)


def _degree_kmin(k_avg: float, maxk: int, t1: float) -> int:
    """Smallest kmin whose truncated power-law mean reaches k_avg."""
    best, best_err = 1, np.inf
    for kmin in range(1, maxk):
        d = np.arange(kmin, maxk + 1, dtype=np.float64)
        p = d**-t1
        mean = (d * p).sum() / p.sum()
        err = abs(mean - k_avg)
        if err < best_err:
            best, best_err = kmin, err
    return best


def _pair_stubs(
    rng: np.random.Generator,
    stubs: np.ndarray,
    existing: Set[Tuple[int, int]],
    allowed,
    max_rounds: int = 8,
) -> List[Tuple[int, int]]:
    """Configuration-model matching; invalid pairs are re-shuffled a few
    rounds, stubborn leftovers dropped (standard LFR-style rewiring cutoff)."""
    out: List[Tuple[int, int]] = []
    pool = np.array(stubs, dtype=np.int64)
    for _ in range(max_rounds):
        if len(pool) < 2:
            break
        rng.shuffle(pool)
        if len(pool) % 2:
            pool = pool[:-1]
        a, b = pool[0::2], pool[1::2]
        leftover = []
        for u, v in zip(a, b):
            u, v = int(min(u, v)), int(max(u, v))
            if u == v or (u, v) in existing or not allowed(u, v):
                leftover.extend((u, v))
                continue
            existing.add((u, v))
            out.append((u, v))
        pool = np.array(leftover, dtype=np.int64)
    return out


def lfr_graph(
    n: int = 1000,
    k: float = 20.0,
    maxk: int = 50,
    mu: float = 0.1,
    on: int = 100,
    om: int = 2,
    min_c: int = 20,
    max_c: int = 100,
    t1: float = 2.0,
    t2: float = 1.0,
    seed: int = 0,
) -> LFRResult:
    """Generate one LFR-lite instance (deterministic in ``seed``)."""
    rng = np.random.default_rng(seed)
    max_c = min(max_c, n)
    # 1. degrees
    kmin = _degree_kmin(k, maxk, t1)
    deg = _truncated_powerlaw(rng, n, kmin, maxk, t1).astype(np.int64)
    # 2. community sizes covering all membership slots
    slots = n + on * (om - 1)
    sizes: List[int] = []
    while sum(sizes) < slots:
        sizes.append(int(_truncated_powerlaw(rng, 1, min_c, max_c, t2)[0]))
    sizes[-1] = max(min_c, sizes[-1] - (sum(sizes) - slots))
    n_comm = len(sizes)
    # 3. membership assignment, capacity-weighted
    caps = np.array(sizes, dtype=np.float64)
    member_count = np.ones(n, dtype=np.int64)
    overlapping = rng.choice(n, size=min(on, n), replace=False)
    member_count[overlapping] = om
    memberships: Dict[int, Set[int]] = {v: set() for v in range(n)}
    for v in rng.permutation(n):
        m = int(member_count[v])
        avail = np.flatnonzero(caps > 0)
        if len(avail) < m:  # capacity exhausted: overflow gracefully
            avail = np.arange(n_comm)
        p = np.maximum(caps[avail], 0.25)
        p = p / p.sum()
        chosen = rng.choice(avail, size=m, replace=False, p=p)
        for c in chosen:
            memberships[int(v)].add(int(c))
            caps[c] -= 1
    comm_members: List[Set[int]] = [set() for _ in range(n_comm)]
    for v, cs in memberships.items():
        for c in cs:
            comm_members[c].add(v)
    # 4. internal stubs per community
    existing: Set[Tuple[int, int]] = set()
    edges: List[Tuple[int, int]] = []
    internal_deg = np.round((1.0 - mu) * deg).astype(np.int64)
    comm_stubs: List[List[int]] = [[] for _ in range(n_comm)]
    internal_assigned = np.zeros(n, dtype=np.int64)
    for v in range(n):
        cs = sorted(memberships[v])
        m = len(cs)
        base, rem = divmod(int(internal_deg[v]), m)
        extra = set(rng.choice(m, size=rem, replace=False)) if rem else set()
        for j, c in enumerate(cs):
            want = base + (1 if j in extra else 0)
            cap = max(len(comm_members[c]) - 1, 0)
            take = min(want, cap)
            comm_stubs[c].extend([v] * take)
            internal_assigned[v] += take
    for c in range(n_comm):
        edges.extend(
            _pair_stubs(
                rng, np.array(comm_stubs[c], dtype=np.int64), existing,
                allowed=lambda u, v: True,
            )
        )
    # 5. external stubs, rejecting same-community pairs
    ext_deg = np.maximum(deg - internal_assigned, 0)
    ext_stubs = np.repeat(np.arange(n, dtype=np.int64), ext_deg)

    def no_shared_community(u: int, v: int) -> bool:
        return not (memberships[u] & memberships[v])

    edges.extend(_pair_stubs(rng, ext_stubs, existing, no_shared_community))
    arr = np.array(sorted(edges), dtype=np.int64).reshape(-1, 2)
    edf = pd.DataFrame({"src": arr[:, 0], "dst": arr[:, 1]})
    return LFRResult(
        edges=edf,
        communities=[s for s in comm_members if len(s) >= 2],
        memberships=memberships,
        params={
            "n": n, "k": k, "maxk": maxk, "mu": mu, "on": on, "om": om,
            "min_c": min_c, "max_c": max_c, "seed": seed,
        },
    )
