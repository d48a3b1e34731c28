"""Monte-Carlo SimRank estimators (Fogaras & Rácz style coupled walks).

``pair_meeting_probability`` estimates ``s(u, v)`` for a batch of targets
as the empirical probability that two sqrt(c)-walks from ``u`` and ``v``
meet (both walks advancing jointly w.p. ``c`` per step — if either stops,
no later meeting is possible). This is the paper's ground-truth generator
for large graphs (pooling method, §5.1) and an independent statistical
cross-check of the exact power-method oracle.

``single_source_mc`` pairs the i-th of ``r`` walks from ``u`` with the
i-th walk from every node — the classic index-free MC baseline and the
estimator READS materialises into its index.
"""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSRGraph

_MAX_STEPS = 64  # P(coupled pair alive beyond this) = c^64 ~ 6e-15


def pair_meeting_probability(g: CSRGraph, u: int, vs: np.ndarray, *,
                             c: float = 0.6, n_samples: int = 100_000,
                             seed: int = 0, batch: int = 2_000_000
                             ) -> np.ndarray:
    """Estimate ``s(u, v)`` for each ``v`` in ``vs`` with ``n_samples``
    coupled walk pairs per target. Standard error per estimate is at most
    ``0.5 / sqrt(n_samples)``."""
    rng = np.random.default_rng(seed)
    vs = np.asarray(vs, dtype=np.int64)
    out = np.zeros(vs.shape[0])
    per = max(1, batch // max(n_samples, 1))
    for lo in range(0, vs.shape[0], per):
        chunk = vs[lo:lo + per]
        k = chunk.shape[0] * n_samples
        cur1 = np.full(k, u, dtype=np.int64)
        cur2 = np.repeat(chunk, n_samples)
        met = cur1 == cur2  # v == u: SimRank 1 by definition
        alive = ~met
        for _ in range(_MAX_STEPS):
            idx = np.flatnonzero(alive)
            if idx.size == 0:
                break
            keep = rng.random(idx.size) < c
            idx = idx[keep]
            alive[:] = False
            ok = (g.in_deg[cur1[idx]] > 0) & (g.in_deg[cur2[idx]] > 0)
            idx = idx[ok]
            if idx.size == 0:
                break
            cur1[idx] = g.random_in_neighbor(cur1[idx], rng)
            cur2[idx] = g.random_in_neighbor(cur2[idx], rng)
            hit = cur1[idx] == cur2[idx]
            met[idx[hit]] = True
            alive[idx[~hit]] = True
        out[lo:lo + per] = met.reshape(chunk.shape[0], n_samples).mean(axis=1)
    return out


def single_source_mc(g: CSRGraph, u: int, *, c: float = 0.6, r: int = 200,
                     max_steps: int = 20, seed: int = 0) -> np.ndarray:
    """Single-source MC baseline: ``r`` sqrt(c)-walks from every node;
    ``s~(u, v)`` = fraction of walk indices ``i`` whose u-walk and v-walk
    meet (same node, same step, both still walking)."""
    rng = np.random.default_rng(seed)
    sc = np.sqrt(c)
    hits = np.zeros(g.n)
    all_nodes = np.arange(g.n, dtype=np.int64)
    for _ in range(r):
        pos_all = g.sqrt_c_walks(all_nodes, sc, max_steps, rng)
        pos_u = pos_all[u]
        meet = (pos_all[:, 1:] == pos_u[None, 1:]) & (pos_u[None, 1:] >= 0)
        hits += meet.any(axis=1)
    out = hits / r
    out[u] = 1.0
    return out
