"""PRSim [Wei et al., SIGMOD 2019] — the paper's best index-based competitor.

Index (preprocessing):
* hubs — the top ``ceil(sqrt(n))`` nodes by in-degree (the paper sets
  ``j0 = sqrt(n)``; degree is the standard hub proxy);
* for each hub ``w``: its reverse hitting vectors ``h^(l)(., w)`` for
  ``l = 1..Lmax``, computed by truncated out-edge pushes from ``e_w``
  (these are the RPPR vectors up to the ``1 - sqrt(c)`` scaling);
* ``eta(w)`` for every node, estimated by coupled-walk sampling.

Query: a forward push from ``u`` (identical operator to SimPush's
Source-Push) yields the significant ``(l, w)`` pairs with
``h^(l)(u, w) >= theta``. Hubs read their reverse vectors from the index;
non-hubs run the reverse push online. Scores accumulate via Eq. (4):
``s(u,v) = sum_l sum_w h^(l)(u,w) * eta(w) * h^(l)(v,w)``.

This keeps PRSim's tradeoff shape: cheaper queries than ProbeSim (hub
lookups), a real preprocessing bill + index footprint, and accuracy
governed by ``eps_a``.
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field

import numpy as np

from repro.graphs.csr import CSRGraph


def estimate_eta(g: CSRGraph, *, c: float = 0.6, n_samples: int = 600,
                 max_steps: int = 48, seed: int = 0) -> np.ndarray:
    """``eta(w)`` = P[two sqrt(c)-walks from w never meet again], estimated
    for every node at once with ``n_samples`` coupled pairs per node."""
    rng = np.random.default_rng(seed)
    never = np.zeros(g.n)
    nodes = np.arange(g.n, dtype=np.int64)
    cur1 = np.repeat(nodes, n_samples)
    cur2 = cur1.copy()
    met = np.zeros(cur1.shape[0], dtype=bool)
    alive = np.ones(cur1.shape[0], dtype=bool)
    for _ in range(max_steps):
        idx = np.flatnonzero(alive)
        if idx.size == 0:
            break
        keep = rng.random(idx.size) < c
        idx = idx[keep]
        alive[:] = False
        ok = g.in_deg[cur1[idx]] > 0
        ok &= g.in_deg[cur2[idx]] > 0
        idx = idx[ok]
        if idx.size == 0:
            break
        cur1[idx] = g.random_in_neighbor(cur1[idx], rng)
        cur2[idx] = g.random_in_neighbor(cur2[idx], rng)
        hit = cur1[idx] == cur2[idx]
        met[idx[hit]] = True
        alive[idx[~hit]] = True
    never = (~met).reshape(g.n, n_samples).mean(axis=1)
    return never


@dataclass
class PRSimIndex:
    hubs: np.ndarray                      # node ids, sorted
    hub_vectors: dict[int, list[tuple[np.ndarray, np.ndarray]]]
    eta: np.ndarray
    Lmax: int
    theta: float
    build_time: float = 0.0
    index_bytes: int = 0
    eta_samples: int = field(default=600)

    def is_hub(self, w: int) -> bool:
        i = np.searchsorted(self.hubs, w)
        return i < self.hubs.size and self.hubs[i] == w


def _reverse_vectors(g: CSRGraph, w: int, Lmax: int, sc: float,
                     prune: float) -> list[tuple[np.ndarray, np.ndarray]]:
    """Truncated reverse hitting vectors ``h^(l)(., w)`` for l=1..Lmax,
    returned sparse as (nodes, values) pairs."""
    vec = np.zeros(g.n)
    vec[w] = 1.0
    out = []
    for _ in range(Lmax):
        vec = g.push_to_out_neighbors(vec, sc)
        vec[vec < prune] = 0.0
        nz = np.flatnonzero(vec)
        out.append((nz.copy(), vec[nz].copy()))
        if nz.size == 0:
            break
    return out


def build_index(g: CSRGraph, *, c: float = 0.6, eps_a: float = 0.1,
                seed: int = 0, n_hubs: int | None = None,
                eta_samples: int | None = None) -> PRSimIndex:
    """Preprocess: hub reverse vectors + eta estimates (see module doc)."""
    t0 = time.perf_counter()
    sc = math.sqrt(c)
    theta = eps_a * (1.0 - sc) / 2.0
    Lmax = max(1, int(math.floor(math.log(1.0 / theta) / math.log(1.0 / sc))))
    if n_hubs is None:
        n_hubs = int(math.ceil(math.sqrt(g.n)))
    if eta_samples is None:
        # 1/eps_a^2-ish growth, bounded for tractability.
        eta_samples = int(min(5000, max(200, 4.0 / eps_a ** 2)))
    hubs = np.sort(np.argsort(g.in_deg)[::-1][:n_hubs].astype(np.int64))
    hub_vectors = {int(w): _reverse_vectors(g, int(w), Lmax, sc, theta / 2)
                   for w in hubs}
    eta = estimate_eta(g, c=c, n_samples=eta_samples, seed=seed)
    nbytes = eta.nbytes + hubs.nbytes + sum(
        a.nbytes + b.nbytes for vecs in hub_vectors.values()
        for a, b in vecs)
    return PRSimIndex(hubs=hubs, hub_vectors=hub_vectors, eta=eta, Lmax=Lmax,
                      theta=theta, build_time=time.perf_counter() - t0,
                      index_bytes=nbytes, eta_samples=eta_samples)


def query(g: CSRGraph, idx: PRSimIndex, u: int, *, c: float = 0.6,
          delta: float = 1e-4, eps_a: float | None = None, seed: int = 0
          ) -> np.ndarray:
    """Single-source estimate using the index (Eq. 4).

    As in the original, the u-side quantities are *sampled*: ``R =
    ceil(log(n/delta) / (2 eps_a^2))`` sqrt(c)-walks from ``u`` give
    empirical ``h^(l)(u, w)`` for the meeting nodes. Hub meeting nodes
    read their reverse vectors from the index; every non-hub meeting node
    pays an individual online reverse estimation (a truncated depth-``l``
    push) — the per-meeting-node online work that dominates PRSim's query
    time and that SimPush's attention-restriction avoids.
    """
    sc = math.sqrt(c)
    rng = np.random.default_rng(seed)
    if eps_a is None:
        eps_a = idx.theta / (1.0 - sc) * 2.0  # invert build-time formula
    R = max(1, math.ceil(math.log(max(g.n, 2) / delta) / (2.0 * eps_a ** 2)))
    # Empirical visit counts at each level.
    counts = np.zeros((idx.Lmax + 1, g.n), dtype=np.int64)
    cur = np.full(R, u, dtype=np.int64)
    for step in range(1, idx.Lmax + 1):
        cur = cur[rng.random(cur.size) < sc]
        cur = cur[g.in_deg[cur] > 0]
        if cur.size == 0:
            break
        cur = g.random_in_neighbor(cur, rng)
        counts[step] += np.bincount(cur, minlength=g.n)
    scores = np.zeros(g.n)
    hub_mask = np.zeros(g.n, dtype=bool)
    hub_mask[idx.hubs] = True
    for ell in range(1, idx.Lmax + 1):
        h_hat = counts[ell] / R
        h_hat[h_hat < idx.theta] = 0.0
        ws = np.flatnonzero(h_hat)
        if ws.size == 0:
            continue
        weights = h_hat[ws] * idx.eta[ws]
        for w, weight in zip(ws, weights):
            if weight <= 0.0:
                continue
            w = int(w)
            if hub_mask[w]:
                vecs = idx.hub_vectors[w]
            else:
                vecs = _reverse_vectors(g, w, ell, sc, idx.theta / 2)
            if ell <= len(vecs):
                nodes, vals = vecs[ell - 1]
                scores[nodes] += weight * vals
    scores[u] = 1.0
    return scores
