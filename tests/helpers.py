"""Shared test fixtures: small graphs, cached exact SimRank, and
brute-force reference implementations used to validate the fast paths."""
from __future__ import annotations

from functools import lru_cache

import numpy as np

from repro.baselines.exact import exact_simrank
from repro.graphs import generators
from repro.graphs.csr import CSRGraph, from_edges

#: name -> (builder, n). Small enough that exact SimRank is instant.
GRAPHS = {
    "powerlaw": (lambda: generators.powerlaw(200, 4, seed=3), 200),
    "social": (lambda: generators.social(200, 5, seed=4), 200),
    "undirected": (lambda: generators.undirected(200, 6, seed=5), 200),
    "erdos": (lambda: generators.erdos_renyi(150, 900, seed=6), 150),
    "chain": (lambda: (np.arange(1, 30), np.arange(0, 29)), 30),
    "cycle": (lambda: (np.arange(40), np.roll(np.arange(40), -1)), 40),
    "star": (lambda: (np.arange(1, 25), np.zeros(24, dtype=np.int64)), 25),
}


@lru_cache(maxsize=None)
def graph(name: str) -> CSRGraph:
    build, n = GRAPHS[name]
    src, dst = build()
    return from_edges(np.asarray(src), np.asarray(dst), n=n)


@lru_cache(maxsize=None)
def exact(name: str, c: float = 0.6) -> np.ndarray:
    return exact_simrank(graph(name), c=c)


def edge_arrays(name: str) -> tuple[np.ndarray, np.ndarray]:
    build, _ = GRAPHS[name]
    src, dst = build()
    return np.asarray(src, dtype=np.int64), np.asarray(dst, dtype=np.int64)


def wt_matrix(g: CSRGraph) -> np.ndarray:
    """Dense ``W^T``: row v holds 1/d_I(v) at each in-neighbour of v.
    ``h^(l)(u, .) = u-th row of (sqrt(c) * W^T)^l`` — the brute-force
    reference for every push-based computation."""
    wt = np.zeros((g.n, g.n))
    for v in range(g.n):
        nbrs = g.in_neighbors(v)
        if nbrs.size:
            wt[v, nbrs] = 1.0 / nbrs.size
    return wt


def hitting_bruteforce(g: CSRGraph, u: int, L: int, sqrt_c: float
                       ) -> np.ndarray:
    """``h^(l)(u, v)`` for l = 0..L via dense matrix powers."""
    wt = sqrt_c * wt_matrix(g)
    out = np.zeros((L + 1, g.n))
    vec = np.zeros(g.n)
    vec[u] = 1.0
    out[0] = vec
    for lvl in range(1, L + 1):
        vec = vec @ wt
        out[lvl] = vec
    return out


def gu_pair_walk_reference(g, gu, att, sqrt_c: float) -> np.ndarray:
    """Reference gammas by dynamic programming over *pairs* of walk
    positions inside ``G_u`` (Definition 4 verbatim): for each attention
    entry, track the joint distribution of two independent walks through
    ``G_u`` levels, removing mass that meets at an attention node."""
    gammas = np.zeros(att.size)
    for a in range(att.size):
        la, node = int(att.levels[a]), int(att.nodes[a])
        # pair distribution over (x, y) at current level, walks alive.
        idx = {(node, node): 1.0}
        survive = 1.0  # mass that never meets an attention node
        meet_total = 0.0
        for lvl in range(la, gu.L):
            att_here = set()
            nxt: dict[tuple[int, int], float] = {}
            children, parents = gu.edges[lvl]
            adj: dict[int, np.ndarray] = {}
            for c_, p_ in zip(children, parents):
                adj.setdefault(int(p_), []).append(int(c_))
            for (x, y), p in idx.items():
                nx_, ny_ = adj.get(x, []), adj.get(y, [])
                if not nx_ or not ny_:
                    continue
                w = p * sqrt_c * sqrt_c / (len(nx_) * len(ny_))
                for xx in nx_:
                    for yy in ny_:
                        nxt[(xx, yy)] = nxt.get((xx, yy), 0.0) + w
            att_next = set(
                int(n) for n in att.nodes[att.levels == lvl + 1])
            idx = {}
            for (x, y), p in nxt.items():
                if x == y and x in att_next:
                    meet_total += p
                else:
                    idx[(x, y)] = p
        gammas[a] = 1.0 - meet_total
    return gammas
