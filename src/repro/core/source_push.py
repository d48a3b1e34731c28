"""Source-Push (Alg. 2, lines 9–21): deterministic residue propagation from
the query node over in-edges, producing the levelled source graph ``G_u``,
the hitting probabilities ``h^(l)(u, .)``, and the attention sets.

``G_u`` is a DAG organised by levels: level 0 holds only ``u``; an edge
runs from a level-``l+1`` node (child) to the level-``l`` node (parent) it
was pushed from. A node expanded at level ``l < L`` contributes *all* its
in-neighbours, so its in-degree within ``G_u`` equals its in-degree in
``G`` (the paper's note (ii) after Eq. 12) — Alg. 3 relies on this.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs.csr import CSRGraph, _ragged_offsets


@dataclass
class SourceGraph:
    """Levelled source graph ``G_u`` plus the hitting probabilities from u.

    ``level_nodes[l]`` — sorted node ids present at level ``l`` (0..L);
    ``h[l]`` — ``h^(l)(u, v)`` aligned with ``level_nodes[l]``;
    ``edges[l]`` — ``(child, parent)`` arrays linking level ``l+1`` children
    to level ``l`` parents, for ``l`` in 0..L-1.
    """

    L: int
    level_nodes: list[np.ndarray]
    h: list[np.ndarray]
    edges: list[tuple[np.ndarray, np.ndarray]]

    def pos(self, level: int, nodes: np.ndarray) -> np.ndarray:
        """Index of each node within ``level_nodes[level]`` (must exist)."""
        return np.searchsorted(self.level_nodes[level], nodes)

    def h_of(self, level: int, nodes: np.ndarray) -> np.ndarray:
        """``h^(level)(u, node)`` for each node (must exist at the level)."""
        return self.h[level][self.pos(level, nodes)]

    @property
    def n_nodes(self) -> int:
        return int(sum(a.size for a in self.level_nodes))

    @property
    def n_edges(self) -> int:
        return int(sum(c.size for c, _ in self.edges))


@dataclass
class AttentionSet:
    """All attention nodes of the query: ``(level, node, h^(level)(u, node))``
    triples, sorted by (level, node). A node may appear at several levels
    (the paper's running example: ``w_c`` at levels 1 and 3)."""

    levels: np.ndarray
    nodes: np.ndarray
    h: np.ndarray

    @property
    def size(self) -> int:
        return int(self.nodes.size)

    def at_level(self, level: int) -> np.ndarray:
        """Indices (into this set) of attention entries at ``level``."""
        return np.flatnonzero(self.levels == level)


def source_push(g: CSRGraph, u: int, eps_h: float, L: int, sqrt_c: float
                ) -> tuple[SourceGraph, AttentionSet]:
    """Run Alg. 2's propagation for ``L`` levels from ``u``.

    Exact (no sampling): each level is one application of the linear
    Source-Push operator; cost O(m) per level.
    """
    h = np.zeros(g.n)
    h[u] = 1.0
    level_nodes = [np.array([u], dtype=np.int64)]
    h_levels = [np.array([1.0])]
    edges: list[tuple[np.ndarray, np.ndarray]] = []
    for _ in range(L):
        frontier = level_nodes[-1]
        active = frontier[g.in_deg[frontier] > 0]
        if active.size == 0:
            break
        counts = g.in_deg[active]
        starts = g.in_ptr[active]
        children = g.in_idx[np.repeat(starts, counts) + _ragged_offsets(counts)]
        parents = np.repeat(active, counts)
        edges.append((children, parents))
        h_next = g.push_to_in_neighbors(h, sqrt_c)
        nodes = np.flatnonzero(h_next)
        level_nodes.append(nodes)
        h_levels.append(h_next[nodes])
        h = h_next
    gu = SourceGraph(L=len(level_nodes) - 1, level_nodes=level_nodes,
                     h=h_levels, edges=edges)
    att_levels, att_nodes, att_h = [], [], []
    for lvl in range(1, gu.L + 1):
        mask = gu.h[lvl] >= eps_h
        att_nodes.append(gu.level_nodes[lvl][mask])
        att_h.append(gu.h[lvl][mask])
        att_levels.append(np.full(int(mask.sum()), lvl, dtype=np.int64))
    cat = (lambda xs, dt: np.concatenate(xs) if xs else np.array([], dtype=dt))
    return gu, AttentionSet(levels=cat(att_levels, np.int64),
                            nodes=cat(att_nodes, np.int64),
                            h=cat(att_h, np.float64))
