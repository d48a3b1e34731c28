"""CSR adjacency over numpy, with the push/walk primitives SimPush needs.

Edge convention throughout the repo: an edge ``(src, dst)`` is the directed
edge ``src -> dst``; the in-neighbours of ``v`` are ``{src : (src, v) in E}``.
SimRank's :math:`\\sqrt{c}`-walks follow **in-edges** (Definition 2 of the
paper), so the two core primitives are:

* :meth:`CSRGraph.push_to_in_neighbors` — one level of Source-Push (Alg. 2):
  mass at ``v`` is split as ``sqrt(c) * h(v) / d_I(v)`` over each in-neighbour.
* :meth:`CSRGraph.push_to_out_neighbors` — one level of Reverse-Push
  (Alg. 5) / a ProbeSim probe step: mass at ``v'`` contributes
  ``sqrt(c) * r(v') / d_I(v)`` to each out-neighbour ``v``.

Both are exact linear operators (no sampling); sampling lives in
:meth:`CSRGraph.random_in_neighbor` used by the batched walk generator.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass(frozen=True)
class CSRGraph:
    """Immutable CSR view of a directed graph with both edge directions.

    ``out_ptr/out_idx`` index out-neighbours by source node; ``in_ptr/in_idx``
    index in-neighbours by destination node. Degrees are cached.
    """

    n: int
    out_ptr: np.ndarray
    out_idx: np.ndarray
    in_ptr: np.ndarray
    in_idx: np.ndarray
    out_deg: np.ndarray = field(default=None)
    in_deg: np.ndarray = field(default=None)

    @property
    def m(self) -> int:
        """Number of directed edges."""
        return int(self.out_idx.shape[0])

    @property
    def nbytes(self) -> int:
        """Bytes held by the adjacency arrays (graph footprint proxy)."""
        return sum(
            a.nbytes
            for a in (self.out_ptr, self.out_idx, self.in_ptr, self.in_idx,
                      self.out_deg, self.in_deg)
        )

    def out_neighbors(self, v: int) -> np.ndarray:
        """Out-neighbours of ``v`` (nodes ``x`` with edge ``v -> x``)."""
        return self.out_idx[self.out_ptr[v]:self.out_ptr[v + 1]]

    def in_neighbors(self, v: int) -> np.ndarray:
        """In-neighbours of ``v`` (nodes ``x`` with edge ``x -> v``)."""
        return self.in_idx[self.in_ptr[v]:self.in_ptr[v + 1]]

    # ---------------------------------------------------------------- pushes

    def push_to_in_neighbors(self, h: np.ndarray, sqrt_c: float) -> np.ndarray:
        """One Source-Push level: ``h'(v') = sum_{v: v' in I(v)} sqrt_c*h(v)/d_I(v)``.

        ``h`` is a dense length-``n`` vector of level-``l`` hitting
        probabilities; returns the dense level-``l+1`` vector. Nodes with no
        in-neighbours simply absorb their mass (the walk stops), matching the
        paper's walk semantics.
        """
        active = np.flatnonzero(h)
        active = active[self.in_deg[active] > 0]
        if active.size == 0:
            return np.zeros(self.n)
        per_nbr = sqrt_c * h[active] / self.in_deg[active]
        counts = self.in_deg[active]
        # Gather every in-edge of every active node in one shot.
        starts = self.in_ptr[active]
        offsets = _ragged_offsets(counts)
        srcs = self.in_idx[np.repeat(starts, counts) + offsets]
        contrib = np.repeat(per_nbr, counts)
        return np.bincount(srcs, weights=contrib, minlength=self.n)

    def push_to_out_neighbors(self, r: np.ndarray, sqrt_c: float,
                              active: np.ndarray | None = None) -> np.ndarray:
        """One Reverse-Push level: ``r'(v) += sqrt_c * r(v') / d_I(v)`` for
        each out-edge ``v' -> v`` of each ``v'`` in ``active``.

        ``active`` defaults to every node with nonzero residue; Alg. 5 passes
        the thresholded subset.
        """
        if active is None:
            active = np.flatnonzero(r)
        active = active[self.out_deg[active] > 0]
        if active.size == 0:
            return np.zeros(self.n)
        counts = self.out_deg[active]
        starts = self.out_ptr[active]
        offsets = _ragged_offsets(counts)
        dsts = self.out_idx[np.repeat(starts, counts) + offsets]
        contrib = sqrt_c * np.repeat(r[active], counts) / self.in_deg[dsts]
        return np.bincount(dsts, weights=contrib, minlength=self.n)

    # ----------------------------------------------------------------- walks

    def random_in_neighbor(self, nodes: np.ndarray,
                           rng: np.random.Generator) -> np.ndarray:
        """Uniform random in-neighbour per node; -1 where there is none."""
        d = self.in_deg[nodes]
        out = np.full(nodes.shape[0], -1, dtype=np.int64)
        has = d > 0
        if has.any():
            pick = self.in_ptr[nodes[has]] + rng.integers(0, d[has])
            out[has] = self.in_idx[pick]
        return out

    def sqrt_c_walks(self, start: np.ndarray, sqrt_c: float, max_steps: int,
                     rng: np.random.Generator) -> np.ndarray:
        """Batched sqrt(c)-walks (Definition 2): each walk stops w.p.
        ``1 - sqrt_c`` per step, else moves to a uniform random in-neighbour.

        Returns an ``(n_walks, max_steps + 1)`` int64 array of positions;
        -1 marks "walk already stopped". Column 0 is ``start``.
        """
        n_walks = start.shape[0]
        pos = np.full((n_walks, max_steps + 1), -1, dtype=np.int64)
        pos[:, 0] = start
        cur = start.copy()
        alive = np.ones(n_walks, dtype=bool)
        for step in range(1, max_steps + 1):
            alive &= rng.random(n_walks) < sqrt_c
            alive &= self.in_deg[np.where(alive, cur, 0)] > 0
            idx = np.flatnonzero(alive)
            if idx.size == 0:
                break
            cur[idx] = self.random_in_neighbor(cur[idx], rng)
            pos[idx, step] = cur[idx]
        return pos


def _ragged_offsets(counts: np.ndarray) -> np.ndarray:
    """``[0..c0-1, 0..c1-1, ...]`` — per-segment offsets for ragged gathers."""
    total = int(counts.sum())
    out = np.arange(total)
    out -= np.repeat(np.concatenate(([0], np.cumsum(counts)[:-1])), counts)
    return out


def from_edges(src: np.ndarray, dst: np.ndarray, n: int | None = None) -> CSRGraph:
    """Build a :class:`CSRGraph` from parallel edge arrays.

    Self-loops and duplicate edges are dropped (SimRank's definition assumes
    a simple directed graph); node ids must be in ``[0, n)``.
    """
    src = np.asarray(src, dtype=np.int64)
    dst = np.asarray(dst, dtype=np.int64)
    keep = src != dst
    src, dst = src[keep], dst[keep]
    if n is None:
        n = int(max(src.max(initial=-1), dst.max(initial=-1)) + 1)
    # Dedupe via a combined key sort.
    key = src * n + dst
    key = np.unique(key)
    src, dst = key // n, key % n

    def _build(by: np.ndarray, other: np.ndarray):
        order = np.argsort(by, kind="stable")
        sorted_by, sorted_other = by[order], other[order]
        deg = np.bincount(sorted_by, minlength=n)
        ptr = np.concatenate(([0], np.cumsum(deg)))
        return ptr.astype(np.int64), sorted_other, deg.astype(np.int64)

    out_ptr, out_idx, out_deg = _build(src, dst)
    in_ptr, in_idx, in_deg = _build(dst, src)
    return CSRGraph(n=n, out_ptr=out_ptr, out_idx=out_idx,
                    in_ptr=in_ptr, in_idx=in_idx,
                    out_deg=out_deg, in_deg=in_deg)


def from_spark(edges_df) -> CSRGraph:
    """Collect a Spark ``(src, dst)`` edge DataFrame into a :class:`CSRGraph`.

    The number of nodes is taken as ``1 + max id`` so isolated high ids are
    preserved. This is the bridge from the distributed representation into
    the single-machine timing engine (DESIGN.md §2).
    """
    pdf = edges_df.select("src", "dst").toPandas()
    return from_edges(pdf["src"].to_numpy(), pdf["dst"].to_numpy())
