"""SimPush driver (Alg. 1) over the numpy-CSR engine, with stage timings.

This is the timing-fidelity engine used by the benchmark harness; the
distributed DataFrame engine in ``core.simpush`` runs the identical
algorithm (same modules for Alg. 4) and is tested to agree with this one.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.core import hitting, last_meeting, reverse_push, source_push, walks
from repro.core.params import SimPushParams
from repro.graphs.csr import CSRGraph


@dataclass
class SimPushResult:
    """Scores plus the per-query statistics the paper reports (L, |A_u|)
    and per-stage wall times (Table 3's empirical counterpart)."""

    scores: np.ndarray
    L: int
    n_attention: int
    gu_nodes: int
    gu_edges: int
    t_mc: float = 0.0
    t_source_push: float = 0.0
    t_gamma: float = 0.0
    t_reverse_push: float = 0.0
    peak_extra_bytes: int = 0

    @property
    def t_total(self) -> float:
        return self.t_mc + self.t_source_push + self.t_gamma + self.t_reverse_push


def simpush_local(g: CSRGraph, u: int, *, c: float = 0.6, eps: float = 0.1,
                  delta: float = 1e-4, seed: int = 0,
                  walks_cap: int | None = 500_000,
                  L_override: int | None = None) -> SimPushResult:
    """Answer a single-source SimRank query with SimPush (Alg. 1).

    ``L_override`` skips the Monte-Carlo stage and forces the push depth —
    used by tests to make the two engines exactly comparable and to check
    Lemma-4 determinism at ``L = L*``.
    """
    params = SimPushParams(c=c, eps=eps, delta=delta, walks_cap=walks_cap)
    sc = params.sqrt_c

    t0 = time.perf_counter()
    if L_override is not None:
        L = min(L_override, params.L_star)
    else:
        L, _ = walks.detect_L(g, u, params, seed=seed)
    t_mc = time.perf_counter() - t0

    t0 = time.perf_counter()
    gu, att = source_push.source_push(g, u, params.eps_h, L, sc)
    t_sp = time.perf_counter() - t0

    if att.size == 0:
        s = np.zeros(g.n)
        s[u] = 1.0
        return SimPushResult(scores=s, L=gu.L, n_attention=0,
                             gu_nodes=gu.n_nodes, gu_edges=gu.n_edges,
                             t_mc=t_mc, t_source_push=t_sp)

    t0 = time.perf_counter()
    hAA = hitting.attention_hitting_matrix(g, gu, att, sc)
    gamma = last_meeting.gammas(hAA, att, gu.L)
    t_gamma = time.perf_counter() - t0

    t0 = time.perf_counter()
    residues = reverse_push.seed_residues(g.n, att, gamma, gu.L)
    s = reverse_push.reverse_push(g, residues, u, params.eps_h, sc)
    t_rp = time.perf_counter() - t0

    extra = hAA.nbytes + gamma.nbytes + sum(r.nbytes for r in residues.values())
    return SimPushResult(scores=s, L=gu.L, n_attention=att.size,
                         gu_nodes=gu.n_nodes, gu_edges=gu.n_edges,
                         t_mc=t_mc, t_source_push=t_sp, t_gamma=t_gamma,
                         t_reverse_push=t_rp, peak_extra_bytes=extra)
