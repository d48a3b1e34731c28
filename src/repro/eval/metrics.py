"""Accuracy metrics exactly as defined in §5.1 of the paper.

``AvgError@k = (1/k) sum_i |s_hat(u, v_i) - s(u, v_i)|`` over the ground
truth top-k nodes ``V_k``; ``Precision@k = |V_k ∩ V'_k| / k`` where
``V'_k`` is the method's top-k. The query node itself is excluded from
top-k sets (its SimRank is 1 by definition for every method).

Ground truth:
* small graphs — a row of the exact power-method matrix;
* large graphs — the paper's *pooling* method: merge each method's top-k,
  evaluate every pooled candidate with high-precision Monte Carlo, and
  take the best k as ``V_k``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.baselines.monte_carlo import pair_meeting_probability
from repro.graphs.csr import CSRGraph


def top_k(scores: np.ndarray, u: int, k: int) -> np.ndarray:
    """Indices of the k highest scores, excluding the query node."""
    order = np.argsort(scores, kind="stable")[::-1]
    order = order[order != u]
    return order[:k]


def avg_error_at_k(est: np.ndarray, gt: np.ndarray, vk: np.ndarray) -> float:
    """Mean absolute error over the ground-truth top-k nodes."""
    return float(np.abs(est[vk] - gt[vk]).mean())


def precision_at_k(est: np.ndarray, u: int, vk: np.ndarray) -> float:
    """Overlap of the method's top-k with the ground-truth top-k."""
    got = top_k(est, u, vk.size)
    return float(len(set(got.tolist()) & set(vk.tolist())) / vk.size)


@dataclass
class GroundTruth:
    """Per-query ground truth: dense score vector + the top-k set."""

    scores: np.ndarray
    vk: np.ndarray


def exact_ground_truth(s_row: np.ndarray, u: int, k: int) -> GroundTruth:
    """Ground truth from a row of the exact SimRank matrix."""
    return GroundTruth(scores=s_row, vk=top_k(s_row, u, k))


def pooled_ground_truth(g: CSRGraph, u: int,
                        method_scores: list[np.ndarray], k: int, *,
                        c: float = 0.6, n_samples: int = 100_000,
                        seed: int = 0) -> GroundTruth:
    """The paper's pooling procedure (§5.1): candidates are the union of
    every method's top-k; each candidate's SimRank is estimated by
    ``n_samples`` coupled-walk pairs; ``V_k`` is the best k of the pool.

    The returned ``scores`` vector holds MC values at pooled nodes and
    zero elsewhere — only pooled nodes are ever read by the metrics.
    """
    pool: set[int] = set()
    for s in method_scores:
        pool.update(int(x) for x in top_k(s, u, k))
    pooled = np.array(sorted(pool), dtype=np.int64)
    vals = pair_meeting_probability(g, u, pooled, c=c,
                                    n_samples=n_samples, seed=seed)
    scores = np.zeros(g.n)
    scores[pooled] = vals
    scores[u] = 1.0
    return GroundTruth(scores=scores, vk=pooled[np.argsort(vals)[::-1][:k]])
