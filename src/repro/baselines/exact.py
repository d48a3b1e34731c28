"""Exact SimRank via the Jeh–Widom power method — the repo's ground truth.

``S_{k+1} = (c * W^T S_k W) with diag forced to 1``, where
``W[i', i] = 1/d_I(i)`` for ``i' in I(i)``. This converges geometrically
(residual ``<= c^k``) to the unique SimRank fixed point, so with the
default 34 iterations (``0.6^34 ~ 3e-8``) the result is exact far beyond
any ``eps`` evaluated in the paper. The paper used 1e-6-error Monte Carlo
as ground truth; the exact fixed point is a strictly stronger oracle
(DESIGN.md §3).

Two implementations:

* :func:`exact_simrank` — numpy, scales to the small dataset suite (the
  SpMM is a segment-sum over CSR, no scipy needed);
* :func:`exact_simrank_df` — Spark DataFrame (pair-table joins), used on
  tiny graphs to cross-validate the numpy oracle and to give the DuckDB
  oracle a relational iteration step to check.
"""
from __future__ import annotations

import hashlib
import os

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.csr import CSRGraph


def _segment_mean_rows(x_gathered: np.ndarray, ptr: np.ndarray,
                       deg: np.ndarray) -> np.ndarray:
    """Per-segment row sums of ``x_gathered`` divided by ``deg``; rows with
    ``deg == 0`` are zero. Works around ``np.add.reduceat``'s empty-segment
    quirk (it returns the *next* row instead of 0) by overwriting those rows.
    """
    n = deg.shape[0]
    out = np.zeros((n, x_gathered.shape[1]))
    nz = np.flatnonzero(deg > 0)
    if nz.size == 0 or x_gathered.shape[0] == 0:
        return out
    # Reduce only over the starts of *non-empty* segments: empty segments
    # occupy no rows of the gather, so consecutive non-empty starts are
    # exactly the segment boundaries and reduceat's empty-segment quirk
    # never applies.
    out[nz] = np.add.reduceat(x_gathered, ptr[nz], axis=0) / deg[nz, None]
    return out


def _wt_s(g: CSRGraph, s: np.ndarray) -> np.ndarray:
    """``(W^T S)[i, :] = (1/d_I(i)) * sum_{i' in I(i)} S[i', :]``."""
    return _segment_mean_rows(s[g.in_idx], g.in_ptr, g.in_deg)


_DENSE_BLAS_MAX_N = 4000  # below this, a dense W^T + BLAS matmul wins


def exact_simrank(g: CSRGraph, *, c: float = 0.6, iters: int = 34
                  ) -> np.ndarray:
    """Dense ``n x n`` exact SimRank matrix (see module docstring).

    For small ``n`` the iteration runs as two BLAS matmuls against a dense
    ``W^T`` (much faster than segment sums); above ``_DENSE_BLAS_MAX_N``
    it falls back to the O(m n)-per-multiply CSR segment-sum path.
    """
    s = np.eye(g.n)
    diag = np.arange(g.n)
    wt = None
    if g.n <= _DENSE_BLAS_MAX_N:
        wt = np.zeros((g.n, g.n))
        has = g.in_deg > 0
        rows = np.repeat(np.arange(g.n)[has], g.in_deg[has])
        wt[rows, g.in_idx] = 1.0 / g.in_deg[rows]
    for _ in range(iters):
        if wt is not None:
            s = c * (wt @ (wt @ s).T).T
        else:
            s = c * _wt_s(g, _wt_s(g, s).T).T
        s[diag, diag] = 1.0
    return s


_CACHE_DIR = os.path.join(os.path.dirname(os.path.dirname(
    os.path.dirname(os.path.dirname(os.path.abspath(__file__))))),
    ".cache", "groundtruth")


def exact_simrank_cached(g: CSRGraph, *, c: float = 0.6, iters: int = 34,
                         tag: str | None = None) -> np.ndarray:
    """Disk-cached :func:`exact_simrank` (the matrix is a pure function of
    the graph, so the cache key hashes the CSR arrays + params)."""
    h = hashlib.sha1()
    for a in (g.out_ptr, g.out_idx):
        h.update(np.ascontiguousarray(a).tobytes())
    h.update(f"{c}:{iters}".encode())
    key = (tag + "-" if tag else "") + h.hexdigest()[:16]
    path = os.path.join(_CACHE_DIR, key + ".npy")
    if os.path.exists(path):
        return np.load(path)
    s = exact_simrank(g, c=c, iters=iters)
    os.makedirs(_CACHE_DIR, exist_ok=True)
    np.save(path, s)
    return s


def simrank_iteration_df(spark: SparkSession, edges: DataFrame,
                         s_prev: DataFrame, c: float) -> DataFrame:
    """One Jeh–Widom iteration as a Catalyst plan over pair table
    ``s_prev(a, b, s)``: ``s'(i,j) = c/(d_I(i) d_I(j)) * sum_{(a,i),(b,j) in E}
    s(a,b)`` for ``i != j``, then the diagonal is forced back to 1.

    Exposed separately so tests can check a single step against DuckDB SQL.
    """
    d_in = edges.groupBy("dst").agg(F.count("*").alias("d")).cache()
    e1 = edges.select(F.col("src").alias("a"), F.col("dst").alias("i"))
    e2 = edges.select(F.col("src").alias("b"), F.col("dst").alias("j"))
    prod = (
        s_prev.join(e1, "a").join(e2, "b")
        .groupBy("i", "j").agg(F.sum("s").alias("ss"))
        .join(d_in.select(F.col("dst").alias("i"), F.col("d").alias("di")), "i")
        .join(d_in.select(F.col("dst").alias("j"), F.col("d").alias("dj")), "j")
        .select("i", "j",
                (F.lit(c) * F.col("ss") / (F.col("di") * F.col("dj"))).alias("s"))
        .where(F.col("i") != F.col("j"))
    )
    nodes = (edges.select(F.col("src").alias("i"))
             .union(edges.select(F.col("dst").alias("i"))).distinct())
    diag = nodes.select("i", F.col("i").alias("j"), F.lit(1.0).alias("s"))
    return prod.union(diag).select(
        F.col("i").alias("a"), F.col("j").alias("b"), "s")


def exact_simrank_df(spark: SparkSession, edges: DataFrame, *,
                     c: float = 0.6, iters: int = 12) -> DataFrame:
    """Iterated :func:`simrank_iteration_df`; returns pair table
    ``(a, b, s)`` of nonzero SimRank values. Tiny-graph use only — each
    iteration is two shuffled joins over the pair table."""
    nodes = (edges.select(F.col("src").alias("a"))
             .union(edges.select(F.col("dst").alias("a"))).distinct())
    s = nodes.select("a", F.col("a").alias("b"), F.lit(1.0).alias("s"))
    for _ in range(iters):
        s = simrank_iteration_df(spark, edges, s, c).localCheckpoint()
    return s
