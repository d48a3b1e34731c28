"""Tests for the evaluation metrics (eval/metrics.py), including the
paper's pooling ground-truth procedure validated against the exact oracle
and a DuckDB check of the top-k selection."""
import numpy as np
import pandas as pd
import pytest

from repro.eval import metrics
from repro.oracle import assert_equivalent
from tests import helpers


def test_top_k_excludes_query_node():
    scores = np.array([0.5, 1.0, 0.25, 0.75])
    vk = metrics.top_k(scores, u=1, k=2)
    assert 1 not in vk
    np.testing.assert_array_equal(vk, [3, 0])


def test_avg_error_hand_case():
    est = np.array([0.1, 0.2, 0.3, 0.0])
    gt = np.array([0.2, 0.2, 0.1, 0.9])
    vk = np.array([0, 2])
    assert metrics.avg_error_at_k(est, gt, vk) == pytest.approx(
        (0.1 + 0.2) / 2)


def test_precision_hand_case():
    est = np.array([0.9, 1.0, 0.8, 0.1, 0.0])
    vk = np.array([0, 3])  # ground truth top-2 (u=1 excluded)
    # method's top-2 excluding u=1: nodes 0, 2 -> overlap {0} -> 0.5
    assert metrics.precision_at_k(est, 1, vk) == pytest.approx(0.5)


def test_perfect_method_scores_perfectly():
    s = helpers.exact("social")
    u = 5
    gt = metrics.exact_ground_truth(s[u], u, 50)
    assert metrics.avg_error_at_k(s[u], gt.scores, gt.vk) == 0.0
    assert metrics.precision_at_k(s[u], u, gt.vk) == 1.0


def test_pooled_ground_truth_close_to_exact():
    """Pooling + MC reproduces the exact top-k up to MC noise on ties."""
    g = helpers.graph("social")
    s = helpers.exact("social")
    u = 5
    # Two imperfect "methods": exact + noise.
    rng = np.random.default_rng(0)
    m1 = s[u] + rng.normal(0, 1e-3, g.n)
    m2 = s[u] + rng.normal(0, 1e-3, g.n)
    gt = metrics.pooled_ground_truth(g, u, [m1, m2], k=20,
                                     n_samples=50_000, seed=1)
    exact_vk = set(metrics.top_k(s[u], u, 20).tolist())
    overlap = len(set(gt.vk.tolist()) & exact_vk) / 20
    assert overlap >= 0.8
    # MC values at pooled nodes close to exact.
    pooled = np.flatnonzero(gt.scores)
    pooled = pooled[pooled != u]
    assert np.abs(gt.scores[pooled] - s[u][pooled]).max() < 0.02


def test_pooled_gt_scores_zero_outside_pool():
    g = helpers.graph("powerlaw")
    s = helpers.exact("powerlaw")
    gt = metrics.pooled_ground_truth(g, 3, [s[3]], k=5, n_samples=2000,
                                     seed=0)
    assert (gt.scores >= 0).all()
    assert gt.vk.size == 5


def test_top_k_matches_duckdb(spark):
    """Top-k selection as SQL vs the numpy implementation."""
    rng = np.random.default_rng(4)
    scores = rng.random(100)
    u = 17
    k = 10
    pdf = pd.DataFrame({"v": np.arange(100), "s": scores})
    sdf = spark.createDataFrame(pdf)
    got = (sdf.where(f"v != {u}").orderBy(sdf["s"].desc(), "v").limit(k))
    assert_equivalent(
        got,
        f"SELECT v, s FROM scores WHERE v != {u} "
        f"ORDER BY s DESC, v LIMIT {k}",
        scores=pdf,
    )
    vk = metrics.top_k(scores, u, k)
    sql_vk = got.toPandas()["v"].to_numpy()
    assert set(vk.tolist()) == set(sql_vk.tolist())
