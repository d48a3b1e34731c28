"""Tests for the ProbeSim baseline."""
import numpy as np
import pytest

from repro.baselines.probesim import probesim
from tests import helpers


@pytest.mark.parametrize("name", ["social", "powerlaw"])
def test_error_within_eps(name):
    g = helpers.graph(name)
    s = helpers.exact(name)
    res = probesim(g, 5, eps_a=0.1, seed=0)
    vk = np.argsort(s[5])[::-1][1:51]
    assert np.abs(res.scores[vk] - s[5][vk]).max() < 0.1


def test_unbiased_up_to_pruning():
    """Averaged over many seeds with pruning off, the estimator mean
    approaches exact SimRank (it is unbiased)."""
    g = helpers.graph("social")
    s = helpers.exact("social")
    acc = np.zeros(g.n)
    k = 12
    for seed in range(k):
        acc += probesim(g, 5, eps_a=0.2, seed=seed, prune=0.0).scores
    acc /= k
    vk = np.argsort(s[5])[::-1][1:11]
    # ~k * R samples total; generous statistical tolerance.
    assert np.abs(acc[vk] - s[5][vk]).max() < 0.02


def test_pruning_only_reduces_scores():
    g = helpers.graph("social")
    a = probesim(g, 5, eps_a=0.2, seed=7, prune=0.0).scores
    b = probesim(g, 5, eps_a=0.2, seed=7, prune=0.02).scores
    assert (b <= a + 1e-12).all()


def test_sample_count_scales_inverse_eps_squared():
    g = helpers.graph("powerlaw")
    r1 = probesim(g, 3, eps_a=0.4, seed=0)
    r2 = probesim(g, 3, eps_a=0.2, seed=0)
    assert r2.n_samples == pytest.approx(4 * r1.n_samples, rel=0.02)


def test_tighter_eps_more_accurate():
    g = helpers.graph("undirected")
    s = helpers.exact("undirected")
    vk = np.argsort(s[2])[::-1][1:51]
    errs = []
    for eps_a in (0.5, 0.1):
        res = probesim(g, 2, eps_a=eps_a, seed=0)
        errs.append(np.abs(res.scores[vk] - s[2][vk]).mean())
    assert errs[1] < errs[0]


def test_self_score_and_determinism():
    g = helpers.graph("social")
    a = probesim(g, 9, eps_a=0.3, seed=5)
    b = probesim(g, 9, eps_a=0.3, seed=5)
    np.testing.assert_array_equal(a.scores, b.scores)
    assert a.scores[9] == 1.0
    assert a.n_probes >= 0


def test_no_in_neighbors():
    g = helpers.graph("chain")
    res = probesim(g, 29, eps_a=0.3, seed=0)
    assert res.scores[29] == 1.0
    assert res.scores.sum() == 1.0
