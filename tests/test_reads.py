"""Tests for the READS baseline."""
import numpy as np
import pytest

from repro.baselines.reads import build_index, query
from tests import helpers


def test_index_shape_and_bytes():
    g = helpers.graph("powerlaw")
    idx = build_index(g, r=20, t=5, seed=0)
    assert idx.walks.shape == (20, 6, g.n)
    assert idx.index_bytes == idx.walks.nbytes
    assert (idx.walks[:, 0, :] == np.arange(g.n)).all()


def test_walks_respect_graph_structure():
    g = helpers.graph("cycle")
    idx = build_index(g, r=5, t=4, seed=1)
    # On the cycle, the only in-neighbour of v is v-1: any surviving step
    # must move exactly one back.
    for i in range(5):
        for step in range(1, 5):
            pos = idx.walks[i, step]
            prev = idx.walks[i, step - 1]
            alive = pos >= 0
            assert (pos[alive] == (prev[alive] - 1) % g.n).all()


@pytest.mark.parametrize("name", ["social", "undirected"])
def test_accuracy_improves_with_r(name):
    g = helpers.graph(name)
    s = helpers.exact(name)
    vk = np.argsort(s[5])[::-1][1:51]
    errs = []
    for r, t in ((10, 2), (400, 10)):
        idx = build_index(g, r=r, t=t, seed=0)
        errs.append(np.abs(query(g, idx, 5)[vk] - s[5][vk]).mean())
    assert errs[1] < errs[0]
    assert errs[1] < 0.03


def test_estimator_is_meeting_frequency():
    g = helpers.graph("social")
    idx = build_index(g, r=50, t=8, seed=3)
    got = query(g, idx, 7)
    assert got[7] == 1.0
    assert got.min() >= 0 and got.max() <= 1
    # Values are multiples of 1/r by construction.
    off = np.delete(got, 7)
    np.testing.assert_allclose((off * 50) % 1, 0, atol=1e-9)


def test_deterministic_in_seed():
    g = helpers.graph("powerlaw")
    a = build_index(g, r=10, t=4, seed=9).walks
    b = build_index(g, r=10, t=4, seed=9).walks
    np.testing.assert_array_equal(a, b)
