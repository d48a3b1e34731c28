"""Tests for the TopSim baseline, pinning its truncation behaviour."""
import numpy as np
import pytest

from repro.baselines.topsim import topsim
from tests import helpers


@pytest.mark.parametrize("name", ["social", "powerlaw"])
def test_rough_accuracy(name):
    g = helpers.graph(name)
    s = helpers.exact(name)
    got = topsim(g, 5, T=3, H=100, inv_h=1000)
    vk = np.argsort(s[5])[::-1][1:51]
    assert np.abs(got[vk] - s[5][vk]).mean() < 0.05
    assert got[5] == 1.0


def test_depth_truncation_drops_deep_mass():
    """On the shared-parent-at-depth-2 graph, T=1 finds nothing."""
    # p -> a1 -> a, p -> b1 -> b: s(a, b) > 0 requires depth 2.
    import numpy as np
    from repro.graphs.csr import from_edges
    src = np.array([4, 4, 2, 3])
    dst = np.array([2, 3, 0, 1])
    g = from_edges(src, dst, n=5)
    shallow = topsim(g, 0, T=1, H=10, inv_h=1000)
    deep = topsim(g, 0, T=3, H=10, inv_h=1000)
    assert shallow[1] == 0.0
    assert deep[1] > 0.3


def test_deeper_T_never_worse():
    g = helpers.graph("undirected")
    s = helpers.exact("undirected")
    vk = np.argsort(s[2])[::-1][1:51]
    e1 = np.abs(topsim(g, 2, T=1, H=100, inv_h=10000)[vk] - s[2][vk]).mean()
    e4 = np.abs(topsim(g, 2, T=4, H=100, inv_h=10000)[vk] - s[2][vk]).mean()
    assert e4 <= e1 + 1e-9


def test_degree_threshold_prunes():
    """A tiny 1/h forces pruning through hubs and loses mass."""
    g = helpers.graph("social")
    pruned = topsim(g, 5, T=3, H=100, inv_h=2)
    full = topsim(g, 5, T=3, H=100, inv_h=10**9)
    assert pruned.sum() <= full.sum() + 1e-9


def test_no_in_neighbors():
    g = helpers.graph("chain")
    got = topsim(g, 29, T=3, H=10, inv_h=100)
    assert got[29] == 1.0 and got.sum() == 1.0
