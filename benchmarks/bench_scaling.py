"""Table 1 benchmark: query time of the index-free methods as the graph
grows (the m-dependence of the complexity comparison).
"""
import numpy as np
import pytest

from repro.baselines.probesim import probesim
from repro.core.simpush_local import simpush_local
from repro.graphs import generators
from repro.graphs.csr import from_edges

SIZES = [1000, 4000]


def _graph(n):
    src, dst = generators.powerlaw(n, 10, seed=n)
    return from_edges(src, dst, n=n)


@pytest.mark.parametrize("n", SIZES)
def test_simpush_scaling(benchmark, n):
    g = _graph(n)
    u = int(np.flatnonzero(g.in_deg > 0)[5])
    res = benchmark.pedantic(
        lambda: simpush_local(g, u, eps=0.1, seed=1),
        rounds=3, iterations=1, warmup_rounds=1)
    assert res.scores[u] == 1.0


@pytest.mark.parametrize("n", SIZES)
def test_probesim_scaling(benchmark, n):
    g = _graph(n)
    u = int(np.flatnonzero(g.in_deg > 0)[5])
    res = benchmark.pedantic(
        lambda: probesim(g, u, eps_a=0.1, seed=1),
        rounds=3, iterations=1, warmup_rounds=1)
    assert res.scores[u] == 1.0
