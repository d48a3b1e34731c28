"""Table 3 benchmark: SimPush end-to-end query cost by eps (stage split is
printed by jobs/stage_breakdown.py; this pins the total under benchmark).
"""
import pytest

from repro.core.simpush_local import simpush_local
from repro.graphs import datasets


@pytest.mark.parametrize("eps", [0.2, 0.1, 0.05])
def test_simpush_query(benchmark, eps):
    g = datasets.load("pokec_analog")
    u = int(datasets.query_nodes("pokec_analog", 1)[0])

    def run():
        return simpush_local(g, u, eps=eps, seed=1, walks_cap=2_000_000)

    res = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert res.scores[u] == 1.0
