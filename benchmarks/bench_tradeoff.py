"""Figures 4/5 benchmark: one representative query per method on the
In-2004 analog at comparable accuracy settings (the full 5-point sweeps
behind EXPERIMENTS.md come from jobs/eval_tradeoff.py; this module pins
the per-method query cost under pytest-benchmark).
"""
import numpy as np
import pytest

from repro.baselines import prsim, reads, sling, topsim, tsf
from repro.baselines.probesim import probesim
from repro.core.simpush_local import simpush_local
from repro.graphs import datasets

DATASET = "in2004_analog"


@pytest.fixture(scope="module")
def graph():
    return datasets.load(DATASET)


@pytest.fixture(scope="module")
def query_node():
    return int(datasets.query_nodes(DATASET, 1)[0])


def test_simpush(benchmark, graph, query_node):
    res = benchmark.pedantic(
        lambda: simpush_local(graph, query_node, eps=0.05, seed=1),
        rounds=3, iterations=1, warmup_rounds=1)
    assert res.scores[query_node] == 1.0


def test_probesim(benchmark, graph, query_node):
    res = benchmark.pedantic(
        lambda: probesim(graph, query_node, eps_a=0.1, seed=1),
        rounds=3, iterations=1, warmup_rounds=1)
    assert res.scores[query_node] == 1.0


def test_prsim_query(benchmark, graph, query_node):
    idx = prsim.build_index(graph, eps_a=0.1, seed=1)
    out = benchmark.pedantic(
        lambda: prsim.query(graph, idx, query_node, eps_a=0.1, seed=1),
        rounds=3, iterations=1, warmup_rounds=1)
    assert out[query_node] == 1.0


def test_sling_query(benchmark, graph, query_node):
    idx = sling.build_index(graph, eps_a=0.1, seed=1)
    out = benchmark.pedantic(
        lambda: sling.query(graph, idx, query_node),
        rounds=3, iterations=1, warmup_rounds=1)
    assert out[query_node] == 1.0


def test_reads_query(benchmark, graph, query_node):
    idx = reads.build_index(graph, r=100, t=10, seed=1)
    out = benchmark.pedantic(
        lambda: reads.query(graph, idx, query_node),
        rounds=3, iterations=1, warmup_rounds=1)
    assert out[query_node] == 1.0


def test_tsf_query(benchmark, graph, query_node):
    idx = tsf.build_index(graph, R_g=200, seed=1)
    out = benchmark.pedantic(
        lambda: tsf.query(graph, idx, query_node, R_q=30, seed=1),
        rounds=3, iterations=1, warmup_rounds=1)
    assert out[query_node] == 1.0


def test_topsim(benchmark, graph, query_node):
    out = benchmark.pedantic(
        lambda: topsim.topsim(graph, query_node, T=3, inv_h=1000),
        rounds=3, iterations=1, warmup_rounds=1)
    assert out[query_node] == 1.0


def test_prsim_build(benchmark, graph):
    """Index-build cost — the price index-based methods pay that the
    paper's online scenario cannot amortise."""
    idx = benchmark.pedantic(
        lambda: prsim.build_index(graph, eps_a=0.1, seed=1),
        rounds=2, iterations=1)
    assert idx.index_bytes > 0
