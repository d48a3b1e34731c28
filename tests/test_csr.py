"""Tests for the CSR substrate (graphs/csr.py): construction, the two push
operators (validated against dict-based brute force and dense linear
algebra), and the batched walk sampler."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from pyspark.sql import functions as F

from repro.graphs import generators
from repro.graphs.csr import CSRGraph, _ragged_offsets, from_edges, from_spark
from repro.oracle import assert_equivalent
from tests import helpers

SQRT_C = np.sqrt(0.6)


def _edges_strategy():
    return st.lists(
        st.tuples(st.integers(0, 19), st.integers(0, 19)),
        min_size=1, max_size=120)


@given(edges=_edges_strategy())
@settings(max_examples=60, deadline=None)
def test_from_edges_matches_bruteforce(edges):
    src = np.array([e[0] for e in edges])
    dst = np.array([e[1] for e in edges])
    g = from_edges(src, dst, n=20)
    simple = {(a, b) for a, b in edges if a != b}
    assert g.m == len(simple)
    for v in range(20):
        assert set(g.out_neighbors(v).tolist()) == {
            b for a, b in simple if a == v}
        assert set(g.in_neighbors(v).tolist()) == {
            a for a, b in simple if b == v}
        assert g.out_deg[v] == len({b for a, b in simple if a == v})
        assert g.in_deg[v] == len({a for a, b in simple if b == v})


def test_ragged_offsets():
    np.testing.assert_array_equal(
        _ragged_offsets(np.array([3, 1, 0, 2])), [0, 1, 2, 0, 0, 1])
    np.testing.assert_array_equal(_ragged_offsets(np.array([0, 0])), [])


@pytest.mark.parametrize("name", ["powerlaw", "social", "undirected", "star"])
def test_push_to_in_neighbors_is_linear_operator(name):
    """One Source-Push level equals a row-vector multiply by
    sqrt(c) * W^T (the brute-force dense operator)."""
    g = helpers.graph(name)
    wt = SQRT_C * helpers.wt_matrix(g)
    rng = np.random.default_rng(0)
    for _ in range(3):
        h = rng.random(g.n) * (rng.random(g.n) < 0.3)
        np.testing.assert_allclose(
            g.push_to_in_neighbors(h, SQRT_C), h @ wt, atol=1e-12)


@pytest.mark.parametrize("name", ["powerlaw", "social", "cycle"])
def test_push_to_out_neighbors_is_adjoint(name):
    """Reverse-Push distributes r(v')*sqrt(c)/d_I(v) over out-edges —
    i.e. multiplication by the same matrix from the other side."""
    g = helpers.graph(name)
    wt = SQRT_C * helpers.wt_matrix(g)
    rng = np.random.default_rng(1)
    for _ in range(3):
        r = rng.random(g.n) * (rng.random(g.n) < 0.3)
        np.testing.assert_allclose(
            g.push_to_out_neighbors(r, SQRT_C), wt @ r, atol=1e-12)


def test_push_active_subset():
    g = helpers.graph("powerlaw")
    rng = np.random.default_rng(2)
    r = rng.random(g.n)
    active = np.array([3, 10, 50])
    masked = np.zeros(g.n)
    masked[active] = r[active]
    np.testing.assert_allclose(
        g.push_to_out_neighbors(r, SQRT_C, active=active),
        g.push_to_out_neighbors(masked, SQRT_C), atol=1e-14)


@pytest.mark.parametrize("name", ["cycle", "undirected"])
def test_push_mass_conservation_on_sink_free_graph(name):
    """On graphs where every node has an in-neighbour, each push level
    retains exactly sqrt(c) of the mass (Lemma 2's level identity)."""
    g = helpers.graph(name)
    assert (g.in_deg > 0).all()
    h = np.zeros(g.n)
    h[1] = 1.0
    for lvl in range(1, 5):
        h = g.push_to_in_neighbors(h, SQRT_C)
        assert h.sum() == pytest.approx(SQRT_C ** lvl)


def test_push_mass_leaks_at_sinks():
    g = helpers.graph("chain")  # node 29 has no in-neighbour
    h = np.zeros(g.n)
    h[0] = 1.0
    total = 0.0
    for lvl in range(1, 40):
        h = g.push_to_in_neighbors(h, SQRT_C)
        total = h.sum()
    assert total == 0.0  # chain exhausted


def test_random_in_neighbor_uniform():
    g = helpers.graph("star")  # node 0 has 24 in-neighbours
    rng = np.random.default_rng(3)
    picks = g.random_in_neighbor(np.zeros(50_000, dtype=np.int64), rng)
    counts = np.bincount(picks, minlength=25)[1:]
    assert counts.min() > 0
    # Each neighbour expected 50000/24 ~ 2083; allow 5 sigma.
    assert np.abs(counts - 50_000 / 24).max() < 5 * np.sqrt(50_000 / 24)


def test_random_in_neighbor_none():
    g = helpers.graph("chain")
    rng = np.random.default_rng(0)
    out = g.random_in_neighbor(np.array([29, 0]), rng)
    assert out[0] == -1  # chain edges run i -> i-1, so nobody points to 29
    assert out[1] == 1   # node 0's only in-neighbour is 1


def test_sqrt_c_walks_shape_and_stopping():
    g = helpers.graph("cycle")
    rng = np.random.default_rng(4)
    pos = g.sqrt_c_walks(np.full(20_000, 7, dtype=np.int64), SQRT_C, 6, rng)
    assert pos.shape == (20_000, 7)
    assert (pos[:, 0] == 7).all()
    # Once stopped, stays stopped.
    stopped = pos[:, 1] < 0
    assert (pos[stopped, 2:] < 0).all()
    # Survival per step ~ sqrt(c).
    alive1 = (pos[:, 1] >= 0).mean()
    assert abs(alive1 - SQRT_C) < 0.02


def test_sqrt_c_walks_match_push_distribution():
    """Empirical step-l occupancy of walks equals the exact push vector."""
    g = helpers.graph("social")
    rng = np.random.default_rng(5)
    n_w = 150_000
    pos = g.sqrt_c_walks(np.full(n_w, 11, dtype=np.int64), SQRT_C, 2, rng)
    h = np.zeros(g.n)
    h[11] = 1.0
    for step in (1, 2):
        h = g.push_to_in_neighbors(h, SQRT_C)
        col = pos[:, step]
        emp = np.bincount(col[col >= 0], minlength=g.n) / n_w
        assert np.abs(emp - h).max() < 0.01


def test_nbytes_positive():
    g = helpers.graph("powerlaw")
    assert g.nbytes > 0


def test_from_spark_roundtrip(spark):
    src, dst = generators.social(150, 4, seed=8)
    df = generators.to_spark(spark, src, dst)
    g1 = from_spark(df)
    g2 = from_edges(src, dst)
    assert g1.n == g2.n and g1.m == g2.m
    np.testing.assert_array_equal(g1.in_ptr, g2.in_ptr)
    np.testing.assert_array_equal(g1.in_idx, g2.in_idx)
    np.testing.assert_array_equal(g1.out_idx, g2.out_idx)


def test_in_degree_matches_duckdb(spark):
    """CSR degrees agree with the SQL definition of in/out degree."""
    import pandas as pd
    src, dst = generators.powerlaw(150, 4, seed=9)
    g = from_edges(src, dst, n=150)
    edges = generators.to_spark(spark, src, dst)
    got = (edges.groupBy(F.col("dst").alias("node"))
           .agg(F.count("*").alias("d")))
    assert_equivalent(
        got, "SELECT dst AS node, COUNT(*) AS d FROM edges GROUP BY dst",
        edges=edges)
    pdf = got.toPandas()
    dense = np.zeros(150, dtype=np.int64)
    dense[pdf["node"].to_numpy()] = pdf["d"].to_numpy()
    np.testing.assert_array_equal(dense, g.in_deg)
