"""End-to-end SimPush tests: Theorem 1's error bound against the exact
oracle, underestimation, eps/seed behaviour, degenerate inputs, and
local/DataFrame engine agreement."""
import numpy as np
import pytest

from repro.core.params import SimPushParams
from repro.core.simpush import simpush_df
from repro.core.simpush_local import simpush_local
from repro.graphs import generators
from repro.graphs.csr import from_edges
from tests import helpers

GRAPHS = ["powerlaw", "social", "undirected", "erdos"]


@pytest.mark.parametrize("name", GRAPHS)
@pytest.mark.parametrize("eps", [0.2, 0.1, 0.05])
@pytest.mark.parametrize("u", [3, 50])
def test_theorem1_bound_deterministic_L(name, eps, u):
    """With L = L* the bound s - s~ <= eps is deterministic (Lemma 4)."""
    g = helpers.graph(name)
    s = helpers.exact(name)
    p = SimPushParams(c=0.6, eps=eps, delta=1e-4)
    res = simpush_local(g, u, eps=eps, L_override=p.L_star)
    diff = s[u] - res.scores
    assert diff.max() <= eps + 1e-12
    assert diff.min() >= -1e-9  # strict underestimate


@pytest.mark.parametrize("name", GRAPHS)
@pytest.mark.parametrize("seed", [0, 1])
def test_theorem1_bound_with_mc_stage(name, seed):
    """Full pipeline including MC level detection (probabilistic bound;
    seeds fixed)."""
    g = helpers.graph(name)
    s = helpers.exact(name)
    for u in (3, 50):
        res = simpush_local(g, u, eps=0.1, seed=seed)
        diff = s[u] - res.scores
        assert diff.max() <= 0.1 + 1e-12
        assert diff.min() >= -1e-9


@pytest.mark.parametrize("name", ["social", "undirected"])
def test_error_shrinks_with_eps(name):
    g = helpers.graph(name)
    s = helpers.exact(name)
    errs = []
    for eps in (0.4, 0.1, 0.025):
        res = simpush_local(g, 3, eps=eps, seed=0)
        errs.append((s[3] - res.scores).max())
    assert errs[2] <= errs[0] + 1e-12
    assert errs[2] < 0.025


def test_deterministic_given_seed():
    g = helpers.graph("social")
    r1 = simpush_local(g, 5, eps=0.1, seed=42)
    r2 = simpush_local(g, 5, eps=0.1, seed=42)
    np.testing.assert_array_equal(r1.scores, r2.scores)
    assert r1.L == r2.L


def test_self_score_is_one():
    g = helpers.graph("powerlaw")
    res = simpush_local(g, 10, eps=0.1, seed=0)
    assert res.scores[10] == 1.0


def test_query_without_in_neighbors():
    g = helpers.graph("chain")
    res = simpush_local(g, 29, eps=0.1, seed=0)
    expect = np.zeros(g.n)
    expect[29] = 1.0
    np.testing.assert_array_equal(res.scores, expect)
    assert res.n_attention == 0


def test_isolated_node():
    src = np.array([0, 1])
    dst = np.array([1, 0])
    g = from_edges(src, dst, n=3)  # node 2 isolated
    res = simpush_local(g, 2, eps=0.1, seed=0)
    assert res.scores[2] == 1.0
    assert res.scores.sum() == 1.0


def test_two_cycle_scores_zero():
    """a <-> b has s(a,b) = 0 exactly; SimPush must not invent mass."""
    g = from_edges(np.array([0, 1]), np.array([1, 0]), n=2)
    res = simpush_local(g, 0, eps=0.05, seed=0)
    assert res.scores[1] == pytest.approx(0.0, abs=1e-9)


def test_shared_parent_pair():
    """p -> a, p -> b: s(a, b) = c = 0.6, reachable at level 1."""
    g = from_edges(np.array([2, 2]), np.array([0, 1]), n=3)
    res = simpush_local(g, 0, eps=0.05, seed=0)
    assert res.scores[1] == pytest.approx(0.6, abs=0.05)


def test_stage_timings_populated():
    g = helpers.graph("social")
    res = simpush_local(g, 5, eps=0.1, seed=0)
    assert res.t_mc > 0 and res.t_source_push > 0
    assert res.t_total >= res.t_mc
    assert res.gu_nodes > 0 and res.gu_edges > 0


def test_attention_count_within_lemma2():
    g = helpers.graph("undirected")
    for eps in (0.2, 0.05):
        p = SimPushParams(c=0.6, eps=eps, delta=1e-4)
        res = simpush_local(g, 2, eps=eps, seed=0)
        assert res.n_attention <= p.max_attention


def test_walks_cap_still_within_bound():
    g = helpers.graph("social")
    s = helpers.exact("social")
    res = simpush_local(g, 5, eps=0.1, seed=0, walks_cap=20_000)
    assert (s[5] - res.scores).max() <= 0.1 + 1e-12


# --------------------------------------------------------------- DataFrame


@pytest.mark.parametrize("u,eps", [(4, 0.1), (40, 0.05)])
def test_df_engine_matches_local(spark, u, eps):
    src, dst = generators.social(150, 4, seed=13)
    g = from_edges(src, dst, n=150)
    edges = generators.to_spark(spark, src, dst)
    local = simpush_local(g, u, eps=eps, L_override=5)
    pdf = simpush_df(spark, edges, u, eps=eps, L_override=5).toPandas()
    dense = np.zeros(g.n)
    dense[pdf["v"].to_numpy()] = pdf["s"].to_numpy()
    np.testing.assert_allclose(dense, local.scores, atol=1e-9)


def test_df_engine_with_mc_detection(spark):
    """Full DataFrame pipeline incl. the walker-DataFrame MC stage: the
    result must satisfy the Theorem-1 bound vs the exact oracle."""
    src, dst = generators.social(120, 4, seed=14)
    g = from_edges(src, dst, n=120)
    from repro.baselines.exact import exact_simrank
    s = exact_simrank(g)
    edges = generators.to_spark(spark, src, dst)
    pdf = simpush_df(spark, edges, 7, eps=0.2, walks_cap=3000,
                     seed=0).toPandas()
    dense = np.zeros(g.n)
    dense[pdf["v"].to_numpy()] = pdf["s"].to_numpy()
    diff = s[7] - dense
    assert diff.max() <= 0.2 + 1e-12
    assert diff.min() >= -1e-9


def test_df_engine_no_attention(spark):
    src = np.arange(1, 30)
    dst = np.arange(0, 29)
    edges = generators.to_spark(spark, src, dst)
    pdf = simpush_df(spark, edges, 29, eps=0.1, L_override=3).toPandas()
    assert len(pdf) == 1
    assert pdf["v"].iloc[0] == 29 and pdf["s"].iloc[0] == 1.0
