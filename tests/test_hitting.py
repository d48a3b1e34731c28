"""Tests for Alg. 3 (hitting probabilities between attention nodes in G_u),
against an independent dense-linear-algebra reference inside G_u."""
import numpy as np
import pytest

from repro.core.hitting import attention_hitting_matrix
from repro.core.source_push import source_push
from tests import helpers

SQRT_C = np.sqrt(0.6)


def _gu_hitting_reference(g, gu, att):
    """Independent reference: propagate each target's indicator up the
    levels of G_u with explicit dense vectors (Definition 5 verbatim)."""
    n_att = att.size
    hAA = np.zeros((n_att, n_att))
    for b in range(n_att):
        lb, nb = int(att.levels[b]), int(att.nodes[b])
        if lb < 2:
            continue
        vec = {nb: 1.0}  # value at level lb
        for lvl in range(lb, 0, -1):
            # record at attention sources of this level
            for a in range(n_att):
                if int(att.levels[a]) == lvl and lvl < lb:
                    hAA[a, b] = vec.get(int(att.nodes[a]), 0.0)
            if lvl == 1:
                break
            children, parents = gu.edges[lvl - 1]
            nxt: dict[int, float] = {}
            for c_, p_ in zip(children.tolist(), parents.tolist()):
                if c_ in vec:
                    nxt[p_] = nxt.get(p_, 0.0) + \
                        SQRT_C * vec[c_] / g.in_deg[p_]
            vec = nxt
    return hAA


@pytest.mark.parametrize("name,u,L,eps_h", [
    ("social", 5, 3, 0.02),
    ("social", 11, 4, 0.01),
    ("powerlaw", 3, 3, 0.02),
    ("undirected", 2, 4, 0.02),
    ("cycle", 0, 5, 0.001),
])
def test_matches_reference(name, u, L, eps_h):
    g = helpers.graph(name)
    gu, att = source_push(g, u, eps_h=eps_h, L=L, sqrt_c=SQRT_C)
    if att.size == 0:
        pytest.skip("no attention nodes at this setting")
    hAA = attention_hitting_matrix(g, gu, att, SQRT_C)
    ref = _gu_hitting_reference(g, gu, att)
    np.testing.assert_allclose(hAA, ref, atol=1e-12)


def test_upper_triangular_in_levels():
    """h~(a -> b) can be nonzero only for strictly deeper targets."""
    g = helpers.graph("undirected")
    gu, att = source_push(g, 1, eps_h=0.02, L=4, sqrt_c=SQRT_C)
    hAA = attention_hitting_matrix(g, gu, att, SQRT_C)
    for a in range(att.size):
        for b in range(att.size):
            if att.levels[b] <= att.levels[a]:
                assert hAA[a, b] == 0.0


def test_values_are_probabilities():
    g = helpers.graph("social")
    gu, att = source_push(g, 5, eps_h=0.01, L=5, sqrt_c=SQRT_C)
    assert att.size > 0
    hAA = attention_hitting_matrix(g, gu, att, SQRT_C)
    assert hAA.min() >= 0.0
    assert hAA.max() <= 1.0 + 1e-12


def test_hitting_from_u_reproduced_in_gu():
    """Paper claim (§4.1): pushing within G_u from u reproduces the
    h^(l)(u, w) computed over G — G_u loses nothing for the query node.
    We check it via the chain: h~ from level-1 attention nodes compose
    with h^(1)(u, .) to give h^(l)(u, .) restricted to attention nodes
    reachable via level-1 nodes... simpler and exact: on the cycle graph
    G_u *is* the walked path, so h~(level-1 node -> level-l node) must
    equal sqrt(c)^(l-1)."""
    g = helpers.graph("cycle")
    gu, att = source_push(g, 0, eps_h=0.001, L=5, sqrt_c=SQRT_C)
    hAA = attention_hitting_matrix(g, gu, att, SQRT_C)
    for a in range(att.size):
        for b in range(att.size):
            la, lb = int(att.levels[a]), int(att.levels[b])
            if lb > la:
                assert hAA[a, b] == pytest.approx(SQRT_C ** (lb - la))


def test_empty_attention():
    g = helpers.graph("chain")
    gu, att = source_push(g, 29, eps_h=0.01, L=3, sqrt_c=SQRT_C)
    hAA = attention_hitting_matrix(g, gu, att, SQRT_C)
    assert hAA.shape == (0, 0)


def test_hitting_df_matches_local(spark):
    """Alg. 3 on the DataFrame engine produces the same attention-to-
    attention hitting matrix as the local engine."""
    import pandas as pd
    from repro.core.simpush import (GraphFrames, _haa_matrix, hitting_df,
                                    source_push_df)
    from repro.graphs import generators
    from repro.graphs.csr import from_edges
    src, dst = generators.social(150, 4, seed=21)
    g = from_edges(src, dst, n=150)
    u, eps_h, L = 4, 0.02, 4
    gu, att = source_push(g, u, eps_h=eps_h, L=L, sqrt_c=SQRT_C)
    if att.size == 0:
        pytest.skip("no attention nodes at this setting")
    ref = attention_hitting_matrix(g, gu, att, SQRT_C)
    edges = generators.to_spark(spark, src, dst)
    gf = GraphFrames.build(edges)
    try:
        _, gu_edges, attention = source_push_df(
            spark, gf, u, eps_h, L, SQRT_C)
        att_pdf = attention.toPandas().sort_values(
            ["level", "node"]).reset_index(drop=True)
        rows = hitting_df(spark, gf, gu_edges, att_pdf, gu.L, SQRT_C)
    finally:
        gf.unpersist()
    got = _haa_matrix(att, rows)
    np.testing.assert_allclose(got, ref, atol=1e-12)
