"""Tests for the 9-analog dataset suite (graphs/datasets.py)."""
import numpy as np
import pytest

from repro.graphs import datasets


def test_registry_has_nine_analogs():
    assert len(datasets.SPECS) == 9
    assert set(datasets.SMALL) | set(datasets.LARGE) == set(datasets.SPECS)
    assert not set(datasets.SMALL) & set(datasets.LARGE)


@pytest.mark.parametrize("name", datasets.SMALL)
def test_small_suite_loads_with_expected_shape(name):
    g = datasets.load(name)
    spec = datasets.SPECS[name]
    assert g.n == spec.n
    assert g.m > g.n  # denser than a forest
    assert g.n <= 2600  # exact ground truth must stay feasible


@pytest.mark.parametrize("name", datasets.SPECS)
def test_deterministic(name):
    s1, d1, _ = datasets.edge_arrays(name)
    s2, d2, _ = datasets.edge_arrays(name)
    np.testing.assert_array_equal(s1, s2)
    np.testing.assert_array_equal(d1, d2)


@pytest.mark.parametrize("name", ["dblp_analog", "friendster_analog"])
def test_undirected_analogs_are_symmetric(name):
    src, dst, spec = datasets.edge_arrays(name)
    assert spec.paper_type == "undirected"
    fwd = set(zip(src.tolist(), dst.tolist()))
    assert all((b, a) in fwd for a, b in fwd)


@pytest.mark.parametrize("name", datasets.SMALL + ["clueweb_analog"])
def test_query_nodes_valid(name):
    g = datasets.load(name)
    qs = datasets.query_nodes(name, 5)
    assert len(qs) == 5
    assert len(set(qs.tolist())) == 5
    assert (g.in_deg[qs] > 0).all()


def test_density_tracks_paper():
    """Each analog's m/n ratio should be within ~3x of the paper graph's
    (the property SimRank locality depends on)."""
    for name, spec in datasets.SPECS.items():
        g = datasets.load(name)
        ours = g.m / g.n
        paper = spec.paper_m / spec.paper_n
        if spec.paper_type == "undirected":
            paper *= 2  # paper counts undirected edges once
        assert ours / paper < 3.5 and paper / ours < 3.5, (
            f"{name}: density {ours:.1f} vs paper {paper:.1f}")


def test_webgraph_analogs_are_skewed():
    g = datasets.load("in2004_analog")
    deg = np.sort(g.in_deg)[::-1]
    assert deg[: g.n // 100].sum() / g.m > 0.15
