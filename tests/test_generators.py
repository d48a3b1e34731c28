"""Tests for the synthetic graph generators (graphs/generators.py) and
their Spark/DuckDB-visible relational properties."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graphs import generators
from repro.oracle import assert_equivalent

GEN_CASES = [
    ("powerlaw", lambda s: generators.powerlaw(300, 5, seed=s)),
    ("social", lambda s: generators.social(300, 5, seed=s)),
    ("undirected", lambda s: generators.undirected(300, 6, seed=s)),
    ("erdos", lambda s: generators.erdos_renyi(300, 1500, seed=s)),
]


@pytest.mark.parametrize("name,gen", GEN_CASES)
@pytest.mark.parametrize("seed", [0, 1, 7])
def test_deterministic_in_seed(name, gen, seed):
    s1, d1 = gen(seed)
    s2, d2 = gen(seed)
    np.testing.assert_array_equal(s1, s2)
    np.testing.assert_array_equal(d1, d2)


@pytest.mark.parametrize("name,gen", GEN_CASES)
def test_different_seeds_differ(name, gen):
    s1, d1 = gen(0)
    s2, d2 = gen(1)
    assert s1.shape != s2.shape or not (
        np.array_equal(s1, s2) and np.array_equal(d1, d2))


@pytest.mark.parametrize("name,gen", GEN_CASES)
@pytest.mark.parametrize("seed", [0, 3])
def test_simple_graph_invariants(name, gen, seed):
    """No self loops, no duplicate edges, ids within range."""
    src, dst = gen(seed)
    assert (src != dst).all()
    assert src.min() >= 0 and dst.min() >= 0
    assert src.max() < 300 and dst.max() < 300
    keys = src * 300 + dst
    assert np.unique(keys).size == keys.size


def test_powerlaw_in_degree_skew():
    """Preferential attachment concentrates in-degree: the top 1% of
    nodes should hold a large share of all in-edges, far above the
    uniform share."""
    src, dst = generators.powerlaw(2000, 8, seed=0)
    deg = np.bincount(dst, minlength=2000)
    top = np.sort(deg)[::-1][:20].sum()
    assert top / deg.sum() > 0.15  # uniform share would be 1%


def test_erdos_renyi_no_skew():
    src, dst = generators.erdos_renyi(2000, 16000, seed=0)
    deg = np.bincount(dst, minlength=2000)
    top = np.sort(deg)[::-1][:20].sum()
    assert top / deg.sum() < 0.05


def test_undirected_is_symmetric():
    src, dst = generators.undirected(300, 6, seed=2)
    fwd = set(zip(src.tolist(), dst.tolist()))
    assert all((b, a) in fwd for a, b in fwd)


def test_social_has_reciprocity():
    """The social generator must mirror a visible fraction of edges."""
    src, dst = generators.social(500, 8, seed=0)
    edges = set(zip(src.tolist(), dst.tolist()))
    recip = sum((b, a) in edges for a, b in edges) / len(edges)
    base_src, base_dst = generators.powerlaw(500, 8, seed=1)
    base = set(zip(base_src.tolist(), base_dst.tolist()))
    base_recip = sum((b, a) in base for a, b in base) / len(base)
    assert recip > base_recip + 0.1


def test_social_denser_than_base():
    ps, pd_ = generators.powerlaw(400, 6, seed=11)
    ss, sd = generators.social(400, 6, seed=10)
    assert ss.size > ps.size


def test_to_spark_roundtrip(spark):
    src, dst = generators.powerlaw(120, 4, seed=0)
    df = generators.to_spark(spark, src, dst)
    pdf = df.toPandas().sort_values(["src", "dst"]).reset_index(drop=True)
    order = np.lexsort((dst, src))
    np.testing.assert_array_equal(pdf["src"].to_numpy(), src[order])
    np.testing.assert_array_equal(pdf["dst"].to_numpy(), dst[order])


def test_degree_aggregation_oracle(spark):
    """In/out degree computation in Spark matches DuckDB SQL — the
    relational primitive every push stage relies on."""
    src, dst = generators.social(200, 5, seed=6)
    edges = generators.to_spark(spark, src, dst)
    got = edges.groupBy(F.col("dst").alias("node")).agg(
        F.count("*").alias("d_in"))
    assert_equivalent(
        got,
        "SELECT dst AS node, COUNT(*) AS d_in FROM edges GROUP BY dst",
        edges=edges,
    )
    got_out = edges.groupBy(F.col("src").alias("node")).agg(
        F.count("*").alias("d_out"))
    assert_equivalent(
        got_out,
        "SELECT src AS node, COUNT(*) AS d_out FROM edges GROUP BY src",
        edges=edges,
    )
