"""Distributed-engine benchmark: one DataFrame SimPush query end-to-end
(Catalyst plans + shuffles). Absolute numbers include Spark job-launch
overhead and are reported separately from the local-engine tables in
EXPERIMENTS.md.
"""
import pytest

from repro.core.simpush import GraphFrames, simpush_df
from repro.graphs import datasets, generators


def test_simpush_dataframe_query(benchmark, spark):
    src, dst, spec = datasets.edge_arrays("in2004_analog")
    edges = generators.to_spark(spark, src, dst)
    gf = GraphFrames.build(edges)
    gf.edges.count()  # materialise caches outside the timed region
    u = int(datasets.query_nodes("in2004_analog", 1)[0])
    try:
        out = benchmark.pedantic(
            lambda: simpush_df(spark, edges, u, eps=0.1, walks_cap=20_000,
                               seed=1, gf=gf).toPandas(),
            rounds=2, iterations=1)
        assert (out["v"] == u).any()
    finally:
        gf.unpersist()
