"""Integration tests for the tradeoff harness (eval/harness.py) and the
headline shape claims of the paper on a small analog."""
import numpy as np
import pytest

from repro.eval import harness
from repro.graphs import datasets


@pytest.fixture(scope="module")
def mini_sweep():
    """One small sweep shared by all assertions in this module."""
    return harness.sweep(
        "in2004_analog",
        methods=["simpush", "probesim", "prsim", "topsim"],
        settings_idx=[2], n_queries=2)


def test_sweep_schema(mini_sweep):
    expect = {"dataset", "method", "setting", "query_time_s",
              "build_time_s", "index_MB", "peak_MB", "avg_error@50",
              "precision@50", "n_queries", "avg_L", "avg_attention",
              "excluded"}
    assert set(mini_sweep.columns) == expect
    assert len(mini_sweep) == 4
    assert (mini_sweep["excluded"] == "").all()


def test_all_methods_reasonably_accurate(mini_sweep):
    assert (mini_sweep["avg_error@50"] < 0.02).all()
    assert (mini_sweep["precision@50"] > 0.7).all()


def test_simpush_stats_reported(mini_sweep):
    row = mini_sweep[mini_sweep["method"] == "simpush"].iloc[0]
    assert row["avg_L"] >= 1
    assert row["avg_attention"] >= 1


def test_index_methods_report_build(mini_sweep):
    row = mini_sweep[mini_sweep["method"] == "prsim"].iloc[0]
    assert row["build_time_s"] > 0
    assert row["index_MB"] > 0
    row2 = mini_sweep[mini_sweep["method"] == "probesim"].iloc[0]
    assert row2["build_time_s"] == 0


def test_memory_budget_exclusion():
    df = harness.sweep("in2004_analog", methods=["reads"],
                       settings_idx=[4], n_queries=1,
                       index_budget_bytes=1024)
    assert (df["excluded"] == "index exceeds memory budget").all()
    assert np.isnan(df["avg_error@50"]).all()


def test_sling_excluded_on_large_graphs():
    df = harness.sweep("clueweb_analog", methods=["sling"],
                       settings_idx=[0], n_queries=1, gt_samples=100)
    assert (df["excluded"] != "").all()


def test_to_markdown_renders(mini_sweep):
    md = harness.to_markdown(mini_sweep)
    assert "simpush" in md and "|" in md


def test_settings_grids_have_five_points_each():
    for method, grid in harness.SETTINGS.items():
        assert len(grid) == 5, method
