"""Table 3 reproduction: empirical per-stage cost of SimPush
(Source-Push incl. MC, gamma computation, Reverse-Push) across eps.

Usage: python jobs/stage_breakdown.py [--datasets pokec_analog dblp_analog]
"""
from __future__ import annotations

import argparse

import numpy as np
import pandas as pd


def stage_table(dataset_names: list[str], eps_grid=(0.2, 0.1, 0.05, 0.025),
                n_queries: int = 3, walks_cap: int = 2_000_000,
                seed: int = 0) -> pd.DataFrame:
    """Average stage wall-times per (dataset, eps)."""
    from repro.core.simpush_local import simpush_local
    from repro.graphs import datasets

    rows = []
    for name in dataset_names:
        g = datasets.load(name)
        queries = datasets.query_nodes(name, n_queries)
        for eps in eps_grid:
            res = [simpush_local(g, int(u), eps=eps, seed=seed + i,
                                 walks_cap=walks_cap)
                   for i, u in enumerate(queries)]
            rows.append({
                "dataset": name, "eps": eps,
                "t_source_push_ms": 1e3 * float(np.mean(
                    [r.t_mc + r.t_source_push for r in res])),
                "t_gamma_ms": 1e3 * float(np.mean([r.t_gamma for r in res])),
                "t_reverse_push_ms": 1e3 * float(np.mean(
                    [r.t_reverse_push for r in res])),
                "avg_L": float(np.mean([r.L for r in res])),
                "avg_attention": float(np.mean([r.n_attention for r in res])),
            })
    return pd.DataFrame(rows)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", nargs="+",
                    default=["pokec_analog", "dblp_analog"])
    args = ap.parse_args()
    from repro.eval.harness import markdown_table
    print(markdown_table(stage_table(args.datasets)))


if __name__ == "__main__":
    main()
