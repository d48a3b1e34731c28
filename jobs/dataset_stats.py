"""Table 4 reproduction: statistics of the 9 synthetic analogs next to the
paper's real-graph numbers.

Usage: python jobs/dataset_stats.py  (no Spark needed — pure generators)
"""
from __future__ import annotations

import pandas as pd


def table4() -> pd.DataFrame:
    """One row per analog: our (n, m, type) and the paper's (n, m, type)."""
    from repro.graphs import datasets

    rows = []
    for name, spec in datasets.SPECS.items():
        g = datasets.load(name)
        rows.append({
            "analog": name, "n": g.n, "m": g.m, "kind": spec.kind,
            "paper_name": spec.paper_name, "paper_n": spec.paper_n,
            "paper_m": spec.paper_m, "paper_type": spec.paper_type,
            "scale": round(spec.paper_n / g.n),
        })
    return pd.DataFrame(rows)


def main() -> None:
    from repro.eval.harness import markdown_table
    print(markdown_table(table4()))


if __name__ == "__main__":
    main()
