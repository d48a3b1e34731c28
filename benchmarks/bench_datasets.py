"""Table 4 benchmark: dataset analog generation + CSR build cost.

Regenerates the dataset statistics printed in EXPERIMENTS.md §Table 4
(via jobs/dataset_stats.py); here we keep the generation pipeline itself
under benchmark so regressions in the substrate are caught.
"""
import pytest

from repro.graphs import datasets
from repro.graphs.csr import from_edges


@pytest.mark.parametrize("name", ["in2004_analog", "pokec_analog",
                                  "dblp_analog"])
def test_generate_and_build(benchmark, name):
    src, dst, spec = datasets.edge_arrays(name)

    def build():
        return from_edges(src, dst, n=spec.n)

    g = benchmark(build)
    assert g.n == spec.n
