"""SimPush — the paper's contribution (Algorithms 1–5).

Two engines share one algorithmic spec:

* ``simpush.py`` — the distributed engine: Source-Push, Alg.-3 hitting
  propagation and Reverse-Push expressed as iterative Spark DataFrame
  join/aggregate pushes (Catalyst plans), per the repro directive.
* ``simpush_local.py`` — the same algorithm over the numpy CSR substrate,
  used by the benchmark harness where per-query latency fidelity matters
  (DESIGN.md §2) and tested to agree with the DataFrame engine to 1e-9.
"""
from repro.core.params import SimPushParams  # noqa: F401
