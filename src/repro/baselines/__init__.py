"""Baselines and oracles the paper compares against (all built here).

``exact.py`` (power method) and ``monte_carlo.py`` provide ground truth;
``probesim/prsim/sling/reads/tsf/topsim`` are the six competitor systems
from the paper's §5, reimplemented over the shared numpy-CSR substrate so
every method pays identical primitive costs (DESIGN.md §2).
"""
