"""Evaluation harness: the paper's metrics (AvgError@k, Precision@k),
peak-memory accounting, ground-truth generation (exact + pooled MC), and
the tradeoff sweep that regenerates the evaluation tables."""
