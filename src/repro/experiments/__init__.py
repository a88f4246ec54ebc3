"""Experiment harnesses reproducing the paper's evaluation (Sec. 9).

One function per table/experiment; each returns the printable rows so
the pytest-benchmark wrappers (``benchmarks/``) and the spark-submit
entrypoints (``jobs/``) share the exact same code path. Paper-side
numbers are recorded next to measured ones in EXPERIMENTS.md.
"""
