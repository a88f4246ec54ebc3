"""Benchmark fixtures: the evaluation catalog at bench scale (~SF 0.1
equivalent for this workload — see workload.Scale docstring for the
scale substitution vs the paper's 200K-2M rows)."""
from __future__ import annotations

import pytest

from repro.experiments.workload import BENCH_SCALE, build_catalog


@pytest.fixture(scope="session")
def bench_catalog(spark):
    cat, gt = build_catalog(spark, BENCH_SCALE)
    return cat, gt
