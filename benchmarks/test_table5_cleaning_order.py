"""Table 5 (Sec. 7.2): executed comparisons by cleaning order on the
motivating example. Paper: clean-V-first = 15 total, clean-P-first = 18.
"""
from __future__ import annotations

import pytest

from repro.core.planner import Catalog
from repro.datagen.paper_example import (
    EXAMPLE_CONFIG,
    publications_df,
    venues_df,
)
from repro.experiments.tables import table5_cleaning_order
from repro.experiments.workload import print_table

PAPER = {"V": (12, 3, 15), "P": (17, 1, 18)}


def test_table5(spark, benchmark):
    cat = Catalog(spark, config=EXAMPLE_CONFIG)
    cat.register("P", publications_df(spark))
    cat.register("V", venues_df(spark))

    header, rows = benchmark.pedantic(
        lambda: table5_cleaning_order(cat), rounds=1, iterations=1
    )
    for r in rows:
        r.extend(PAPER[r[0]])
    header += ["paper V", "paper P", "paper Total"]
    print_table("Table 5: comparisons by cleaning order", header, rows)

    by_first = {r[0]: r for r in rows}
    # Both orders run, produce non-negative counts, and differ in total.
    assert by_first["V"][3] != by_first["P"][3]
    for r in rows:
        assert r[1] >= 0 and r[2] >= 0
