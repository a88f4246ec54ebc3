"""Fig. 9 shape (Sec. 9.2): QueryER vs the Batch Approach over the
Q1-Q5 selectivity ladder — QueryER beats BA on every query, with the
gap narrowing as selectivity grows. Reported as the table of numbers
behind the figure (figures themselves are out of scope)."""
from __future__ import annotations

from repro.experiments.tables import fig9_queryer_vs_ba
from repro.experiments.workload import print_table


def test_fig9_dsd(bench_catalog, benchmark):
    cat, _ = bench_catalog
    header, rows = benchmark.pedantic(
        lambda: fig9_queryer_vs_ba(cat, "DSD"), rounds=1, iterations=1
    )
    print_table("Fig. 9 numbers: QueryER vs BA on DSD (Q1-Q5)", header, rows)

    # QueryER executes fewer comparisons than BA at every selectivity,
    # and comparisons grow monotonically with selectivity.
    comp = [r[4] for r in rows]
    for r in rows:
        assert r[4] < r[5]
    assert comp == sorted(comp)
    # The relative gap narrows as S grows (paper Sec. 9.2).
    first_ratio = rows[0][4] / rows[0][5]
    last_ratio = rows[-1][4] / rows[-1][5]
    assert first_ratio < last_ratio
