"""Fig. 11 shape (Sec. 9.2): consecutive overlapping queries Q10-Q13
with and without the Link Index — with LI the per-query comparisons
drop toward zero; without it they keep growing."""
from __future__ import annotations

from repro.experiments.tables import fig11_link_index
from repro.experiments.workload import print_table


def test_fig11(bench_catalog, benchmark):
    cat, _ = bench_catalog
    header, rows = benchmark.pedantic(
        lambda: fig11_link_index(cat), rounds=1, iterations=1
    )
    print_table("Fig. 11 numbers: LI effect on Q10-Q13 (OAGP)", header, rows)

    with_comp = [r[2] for r in rows]
    no_comp = [r[4] for r in rows]
    # Without LI every query pays for its full selection; with LI each
    # query pays only for the ~30% it adds -> strictly fewer
    # comparisons on every follow-up query.
    for i in range(1, len(rows)):
        assert with_comp[i] < no_comp[i]
    # And the without-LI cost grows with the widening range.
    assert no_comp == sorted(no_comp)
