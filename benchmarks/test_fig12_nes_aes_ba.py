"""Fig. 12 shape (Sec. 9.3): SPJ queries Q6a/Q6b/Q7a/Q7b under the
Advanced ER Solution vs the Naive ER Solution vs the Batch Approach —
AES executes no more comparisons than NES, both beat BA."""
from __future__ import annotations

from repro.experiments.tables import fig12_nes_aes_ba
from repro.experiments.workload import print_table


def test_fig12(bench_catalog, benchmark):
    cat, _ = bench_catalog
    header, rows = benchmark.pedantic(
        lambda: fig12_nes_aes_ba(cat), rounds=1, iterations=1
    )
    print_table("Fig. 12 numbers: AES vs NES vs BA (SPJ)", header, rows)

    for r in rows:
        aes_c, nes_c, ba_c = r[2], r[4], r[6]
        assert aes_c <= nes_c
        assert aes_c < ba_c
