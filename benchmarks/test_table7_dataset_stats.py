"""Table 7 (Sec. 9.1): dataset characteristics — |E|, |L_E|, |A|, |TBI|.

Paper rows (for the families we reproduce, at their full scale):
DSD 66879/5347/4/88K; OAO 55464/5464/3/22K; OAP 500K/58074/8/170K;
PPL2M 2M/645489/12/850K; OAGP2M 2M/267843/18/360K; OAGV 130K/29841/5/55K.
Ours are ~100x smaller by design (see workload.Scale); the row shape to
check is the *ratios*: |L_E|/|E| ~ the injected duplicate rate and
|TBI| of the same order as |E|.
"""
from __future__ import annotations

from repro.experiments.tables import table7_dataset_stats
from repro.experiments.workload import print_table

PAPER = {
    "DSD": (66879, 5347, 4, "88K"),
    "OAO": (55464, 5464, 3, "22K"),
    "OAP": (500_000, 58074, 8, "170K"),
    "PPL": (2_000_000, 645489, 12, "850K"),
    "OAGP": (2_000_000, 267843, 18, "360K"),
    "OAGV": (130_000, 29841, 5, "55K"),
}

# Attribute-count narrowing documented in DESIGN.md (ids/urls carry no
# ER signal): OAGP 18 -> 10, OAGV 5 -> 5, PPL 12 -> 12, OAP 8 -> 8.
EXPECTED_ATTRS = {"DSD": 4, "OAO": 3, "OAP": 8, "PPL": 12, "OAGP": 10,
                  "OAGV": 5}


def test_table7(bench_catalog, benchmark):
    cat, gt = bench_catalog
    header, rows = benchmark.pedantic(
        lambda: table7_dataset_stats(cat, gt), rounds=1, iterations=1
    )
    for r in rows:
        p = PAPER[r[0]]
        r.extend([p[0], p[1], p[2], p[3]])
    header += ["paper |E|", "paper |L_E|", "paper |A|", "paper |TBI|"]
    print_table("Table 7: dataset characteristics", header, rows)

    for r in rows:
        name, n_e, n_l, n_a, n_tbi = r[0], r[1], r[2], r[3], r[4]
        assert n_a == EXPECTED_ATTRS[name]
        assert 0 < n_l < n_e
        assert n_tbi > 0
        # Duplicate-rate shape vs paper: PPL ~32% of rows are in L_E
        # pairs, OAO/OAP ~10%, within loose factor-2 bounds.
        paper_rate = PAPER[name][1] / PAPER[name][0]
        ours_rate = n_l / n_e
        assert 0.3 * paper_rate < ours_rate < 4 * paper_rate
