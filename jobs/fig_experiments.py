"""Numbers behind Figs. 9, 11, 12 and 13 (QueryER vs BA, Link-Index
effect, AES vs NES vs BA on SPJ, scalability).

    spark-submit jobs/fig_experiments.py [fig9|fig11|fig12|fig13|all]
"""
import sys

from repro.experiments.tables import (
    fig9_queryer_vs_ba,
    fig11_link_index,
    fig12_nes_aes_ba,
    fig13_scalability,
)
from repro.experiments.workload import BENCH_SCALE, build_catalog, print_table

from _session import get_spark


def main() -> None:
    which = sys.argv[1] if len(sys.argv) > 1 else "all"
    spark = get_spark("fig-experiments")
    cat, _ = build_catalog(spark, BENCH_SCALE)
    if which in ("fig9", "all"):
        print_table(
            "Fig. 9: QueryER vs BA on DSD", *fig9_queryer_vs_ba(cat, "DSD")
        )
    if which in ("fig11", "all"):
        print_table("Fig. 11: Link-Index effect", *fig11_link_index(cat))
    if which in ("fig12", "all"):
        print_table("Fig. 12: AES vs NES vs BA", *fig12_nes_aes_ba(cat))
    if which in ("fig13", "all"):
        print_table("Fig. 13: scalability of Q8a", *fig13_scalability(spark))
    spark.stop()


if __name__ == "__main__":
    main()
