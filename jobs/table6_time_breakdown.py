"""Table 6: TT breakdown for Q5 on DSD and OAP.

    spark-submit jobs/table6_time_breakdown.py
"""
from repro.experiments.tables import table6_time_breakdown
from repro.experiments.workload import BENCH_SCALE, build_catalog, print_table

from _session import get_spark


def main() -> None:
    spark = get_spark("table6")
    cat, _ = build_catalog(spark, BENCH_SCALE)
    header, rows = table6_time_breakdown(cat)
    print_table("Table 6: TT breakdown for Q5", header, rows)
    spark.stop()


if __name__ == "__main__":
    main()
