"""Table 7: dataset characteristics (|E|, |L_E|, |A|, |TBI|).

    spark-submit jobs/table7_dataset_stats.py
"""
from repro.experiments.tables import table7_dataset_stats
from repro.experiments.workload import BENCH_SCALE, build_catalog, print_table

from _session import get_spark


def main() -> None:
    spark = get_spark("table7")
    cat, gt = build_catalog(spark, BENCH_SCALE)
    header, rows = table7_dataset_stats(cat, gt)
    print_table("Table 7: dataset characteristics", header, rows)
    spark.stop()


if __name__ == "__main__":
    main()
