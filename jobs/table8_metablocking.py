"""Table 8: Meta-Blocking configuration sweep (ALL / BP+BF / BP+EP).

    spark-submit jobs/table8_metablocking.py
"""
from repro.experiments.tables import table8_metablocking_configs
from repro.experiments.workload import BENCH_SCALE, build_catalog, print_table

from _session import get_spark


def main() -> None:
    spark = get_spark("table8")
    cat, gt = build_catalog(spark, BENCH_SCALE)
    header, rows = table8_metablocking_configs(cat, gt)
    print_table("Table 8: Meta-Blocking configurations", header, rows)
    spark.stop()


if __name__ == "__main__":
    main()
