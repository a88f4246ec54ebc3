"""Ad-hoc Dedupe-query runner over the synthetic evaluation catalog.

    spark-submit jobs/run_query.py "SELECT DEDUP * FROM PPL WHERE state = 'NSW'" [AES|NES|BA]
"""
import sys

from repro.core.planner import AES, execute
from repro.experiments.workload import BENCH_SCALE, build_catalog

from _session import get_spark


def main() -> None:
    if len(sys.argv) < 2:
        raise SystemExit(__doc__)
    sql = sys.argv[1]
    solution = sys.argv[2] if len(sys.argv) > 2 else AES
    spark = get_spark("run-query")
    cat, _ = build_catalog(spark, BENCH_SCALE)
    res = execute(cat, sql, solution=solution)
    res.grouped.show(50, truncate=80)
    print(
        f"solution={solution} comparisons={res.metrics.comparisons} "
        f"qe={res.metrics.qe_size} stages={res.metrics.stage_seconds}"
    )
    spark.stop()


if __name__ == "__main__":
    main()
