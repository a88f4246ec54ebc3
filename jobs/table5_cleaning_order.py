"""Table 5: executed comparisons by cleaning order (motivating example).

    spark-submit jobs/table5_cleaning_order.py
"""
from repro.core.planner import Catalog
from repro.datagen.paper_example import (
    EXAMPLE_CONFIG,
    publications_df,
    venues_df,
)
from repro.experiments.tables import table5_cleaning_order
from repro.experiments.workload import print_table

from _session import get_spark


def main() -> None:
    spark = get_spark("table5")
    cat = Catalog(spark, config=EXAMPLE_CONFIG)
    cat.register("P", publications_df(spark))
    cat.register("V", venues_df(spark))
    header, rows = table5_cleaning_order(cat)
    print_table("Table 5: comparisons by cleaning order", header, rows)
    spark.stop()


if __name__ == "__main__":
    main()
