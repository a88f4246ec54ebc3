"""The Group-Entities operator (Sec. 6.3).

Groups each set of duplicate entities in a DR_E into a single
"hyper-entity" before the final Project: per attribute, the distinct
non-null values of the cluster are concatenated with " | " (the
paper's [EDBT | International Conference on Extending Database
Technology] example; nulls map to the empty value). Fusion policies
are orthogonal in the paper, so concatenation is the fixed one here.

Pure DataFrame implementation: cluster labels come from the linkset's
connected components, then one groupBy with sort_array(collect_set())
per attribute — deterministic output independent of partitioning.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .graph import cluster_assignments
from .tokenize import EID

GROUP_SEP = " | "
CLUSTER = "_cluster"


def group_entities(
    entities: DataFrame,
    links: DataFrame | None,
    attrs: list[str],
) -> DataFrame:
    """DR_G: one row per duplicate cluster.

    Output columns: ``_cluster`` (min member eid — a stable surrogate),
    ``_members`` (sorted member eids, for correctness checks), and each
    attribute fused by concatenating its sorted distinct non-null
    values with ``" | "``.
    """
    spark = entities.sparkSession
    labelled = entities.join(
        cluster_assignments(spark, entities, links), EID
    )
    aggs = [
        F.array_join(
            F.array_sort(
                F.array_distinct(
                    F.collect_list(F.col(a).cast("string"))
                )
            ),
            GROUP_SEP,
        ).alias(a)
        for a in attrs
    ]
    return labelled.groupBy(CLUSTER).agg(
        F.array_sort(F.collect_set(EID)).alias("_members"), *aggs
    )


def grouped_key_rows(grouped: DataFrame) -> list[tuple]:
    """Canonical driver-side form of a grouped result: sorted tuples of
    member-id tuples — the representation DQ ≡ BA equality tests use."""
    rows = grouped.select("_members").collect()
    return sorted(tuple(r["_members"]) for r in rows)
