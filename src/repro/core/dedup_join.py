"""The Deduplicate-Join operator (Sec. 6.2, Algorithms 1 and 2).

A join that knows which input side is still dirty. DIRTY-RIGHT takes a
resolved DR_E on the left and a dirty selection QE_E on the right; it
first restricts the dirty side to entities that join with *any variant*
of the clean side (the relational join of Alg. 1 line 4 — this is the
comparison-saving step the cost-based planner exploits), deduplicates
that restricted set, and finally joins the two resolved sets with the
Deduplicate-Join operation (Alg. 2): clusters join if any member pair
satisfies the predicate, and the output is the Cartesian product of
the matched clusters — exactly the paper's E_left × E_right per
matched pair of link-sets.

All steps are DataFrame joins; the Cartesian expansion happens through
a relational join on cluster ids rather than a driver-side loop.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .config import ERConfig
from .dedup import DedupResult, deduplicate
from .graph import cluster_assignments
from .metrics import QueryMetrics
from .tokenize import EID

DIRTY_RIGHT = "DIRTY-RIGHT"
DIRTY_LEFT = "DIRTY-LEFT"


def _with_clusters(dr: DedupResult, prefix: str) -> DataFrame:
    """DR entities with a ``{prefix}_cluster`` label from the linkset."""
    spark = dr.spark
    clusters = cluster_assignments(spark, dr.entities, dr.links)
    return dr.entities.join(clusters, EID).withColumnRenamed(
        "_cluster", f"{prefix}_cluster"
    )


def dedup_join_operation(
    left: DedupResult,
    right: DedupResult,
    left_attr: str,
    right_attr: str,
) -> DataFrame:
    """Algorithm 2 as relational algebra.

    1. label both DRs with cluster ids (link-set closure);
    2. find the distinct (left_cluster, right_cluster) pairs where some
       member pair satisfies ``left_attr = right_attr`` — the "any
       variant of the entity's values" join semantics;
    3. expand each matched cluster pair back to E_left × E_right.

    Output columns: left attributes prefixed ``l_``, right prefixed
    ``r_``, plus ``l__eid``/``r__eid`` and the two cluster labels.
    """
    l_ent = _with_clusters(left, "l")
    r_ent = _with_clusters(right, "r")

    l_keyed = l_ent.select(
        F.col("l_cluster"), F.col(left_attr).cast("string").alias("_lkey")
    ).where(F.col("_lkey").isNotNull())
    r_keyed = r_ent.select(
        F.col("r_cluster"), F.col(right_attr).cast("string").alias("_rkey")
    ).where(F.col("_rkey").isNotNull())
    matched = (
        l_keyed.join(r_keyed, F.col("_lkey") == F.col("_rkey"))
        .select("l_cluster", "r_cluster")
        .distinct()
    )

    l_rows = l_ent.select(
        F.col("l_cluster"),
        F.col(EID).alias("l__eid"),
        *[F.col(a).alias(f"l_{a}") for a in left.table.attrs],
    )
    r_rows = r_ent.select(
        F.col("r_cluster"),
        F.col(EID).alias("r__eid"),
        *[F.col(a).alias(f"r_{a}") for a in right.table.attrs],
    )
    return matched.join(l_rows, "l_cluster").join(r_rows, "r_cluster")


def deduplicate_join(
    left,
    right,
    left_attr: str,
    right_attr: str,
    join_type: str,
    *,
    config: ERConfig | None = None,
    metrics: QueryMetrics | None = None,
) -> tuple[DataFrame, DedupResult, DedupResult]:
    """Algorithm 1: resolve the dirty side restricted to joining
    entities, then run the Deduplicate-Join operation.

    For DIRTY-RIGHT, ``left`` is a DedupResult and ``right`` a
    ``(TableIndex, QE DataFrame)`` pair; DIRTY-LEFT mirrors this.
    Returns the joined rows plus both resolved DRs (a multi-join plan
    feeds the DRs onward — the operator's "case-independent output").
    """
    m = metrics if metrics is not None else QueryMetrics()
    if join_type == DIRTY_RIGHT:
        ldr: DedupResult = left
        rti, r_qe = right
        r_qe2 = _restrict_to_joining(r_qe, ldr, right_attr, left_attr, m)
        rdr = deduplicate(rti, r_qe2, config=config, metrics=m)
    elif join_type == DIRTY_LEFT:
        rdr = right
        lti, l_qe = left
        l_qe2 = _restrict_to_joining(l_qe, rdr, left_attr, right_attr, m)
        ldr = deduplicate(lti, l_qe2, config=config, metrics=m)
    else:
        raise ValueError(f"unknown join type {join_type!r}")
    with m.stage("join"):
        joined = dedup_join_operation(ldr, rdr, left_attr, right_attr).cache()
        joined.count()
    return joined, ldr, rdr


def _restrict_to_joining(
    dirty_qe: DataFrame,
    clean: DedupResult,
    dirty_attr: str,
    clean_attr: str,
    m: QueryMetrics,
) -> DataFrame:
    """Alg. 1 line 4: QE' — drop dirty entities that join with no variant
    of the resolved side (a relational semi-join on the join key)."""
    with m.stage("join"):
        keys = (
            clean.entities.select(
                F.col(clean_attr).cast("string").alias("_k")
            )
            .where(F.col("_k").isNotNull())
            .distinct()
        )
        out = dirty_qe.join(
            keys,
            dirty_qe[dirty_attr].cast("string") == keys["_k"],
            "left_semi",
        ).cache()
        out.count()
    return out
