"""The Batch Approach (BA) baseline (Sec. 5).

BA deduplicates an *entire* collection offline with exactly the same
ER pipeline the Deduplicate operator uses (blocking -> BP -> BF -> EP
-> Jaro-Winkler comparisons), producing the grouped collection E_G =
D'; an SQL query (BAQ) is then evaluated over E_G. Query semantics
over a grouped entity: a hyper-entity satisfies a predicate if any of
its member variants does, and two hyper-entities join if any member
pair joins — the natural reading of querying concatenated group
values, applied member-wise so BAQ and DQ are comparable row-by-row.

This is the paper's baseline in Figs. 9 and 12 and the "time needed
for applying ER over the entire D" term of the DQ-Performance
criterion.
"""
from __future__ import annotations

from dataclasses import dataclass

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .comparison import execute_comparisons
from .config import ERConfig
from .graph import cluster_assignments
from .grouping import group_entities
from .indices import TableIndex
from .metablocking import meta_block
from .metrics import QueryMetrics
from .tokenize import EID


@dataclass
class BatchResult:
    """A fully deduplicated collection: cluster labels + linkset."""

    table: TableIndex
    clusters: DataFrame  # (_eid, _cluster)
    links: DataFrame  # (e1, e2)
    metrics: QueryMetrics


def batch_er(ti: TableIndex, *, config: ERConfig | None = None) -> BatchResult:
    """Offline ER over the whole collection E (the BA pre-processing)."""
    cfg = config or ti.config
    m = QueryMetrics()
    m.qe_size = ti.n_entities
    with m.stage("meta_blocking"):
        _, edges = meta_block(
            ti.tbi,
            ti.tbi_stats,
            cfg,
            left_ids=None,
            ep_threshold=ti.ep_threshold(cfg) if cfg.edge_pruning else None,
            keep=ti.meta_collection(cfg),
        )
        edges = edges.cache()
        edges.count()
    with m.stage("resolution"):
        matches, n_cmp = execute_comparisons(
            edges, ti.entities, ti.attrs, cfg
        )
    m.comparisons += n_cmp
    m.matches += len(matches)
    links = ti.spark.createDataFrame(
        sorted(set(matches)) or [],
        schema="e1 long, e2 long",
    )
    with m.stage("group"):
        clusters = cluster_assignments(
            ti.spark, ti.entities, links
        ).cache()
        clusters.count()
    edges.unpersist()
    return BatchResult(table=ti, clusters=clusters, links=links, metrics=m)


def baq_select(
    batch: BatchResult, qe: DataFrame, *, metrics: QueryMetrics | None = None
) -> DataFrame:
    """BAQ over one collection: grouped entities with >= 1 member in the
    selection ``qe``, fused by Group-Entities. Returns DR_G-shaped rows."""
    ti = batch.table
    m = metrics if metrics is not None else QueryMetrics()
    with m.stage("query"):
        hit = (
            batch.clusters.join(qe.select(EID).distinct(), EID, "left_semi")
            .select("_cluster")
            .distinct()
        )
        member_ids = batch.clusters.join(hit, "_cluster", "left_semi").select(EID)
        entities = ti.entities.join(member_ids, EID, "left_semi")
        out = group_entities(entities, batch.links, ti.attrs).cache()
        out.count()
    return out


def baq_join_rows(
    left: BatchResult,
    right: BatchResult,
    left_qe: DataFrame,
    right_qe: DataFrame,
    left_attr: str,
    right_attr: str,
) -> DataFrame:
    """BAQ over a join: member-level equi-join lifted to cluster pairs,
    expanded to the Cartesian product of matched clusters — mirrors
    ``dedup_join_operation`` so DQ ≡ BA comparisons are row-compatible.

    Selections are applied member-wise ("any variant matches") before
    the join, then matched clusters are expanded in full.
    """
    lt, rt = left.table, right.table

    def side(batch: BatchResult, qe: DataFrame, prefix: str):
        hit = (
            batch.clusters.join(qe.select(EID).distinct(), EID, "left_semi")
            .select("_cluster")
            .distinct()
        )
        members = batch.clusters.join(hit, "_cluster", "left_semi")
        ents = batch.table.entities.join(members, EID).withColumnRenamed(
            "_cluster", f"{prefix}_cluster"
        )
        return ents

    l_ent = side(left, left_qe, "l")
    r_ent = side(right, right_qe, "r")
    matched = (
        l_ent.select(
            "l_cluster", F.col(left_attr).cast("string").alias("_lk")
        )
        .where(F.col("_lk").isNotNull())
        .join(
            r_ent.select(
                "r_cluster", F.col(right_attr).cast("string").alias("_rk")
            ).where(F.col("_rk").isNotNull()),
            F.col("_lk") == F.col("_rk"),
        )
        .select("l_cluster", "r_cluster")
        .distinct()
    )
    l_rows = l_ent.select(
        "l_cluster",
        F.col(EID).alias("l__eid"),
        *[F.col(a).alias(f"l_{a}") for a in lt.attrs],
    )
    r_rows = r_ent.select(
        "r_cluster",
        F.col(EID).alias("r__eid"),
        *[F.col(a).alias(f"r_{a}") for a in rt.attrs],
    )
    return matched.join(l_rows, "l_cluster").join(r_rows, "r_cluster")
