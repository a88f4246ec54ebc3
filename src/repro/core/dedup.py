"""The Deduplicate operator (Sec. 6.1) — QueryER's central relational
operator.

Pipeline (strict order, Fig. 3): Query Blocking -> Block-Join ->
Meta-Blocking (BP, BF, EP) -> Comparison-Execution, then LI amendment.
Input: the set QE_E selected by the query. Output: DR_E = <QE_E ∪
\\overline{QE}_E, L_E> — the selection, its duplicates found anywhere
in E, and the linkset connecting them.

Implemented as a DataFrame -> DedupResult transformation over the
table's cached indices; every stage is a Catalyst join/aggregation
except pair scoring, which runs in ``mapInPandas`` tasks.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame

from .blocking import block_join, query_block_index
from .comparison import execute_comparisons
from .config import ERConfig
from .indices import TableIndex
from .metablocking import meta_block
from .metrics import QueryMetrics
from .tokenize import EID


@dataclass
class DedupResult:
    """DR_E: resolved superset of a query's selection plus its linkset.

    ``entities``: full-attribute rows for QE ∪ dups(QE);
    ``links``: canonical (e1 < e2) matching pairs among them;
    ``qe_ids``: the original selection (needed by Deduplicate-Join);
    ``metrics``: stage timings / comparison counts for this evaluation.
    """

    table: TableIndex
    entities: DataFrame
    links: DataFrame
    qe_ids: DataFrame
    metrics: QueryMetrics

    @property
    def spark(self):
        return self.table.spark


def deduplicate(
    ti: TableIndex,
    qe: DataFrame,
    *,
    config: ERConfig | None = None,
    metrics: QueryMetrics | None = None,
    collect_candidates: bool = False,
) -> DedupResult:
    """Run the Deduplicate operator on selection ``qe`` (rows of E).

    ``collect_candidates`` additionally records the co-occurring pairs
    that survived Meta-Blocking (for Pair-Completeness measurement,
    Table 8) on ``metrics.candidate_pairs``.
    """
    cfg = config or ti.config
    m = metrics if metrics is not None else QueryMetrics()

    qe_ids = qe.select(EID).distinct().cache()
    m.qe_size = qe_ids.count()

    # -- i) Query Blocking: QBI of unresolved QE entities -------------
    with m.stage("blocking"):
        qbi = query_block_index(ti, qe_ids).cache()
        qbi.count()

    # -- ii) Block-Join: enrich with co-blocked entities of E ---------
    with m.stage("block_join"):
        eqbi = block_join(ti, qbi).cache()
        eqbi.count()

    # -- iii) Meta-Blocking: BP -> BF -> EP ---------------------------
    with m.stage("meta_blocking"):
        unresolved = qbi.select(EID).distinct()
        _, edges = meta_block(
            eqbi,
            ti.tbi_stats,
            cfg,
            left_ids=unresolved,
            ep_threshold=ti.ep_threshold(cfg) if cfg.edge_pruning else None,
            keep=ti.meta_collection(cfg),
        )
        edges = edges.cache()
        n_edges = edges.count()
    if collect_candidates:
        m.candidate_pairs = {
            (int(r["e1"]), int(r["e2"]))
            for r in edges.select("e1", "e2").collect()
        }

    # -- iv) Comparison-Execution ------------------------------------
    with m.stage("resolution"):
        matches, n_cmp = execute_comparisons(
            edges, ti.entities, ti.attrs, cfg
        )
    m.comparisons += n_cmp
    m.matches += len(matches)

    # -- amend LI_E ---------------------------------------------------
    resolved = [int(r[EID]) for r in qe_ids.collect()]
    ti.li.amend(resolved, matches)

    # -- assemble DR_E: QE ∪ partners of QE from the (full) LI --------
    qe_id_set = set(resolved)
    partner_ids = ti.li.partners_of(qe_id_set)
    dr_ids = qe_id_set | partner_ids
    dr_ids_df = ti.spark.createDataFrame(
        [(i,) for i in sorted(dr_ids)], schema=f"{EID} long"
    )
    entities = ti.entities.join(dr_ids_df, EID, "left_semi")
    links = ti.li.links_df()
    links = (
        links.join(dr_ids_df.withColumnRenamed(EID, "e1"), "e1", "left_semi")
        .join(dr_ids_df.withColumnRenamed(EID, "e2"), "e2", "left_semi")
    )
    m.dr_size = len(dr_ids)

    for df in (qbi, eqbi, edges):
        df.unpersist()
    qe_ids.unpersist()
    return DedupResult(
        table=ti,
        entities=entities,
        links=links,
        qe_ids=qe.select(EID).distinct(),
        metrics=m,
    )
