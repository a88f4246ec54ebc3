"""Dedupe-query planning and execution (Sec. 7).

Three solutions over the parsed :class:`DedupeQuery`:

* **NES** (Naive ER Solution, Sec. 7.1): fixed plans. The Deduplicate
  operator sits directly above each branch's Filter (above the Scan if
  there is no WHERE); both join branches are deduplicated
  independently, then joined with the Deduplicate-Join *operation*.
* **AES** (Advanced ER Solution, Sec. 7.2): the cost-based planner
  estimates each branch's comparison count from the indices (stopping
  at Block Filtering), deduplicates the *cheaper* branch first, and
  uses a DIRTY-LEFT / DIRTY-RIGHT Deduplicate-Join so the expensive
  side is restricted to entities that actually join before it is
  cleaned.
* **BA** (Batch Approach, Sec. 5): the baseline — batch-ER every
  touched table in full, then run the query over the grouped result.

Every solution ends with Group-Entities directly before the final
Project, and all three return identically shaped results so the
DQ-Correctness tests can compare them row-by-row.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .batch import BatchResult, baq_join_rows, baq_select, batch_er
from .config import ERConfig
from .dedup import deduplicate
from .dedup_join import (
    DIRTY_LEFT,
    DIRTY_RIGHT,
    dedup_join_operation,
    deduplicate_join,
)
from .grouping import group_entities
from .indices import TableIndex
from .metrics import QueryMetrics
from .sqlparse import (
    ColRef,
    DedupeQuery,
    compile_predicate,
    parse_query,
    split_where,
    string_literals,
)
from .stats import estimate_comparisons, estimate_selection

NES = "NES"
AES = "AES"
BA = "BA"


@dataclass
class PlanExplain:
    """What the planner decided, for tests and the Table 5 experiment."""

    solution: str
    clean_first: str | None = None  # table alias deduplicated first (SPJ)
    est_comparisons: dict[str, float] = field(default_factory=dict)


@dataclass
class QueryResult:
    grouped: DataFrame
    metrics: QueryMetrics
    explain: PlanExplain
    query: DedupeQuery


class Catalog:
    """Registered tables plus cached batch-ER results for BA runs."""

    def __init__(self, spark, *, config: ERConfig | None = None) -> None:
        self.spark = spark
        self.config = config or ERConfig()
        self.tables: dict[str, TableIndex] = {}
        self._batch: dict[str, BatchResult] = {}

    def register(self, name: str, entities: DataFrame) -> TableIndex:
        ti = TableIndex(self.spark, name, entities, config=self.config)
        self.tables[name] = ti
        return ti

    def table(self, name: str) -> TableIndex:
        return self.tables[name]

    def batch(self, name: str, *, force: bool = False) -> BatchResult:
        """Batch-ER ``name`` (cached — BA pays this once per table)."""
        if force or name not in self._batch:
            self._batch[name] = batch_er(
                self.tables[name], config=self.config
            )
        return self._batch[name]

    def reset_link_indices(self) -> None:
        for ti in self.tables.values():
            ti.li.clear()


# ------------------------------------------------------------ helpers
def _qe(ti: TableIndex, predicate) -> DataFrame:
    """Filter E by the (possibly absent) per-table predicate -> QE_E."""
    if predicate is None:
        return ti.entities
    return ti.entities.where(compile_predicate(ti.entities, predicate))


def _project(query: DedupeQuery, grouped: DataFrame, attrs_by_alias) -> DataFrame:
    """Final Project: keep requested columns (prefixed on join output)."""
    if query.select == ("*",):
        return grouped
    cols = []
    for ref in query.select:
        assert isinstance(ref, ColRef)
        if len(query.tables) == 1:
            cols.append(ref.column)
        else:
            alias = query.alias_of(ref.table or query.tables[0].alias).alias
            side = "l" if alias == query.tables[0].alias else "r"
            cols.append(f"{side}_{ref.column}")
    keep = [c for c in grouped.columns if c.startswith("_")] + cols
    return grouped.select(*dict.fromkeys(keep))


def _join_attr(query: DedupeQuery, side_alias: str) -> str:
    js = query.join
    for ref in (js.left, js.right):
        if query.alias_of(ref.table).alias == side_alias:
            return ref.column
    raise ValueError(f"join does not mention table {side_alias!r}")


# ----------------------------------------------------------- execution
def execute(
    catalog: Catalog,
    sql_or_query: str | DedupeQuery,
    *,
    solution: str = AES,
    config: ERConfig | None = None,
) -> QueryResult:
    """Plan and evaluate a Dedupe query under the chosen solution."""
    query = (
        parse_query(sql_or_query)
        if isinstance(sql_or_query, str)
        else sql_or_query
    )
    cfg = config or catalog.config
    if not query.dedup:
        raise ValueError(
            "plain (non-DEDUP) queries follow standard SQL semantics; "
            "use spark.sql or the oracle directly"
        )
    if len(query.tables) == 1:
        return _execute_sp(catalog, query, solution, cfg)
    if len(query.tables) == 2 and query.join is not None:
        return _execute_spj(catalog, query, solution, cfg)
    raise ValueError("only SP and two-table SPJ queries are supported")


def _execute_sp(
    catalog: Catalog, query: DedupeQuery, solution: str, cfg: ERConfig
) -> QueryResult:
    """SP plan (identical for NES/AES, Sec. 7.2.1): Scan -> Filter ->
    Deduplicate -> Group-Entities -> Project."""
    alias = query.tables[0].alias
    ti = catalog.table(query.tables[0].name)
    predicate = split_where(query)[alias]
    m = QueryMetrics()
    explain = PlanExplain(solution=solution)

    if solution == BA:
        batch = catalog.batch(query.tables[0].name)
        m.merge(batch.metrics)
        m.comparisons = batch.metrics.comparisons
        with m.stage("query"):
            qe = _qe(ti, predicate)
            m.qe_size = qe.count()
        grouped = baq_select(batch, qe, metrics=m)
        return QueryResult(_project(query, grouped, None), m, explain, query)

    with m.stage("scan_filter"):
        qe = _qe(ti, predicate).cache()
        qe.count()
    dr = deduplicate(ti, qe, config=cfg, metrics=m)
    with m.stage("group"):
        grouped = group_entities(dr.entities, dr.links, ti.attrs).cache()
        grouped.count()
    return QueryResult(_project(query, grouped, None), m, explain, query)


def _execute_spj(
    catalog: Catalog, query: DedupeQuery, solution: str, cfg: ERConfig
) -> QueryResult:
    l_ref, r_ref = query.tables
    lt, rt = catalog.table(l_ref.name), catalog.table(r_ref.name)
    preds = split_where(query)
    l_pred, r_pred = preds[l_ref.alias], preds[r_ref.alias]
    l_attr = _join_attr(query, l_ref.alias)
    r_attr = _join_attr(query, r_ref.alias)
    m = QueryMetrics()

    if solution == BA:
        lb, rb = catalog.batch(l_ref.name), catalog.batch(r_ref.name)
        m.merge(lb.metrics)
        m.merge(rb.metrics)
        explain = PlanExplain(solution=BA)
        with m.stage("query"):
            rows = baq_join_rows(
                lb, rb, _qe(lt, l_pred), _qe(rt, r_pred), l_attr, r_attr
            ).cache()
            rows.count()
        grouped = _group_join_rows(rows, lt, rt, m)
        return QueryResult(_project(query, grouped, None), m, explain, query)

    with m.stage("scan_filter"):
        l_qe = _qe(lt, l_pred).cache()
        r_qe = _qe(rt, r_pred).cache()
        l_qe.count(), r_qe.count()

    if solution == NES:
        # Fixed plan: Deduplicate above each Filter, then plain
        # Deduplicate-Join operation over the two DRs.
        explain = PlanExplain(solution=NES)
        ldr = deduplicate(lt, l_qe, config=cfg, metrics=m)
        rdr = deduplicate(rt, r_qe, config=cfg, metrics=m)
        with m.stage("join"):
            rows = dedup_join_operation(ldr, rdr, l_attr, r_attr).cache()
            rows.count()
    elif solution == AES:
        # Cost-based: estimate each branch's comparisons from the WHERE
        # literals and the indices; deduplicate the cheaper branch first
        # and restrict the expensive one to joining entities (Alg. 1).
        with m.stage("planning"):
            l_est = estimate_comparisons(
                lt, estimate_selection(lt, string_literals(l_pred)), config=cfg
            )
            r_est = estimate_comparisons(
                rt, estimate_selection(rt, string_literals(r_pred)), config=cfg
            )
        explain = PlanExplain(
            solution=AES,
            est_comparisons={l_ref.alias: l_est, r_ref.alias: r_est},
        )
        if l_est <= r_est:
            explain.clean_first = l_ref.alias
            ldr = deduplicate(lt, l_qe, config=cfg, metrics=m)
            rows, ldr, rdr = deduplicate_join(
                ldr, (rt, r_qe), l_attr, r_attr, DIRTY_RIGHT,
                config=cfg, metrics=m,
            )
        else:
            explain.clean_first = r_ref.alias
            rdr = deduplicate(rt, r_qe, config=cfg, metrics=m)
            rows, ldr, rdr = deduplicate_join(
                (lt, l_qe), rdr, l_attr, r_attr, DIRTY_LEFT,
                config=cfg, metrics=m,
            )
    else:
        raise ValueError(f"unknown solution {solution!r}")

    grouped = _group_join_rows(rows, lt, rt, m)
    return QueryResult(_project(query, grouped, None), m, explain, query)


def _group_join_rows(
    rows: DataFrame, lt: TableIndex, rt: TableIndex, m: QueryMetrics
) -> DataFrame:
    """Group-Entities over join output: one row per (left cluster, right
    cluster) pair, each side's attributes fused as in Sec. 6.3."""
    with m.stage("group"):
        aggs = []
        for side, ti in (("l", lt), ("r", rt)):
            aggs.append(
                F.array_sort(F.collect_set(f"{side}__eid")).alias(
                    f"_{side}_members"
                )
            )
            for a in ti.attrs:
                aggs.append(
                    F.array_join(
                        F.array_sort(
                            F.array_distinct(
                                F.collect_list(
                                    F.col(f"{side}_{a}").cast("string")
                                )
                            )
                        ),
                        " | ",
                    ).alias(f"{side}_{a}")
                )
        out = rows.groupBy("l_cluster", "r_cluster").agg(*aggs).cache()
        out.count()
    return out
