"""Reproductions of the paper's evaluation tables (Sec. 9) and the
headline figure experiments, one function per artifact.

Every function takes a ready catalog (+ ground truth where needed) and
returns ``(header, rows)`` for ``print_table``; timings are wall-clock
over materialised stages (see ``repro.core.metrics``).
"""
from __future__ import annotations

import time

import pyspark.sql.functions as F

from ..core.batch import batch_er
from ..core.config import ERConfig
from ..core.dedup import deduplicate
from ..core.dedup_join import DIRTY_LEFT, DIRTY_RIGHT, deduplicate_join
from ..core.metrics import QueryMetrics, pair_completeness
from ..core.planner import AES, BA, NES, Catalog, execute
from ..core.sqlparse import compile_predicate, parse_query, split_where
from ..core.tokenize import EID
from .workload import LI_QUERIES, SPJ_QUERIES, selectivity_queries


# ----------------------------------------------------------- Table 5
def table5_cleaning_order(paper_catalog: Catalog):
    """Sec. 7.2 Table 5: executed comparisons per cleaning order for the
    motivating-example query. Paper: V-first = V:12 P:3 total 15;
    P-first = V:17 P:1 total 18."""
    from ..datagen.paper_example import EXAMPLE_CONFIG

    p, v = paper_catalog.table("P"), paper_catalog.table("V")
    rows = []
    for first in ("V", "P"):
        paper_catalog.reset_link_indices()
        m = QueryMetrics()
        p_qe = p.entities.where(F.col("Venue") == "EDBT")
        if first == "V":
            vdr = deduplicate(v, v.entities, config=EXAMPLE_CONFIG)
            v_cmp = vdr.metrics.comparisons
            _, ldr, rdr = deduplicate_join(
                (p, p_qe), vdr, "Venue", "Title", DIRTY_LEFT,
                config=EXAMPLE_CONFIG, metrics=m,
            )
            p_cmp = m.comparisons
        else:
            pdr = deduplicate(p, p_qe, config=EXAMPLE_CONFIG)
            p_cmp = pdr.metrics.comparisons
            _, ldr, rdr = deduplicate_join(
                pdr, (v, v.entities), "Venue", "Title", DIRTY_RIGHT,
                config=EXAMPLE_CONFIG, metrics=m,
            )
            v_cmp = m.comparisons
        rows.append([first, v_cmp, p_cmp, v_cmp + p_cmp])
    return ["CleanFirst", "Comparisons V", "Comparisons P", "Total"], rows


# ----------------------------------------------------------- Table 6
_T6_STAGE_MAP = {
    "block_join": "Block-Join",
    "meta_blocking": "Meta-blocking",
    "resolution": "Resolution",
    "group": "Group",
}


def table6_time_breakdown(catalog: Catalog):
    """Table 6: TT breakdown for Q5 (highest selectivity) on DSD and
    OAP. Paper: Resolution dominates (82-83%)."""
    rows = []
    for table in ("DSD", "OAP"):
        catalog.reset_link_indices()
        q5 = selectivity_queries(table, "_eid")["Q5"]
        res = execute(catalog, q5, solution=AES)
        tt = res.metrics.total_seconds
        shares = {v: 0.0 for v in _T6_STAGE_MAP.values()}
        other = 0.0
        for stage, secs in res.metrics.stage_seconds.items():
            label = _T6_STAGE_MAP.get(stage)
            if label:
                shares[label] += secs
            else:
                other += secs
        row = [table, f"{tt:.3f}"]
        row += [f"{shares[c] / tt:.0%}" for c in
                ("Block-Join", "Meta-blocking", "Resolution", "Group")]
        row.append(f"{other / tt:.0%}")
        rows.append(row)
    return (
        ["E", "TT(s)", "Block-Join", "Meta-blocking", "Resolution",
         "Group", "Other"],
        rows,
    )


# ----------------------------------------------------------- Table 7
def table7_dataset_stats(catalog: Catalog, ground_truth):
    """Table 7: |E|, |L_E| (ground-truth duplicate pairs), |A| (distinct
    attribute names), |TBI| per collection."""
    rows = []
    for name in ("DSD", "OAO", "OAP", "PPL", "OAGP", "OAGV"):
        ti = catalog.table(name)
        s = ti.stats_summary()
        rows.append(
            [name, s["n_entities"], len(ground_truth[name]),
             s["n_attributes"], s["tbi_size"]]
        )
    return ["E", "|E|", "|L_E|", "|A|", "|TBI|"], rows


# ----------------------------------------------------------- Table 8
def table8_metablocking_configs(catalog: Catalog, ground_truth):
    """Table 8: Meta-Blocking configuration sweep (ALL, BP+BF, BP+EP)
    for Q1/Q5 on PPL and OAGP: time and Pair Completeness."""
    configs = {
        "ALL": dict(bp=True, bf=True, ep=True),
        "BP+BF": dict(bp=True, bf=True, ep=False),
        "BP+EP": dict(bp=True, bf=False, ep=True),
    }
    rows = []
    for qname in ("Q1", "Q5"):
        for label, stages in configs.items():
            cells = [qname, label]
            times, pcs = [], []
            for table in ("PPL", "OAGP"):
                catalog.reset_link_indices()
                ti = catalog.table(table)
                cfg = catalog.config.with_stages(**stages)
                sql = selectivity_queries(table, "_eid")[qname]
                query = parse_query(sql)
                pred = split_where(query)[query.tables[0].alias]
                qe = ti.entities.where(compile_predicate(ti.entities, pred))
                t0 = time.perf_counter()
                dr = deduplicate(ti, qe, config=cfg, collect_candidates=True)
                secs = time.perf_counter() - t0
                qe_ids = {r[EID] for r in qe.select(EID).collect()}
                pc = pair_completeness(
                    dr.metrics.candidate_pairs, ground_truth[table], qe_ids
                )
                times.append(secs)
                pcs.append(pc)
            cells.append(" / ".join(f"{t:.2f}" for t in times))
            cells.append(" / ".join(f"{p:.3f}" for p in pcs))
            rows.append(cells)
    return ["Query", "Method", "Time (s) PPL/OAGP", "PC PPL/OAGP"], rows


# ------------------------------------------------- Fig. 9 (shape): SP
def fig9_queryer_vs_ba(catalog: Catalog, table: str = "DSD"):
    """QueryER vs BA over the Q1..Q5 selectivity ladder: TT and executed
    comparisons. BA's cleaning cost is paid once and attributed to every
    query (the paper's per-query BA includes full cleaning)."""
    queries = selectivity_queries(table, "_eid")
    ti = catalog.table(table)

    t0 = time.perf_counter()
    batch = batch_er(ti, config=catalog.config)
    batch_secs = time.perf_counter() - t0
    rows = []
    for qname, sql in queries.items():
        catalog.reset_link_indices()
        t0 = time.perf_counter()
        dq = execute(catalog, sql, solution=AES)
        dq_secs = time.perf_counter() - t0
        sel = dq.metrics.qe_size / ti.n_entities

        query = parse_query(sql)
        pred = split_where(query)[query.tables[0].alias]
        from ..core.batch import baq_select

        t0 = time.perf_counter()
        qe = ti.entities.where(compile_predicate(ti.entities, pred))
        baq_select(batch, qe).count()
        ba_secs = batch_secs + (time.perf_counter() - t0)
        rows.append(
            [qname, f"{sel:.0%}", f"{dq_secs:.2f}", f"{ba_secs:.2f}",
             dq.metrics.comparisons, batch.metrics.comparisons]
        )
    return (
        ["Query", "S", "QueryER TT(s)", "BA TT(s)", "QueryER Comp.",
         "BA Comp."],
        rows,
    )


# ------------------------------------------------ Fig. 11 (shape): LI
def fig11_link_index(catalog: Catalog):
    """Consecutive overlapping queries Q10-Q13 with and without the LI:
    with-LI time falls per query, without-LI grows (Fig. 11 shape)."""
    rows = []
    catalog.reset_link_indices()
    with_li = {}
    for qname, sql in LI_QUERIES.items():
        t0 = time.perf_counter()
        res = execute(catalog, sql, solution=AES)
        with_li[qname] = (time.perf_counter() - t0, res.metrics.comparisons)
    without_li = {}
    for qname, sql in LI_QUERIES.items():
        catalog.reset_link_indices()
        t0 = time.perf_counter()
        res = execute(catalog, sql, solution=AES)
        without_li[qname] = (time.perf_counter() - t0, res.metrics.comparisons)
    for qname in LI_QUERIES:
        rows.append(
            [qname,
             f"{with_li[qname][0]:.2f}", with_li[qname][1],
             f"{without_li[qname][0]:.2f}", without_li[qname][1]]
        )
    return (
        ["Query", "WithLI TT(s)", "WithLI Comp.", "NoLI TT(s)", "NoLI Comp."],
        rows,
    )


# ----------------------------------------- Fig. 12/13 (shape): NES/AES
def fig12_nes_aes_ba(catalog: Catalog, query_names=("Q6a", "Q6b", "Q7a", "Q7b")):
    """SPJ comparison of AES vs NES vs BA: TT and executed comparisons.
    Expected shape: AES <= NES < BA on comparisons."""
    rows = []
    for qname in query_names:
        sql = SPJ_QUERIES[qname]
        cells = [qname]
        for solution in (AES, NES, BA):
            catalog.reset_link_indices()
            t0 = time.perf_counter()
            res = execute(catalog, sql, solution=solution)
            secs = time.perf_counter() - t0
            cells += [f"{secs:.2f}", res.metrics.comparisons]
        rows.append(cells)
    return (
        ["Query", "AES TT(s)", "AES Comp.", "NES TT(s)", "NES Comp.",
         "BA TT(s)", "BA Comp."],
        rows,
    )


def fig13_scalability(spark, sizes=(500, 1000, 2000)):
    """Q8a over growing PPL sizes joined with OAO (fixed): sub-linear
    comparison growth (Fig. 13 shape)."""
    from ..datagen import datasets
    from ..datagen.datasets import to_spark

    rows = []
    oao_pdf, _ = datasets.oao(600, seed=21)
    org_names = sorted(set(oao_pdf["name"].dropna()))
    for n in sizes:
        cat = Catalog(spark, config=ERConfig())
        cat.register("OAO", to_spark(spark, oao_pdf))
        ppl_pdf, _ = datasets.people(n, seed=11)
        cat.register("PPL", to_spark(spark, ppl_pdf))
        for qname, solution in (("Q8a", AES), ("Q8a", NES)):
            t0 = time.perf_counter()
            res = execute(cat, SPJ_QUERIES[qname], solution=solution)
            secs = time.perf_counter() - t0
            rows.append(
                [f"PPL{n}", solution, f"{secs:.2f}", res.metrics.comparisons]
            )
            cat.reset_link_indices()
    return ["Dataset", "Solution", "TT(s)", "Comp."], rows
