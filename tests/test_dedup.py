"""Deduplicate operator (Sec. 6.1) integration tests on synthetic data."""
from __future__ import annotations

import pyspark.sql.functions as F
import pytest

from repro.core.dedup import deduplicate
from repro.core.metrics import pair_completeness
from repro.core.tokenize import EID


def _qe(ti, cond):
    return ti.entities.where(cond)


def test_dr_is_superset_of_qe(catalog, ground_truth):
    ti = catalog.table("PPL")
    qe = _qe(ti, F.col("state") == "NSW")
    dr = deduplicate(ti, qe)
    qe_ids = {r[EID] for r in qe.select(EID).collect()}
    dr_ids = {r[EID] for r in dr.entities.select(EID).collect()}
    assert qe_ids <= dr_ids
    assert dr.metrics.qe_size == len(qe_ids)
    assert dr.metrics.dr_size == len(dr_ids)


def test_finds_ground_truth_partners_outside_selection(
    catalog, ground_truth
):
    """The reason QueryER exists: duplicates that do NOT satisfy the
    filter must still be returned (the paper's \\overline{QE}_E)."""
    ti = catalog.table("PPL")
    qe = _qe(ti, F.col("state") == "NSW")
    dr = deduplicate(ti, qe)
    qe_ids = {r[EID] for r in qe.select(EID).collect()}
    dr_ids = {r[EID] for r in dr.entities.select(EID).collect()}
    outside = dr_ids - qe_ids
    # Found links must connect outside entities to QE ones.
    links = {(r["e1"], r["e2"]) for r in dr.links.collect()}
    for o in outside:
        assert any(o in p for p in links)
    # And a decent share of GT partners is recovered (PC >= 0.8 in the
    # paper's summary; corrupted state values can block some).
    gt = ground_truth["PPL"]
    relevant = {p for p in gt if p[0] in qe_ids or p[1] in qe_ids}
    found = relevant & links
    assert len(found) >= 0.6 * len(relevant)


def test_links_are_canonical_and_within_dr(catalog):
    ti = catalog.table("DSD")
    dr = deduplicate(ti, _qe(ti, F.col("year") == "2005"))
    dr_ids = {r[EID] for r in dr.entities.select(EID).collect()}
    for r in dr.links.collect():
        assert r["e1"] < r["e2"]
        assert r["e1"] in dr_ids and r["e2"] in dr_ids


def test_li_amended_and_second_query_cheaper(catalog):
    """Progressive resolution (Sec. 6.1): re-running the same selection
    must execute zero comparisons — all link-sets are in LI."""
    ti = catalog.table("OAGP")
    qe = _qe(ti, F.col("year") <= "2000")
    dr1 = deduplicate(ti, qe)
    assert ti.li.resolved_ids  # amended
    dr2 = deduplicate(ti, qe)
    assert dr1.metrics.comparisons > 0
    assert dr2.metrics.comparisons == 0
    # And the result is identical.
    ids1 = {r[EID] for r in dr1.entities.select(EID).collect()}
    ids2 = {r[EID] for r in dr2.entities.select(EID).collect()}
    assert ids1 == ids2


def test_overlapping_query_reuses_links(catalog):
    """The Fig. 11 effect: an overlapping second query only pays for the
    entities it adds."""
    ti = catalog.table("PPL")
    q1 = _qe(ti, F.col("state") == "NSW")
    q2 = _qe(ti, (F.col("state") == "NSW") | (F.col("state") == "VIC"))
    deduplicate(ti, q1)
    fresh_cost = None
    # Cost of VIC alone on a fresh LI:
    ti.li.clear()
    fresh_cost = deduplicate(ti, q2).metrics.comparisons
    ti.li.clear()
    deduplicate(ti, q1)
    incremental = deduplicate(ti, q2).metrics.comparisons
    assert incremental < fresh_cost


def test_metrics_stages_populated(catalog):
    ti = catalog.table("OAO")
    dr = deduplicate(ti, _qe(ti, F.col("country").isNotNull()))
    for stage in ("blocking", "block_join", "meta_blocking", "resolution"):
        assert stage in dr.metrics.stage_seconds


def test_collect_candidates_for_pc(catalog, ground_truth):
    ti = catalog.table("PPL")
    qe = _qe(ti, F.col("state") == "QLD")
    dr = deduplicate(ti, qe, collect_candidates=True)
    qe_ids = {r[EID] for r in qe.select(EID).collect()}
    pc = pair_completeness(
        dr.metrics.candidate_pairs, ground_truth["PPL"], qe_ids
    )
    assert 0.0 <= pc <= 1.0
    assert pc >= 0.6  # paper: never below 0.82 at full scale


def test_empty_selection(catalog):
    ti = catalog.table("DSD")
    dr = deduplicate(ti, ti.entities.where(F.lit(False)))
    assert dr.entities.count() == 0
    assert dr.metrics.comparisons == 0
