"""Batch Approach baseline (Sec. 5) tests."""
from __future__ import annotations

import pyspark.sql.functions as F
import pytest

from repro.core.batch import baq_join_rows, baq_select, batch_er
from repro.core.tokenize import EID


def test_batch_er_covers_ground_truth(catalog, ground_truth):
    ti = catalog.table("PPL")
    b = batch_er(ti)
    links = {(r["e1"], r["e2"]) for r in b.links.collect()}
    gt = ground_truth["PPL"]
    assert len(links & gt) >= 0.6 * len(gt)
    assert b.metrics.comparisons > 0


def test_batch_er_clusters_cover_all_entities(catalog):
    ti = catalog.table("OAO")
    b = batch_er(ti)
    assert b.clusters.count() == ti.n_entities


def test_baq_select_returns_whole_clusters(catalog):
    """A grouped entity is returned iff >= 1 member satisfies the
    selection, and then with ALL its members (the 'any variant'
    semantics)."""
    ti = catalog.table("PPL")
    b = catalog.batch("PPL")
    qe = ti.entities.where(F.col("state") == "NSW")
    out = baq_select(b, qe)
    qe_ids = {r[EID] for r in qe.select(EID).collect()}
    clusters = {r["_eid"]: r["_cluster"] for r in b.clusters.collect()}
    hit_clusters = {clusters[i] for i in qe_ids}
    for row in out.collect():
        members = set(row["_members"])
        assert clusters[min(members)] in hit_clusters
        # cluster-complete: all members of that cluster present
        full = {e for e, c in clusters.items() if c == clusters[min(members)]}
        assert members == full


def test_baq_select_empty_selection(catalog):
    ti = catalog.table("DSD")
    b = catalog.batch("DSD")
    out = baq_select(b, ti.entities.where(F.lit(False)))
    assert out.count() == 0


def test_baq_join_rows_cluster_expansion(catalog):
    lb = catalog.batch("OAGV")
    rb = catalog.batch("OAGP")
    lv, rp = lb.table, rb.table
    rows = baq_join_rows(
        lb, rb, lv.entities, rp.entities, "title", "venue"
    )
    assert rows.count() > 0
    # Every joined pair's clusters actually contain a member-level match.
    sample = rows.limit(50).collect()
    titles = {
        r[EID]: r["title"] for r in lv.entities.select(EID, "title").collect()
    }
    venues = {
        r[EID]: r["venue"] for r in rp.entities.select(EID, "venue").collect()
    }
    lc = {r[EID]: r["_cluster"] for r in lb.clusters.collect()}
    rc = {r[EID]: r["_cluster"] for r in rb.clusters.collect()}
    for row in sample:
        l_members = [e for e, c in lc.items() if c == row["l_cluster"]]
        r_members = [e for e, c in rc.items() if c == row["r_cluster"]]
        assert any(
            titles.get(lm) is not None and titles.get(lm) == venues.get(rm)
            for lm in l_members
            for rm in r_members
        )


def test_batch_cached_in_catalog(catalog):
    b1 = catalog.batch("OAO")
    b2 = catalog.batch("OAO")
    assert b1 is b2
    b3 = catalog.batch("OAO", force=True)
    assert b3 is not b1
