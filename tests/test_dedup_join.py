"""Deduplicate-Join operator (Sec. 6.2, Algorithms 1-2) tests."""
from __future__ import annotations

import pyspark.sql.functions as F
import pytest

from repro.core.dedup import deduplicate
from repro.core.dedup_join import (
    DIRTY_LEFT,
    DIRTY_RIGHT,
    dedup_join_operation,
    deduplicate_join,
)
from repro.core.tokenize import EID
from repro.datagen.paper_example import EXAMPLE_CONFIG


@pytest.fixture()
def paper_drs(paper_catalog):
    """Both paper tables fully deduplicated (QE = whole table)."""
    p, v = paper_catalog.table("P"), paper_catalog.table("V")
    return deduplicate(p, p.entities), deduplicate(v, v.entities)


def test_join_operation_joins_via_any_variant(paper_drs):
    """P6 (venue 'EDBT') must join venue cluster {V1, V4} even though
    V1's title is the long form — the cluster-level predicate."""
    pdr, vdr = paper_drs
    rows = dedup_join_operation(pdr, vdr, "Venue", "Title").collect()
    pairs = {(r["l__eid"], r["r__eid"]) for r in rows}
    assert (6, 4) in pairs  # direct: P6.venue == V4.title == 'EDBT'
    assert (6, 1) in pairs  # via cluster: V1 ≡ V4
    assert (7, 1) in pairs and (7, 4) in pairs  # P7 in P6's cluster


def test_join_operation_emits_full_cartesian_of_clusters(paper_drs):
    pdr, vdr = paper_drs
    rows = dedup_join_operation(pdr, vdr, "Venue", "Title").collect()
    pairs = {(r["l__eid"], r["r__eid"]) for r in rows}
    # Cluster {P6,P7,P8} x {V1,V4} fully expanded: 6 pairs.
    for p in (6, 7, 8):
        for v in (1, 4):
            assert (p, v) in pairs


def test_join_operation_excludes_non_joining_clusters(paper_drs):
    pdr, vdr = paper_drs
    rows = dedup_join_operation(pdr, vdr, "Venue", "Title").collect()
    right_ids = {r["r__eid"] for r in rows}
    # CIDR cluster {V5,V6} joins no publication.
    assert 5 not in right_ids and 6 not in right_ids


def test_join_operation_prefixes_columns(paper_drs):
    pdr, vdr = paper_drs
    cols = dedup_join_operation(pdr, vdr, "Venue", "Title").columns
    assert "l_Title" in cols and "r_Title" in cols
    assert "l__eid" in cols and "r__eid" in cols


def test_dirty_right_restricts_before_dedup(paper_catalog):
    """Alg. 1 line 4: the dirty side is filtered to joining entities
    before its Deduplicate — CIDR venues never get cleaned."""
    p, v = paper_catalog.table("P"), paper_catalog.table("V")
    pdr = deduplicate(p, p.entities.where(F.col("Venue") == "EDBT"))
    joined, ldr, rdr = deduplicate_join(
        pdr, (v, v.entities), "Venue", "Title", DIRTY_RIGHT,
        config=EXAMPLE_CONFIG,
    )
    r_ids = {r[EID] for r in rdr.qe_ids.collect()}
    assert 5 not in r_ids and 6 not in r_ids  # CIDR cluster skipped
    assert joined.count() > 0


def test_dirty_left_matches_dirty_right_result(paper_catalog):
    """Output must be side-symmetric: same joined cluster pairs either
    way (the operator's 'consistent output' property)."""
    p, v = paper_catalog.table("P"), paper_catalog.table("V")

    paper_catalog.reset_link_indices()
    vdr = deduplicate(v, v.entities)
    j1, _, _ = deduplicate_join(
        (p, p.entities.where(F.col("Venue") == "EDBT")), vdr,
        "Venue", "Title", DIRTY_LEFT, config=EXAMPLE_CONFIG,
    )
    pairs1 = {
        (r["l__eid"], r["r__eid"]) for r in j1.select("l__eid", "r__eid").collect()
    }

    paper_catalog.reset_link_indices()
    pdr = deduplicate(p, p.entities.where(F.col("Venue") == "EDBT"))
    j2, _, _ = deduplicate_join(
        pdr, (v, v.entities), "Venue", "Title", DIRTY_RIGHT,
        config=EXAMPLE_CONFIG,
    )
    pairs2 = {
        (r["l__eid"], r["r__eid"]) for r in j2.select("l__eid", "r__eid").collect()
    }
    assert pairs1 == pairs2


def test_unknown_join_type_raises(paper_catalog):
    p = paper_catalog.table("P")
    with pytest.raises(ValueError):
        deduplicate_join(
            (p, p.entities), (p, p.entities), "Venue", "Venue", "BOTH-DIRTY"
        )


def test_synthetic_join_recovers_variant_matches(catalog):
    """OAGP rows referencing a venue acronym must reach the long-title
    venue row through the venue clusters."""
    gp, gv = catalog.table("OAGP"), catalog.table("OAGV")
    vdr = deduplicate(gv, gv.entities)
    qe = gp.entities.where(F.col("doc_type") == "conference")
    joined, _, _ = deduplicate_join(
        vdr, (gp, qe), "title", "venue", DIRTY_RIGHT
    )
    plain = qe.join(
        gv.entities, qe["venue"] == gv.entities["title"], "inner"
    )
    # The dedup-join must match at least every plain equi-join row's
    # publication, and typically strictly more via venue variants.
    plain_pubs = {r[EID] for r in plain.select(qe[EID]).collect()}
    dedup_pubs = {r["r__eid"] for r in joined.select("r__eid").collect()}
    assert plain_pubs <= dedup_pubs
