"""Cost-based planner statistics (Sec. 7.2.1) tests."""
from __future__ import annotations

import pyspark.sql.functions as F
import pytest

from repro.core.stats import (
    duplication_factor,
    estimate_comparisons,
    estimate_selection,
    join_percentage,
)
from repro.core.tokenize import EID


def test_estimate_selection_superset_of_equality_filter(catalog):
    """WB-block estimation: every entity whose value IS the literal sits
    in a block keyed by the literal's tokens, so S_E ⊇ QE_E."""
    ti = catalog.table("PPL")
    s = estimate_selection(ti, ["NSW"])
    s_ids = {r[EID] for r in s.collect()}
    qe_ids = {
        r[EID]
        for r in ti.entities.where(F.col("state") == "NSW").select(EID).collect()
    }
    assert qe_ids <= s_ids


def test_estimate_selection_no_literal_falls_back_to_table(catalog):
    ti = catalog.table("PPL")
    assert estimate_selection(ti, []).count() == ti.n_entities
    # literals that tokenize to nothing behave the same
    assert estimate_selection(ti, ["!"]).count() == ti.n_entities


def test_estimate_selection_unknown_literal_empty(catalog):
    ti = catalog.table("PPL")
    assert estimate_selection(ti, ["zzqqxxyy"]).count() == 0


def test_estimate_comparisons_positive_and_bounded(catalog):
    ti = catalog.table("PPL")
    s = estimate_selection(ti, ["NSW"])
    est = estimate_comparisons(ti, s)
    assert est > 0
    # Never more than the full pairwise count of the table.
    n = ti.n_entities
    assert est <= n * (n - 1) / 2


def test_estimate_comparisons_monotone_in_selection(catalog):
    ti = catalog.table("PPL")
    small = ti.entities.where(F.col("state") == "NSW")
    large = ti.entities.where(
        (F.col("state") == "NSW") | (F.col("state") == "VIC")
    )
    assert estimate_comparisons(ti, small) <= estimate_comparisons(ti, large)


def test_estimate_comparisons_drops_with_li(catalog):
    """The estimate excludes already-resolved entities (S_E \\ LI_E), so
    it must shrink after a query resolves part of the selection."""
    from repro.core.dedup import deduplicate

    ti = catalog.table("PPL")
    sel = ti.entities.where(F.col("state") == "NSW")
    before = estimate_comparisons(ti, sel)
    deduplicate(ti, sel)
    after = estimate_comparisons(ti, sel)
    assert after == 0.0
    assert before > 0


def test_estimate_comparisons_empty_selection(catalog):
    ti = catalog.table("PPL")
    empty = ti.entities.where(F.lit(False))
    assert estimate_comparisons(ti, empty) == 0.0


def test_duplication_factor_near_true_rate(catalog):
    """PPL has ~40% duplicate rows: a cleaned sample should see roughly
    1.3-1.8 entities per selected one (sample dups resolve against the
    whole table, so df > 1)."""
    ti = catalog.table("PPL")
    df_est = duplication_factor(ti, sample_fraction=0.3, seed=7)
    assert 1.0 <= df_est <= 2.5


def test_duplication_factor_restores_li(catalog):
    ti = catalog.table("PPL")
    assert not ti.li.resolved_ids
    duplication_factor(ti, sample_fraction=0.2, seed=7)
    assert not ti.li.resolved_ids  # eager cleaning must not leak state


def test_join_percentage_bounds_and_direction(catalog):
    gp, gv = catalog.table("OAGP"), catalog.table("OAGV")
    p_frac, v_frac = join_percentage(gp, gv, "venue", "title")
    assert 0.0 <= p_frac <= 1.0 and 0.0 <= v_frac <= 1.0
    # Most papers reference a real venue variant; many venues are used.
    assert p_frac > 0.3


def test_join_percentage_disjoint_tables(catalog):
    ppl, gv = catalog.table("PPL"), catalog.table("OAGV")
    f1, f2 = join_percentage(ppl, gv, "surname", "title")
    assert f1 == 0.0 and f2 == 0.0
