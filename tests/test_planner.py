"""Query planning/execution (Sec. 7): NES vs AES vs BA.

The DQ-Correctness tests here are the paper's central guarantee: a
Dedupe query over dirty data returns the same grouped entities as the
batch-cleaned query (Sec. 5, problem statement (2)).
"""
from __future__ import annotations

import pytest

from repro.core.grouping import grouped_key_rows
from repro.core.planner import AES, BA, NES, execute
from repro.core.sqlparse import QuerySyntaxError


def _sp_keys(result):
    return grouped_key_rows(result.grouped)


def _spj_keys(result):
    rows = result.grouped.select("_l_members", "_r_members").collect()
    return sorted(
        (tuple(r["_l_members"]), tuple(r["_r_members"])) for r in rows
    )


SP_QUERIES = [
    "SELECT DEDUP given_name, surname FROM PPL WHERE state = 'NSW'",
    "SELECT DEDUP * FROM PPL WHERE state IN ('VIC', 'QLD')",
    "SELECT DEDUP title FROM DSD WHERE year > '2005'",
    "SELECT DEDUP * FROM OAGP WHERE doc_type = 'journal' AND year < '2000'",
    "SELECT DEDUP * FROM PPL WHERE MOD(_eid, 10) < 1",
]


@pytest.mark.parametrize("q", SP_QUERIES)
def test_sp_dq_equals_ba(catalog, q):
    """DQ ≡ BA on SP queries: same grouped member sets."""
    dq = execute(catalog, q, solution=AES)
    ba = execute(catalog, q, solution=BA)
    assert _sp_keys(dq) == _sp_keys(ba)


@pytest.mark.parametrize("q", SP_QUERIES[:2])
def test_sp_nes_equals_aes(catalog, q):
    nes = execute(catalog, q, solution=NES)
    catalog.reset_link_indices()
    aes = execute(catalog, q, solution=AES)
    assert _sp_keys(nes) == _sp_keys(aes)


SPJ_QUERIES = [
    "SELECT DEDUP p.title, v.rank FROM OAGP p INNER JOIN OAGV v "
    "ON p.venue = v.title WHERE p.doc_type = 'conference'",
    "SELECT DEDUP p.surname, o.country FROM PPL p INNER JOIN OAO o "
    "ON p.organisation = o.name WHERE p.state = 'NSW'",
]


@pytest.mark.parametrize("q", SPJ_QUERIES)
def test_spj_aes_equals_nes(catalog, q):
    aes = execute(catalog, q, solution=AES)
    catalog.reset_link_indices()
    nes = execute(catalog, q, solution=NES)
    assert _spj_keys(aes) == _spj_keys(nes)


@pytest.mark.parametrize("q", SPJ_QUERIES)
def test_spj_dq_equals_ba(catalog, q):
    dq = execute(catalog, q, solution=AES)
    ba = execute(catalog, q, solution=BA)
    assert _spj_keys(dq) == _spj_keys(ba)


def test_aes_cleans_cheaper_branch_first(catalog):
    """The planner must dedup the branch with the lower comparison
    estimate (Sec. 7.2.1): a tightly filtered OAGP side is cheaper than
    the unfiltered OAGV side only if the estimate says so — assert the
    explain is consistent with the estimates either way."""
    q = (
        "SELECT DEDUP p.title, v.rank FROM OAGP p INNER JOIN OAGV v "
        "ON p.venue = v.title WHERE p.year = '1995'"
    )
    res = execute(catalog, q, solution=AES)
    est = res.explain.est_comparisons
    assert set(est) == {"p", "v"}
    cheaper = min(est, key=est.get)
    assert res.explain.clean_first == cheaper


def test_aes_executes_fewer_comparisons_than_ba(catalog):
    """The DQ-Performance criterion on a selective query."""
    q = "SELECT DEDUP given_name FROM PPL WHERE state = 'TAS'"
    dq = execute(catalog, q, solution=AES)
    ba = execute(catalog, q, solution=BA)
    assert dq.metrics.comparisons < ba.metrics.comparisons


def test_aes_at_most_nes_comparisons_on_join(catalog):
    q = SPJ_QUERIES[1]
    aes = execute(catalog, q, solution=AES)
    catalog.reset_link_indices()
    nes = execute(catalog, q, solution=NES)
    assert aes.metrics.comparisons <= nes.metrics.comparisons


def test_projection_sp(catalog):
    res = execute(
        catalog,
        "SELECT DEDUP given_name, surname FROM PPL WHERE state = 'ACT'",
        solution=AES,
    )
    visible = [c for c in res.grouped.columns if not c.startswith("_")]
    assert visible == ["given_name", "surname"]


def test_projection_spj(catalog):
    res = execute(catalog, SPJ_QUERIES[0], solution=AES)
    visible = [c for c in res.grouped.columns if not c.startswith("_")]
    assert visible == ["l_title", "r_rank"]


def test_select_star_keeps_all_attributes(catalog):
    res = execute(
        catalog, "SELECT DEDUP * FROM OAO WHERE country IS NOT NULL"
        if False
        else "SELECT DEDUP * FROM OAO WHERE name LIKE '%Institute%'",
        solution=AES,
    )
    for a in catalog.table("OAO").attrs:
        assert a in res.grouped.columns


def test_no_where_deduplicates_whole_table(catalog):
    res = execute(catalog, "SELECT DEDUP name FROM OAO", solution=AES)
    assert res.metrics.qe_size == catalog.table("OAO").n_entities


def test_plain_query_rejected(catalog):
    with pytest.raises(ValueError, match="standard SQL semantics"):
        execute(catalog, "SELECT name FROM OAO", solution=AES)


def test_unknown_solution_rejected(catalog):
    with pytest.raises(ValueError):
        execute(
            catalog,
            "SELECT DEDUP p.title, v.rank FROM OAGP p INNER JOIN OAGV v "
            "ON p.venue = v.title",
            solution="MAGIC",
        )


def test_li_makes_repeat_query_free(catalog):
    q = "SELECT DEDUP surname FROM PPL WHERE state = 'WA'"
    first = execute(catalog, q, solution=AES)
    second = execute(catalog, q, solution=AES)
    assert first.metrics.comparisons > 0
    assert second.metrics.comparisons == 0
    assert _sp_keys(first) == _sp_keys(second)


def test_metrics_breakdown_covers_pipeline(catalog):
    res = execute(
        catalog,
        "SELECT DEDUP title FROM OAGP WHERE year >= '2015'",
        solution=AES,
    )
    for stage in ("scan_filter", "blocking", "block_join",
                  "meta_blocking", "resolution", "group"):
        assert stage in res.metrics.stage_seconds
