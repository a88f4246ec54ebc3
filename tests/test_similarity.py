"""Unit tests for the similarity substrate (pure Python, no Spark)."""
from __future__ import annotations

import itertools

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.similarity import (
    entity_similarity,
    jaro,
    jaro_winkler,
    monge_elkan,
    token_jaccard,
    tokenize_value,
    value_similarity,
)
from repro.datagen.paper_example import (
    EXAMPLE_CONFIG,
    P_GT,
    PUBLICATIONS,
    V_GT,
    VENUES,
)

# ---------------------------------------------------------------- jaro
@pytest.mark.parametrize(
    "a,b,expected",
    [
        ("martha", "marhta", 0.9444),
        ("dixon", "dicksonx", 0.7667),
        ("jellyfish", "smellyfish", 0.8963),
        ("abc", "abc", 1.0),
        ("", "abc", 0.0),
        ("abc", "", 0.0),
        ("a", "a", 1.0),
        ("abc", "xyz", 0.0),
    ],
)
def test_jaro_known_values(a, b, expected):
    assert jaro(a, b) == pytest.approx(expected, abs=1e-4)


@pytest.mark.parametrize(
    "a,b,expected",
    [
        ("martha", "marhta", 0.9611),
        ("dixon", "dicksonx", 0.8133),
        ("duane", "dwayne", 0.84),
    ],
)
def test_jaro_winkler_known_values(a, b, expected):
    assert jaro_winkler(a, b) == pytest.approx(expected, abs=1e-4)


def test_jw_no_boost_below_07():
    # Winkler boost only applies above 0.7 Jaro.
    assert jaro_winkler("abc", "xyz") == jaro("abc", "xyz")


def test_jw_prefix_capped_at_4():
    a, b = "abcdefgh", "abcdexyz"
    j = jaro(a, b)
    assert jaro_winkler(a, b) == pytest.approx(j + 4 * 0.1 * (1 - j))


@given(st.text(max_size=24), st.text(max_size=24))
@settings(max_examples=200, deadline=None)
def test_jaro_symmetric_and_bounded(a, b):
    s1, s2 = jaro(a, b), jaro(b, a)
    assert s1 == pytest.approx(s2)
    assert 0.0 <= s1 <= 1.0


@given(st.text(min_size=1, max_size=24))
@settings(max_examples=100, deadline=None)
def test_jaro_identity(a):
    assert jaro(a, a) == 1.0
    assert jaro_winkler(a, a) == 1.0


@given(st.text(max_size=16), st.text(max_size=16))
@settings(max_examples=200, deadline=None)
def test_jw_bounded(a, b):
    assert 0.0 <= jaro_winkler(a, b) <= 1.0


# ----------------------------------------------------------- tokenize
@pytest.mark.parametrize(
    "value,expected",
    [
        ("Collective Entity Resolution", ["collective", "entity", "resolution"]),
        ("E.R. 2008", ["2008"]),  # single letters dropped, digits kept
        ("a b c", []),
        ("EDBT", ["edbt"]),
        (None, []),
        ("", []),
        ("  ", []),
        ("foo-bar_baz", ["foo", "bar", "baz"]),
        ("1", ["1"]),
        ("X1", ["x1"]),
        ("don't", ["don"]),
    ],
)
def test_tokenize_value(value, expected):
    assert tokenize_value(value) == expected


def test_tokenize_min_len():
    assert tokenize_value("ab abc", min_len=3) == ["abc"]


# ----------------------------------------------------- value similarity
def test_value_similarity_missing_is_none():
    assert value_similarity(None, "x") is None
    assert value_similarity("x", None) is None
    assert value_similarity("", "x") is None


@pytest.mark.parametrize(
    "a,b,expected",
    [("2008", "2008", 1.0), ("2008", "2015", 0.0), ("1", "2", 0.0)],
)
def test_value_similarity_digit_rule(a, b, expected):
    assert value_similarity(a, b) == expected


def test_value_similarity_normalises_case_and_space():
    assert value_similarity("  EDBT ", "edbt") == 1.0


def test_value_similarity_thorough_rescues_reorder():
    plain = value_similarity("john smith", "smith john")
    thorough = value_similarity("john smith", "smith john", thorough=True)
    assert thorough == 1.0
    assert thorough > plain


def test_monge_elkan_empty():
    assert monge_elkan("", "abc") == 0.0
    assert monge_elkan("...", "abc") == 0.0


def test_monge_elkan_symmetric():
    a, b = "entity resolution on big data", "e.r on big data"
    assert monge_elkan(a, b) == pytest.approx(monge_elkan(b, a))


# ---------------------------------------------------- entity similarity
def _paper_records(pdf):
    return {
        int(r["_eid"]): {k: r[k] for k in pdf.columns if k != "_eid"}
        for _, r in pdf.iterrows()
    }


P_RECS = _paper_records(PUBLICATIONS)
V_RECS = _paper_records(VENUES)
W = EXAMPLE_CONFIG.weights_dict
TH = EXAMPLE_CONFIG.sim_threshold


@pytest.mark.parametrize(
    "a,b", sorted(itertools.combinations(sorted(P_RECS), 2))
)
def test_thorough_matcher_on_paper_publications(a, b):
    """Every pair of Table 1 classifies exactly as Sec. 2's groups."""
    s = entity_similarity(P_RECS[a], P_RECS[b], weights=W, thorough=True)
    if (a, b) in P_GT:
        assert s >= TH, f"P{a}-P{b} should match (sim={s:.3f})"
    else:
        assert s < TH, f"P{a}-P{b} should not match (sim={s:.3f})"


@pytest.mark.parametrize(
    "a,b", sorted(itertools.combinations(sorted(V_RECS), 2))
)
def test_thorough_matcher_on_paper_venues(a, b):
    """Every pair of Table 2 classifies exactly as Sec. 2's groups."""
    s = entity_similarity(V_RECS[a], V_RECS[b], weights=W, thorough=True)
    if (a, b) in V_GT:
        assert s >= TH, f"V{a}-V{b} should match (sim={s:.3f})"
    else:
        assert s < TH, f"V{a}-V{b} should not match (sim={s:.3f})"


def test_entity_similarity_symmetric():
    a, b = P_RECS[1], P_RECS[2]
    assert entity_similarity(a, b) == pytest.approx(entity_similarity(b, a))
    assert entity_similarity(a, b, thorough=True) == pytest.approx(
        entity_similarity(b, a, thorough=True)
    )


def test_entity_similarity_identity():
    for rec in (P_RECS[1], V_RECS[4]):
        assert entity_similarity(rec, rec) == pytest.approx(1.0)
        assert entity_similarity(rec, rec, thorough=True) == pytest.approx(1.0)


def test_entity_similarity_all_missing():
    assert entity_similarity({"a": None}, {"a": None}) == 0.0


def test_token_jaccard_basic():
    a = {"x": "entity resolution", "y": None}
    b = {"x": "entity matching", "y": None}
    assert token_jaccard(a, b) == pytest.approx(1 / 3)
    assert token_jaccard(a, a) == 1.0
    assert token_jaccard({"x": None}, {"x": None}) == 0.0


def test_weights_shift_score():
    # Raising the weight of an agreeing attribute must not lower the score.
    a = {"t": "same title", "v": "aaaa"}
    b = {"t": "same title", "v": "zzzz"}
    lo = entity_similarity(a, b, jw_weight=1.0)
    hi = entity_similarity(a, b, jw_weight=1.0, weights={"t": 5.0})
    assert hi > lo


def test_fast_matcher_separates_corrupted_duplicate():
    from repro.datagen.corrupt import corrupt_value
    import numpy as np

    g = np.random.default_rng(3)
    rec = {
        "name": "Johannes Brahms",
        "street": "Karlsgasse 4 Vienna",
        "year": "1833",
        "work": "Ein deutsches Requiem opus 45",
    }
    dup = {k: corrupt_value(v, g) for k, v in rec.items()}
    other = {
        "name": "Clara Schumann",
        "street": "Bilker Strasse 15 Dusseldorf",
        "year": "1819",
        "work": "Piano Concerto in A minor opus 7",
    }
    assert entity_similarity(rec, dup) > entity_similarity(rec, other)
