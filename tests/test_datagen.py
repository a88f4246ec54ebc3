"""Dirty-data generator substrate tests (febrl-style corruption)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.datagen import datasets
from repro.datagen.corrupt import (
    CorruptionSpec,
    corrupt_value,
    inject_duplicates,
)


# ---------------------------------------------------------- corruption
def test_corrupt_value_deterministic():
    a = corrupt_value("hello world", np.random.default_rng(5))
    b = corrupt_value("hello world", np.random.default_rng(5))
    assert a == b


def test_corrupt_value_changes_or_preserves_type():
    g = np.random.default_rng(1)
    out = corrupt_value("some value here", g)
    assert isinstance(out, str)


def test_corrupt_value_none_passthrough():
    g = np.random.default_rng(1)
    assert corrupt_value(None, g) is None
    assert corrupt_value("", g) == ""


def _mk_clean(n):
    return pd.DataFrame(
        {
            "_eid": np.arange(1, n + 1),
            "a": [f"value number {i} alpha" for i in range(n)],
            "b": [f"other text {i}" for i in range(n)],
        }
    )


def test_inject_duplicates_fraction():
    clean = _mk_clean(200)
    spec = CorruptionSpec(dup_fraction=0.4)
    dirty, gt = inject_duplicates(clean, ["a", "b"], spec, seed=3)
    n_dups = len(dirty) - 200
    assert n_dups == pytest.approx(200 * 0.4 / 0.6, abs=2)
    assert len(gt) >= n_dups  # within-group pairs >= #dup rows


def test_inject_duplicates_ground_truth_valid():
    clean = _mk_clean(50)
    dirty, gt = inject_duplicates(
        clean, ["a", "b"], CorruptionSpec(), seed=3
    )
    by_id = dirty.set_index("_eid")["_src"].to_dict()
    for a, b in gt:
        assert a < b
        assert by_id[a] == by_id[b] or by_id[b] == a or by_id[a] == b


def test_inject_duplicates_respects_max_dups():
    clean = _mk_clean(30)
    spec = CorruptionSpec(dup_fraction=0.5, max_dups_per_record=2)
    dirty, _ = inject_duplicates(clean, ["a", "b"], spec, seed=4)
    dups = dirty[dirty["_eid"] != dirty["_src"]]
    assert dups.groupby("_src").size().max() <= 2


def test_inject_duplicates_deterministic():
    clean = _mk_clean(40)
    d1, g1 = inject_duplicates(clean, ["a", "b"], CorruptionSpec(), 9)
    d2, g2 = inject_duplicates(clean, ["a", "b"], CorruptionSpec(), 9)
    pd.testing.assert_frame_equal(d1, d2)
    assert g1 == g2


def test_inject_duplicates_unique_eids():
    clean = _mk_clean(60)
    dirty, _ = inject_duplicates(clean, ["a", "b"], CorruptionSpec(), 2)
    assert dirty["_eid"].is_unique


# ------------------------------------------------------------ datasets
@pytest.mark.parametrize(
    "gen,kwargs,n_attrs,dup_rate",
    [
        (datasets.people, {}, 12, 0.4),
        (datasets.oao, {}, 3, 0.1),
        (datasets.oap, {}, 8, 0.1),
        (datasets.dsd, {}, 4, 0.08),
    ],
)
def test_dataset_shapes(gen, kwargs, n_attrs, dup_rate):
    pdf, gt = gen(150, **kwargs)
    attrs = [c for c in pdf.columns if not c.startswith("_")]
    assert len(attrs) == n_attrs
    n_dups = len(pdf) - 150
    expected = 150 * dup_rate / (1 - dup_rate)
    assert n_dups == pytest.approx(expected, abs=3)
    assert gt  # some duplicates exist
    assert pdf["_eid"].is_unique


def test_people_deterministic():
    a, ga = datasets.people(100, seed=5)
    b, gb = datasets.people(100, seed=5)
    pd.testing.assert_frame_equal(a, b)
    assert ga == gb


def test_people_different_seeds_differ():
    a, _ = datasets.people(100, seed=5)
    b, _ = datasets.people(100, seed=6)
    assert not a.equals(b)


def test_oagv_variants_align():
    pdf, gt, variants = datasets.oagv(40, seed=41)
    assert len(variants) == 40
    # Every duplicated venue contributes exactly one GT pair and two
    # title variants (long title + acronym).
    for a, b in gt:
        assert a <= 40 < b  # clean id pairs with its appended variant
    n_dup_groups = sum(1 for v in variants if len(v) == 2)
    assert n_dup_groups == len(gt)


def test_oagp_venues_reference_variants():
    _, _, variants = datasets.oagv(30, seed=41)
    pdf, _ = datasets.oagp(100, seed=51, venue_variants=variants)
    all_variants = {t for vs in variants for t in vs}
    clean = pdf[pdf["_eid"] == pdf["_src"]]
    assert set(clean["venue"]) <= all_variants


def test_oap_references_org_names():
    orgs = ["Alpha Institute", "Beta Institute"]
    pdf, _ = datasets.oap(80, seed=31, org_names=orgs)
    clean = pdf[pdf["_eid"] == pdf["_src"]]
    assert set(clean["organisation"]) <= set(orgs)


def test_to_spark_schema(spark):
    pdf, _ = datasets.oao(50, seed=21)
    df = datasets.to_spark(spark, pdf)
    schema = dict(df.dtypes)
    assert schema["_eid"] == "bigint"
    assert schema["name"] == "string"
    assert df.count() == len(pdf)


def test_to_spark_preserves_nulls(spark):
    pdf, _ = datasets.people(100, seed=11)
    df = datasets.to_spark(spark, pdf)
    null_cols = [c for c in pdf.columns if pdf[c].isna().any()]
    if null_cols:  # corruption blanks some values with high probability
        c = null_cols[0]
        assert df.where(df[c].isNull()).count() == int(pdf[c].isna().sum())


def test_words_deterministic_vocab():
    from repro.datagen.datasets import _words

    assert _words(10, 1) == _words(10, 1)
    assert _words(10, 1) != _words(10, 2)
    assert len(set(_words(50, 3))) == 50
