"""febrl-style record corruption (substitute for febrl [9] in Sec. 9.1).

The paper's synthetic People datasets were produced with febrl:
duplicates of clean records "randomly generated based on real-world
error characteristics ... up to 3 duplicates per record, no more than 2
modifications/attribute, and up to 4 modifications/record". This module
reimplements that model:

* character-level typos: insert / delete / substitute / transpose;
* token-level edits: drop a token, swap adjacent tokens, abbreviate
  (``Entity Resolution`` -> ``E. Resolution`` — the motivating
  example's dominant error);
* value-level: blank an attribute (missing value).

All randomness flows through one ``numpy.random.Generator`` so a
dataset is a pure function of its seed, and ground truth (which dirty
record came from which clean one) is returned alongside the data.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

_ALPHABET = "abcdefghijklmnopqrstuvwxyz"


# -------------------------------------------------------- char-level ops
def _typo_insert(s: str, g: np.random.Generator) -> str:
    i = int(g.integers(0, len(s) + 1))
    return s[:i] + _ALPHABET[int(g.integers(0, 26))] + s[i:]


def _typo_delete(s: str, g: np.random.Generator) -> str:
    if len(s) <= 1:
        return s
    i = int(g.integers(0, len(s)))
    return s[:i] + s[i + 1 :]


def _typo_substitute(s: str, g: np.random.Generator) -> str:
    if not s:
        return s
    i = int(g.integers(0, len(s)))
    return s[:i] + _ALPHABET[int(g.integers(0, 26))] + s[i + 1 :]


def _typo_transpose(s: str, g: np.random.Generator) -> str:
    if len(s) < 2:
        return s
    i = int(g.integers(0, len(s) - 1))
    return s[:i] + s[i + 1] + s[i] + s[i + 2 :]


# ------------------------------------------------------- token-level ops
def _drop_token(s: str, g: np.random.Generator) -> str:
    toks = s.split()
    if len(toks) <= 1:
        return s
    i = int(g.integers(0, len(toks)))
    return " ".join(toks[:i] + toks[i + 1 :])


def _swap_tokens(s: str, g: np.random.Generator) -> str:
    toks = s.split()
    if len(toks) < 2:
        return s
    i = int(g.integers(0, len(toks) - 1))
    toks[i], toks[i + 1] = toks[i + 1], toks[i]
    return " ".join(toks)


def _abbreviate(s: str, g: np.random.Generator) -> str:
    """Abbreviate a run of leading tokens to initials: the motivating
    example's ``Collective Entity Resolution`` -> ``Collective E.R.``"""
    toks = s.split()
    if len(toks) < 2:
        return s
    k = int(g.integers(1, len(toks)))
    abbrev = ".".join(t[0].upper() for t in toks[:k] if t) + "."
    return " ".join([abbrev] + toks[k:])


_STRING_OPS = (
    _typo_insert,
    _typo_delete,
    _typo_substitute,
    _typo_transpose,
    _drop_token,
    _swap_tokens,
    _abbreviate,
)


def corrupt_value(
    value: str | None, g: np.random.Generator, *, max_mods: int = 2
) -> str | None:
    """Apply 1..max_mods random edits to one attribute value."""
    if value is None or value == "":
        return value
    s = str(value)
    for _ in range(int(g.integers(1, max_mods + 1))):
        op = _STRING_OPS[int(g.integers(0, len(_STRING_OPS)))]
        s = op(s, g)
    return s


@dataclass(frozen=True)
class CorruptionSpec:
    """febrl-style knobs (paper defaults for the People datasets)."""

    dup_fraction: float = 0.4  # fraction of *output* records that are dups
    max_dups_per_record: int = 3
    max_mods_per_attribute: int = 2
    max_mods_per_record: int = 4
    missing_prob: float = 0.1  # chance a modified attribute is blanked


def inject_duplicates(
    clean: pd.DataFrame,
    attrs: list[str],
    spec: CorruptionSpec,
    seed: int,
) -> tuple[pd.DataFrame, set[tuple[int, int]]]:
    """Append corrupted duplicates to ``clean`` and return ground truth.

    ``clean`` must already carry a unique ``_eid``; duplicates receive
    fresh ids above the existing maximum and a ``_src`` column records
    provenance for every row (its own id for originals). Ground truth
    is the set of canonical (min, max) pairs within each duplicate
    group — all pairs, matching how the paper's |L_E| counts matches.
    """
    g = np.random.default_rng(seed)
    n_clean = len(clean)
    base = clean.copy()
    base["_src"] = base["_eid"].to_numpy()

    n_dups_target = (
        int(round(n_clean * spec.dup_fraction / (1.0 - spec.dup_fraction)))
        if spec.dup_fraction < 1.0
        else n_clean
    )
    next_id = int(base["_eid"].max()) + 1 if n_clean else 1
    rows: list[dict] = []
    gt: set[tuple[int, int]] = set()
    groups: dict[int, list[int]] = {}

    originals = base.to_dict("records")
    while len(rows) < n_dups_target:
        src = originals[int(g.integers(0, n_clean))]
        src_id = int(src["_eid"])
        existing = groups.setdefault(src_id, [src_id])
        if len(existing) - 1 >= spec.max_dups_per_record:
            continue
        dup = dict(src)
        dup["_eid"] = next_id
        dup["_src"] = src_id
        n_mods = int(g.integers(1, spec.max_mods_per_record + 1))
        mod_attrs = list(
            g.choice(attrs, size=min(n_mods, len(attrs)), replace=False)
        )
        for a in mod_attrs:
            if g.random() < spec.missing_prob:
                dup[a] = None
            else:
                dup[a] = corrupt_value(
                    dup[a], g, max_mods=spec.max_mods_per_attribute
                )
        for member in existing:
            gt.add((min(member, next_id), max(member, next_id)))
        existing.append(next_id)
        rows.append(dup)
        next_id += 1

    dirty = pd.concat([base, pd.DataFrame(rows)], ignore_index=True)
    # Shuffle row order deterministically: dirty files interleave
    # sources, and nothing downstream may rely on physical adjacency.
    order = g.permutation(len(dirty))
    dirty = dirty.iloc[order].reset_index(drop=True)
    return dirty, gt
