"""Synthetic dirty-data substrates for the QueryER evaluation.

The paper's corpora (DBLP-Scholar, OpenAIRE organisations/projects,
Open Academic Graph papers/venues, febrl-generated People) are either
proprietary dumps or too large for this environment, so this package
rebuilds their *shape*: clean records from frequency-style vocabularies,
duplicates injected with febrl-style error characteristics (typos,
abbreviations, token swaps, missing values), join relationships between
tables, and exact ground-truth linkage for Pair-Completeness. Every
substitution is documented in DESIGN.md.
"""
