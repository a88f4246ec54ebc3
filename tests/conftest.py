"""Shared dataset fixtures for the test suite.

Everything heavy is session-scoped: dataset generation is deterministic
(fixed seeds) and the registered TableIndex caches its Spark-side
indices, so each family is built once per pytest session. Tests that
mutate a table's Link Index must use the ``*_catalog`` factory
fixtures, which reset LIs before handing the catalog out.
"""
from __future__ import annotations

import pytest

from repro.core.config import ERConfig
from repro.core.planner import Catalog
from repro.datagen import datasets
from repro.datagen.datasets import to_spark
from repro.datagen.paper_example import (
    EXAMPLE_CONFIG,
    publications_df,
    venues_df,
)

# Unit-test scale: big enough for blocking/meta-blocking to act, small
# enough that a full BA pass takes seconds (SF guidance: tests <= 0.01).
N_PEOPLE = 300
N_OAO = 200
N_OAGV = 60
N_OAGP = 300
N_DSD = 250


@pytest.fixture(scope="session")
def people_data(spark):
    pdf, gt = datasets.people(N_PEOPLE, seed=11)
    return to_spark(spark, pdf), gt


@pytest.fixture(scope="session")
def oao_data(spark):
    pdf, gt = datasets.oao(N_OAO, seed=21)
    return to_spark(spark, pdf), gt


@pytest.fixture(scope="session")
def oagv_data(spark):
    pdf, gt, variants = datasets.oagv(N_OAGV, seed=41)
    return to_spark(spark, pdf), gt, variants


@pytest.fixture(scope="session")
def oagp_data(spark, oagv_data):
    _, _, variants = oagv_data
    pdf, gt = datasets.oagp(N_OAGP, seed=51, venue_variants=variants)
    return to_spark(spark, pdf), gt


@pytest.fixture(scope="session")
def dsd_data(spark):
    pdf, gt = datasets.dsd(N_DSD, seed=61)
    return to_spark(spark, pdf), gt


@pytest.fixture(scope="session")
def _catalog(spark, people_data, oao_data, oagv_data, oagp_data, dsd_data):
    cat = Catalog(spark, config=ERConfig())
    cat.register("PPL", people_data[0])
    cat.register("OAO", oao_data[0])
    cat.register("OAGV", oagv_data[0])
    cat.register("OAGP", oagp_data[0])
    cat.register("DSD", dsd_data[0])
    return cat


@pytest.fixture()
def catalog(_catalog):
    """The shared catalog with all Link Indices reset (isolated tests)."""
    _catalog.reset_link_indices()
    return _catalog


@pytest.fixture(scope="session")
def _paper_catalog(spark):
    cat = Catalog(spark, config=EXAMPLE_CONFIG)
    cat.register("P", publications_df(spark))
    cat.register("V", venues_df(spark))
    return cat


@pytest.fixture()
def paper_catalog(_paper_catalog):
    _paper_catalog.reset_link_indices()
    return _paper_catalog


@pytest.fixture(scope="session")
def ground_truth(people_data, oao_data, oagv_data, oagp_data, dsd_data):
    return {
        "PPL": people_data[1],
        "OAO": oao_data[1],
        "OAGV": oagv_data[1],
        "OAGP": oagp_data[1],
        "DSD": dsd_data[1],
    }
