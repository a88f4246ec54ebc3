"""Connected components / union-find substrate tests."""
from __future__ import annotations

import pytest

from repro.core.graph import (
    UnionFind,
    cluster_assignments,
    connected_components,
)
from repro.core.tokenize import EID


def test_union_find_basic():
    uf = UnionFind()
    uf.union(1, 2)
    uf.union(2, 3)
    assert uf.find(3) == 1
    assert uf.find(1) == 1


def test_union_find_min_label_wins():
    uf = UnionFind()
    uf.union(9, 5)
    uf.union(5, 7)
    labels = uf.labels()
    assert labels[9] == 5 and labels[7] == 5


def test_union_find_disjoint_components():
    uf = UnionFind()
    uf.union(1, 2)
    uf.union(10, 11)
    labels = uf.labels()
    assert labels[2] == 1 and labels[11] == 10


def test_union_find_idempotent():
    uf = UnionFind()
    uf.union(1, 2)
    uf.union(1, 2)
    uf.union(2, 1)
    assert uf.labels() == {1: 1, 2: 1}


def test_connected_components_none_links(spark):
    assert connected_components(spark, None) == {}


def test_connected_components_chain(spark):
    links = spark.createDataFrame(
        [(4, 2), (2, 7), (9, 8)], schema="e1 long, e2 long"
    )
    labels = connected_components(spark, links)
    assert labels[4] == labels[2] == labels[7] == 2
    assert labels[9] == labels[8] == 8


def test_cluster_assignments_singletons_label_themselves(spark):
    entities = spark.createDataFrame(
        [(1, "a"), (2, "b"), (3, "c")], schema=f"{EID} long, v string"
    )
    links = spark.createDataFrame([(1, 3)], schema="e1 long, e2 long")
    got = {
        r[EID]: r["_cluster"]
        for r in cluster_assignments(spark, entities, links).collect()
    }
    assert got == {1: 1, 3: 1, 2: 2}


def test_cluster_assignments_ignores_links_outside_entities(spark):
    # Links mentioning absent entities must not create rows.
    entities = spark.createDataFrame([(1, "a")], schema=f"{EID} long, v string")
    links = spark.createDataFrame([(5, 6)], schema="e1 long, e2 long")
    got = cluster_assignments(spark, entities, links).collect()
    assert {(r[EID], r["_cluster"]) for r in got} == {(1, 1)}
