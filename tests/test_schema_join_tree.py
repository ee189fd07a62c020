"""Catalog + Join Tree layer tests: validation of the running-intersection
property, navigation primitives, and the catalogs of all four datasets."""
from __future__ import annotations

import pytest

from repro.core.join_tree import JoinTree
from repro.core.schema import Attribute as A
from repro.core.schema import Database, Relation
from repro.datasets import all_datasets


def _db_chain(n: int) -> Database:
    """S_k(X_k, X_{k+1}) chain database from paper Example 3.3."""
    return Database(
        [
            Relation(f"S{k}", (A(f"X{k}", "key"), A(f"X{k+1}", "key")))
            for k in range(1, n)
        ]
    )


def test_attribute_kind_validated():
    with pytest.raises(ValueError):
        A("x", "weird")


def test_duplicate_relation_rejected():
    r = Relation("R", (A("a", "key"),))
    with pytest.raises(ValueError):
        Database([r, r])


def test_duplicate_attr_within_relation_rejected():
    with pytest.raises(ValueError):
        Database([Relation("R", (A("a"), A("a")))])


def test_shared_nonkey_attr_rejected():
    with pytest.raises(ValueError):
        Database(
            [Relation("R", (A("a", "cont"),)), Relation("S", (A("a", "cont"),))]
        )


def test_shared_key_attr_allowed():
    db = Database(
        [Relation("R", (A("k", "key"), A("a"))), Relation("S", (A("k", "key"), A("b")))]
    )
    assert db.relations_containing("k") == ("R", "S")
    assert db.kind("k") == "key"


def test_attrs_of_kind_sorted():
    db = _db_chain(4)
    assert db.attrs_of_kind("key") == ("X1", "X2", "X3", "X4")


def test_join_tree_valid_chain():
    db = _db_chain(5)
    t = JoinTree(db, [("S1", "S2"), ("S2", "S3"), ("S3", "S4")])
    assert t.keys("S2", "S3") == ("X3",)
    assert t.subtree_attrs("S3", "S2") == frozenset({"X3", "X4", "X5"})
    assert t.subtree_nodes("S2", "S1") == frozenset({"S2", "S3", "S4"})


def test_join_tree_wrong_edge_count():
    db = _db_chain(4)
    with pytest.raises(ValueError):
        JoinTree(db, [("S1", "S2")])


def test_join_tree_disconnected():
    db = Database(
        [
            Relation("R", (A("k", "key"), A("a"))),
            Relation("S", (A("k", "key"), A("b"))),
            Relation("T", (A("k", "key"), A("c"))),
            Relation("U", (A("k", "key"), A("d"))),
        ]
    )
    with pytest.raises(ValueError):
        JoinTree(db, [("R", "S"), ("R", "S"), ("T", "U")])


def test_join_tree_running_intersection_violated():
    # R(k,a) - M(j) - S(k,b): R and S share k but M does not contain it
    db = Database(
        [
            Relation("R", (A("k", "key"), A("j", "key"))),
            Relation("M", (A("j", "key"), A("l", "key"))),
            Relation("S", (A("k", "key"), A("l", "key"))),
        ]
    )
    with pytest.raises(ValueError):
        JoinTree(db, [("R", "M"), ("M", "S")])


def test_join_tree_edge_without_shared_keys():
    db = Database(
        [Relation("R", (A("k", "key"),)), Relation("S", (A("j", "key"),))]
    )
    with pytest.raises(ValueError):
        JoinTree(db, [("R", "S")])


def test_bfs_order_prefix_connected():
    db = _db_chain(6)
    t = JoinTree(db, [(f"S{k}", f"S{k+1}") for k in range(1, 5)])
    for root in t.nodes:
        order = t.bfs_order(root)
        assert order[0] == root
        seen = {order[0]}
        for n in order[1:]:
            assert any(m in seen for m in t.neighbors(n))
            seen.add(n)


def test_home_of_unique_child():
    db = _db_chain(5)
    t = JoinTree(db, [("S1", "S2"), ("S2", "S3"), ("S3", "S4")])
    assert t.home_of("X5", "S2", "S1") == "S3"
    with pytest.raises(KeyError):
        t.home_of("X2", "S2", "S1")  # X2 is local to S2, not below it


@pytest.mark.parametrize("name", sorted(all_datasets()))
def test_dataset_join_trees_valid(name):
    spec = all_datasets()[name]
    t = spec.tree()  # constructor validates
    assert set(t.nodes) == set(spec.db.relations)
    # every edge shares at least one key
    for a, b in t.edges:
        assert t.keys(a, b)


@pytest.mark.parametrize("name", sorted(all_datasets()))
def test_dataset_workload_attrs_exist(name):
    spec = all_datasets()[name]
    for a in (
        list(spec.cm_cats)
        + list(spec.mi_attrs)
        + list(spec.cube_dims)
        + list(spec.cube_measures)
        + ([spec.label] if spec.label else [])
    ):
        assert a in spec.db.attrs, a
    for c in spec.cm_cats + spec.mi_attrs + spec.cube_dims:
        assert spec.db.kind(c) == "cat", c
