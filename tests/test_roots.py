"""Find Roots layer tests, including the paper's Example 3.3: per-attribute
count queries over a chain of binary relations should be rooted at the
relation holding the group-by attribute, giving O(n) linear-size views."""
from __future__ import annotations

import pytest

from repro.core.expr import count
from repro.core.join_tree import JoinTree
from repro.core.query import Query
from repro.core.roots import choose_roots, single_root
from repro.core.schema import Attribute as A
from repro.core.schema import Database, Relation


def _chain(n: int) -> JoinTree:
    db = Database(
        [
            Relation(f"S{k}", (A(f"X{k}", "key"), A(f"X{k+1}", "key")))
            for k in range(1, n)
        ]
    )
    return JoinTree(db, [(f"S{k}", f"S{k+1}") for k in range(1, n - 1)])


def test_example_3_3_each_query_rooted_at_home():
    """Q_i(X_i; 1) gets a root containing X_i (paper §3.3)."""
    tree = _chain(6)
    queries = [Query(f"Q{i}", (f"X{i}",), (count(),)) for i in range(1, 7)]
    roots = choose_roots(tree, queries)
    for i in range(1, 7):
        root = roots[f"Q{i}"]
        assert f"X{i}" in tree.db.schema_of(root), (i, root)


def test_roots_cover_all_queries():
    tree = _chain(5)
    queries = [Query("a", (), (count(),)), Query("b", ("X3",), (count(),))]
    roots = choose_roots(tree, queries)
    assert set(roots) == {"a", "b"}
    assert all(r in tree.nodes for r in roots.values())


def test_no_groupby_ties_broken_by_size():
    tree = _chain(4)
    sizes = {"S1": 10, "S2": 1000, "S3": 10}
    roots = choose_roots(tree, [Query("q", (), (count(),))], sizes)
    assert roots["q"] == "S2"


def test_heaviest_relation_attracts_groupby_queries():
    tree = _chain(4)
    # two queries group by X2 (in S1 and S2), one by X3 (in S2 and S3):
    # S2 accumulates the largest weight and should root all three
    queries = [
        Query("q1", ("X2",), (count(),)),
        Query("q2", ("X2",), (count(),)),
        Query("q3", ("X3",), (count(),)),
    ]
    roots = choose_roots(tree, queries)
    assert roots == {"q1": "S2", "q2": "S2", "q3": "S2"}


def test_single_root_forces_one_root():
    tree = _chain(6)
    queries = [Query(f"Q{i}", (f"X{i}",), (count(),)) for i in range(1, 7)]
    roots = single_root(tree, queries)
    assert len(set(roots.values())) == 1


def test_multi_root_reduces_view_count_on_chain():
    """The paper's complexity argument: multi-root needs O(n) views on the
    chain, single-root O(n^2)."""
    from repro.core.views import ViewRegistry, decompose_query

    tree = _chain(8)
    queries = [Query(f"Q{i}", (f"X{i}",), (count(),)) for i in range(1, 9)]

    multi = choose_roots(tree, queries)
    reg_multi = ViewRegistry()
    for q in queries:
        decompose_query(q, multi[q.name], tree, reg_multi)

    uni = single_root(tree, queries)
    reg_uni = ViewRegistry()
    for q in queries:
        decompose_query(q, uni[q.name], tree, reg_uni)

    n_multi = sum(1 for v in reg_multi.views if not v.is_query)
    n_uni = sum(1 for v in reg_uni.views if not v.is_query)
    assert n_multi < n_uni


def test_root_weight_fraction_for_partial_groupby():
    # group-by spans two relations; either is an acceptable root, and the
    # chosen root must contain at least one group-by attribute
    tree = _chain(5)
    q = Query("q", ("X1", "X5"), (count(),))
    roots = choose_roots(tree, [q])
    root = roots["q"]
    assert {"X1", "X5"} & set(tree.db.schema_of(root))
