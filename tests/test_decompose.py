"""Aggregate Pushdown + Merge Views structural tests: the invariants the
executor's correctness argument rests on (one incoming view per edge, group-by
composition, interning/dedup behavior)."""
from __future__ import annotations

import pytest

from repro.core.expr import count, delta, fn, ident, sum_of
from repro.core.join_tree import JoinTree
from repro.core.query import Query
from repro.core.schema import Attribute as A
from repro.core.schema import Database, Relation
from repro.core.views import ViewRegistry, decompose_query
from repro.datasets import FAVORITA


def _tree():
    return FAVORITA.tree()


def test_query_view_outputs_named():
    reg = ViewRegistry()
    q = Query("q", ("family",), (count(), sum_of(ident("units"))), ("c", "s"))
    qv = decompose_query(q, "Sales", _tree(), reg)
    assert qv.is_query and qv.query_name == "q"
    assert [name for name, _ in qv.outputs] == ["c", "s"]
    assert qv.group_by == ("family",)


def test_one_incoming_view_per_edge():
    """The executor's fan-out-safety invariant."""
    reg = ViewRegistry()
    queries = [
        Query("a", ("family",), (count(),)),
        Query("b", ("city", "htype"), (sum_of(ident("units")),)),
        Query("c", (), (sum_of(fn("xy_plus1", "txns", "city")),)),
    ]
    for q in queries:
        decompose_query(q, "Sales", _tree(), reg)
    tree = _tree()
    for v in reg.views:
        # group incoming views by the edge (child source) they come from
        edges = [reg.views[w].source for w in v.incoming]
        assert len(edges) == len(set(edges)), f"view {v.vid} joins an edge twice"
        for w in v.incoming:
            assert reg.views[w].target == v.source


def test_views_in_dependency_order():
    reg = ViewRegistry()
    decompose_query(
        Query("q", ("family",), (count(),)), "Sales", _tree(), reg
    )
    for v in reg.views:
        assert all(w < v.vid for w in v.incoming)


def test_identical_queries_share_all_internal_views():
    """Merge case (3): the second query reuses every directional view."""
    reg = ViewRegistry()
    q1 = Query("q1", (), (sum_of(ident("price")),))
    q2 = Query("q2", (), (sum_of(ident("price")),))
    decompose_query(q1, "Sales", _tree(), reg)
    before = sum(1 for v in reg.views if not v.is_query)
    decompose_query(q2, "Sales", _tree(), reg)
    after = sum(1 for v in reg.views if not v.is_query)
    assert before == after


def test_same_body_merges_aggregates():
    """Merge case (2): same group-by+body, new aggregate appended."""
    reg = ViewRegistry()
    decompose_query(Query("q1", (), (sum_of(ident("price")),)), "Sales", _tree(), reg)
    n_views = sum(1 for v in reg.views if not v.is_query)
    atoms_before = sum(len(v.atoms) for v in reg.views if not v.is_query)
    decompose_query(
        Query("q2", (), (sum_of(fn("log1p", "price")),)), "Sales", _tree(), reg
    )
    assert sum(1 for v in reg.views if not v.is_query) == n_views
    atoms_after = sum(len(v.atoms) for v in reg.views if not v.is_query)
    assert atoms_after > atoms_before  # new partial added to an existing view


def test_atom_dedup_within_view():
    """Two aggregates with the same partial in a subtree share one slot."""
    reg = ViewRegistry()
    # both aggregates need only the count from the Items subtree
    q = Query("q", (), (sum_of(ident("units")), sum_of(ident("txns"))))
    decompose_query(q, "Sales", _tree(), reg)
    items_views = [
        v for v in reg.views if v.source == "Items" and not v.is_query
    ]
    assert len(items_views) == 1
    assert len(items_views[0].atoms) == 1  # the shared count partial


def test_merge_disabled_duplicates_views():
    reg = ViewRegistry(merge=False)
    q1 = Query("q1", (), (sum_of(ident("price")),))
    q2 = Query("q2", (), (sum_of(ident("price")),))
    decompose_query(q1, "Sales", _tree(), reg)
    n1 = sum(1 for v in reg.views if not v.is_query)
    decompose_query(q2, "Sales", _tree(), reg)
    n2 = sum(1 for v in reg.views if not v.is_query)
    assert n2 == 2 * n1


def test_groupby_bubbles_through_chain():
    """city lives in Stores; rooted at Sales the chain Stores->Transactions->
    Sales must expose it in every view on the path (paper §3.2 rule)."""
    reg = ViewRegistry()
    decompose_query(Query("q", ("city",), (count(),)), "Sales", _tree(), reg)
    t_view = [v for v in reg.views if v.source == "Transactions"][0]
    s_view = [v for v in reg.views if v.source == "Stores"][0]
    assert "city" in t_view.group_by
    assert "city" in s_view.group_by


def test_spanning_factor_bubbles_attrs():
    """h(txns, city) spans Transactions and Stores: evaluated at
    Transactions, with city bubbled from the Stores view."""
    reg = ViewRegistry()
    decompose_query(
        Query("q", (), (sum_of(fn("xy_plus1", "txns", "city")),)),
        "Sales",
        _tree(),
        reg,
    )
    s_view = [v for v in reg.views if v.source == "Stores"][0]
    assert "city" in s_view.group_by
    t_view = [v for v in reg.views if v.source == "Transactions"][0]
    assert any(
        f.kind == "fn" for a in t_view.atoms for f in a.local.factors
    ), "spanning factor must evaluate at Transactions"


def test_join_keys_always_in_view_groupby():
    reg = ViewRegistry()
    decompose_query(
        Query("q", ("family",), (sum_of(ident("price")),)), "Sales", _tree(), reg
    )
    tree = _tree()
    for v in reg.views:
        if v.is_query:
            continue
        keys = set(tree.keys(v.source, v.target))
        assert keys <= set(v.group_by)


def test_unknown_attr_rejected():
    reg = ViewRegistry()
    with pytest.raises(KeyError):
        decompose_query(
            Query("q", ("nope",), (count(),)), "Sales", _tree(), reg
        )


def test_delta_factor_pushed_to_home_relation():
    """A split condition on price (an Oil attribute) becomes a local factor
    of the Oil-edge view, not of the root."""
    reg = ViewRegistry()
    qv = decompose_query(
        Query("q", (), (sum_of(delta("price", "<=", 50.0)),)),
        "Sales",
        _tree(),
        reg,
    )
    # price's delta must not appear at the root
    for atom in qv.atoms:
        assert all(f.kind != "delta" for f in atom.local.factors)
    oil_or_items = [
        v
        for v in reg.views
        if not v.is_query
        and any(f.kind == "delta" for a in v.atoms for f in a.local.factors)
    ]
    assert {v.source for v in oil_or_items} == {"Oil"}
