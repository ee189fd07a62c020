"""Workload-builder tests: batch sizes follow the paper's closed forms
(§2 "Applications need a large number of aggregates") and every workload
compiles into a plan with the Table-2 consolidation shape."""
from __future__ import annotations

import pytest

from repro.apps.covar import n_covar_aggregates
from repro.workloads import WORKLOADS, build_workload


def test_count_workload_single_query(favorita):
    qs = build_workload(favorita.spec, "count")
    assert len(qs) == 1 and qs[0].n_aggregates == 1


@pytest.mark.parametrize("name", ["favorita", "retailer", "yelp", "tpcds"])
def test_cm_aggregate_count_formula(name, data):
    spec = data[name].spec
    qs = build_workload(spec, "cm")
    n_cont = len(spec.db.attrs_of_kind("cont"))
    n_cat = len(spec.cm_cats)
    total = sum(q.n_aggregates for q in qs)
    assert total == n_covar_aggregates(n_cont, n_cat)
    assert len(qs) == 1 + n_cat + n_cat * (n_cat - 1) // 2


@pytest.mark.parametrize("name", ["favorita", "retailer", "yelp", "tpcds"])
def test_mi_query_count(name, data):
    spec = data[name].spec
    qs = build_workload(spec, "mi")
    n = len(spec.mi_attrs)
    assert len(qs) == 1 + n + n * (n - 1) // 2
    assert all(q.n_aggregates == 1 for q in qs)


@pytest.mark.parametrize("name", ["favorita", "retailer", "yelp", "tpcds"])
def test_dc_counts(name, data):
    """2^d group-by sets x v measures (paper: 40 aggregates for d=3, v=5)."""
    spec = data[name].spec
    qs = build_workload(spec, "dc")
    d, v = len(spec.cube_dims), len(spec.cube_measures)
    assert len(qs) == 2**d
    assert sum(q.n_aggregates for q in qs) == 2**d * v


def test_rt_aggregate_count(favorita):
    """d*n*(p+1)*c shape: 3 aggregates per (continuous attr, bucket) plus the
    node totals plus 3 per categorical attr (regression => p=2)."""
    spec = favorita.spec
    qs = build_workload(spec, "rt", favorita.relations, n_buckets=5)
    num = next(q for q in qs if q.name.endswith("_num"))
    n_thr = (num.n_aggregates - 3) // 3
    assert 1 <= n_thr <= len(spec.continuous_features()) * 5
    assert len(qs) == 1 + len(spec.cm_cats)


def test_rt_needs_relations(favorita):
    with pytest.raises(AssertionError):
        build_workload(favorita.spec, "rt")


def test_unknown_workload_rejected(favorita):
    with pytest.raises(ValueError):
        build_workload(favorita.spec, "bogus")


@pytest.mark.parametrize("wl", [w for w in WORKLOADS if w != "rt"])
@pytest.mark.parametrize("name", ["favorita", "retailer", "yelp", "tpcds"])
def test_workloads_compile(name, wl, data):
    """Every (dataset, workload) cell of Tables 2/3 compiles into a plan with
    far fewer views than the naive aggregates-times-edges bound."""
    bundle = data[name]
    qs = build_workload(bundle.spec, wl)
    plan = bundle.engine.compile(qs)
    s = plan.stats()
    n_edges = len(bundle.spec.tree().edges)
    assert s["V"] <= max(n_edges, s["A"] * n_edges)
    if s["A"] > 5:
        assert s["V"] < s["A"] * n_edges / 2, "consolidation too weak"


@pytest.mark.parametrize("name", ["favorita", "retailer", "yelp", "tpcds"])
def test_rt_workload_compiles(name, data):
    bundle = data[name]
    qs = build_workload(bundle.spec, "rt", bundle.relations, n_buckets=3)
    plan = bundle.engine.compile(qs)
    assert plan.stats()["A"] > 10
