"""Decision-tree tests: the LMFAO CART (aggregates over the input database)
must build the SAME tree as CART over the materialized join (pandas oracle),
for both regression (variance) and classification (gini) — the paper's
accuracy-parity claim for Tables 4-5."""
from __future__ import annotations

import numpy as np
import pytest

from repro.apps.dtree import (
    DecisionTree,
    compute_thresholds,
    learn_tree,
)
from repro.baselines.ml_baselines import pandas_cart


def _tree_paths(tree: DecisionTree) -> dict[str, tuple]:
    """Map root-to-node path strings to splits for structural comparison."""
    out = {}

    def rec(node, path):
        out[path] = node.split
        if node.split is not None:
            rec(node.left, path + "L")
            rec(node.right, path + "R")

    rec(tree.root, "")
    return out


def _baseline_paths(nodes: list[dict]) -> dict[str, tuple]:
    return {n["path"]: n["split"] for n in nodes}


REG_CONFIGS = {
    "favorita": (("txns", "price"), ("promo", "family"), "units"),
    "retailer": (("price", "mxtemp"), ("rain", "category"), "inventoryunits"),
    "yelp": (("u_fans", "b_stars"), ("b_open", "u_elite"), "rstars"),
}


@pytest.mark.parametrize("name", sorted(REG_CONFIGS))
def test_regression_tree_matches_pandas_cart(spark, data, name):
    bundle = data[name]
    cont, cats, label = REG_CONFIGS[name]
    thr = compute_thresholds(bundle.relations, bundle.spec.db, cont, 4)
    kw = dict(cont=cont, cats=cats, label=label, kind="regression",
              max_depth=2, min_split=30)
    dt = learn_tree(spark, bundle.relations, bundle.engine, thresholds=thr, **kw)
    bl = pandas_cart(bundle.joined, thresholds=thr, **kw)
    got, exp = _tree_paths(dt), _baseline_paths(bl)
    assert set(got) == set(exp), "tree shapes differ"
    for path in exp:
        assert got[path] == exp[path], f"split at {path!r} differs"


def test_classification_tree_matches_pandas_cart(spark, data):
    bundle = data["tpcds"]
    cont = ("c_birth_year", "ss_quantity")
    cats = ("cd_gender", "cd_marital")
    label = "c_preferred"
    thr = compute_thresholds(bundle.relations, bundle.spec.db, cont, 4)
    kw = dict(cont=cont, cats=cats, label=label, kind="classification",
              max_depth=2, min_split=30)
    dt = learn_tree(spark, bundle.relations, bundle.engine, thresholds=thr, **kw)
    bl = pandas_cart(bundle.joined, thresholds=thr, **kw)
    got, exp = _tree_paths(dt), _baseline_paths(bl)
    assert set(got) == set(exp)
    for path in exp:
        assert got[path] == exp[path], f"split at {path!r} differs"


def test_predictions_match_leaf_means(spark, favorita):
    cont, cats, label = REG_CONFIGS["favorita"]
    dt = learn_tree(
        spark, favorita.relations, favorita.engine,
        cont=cont, cats=cats, label=label, kind="regression",
        max_depth=2, min_split=30, n_buckets=4,
    )
    pdf = favorita.joined
    pred = dt.predict(pdf)
    # group rows by predicted leaf value; each group's label mean must equal
    # the prediction (leaf prediction == mean of its fragment)
    for v in np.unique(pred):
        frag = pdf[pred == v][label].to_numpy(dtype=float)
        assert abs(frag.mean() - v) < 1e-9


def test_tree_respects_max_depth_and_node_budget(spark, favorita):
    cont, cats, label = REG_CONFIGS["favorita"]
    for depth, max_nodes in [(1, 3), (2, 7), (3, 15)]:
        dt = learn_tree(
            spark, favorita.relations, favorita.engine,
            cont=cont, cats=cats, label=label, kind="regression",
            max_depth=depth, min_split=10, n_buckets=3,
        )
        assert dt.n_nodes() <= max_nodes


def test_min_split_prunes(spark, favorita):
    cont, cats, label = REG_CONFIGS["favorita"]
    dt = learn_tree(
        spark, favorita.relations, favorita.engine,
        cont=cont, cats=cats, label=label, kind="regression",
        max_depth=3, min_split=10**9, n_buckets=3,
    )
    assert dt.n_nodes() == 1  # nothing is splittable


def test_classification_prediction_accuracy_vs_baseline(spark, data):
    """Predicted classes must coincide with the pandas tree's predictions."""
    bundle = data["tpcds"]
    cont = ("c_birth_year",)
    cats = ("cd_marital",)
    label = "c_preferred"
    thr = compute_thresholds(bundle.relations, bundle.spec.db, cont, 3)
    kw = dict(cont=cont, cats=cats, label=label, kind="classification",
              max_depth=2, min_split=30)
    dt = learn_tree(spark, bundle.relations, bundle.engine, thresholds=thr, **kw)
    pred = dt.predict(bundle.joined)
    acc = (pred == bundle.joined[label].to_numpy()).mean()
    # tree must beat always-majority baseline or match it
    maj = bundle.joined[label].value_counts(normalize=True).max()
    assert acc >= maj - 1e-9


def test_variance_identity():
    from repro.apps.dtree import _variance

    rng = np.random.default_rng(0)
    x = rng.normal(3, 2, 100)
    v = _variance(len(x), x.sum(), (x**2).sum())
    assert abs(v - ((x - x.mean()) ** 2).sum()) < 1e-8


def test_gini_identity():
    from repro.apps.dtree import _gini_cost

    counts = np.array([30.0, 10.0, 60.0])
    n = counts.sum()
    expected = n * (1 - ((counts / n) ** 2).sum())
    assert abs(_gini_cost(counts) - expected) < 1e-12
    assert _gini_cost(np.zeros(3)) == 0.0
