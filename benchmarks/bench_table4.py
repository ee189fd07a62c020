"""Table 4 benchmark: end-to-end learning over Favorita/Retailer — LMFAO's
covar+BGD pipeline vs the materialize-then-learn proxies, and the regression
tree (LMFAO batches vs pandas CART over the materialized join)."""
from __future__ import annotations

import numpy as np
import pytest

from benchmarks.conftest import once
from repro.apps.covar import assemble_covar, covar_queries
from repro.apps.dtree import compute_thresholds, learn_tree
from repro.apps.linreg import learn_bgd
from repro.baselines.ml_baselines import (
    closed_form_materialized,
    gd_epochs,
    materialize_join,
    one_hot,
    pandas_cart,
)

DATASETS = ["favorita", "retailer"]


def _cfg(spec):
    cont = tuple(spec.db.attrs_of_kind("cont"))
    return cont, spec.cm_cats, spec.label


@pytest.mark.parametrize("name", DATASETS)
def test_linreg_lmfao(benchmark, bench_data, spark, name):
    spec, relations, sizes, engine, pdfs = bench_data.get(name)
    cont, cats, label = _cfg(spec)

    def run():
        queries = covar_queries(cont, cats)
        plan = engine.compile(queries)
        res = engine.run(spark, relations, plan)
        results = {q.name: res.pandas(q.name) for q in queries}
        res.cleanup()
        cm = assemble_covar(results, cont, cats, label)
        return learn_bgd(cm, label)

    model = once(benchmark, run)
    assert np.isfinite(model.theta).all()


@pytest.mark.parametrize("name", DATASETS)
def test_linreg_materialize_then_learn(benchmark, bench_data, spark, name):
    """The TensorFlow/MADlib pipeline shape: join + export + learn."""
    spec, relations, sizes, engine, pdfs = bench_data.get(name)
    cont, cats, label = _cfg(spec)

    def run():
        pdf = materialize_join(spark, relations, spec.tree(), spec.fact).toPandas()
        X, y, _ = one_hot(pdf, cont, cats, label)
        gd_epochs(X, y, epochs=1)  # TF proxy: one epoch
        return closed_form_materialized(X, y)  # MADlib proxy

    theta = once(benchmark, run)
    assert np.isfinite(theta).all()


@pytest.mark.parametrize("name", ["favorita"])
def test_regression_tree_lmfao(benchmark, bench_data, spark, name):
    spec, relations, sizes, engine, pdfs = bench_data.get(name)
    cont = spec.continuous_features()
    cats = spec.cm_cats
    thr = compute_thresholds(relations, spec.db, cont, 20)

    # depth 3 keeps the cell inside the benchmark budget; the paper's
    # depth-4 (31-node) run is jobs/table4_training.py
    def run():
        return learn_tree(
            spark, relations, engine, cont=cont, cats=cats, label=spec.label,
            kind="regression", max_depth=3, min_split=100, thresholds=thr,
        )

    dt = once(benchmark, run)
    assert dt.n_nodes() >= 3


@pytest.mark.parametrize("name", ["favorita"])
def test_regression_tree_materialized(benchmark, bench_data, spark, name):
    spec, relations, sizes, engine, pdfs = bench_data.get(name)
    cont = spec.continuous_features()
    cats = spec.cm_cats
    thr = compute_thresholds(relations, spec.db, cont, 20)
    pdf = materialize_join(spark, relations, spec.tree(), spec.fact).toPandas()

    def run():
        return pandas_cart(
            pdf, cont=cont, cats=cats, label=spec.label, kind="regression",
            max_depth=3, min_split=100, thresholds=thr,
        )

    nodes = once(benchmark, run)
    assert len(nodes) >= 3
