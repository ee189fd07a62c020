"""Table 5 benchmark: classification tree (gini) over TPC-DS predicting the
preferred-customer flag — LMFAO aggregate batches vs pandas CART over the
materialized join. Depth 2 here keeps the cell in the benchmark budget; the
full depth-4 run is jobs/table5_classification.py."""
from __future__ import annotations

import pytest

from benchmarks.conftest import once
from repro.apps.dtree import compute_thresholds, learn_tree
from repro.baselines.ml_baselines import materialize_join, pandas_cart


@pytest.fixture(scope="module")
def tpcds_setup(bench_data, spark):
    spec, relations, sizes, engine, pdfs = bench_data.get("tpcds")
    cont = spec.continuous_features()
    cats = tuple(c for c in spec.cm_cats if c != spec.label)
    thr = compute_thresholds(relations, spec.db, cont, 10)
    return spec, relations, engine, cont, cats, thr


def test_classification_tree_lmfao(benchmark, tpcds_setup, spark):
    spec, relations, engine, cont, cats, thr = tpcds_setup

    def run():
        return learn_tree(
            spark, relations, engine, cont=cont, cats=cats, label=spec.label,
            kind="classification", max_depth=2, min_split=100, thresholds=thr,
        )

    dt = once(benchmark, run)
    assert dt.n_nodes() >= 1


def test_classification_tree_materialized(benchmark, tpcds_setup, spark):
    spec, relations, engine, cont, cats, thr = tpcds_setup
    pdf = materialize_join(spark, relations, spec.tree(), spec.fact).toPandas()

    def run():
        return pandas_cart(
            pdf, cont=cont, cats=cats, label=spec.label, kind="classification",
            max_depth=2, min_split=100, thresholds=thr,
        )

    nodes = once(benchmark, run)
    assert len(nodes) >= 1
