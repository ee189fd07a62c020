"""Baseline tests: the per-query Spark and DuckDB comparators must return the
same results as the LMFAO engine (three-way agreement on the Table-3
workloads), and the materialize-then-learn helpers must behave."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.baselines.duckdb_batch import run_per_query_duckdb
from repro.baselines.ml_baselines import gd_epochs, materialize_join, one_hot
from repro.baselines.sql_batch import run_per_query_spark
from repro.workloads import build_workload
from tests.conftest import run_batch


def _canon(pdf: pd.DataFrame) -> pd.DataFrame:
    pdf = pdf[sorted(pdf.columns)].astype(float)
    return pdf.sort_values(list(pdf.columns)).reset_index(drop=True).round(6)


@pytest.mark.parametrize("wl", ["count", "mi", "dc"])
@pytest.mark.parametrize("name", ["favorita", "yelp"])
def test_three_way_agreement(spark, data, name, wl):
    bundle = data[name]
    queries = build_workload(bundle.spec, wl)
    lmfao, _ = run_batch(spark, bundle, queries)
    spark_pq = run_per_query_spark(spark, bundle.relations, bundle.spec.tree(), queries)
    duck_pq = run_per_query_duckdb(bundle.pandas, bundle.spec.tree(), queries)
    for q in queries:
        a, b, c = _canon(lmfao[q.name]), _canon(spark_pq[q.name]), _canon(duck_pq[q.name])
        pd.testing.assert_frame_equal(a, b, check_dtype=False)
        pd.testing.assert_frame_equal(a, c, check_dtype=False)


def test_cm_agreement_small(spark, favorita):
    from repro.apps.covar import covar_queries

    queries = covar_queries(("txns", "units"), ("promo",))
    lmfao, _ = run_batch(spark, favorita, queries)
    duck_pq = run_per_query_duckdb(favorita.pandas, favorita.spec.tree(), queries)
    for q in queries:
        pd.testing.assert_frame_equal(
            _canon(lmfao[q.name]), _canon(duck_pq[q.name]), check_dtype=False
        )


def test_materialize_join_matches_duckdb(spark, favorita):
    got = materialize_join(
        spark, favorita.relations, favorita.spec.tree(), "Sales"
    ).count()
    import duckdb

    con = duckdb.connect()
    try:
        for n, pdf in favorita.pandas.items():
            con.register(n, pdf)
        exp = con.execute(
            "SELECT COUNT(*) FROM Sales NATURAL JOIN Transactions "
            "NATURAL JOIN Items NATURAL JOIN Stores NATURAL JOIN Oil "
            "NATURAL JOIN Holiday"
        ).fetchone()[0]
    finally:
        con.close()
    assert got == exp


def test_gd_epochs_monotone_improvement(favorita):
    X, y, _ = one_hot(
        favorita.joined, ("txns", "price", "units"), ("promo",), "units"
    )
    prev = np.inf
    for e in (1, 5, 25):
        t = gd_epochs(X, y, epochs=e)
        r = float(np.sqrt(np.mean((X @ t - y) ** 2)))
        assert r <= prev + 1e-9
        prev = r


def test_per_query_spark_handles_rt(spark, favorita):
    queries = build_workload(favorita.spec, "rt", favorita.relations, n_buckets=2)
    lmfao, _ = run_batch(spark, favorita, queries)
    duck_pq = run_per_query_duckdb(favorita.pandas, favorita.spec.tree(), queries)
    for q in queries:
        pd.testing.assert_frame_equal(
            _canon(lmfao[q.name]), _canon(duck_pq[q.name]), check_dtype=False
        )
