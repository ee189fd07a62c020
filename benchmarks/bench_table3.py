"""Table 3 benchmark: aggregate-batch time, LMFAO vs per-query Spark SQL
(DBX role) vs per-query DuckDB (MonetDB role).

The full 4-dataset x 5-workload grid is produced by
``jobs/table3_aggregate_batches.py``; this benchmark re-times the
representative cells (all workloads on Favorita+Retailer, CM on Yelp+TPC-DS)
under pytest-benchmark so regressions show up in CI-style runs.
"""
from __future__ import annotations

import pytest

from benchmarks.conftest import once
from repro.baselines.duckdb_batch import run_per_query_duckdb
from repro.baselines.sql_batch import run_per_query_spark
from repro.workloads import build_workload

CELLS = [
    *[("favorita", wl) for wl in ("count", "cm", "rt", "mi", "dc")],
    *[("retailer", wl) for wl in ("count", "cm", "dc")],
    ("yelp", "cm"),
    ("tpcds", "cm"),
]


def _queries(bench_data, name, wl):
    spec, relations, sizes, engine, pdfs = bench_data.get(name)
    return spec, relations, engine, pdfs, build_workload(spec, wl, relations)


@pytest.mark.parametrize("name,wl", CELLS, ids=[f"{d}-{w}" for d, w in CELLS])
def test_lmfao(benchmark, bench_data, spark, name, wl):
    spec, relations, engine, pdfs, queries = _queries(bench_data, name, wl)

    def run():
        plan = engine.compile(queries)
        res = engine.run(spark, relations, plan)
        res.cleanup()
        return plan

    plan = once(benchmark, run)
    assert plan.stats()["A"] >= 1


@pytest.mark.parametrize("name,wl", CELLS, ids=[f"{d}-{w}" for d, w in CELLS])
def test_spark_per_query(benchmark, bench_data, spark, name, wl):
    spec, relations, engine, pdfs, queries = _queries(bench_data, name, wl)
    out = once(
        benchmark, run_per_query_spark, spark, relations, spec.tree(), queries
    )
    assert len(out) == len(queries)


@pytest.mark.parametrize("name,wl", CELLS, ids=[f"{d}-{w}" for d, w in CELLS])
def test_duckdb_per_query(benchmark, bench_data, name, wl):
    spec, relations, engine, pdfs, queries = _queries(bench_data, name, wl)
    out = once(benchmark, run_per_query_duckdb, pdfs, spec.tree(), queries)
    assert len(out) == len(queries)
