"""Table 1 benchmark: natural-join materialization cost per dataset — the
step every structure-agnostic competitor pays and LMFAO avoids."""
from __future__ import annotations

import pytest

from benchmarks.conftest import once
from repro.baselines.ml_baselines import materialize_join


@pytest.mark.parametrize("name", ["favorita", "retailer", "yelp", "tpcds"])
def test_join_materialization(benchmark, bench_data, spark, name):
    spec, relations, sizes, engine, pdfs = bench_data.get(name)

    def run():
        return materialize_join(spark, relations, spec.tree(), spec.fact).count()

    n = once(benchmark, run)
    assert n > 0
