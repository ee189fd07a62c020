"""Table 2 benchmark: the LMFAO logical-optimizer cost (find roots →
pushdown → merge → group) per batch. Prints the A/I/V/G stats the paper
tables (recorded in EXPERIMENTS.md)."""
from __future__ import annotations

import pytest

from benchmarks.conftest import once
from repro.workloads import build_workload


@pytest.mark.parametrize("wl", ["cm", "rt", "mi", "dc"])
@pytest.mark.parametrize("name", ["favorita", "retailer"])
def test_compile_batch(benchmark, bench_data, name, wl):
    spec, relations, sizes, engine, pdfs = bench_data.get(name)
    queries = build_workload(spec, wl, relations)

    plan = once(benchmark, engine.compile, queries)
    s = plan.stats()
    print(f"[table2] {name} {wl.upper()}: {s}")
    assert s["V"] >= 1
