"""Benchmark fixtures: warm, cached datasets at the benchmark scale factor.

REPRO_BENCH_SF (default 0.05 ≈ 30k fact rows) controls scale. Every cell is
measured as a single pedantic round on a warm cache — the laptop-scale analog
of the paper's warm-cache averaging protocol.
"""
from __future__ import annotations

import pytest
from pyspark.sql import SparkSession

from repro.core.engine import LMFAO
from repro.datasets import all_datasets
from repro.harness import BENCH_SF, load_dataset


@pytest.fixture(scope="session", autouse=True)
def _tune_spark(spark: SparkSession):
    spark.sparkContext.setLogLevel("ERROR")
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    return spark


class BenchData:
    """Lazy per-dataset cache shared across benchmark modules."""

    def __init__(self, spark: SparkSession):
        self.spark = spark
        self._cache: dict[str, tuple] = {}

    def get(self, name: str):
        if name not in self._cache:
            spec = all_datasets()[name]
            relations, sizes = load_dataset(self.spark, spec, BENCH_SF)
            engine = LMFAO(spec.tree(), sizes)
            pdfs = {n: df.toPandas() for n, df in relations.items()}
            self._cache[name] = (spec, relations, sizes, engine, pdfs)
        return self._cache[name]


@pytest.fixture(scope="session")
def bench_data(spark, _tune_spark) -> BenchData:
    return BenchData(spark)


def once(benchmark, fn, *args, **kwargs):
    """Run a cell exactly once under pytest-benchmark (cells are seconds-to-
    minutes long; multi-round timing would dominate the session budget)."""
    return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)
