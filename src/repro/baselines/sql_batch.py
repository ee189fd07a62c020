"""Per-query Spark SQL baseline: the "no sharing" comparator.

Executes each query of a batch as an independent Spark SQL statement over
the NATURAL JOIN of all relations — the same query list the paper hands to
DBX and MonetDB. Running on the same engine as LMFAO-on-Spark makes this the
apples-to-apples measurement of what the sharing layers buy.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.join_tree import JoinTree
from repro.core.query import Query
from repro.core.sql import render_query_sql


def run_per_query_spark(
    spark: SparkSession,
    relations: dict[str, DataFrame],
    tree: JoinTree,
    queries: list[Query],
) -> dict[str, pd.DataFrame]:
    """Run each query independently; returns collected results by name."""
    for name, df in relations.items():
        df.createOrReplaceTempView(name)
    out: dict[str, pd.DataFrame] = {}
    for q in queries:
        out[q.name] = spark.sql(render_query_sql(tree, q)).toPandas()
    return out
