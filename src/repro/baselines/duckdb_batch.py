"""Per-query DuckDB baseline: the in-memory columnar DBMS comparator
(MonetDB stand-in). Each query of the batch runs as an independent SQL
statement over the registered input relations; DuckDB plans the join itself.
"""
from __future__ import annotations

import duckdb
import pandas as pd

from repro.core.join_tree import JoinTree
from repro.core.query import Query
from repro.core.sql import render_query_sql


def run_per_query_duckdb(
    relations: dict[str, pd.DataFrame],
    tree: JoinTree,
    queries: list[Query],
) -> dict[str, pd.DataFrame]:
    """Run each query in DuckDB; relations are pandas frames (pre-loaded, so
    timing excludes load, matching the paper's warm-cache protocol)."""
    con = duckdb.connect()
    try:
        for name, pdf in relations.items():
            con.register(name, pdf)
        out: dict[str, pd.DataFrame] = {}
        for q in queries:
            out[q.name] = con.execute(render_query_sql(tree, q)).fetchdf()
        return out
    finally:
        con.close()
