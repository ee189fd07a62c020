"""Comparator systems (paper §4): per-query engines and materialize-then-learn
ML pipelines. See DESIGN.md for the stand-in mapping (DBX/MonetDB -> per-query
Spark SQL / DuckDB; TensorFlow/MADlib/R -> numpy/pandas over the materialized
join)."""
