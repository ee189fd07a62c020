"""Manual smoke test for the core engine (not a pytest test)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))
import conftest  # noqa: F401  sets PYSPARK_SUBMIT_ARGS

from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.core import LMFAO, Query
from repro.core.expr import count, delta, fn, ident, power, sum_of
from repro.core.sql import render_query_sql
from repro.datasets import FAVORITA
from repro.oracle import assert_equivalent

spec = FAVORITA
tree = spec.tree()
rels = spec.generate(spark, sf=0.003, seed=0)
for n, df in rels.items():
    rels[n] = df.cache()
    print(n, rels[n].count())

queries = [
    Query("q_count", (), (count(),)),
    Query("q1", (), (sum_of(fn("log1p", "units"), fn("log1p", "price")),)),
    Query("q2", ("family",), (sum_of(fn("log1p", "price")),)),
    Query("q3", ("family",), (sum_of(fn("xy_plus1", "txns", "city")),)),
    Query("q4", ("city", "htype"), (count(), sum_of(ident("units")), sum_of(power("units", 2)))),
    Query("q5", (), (sum_of(delta("units", "<=", 5), ident("price")),)),
]
sizes = {n: rels[n].count() for n in rels}
eng = LMFAO(tree, sizes)
plan = eng.compile(queries)
print("roots:", plan.roots)
print("stats:", plan.stats())
res = eng.run(spark, rels, plan)
for q in queries:
    sql = render_query_sql(tree, q)
    print("checking", q.name, "::", sql[:120])
    assert_equivalent(res[q.name], sql, **rels)
print("SMOKE OK")
res.cleanup()
spark.stop()
