"""Manual smoke test for applications (covar/linreg, dtree, mi, cube)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))
import conftest  # noqa: F401

import numpy as np
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke-apps")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.apps import cube as cube_app
from repro.apps import mi as mi_app
from repro.apps.covar import assemble_covar, covar_queries, design_matrix
from repro.apps.dtree import learn_tree
from repro.apps.linreg import learn_bgd, learn_closed_form
from repro.baselines.ml_baselines import (
    closed_form_materialized,
    materialize_join,
    one_hot,
    pandas_cart,
)
from repro.core import LMFAO
from repro.datasets import FAVORITA

spec = FAVORITA
tree = spec.tree()
rels = {n: df.cache() for n, df in spec.generate(spark, sf=0.003).items()}
sizes = {n: df.count() for n, df in rels.items()}
eng = LMFAO(tree, sizes)

# ---- covar + linreg --------------------------------------------------------
cont = ("txns", "price", "units")  # label units included
cats = ("promo", "family")
label = "units"
qs = covar_queries(cont, cats)
plan = eng.compile(qs)
print("covar stats:", plan.stats())
run = eng.run(spark, rels, plan)
results = {q.name: run.pandas(q.name) for q in qs}
run.cleanup()
cm = assemble_covar(results, cont, cats, label)
print("covar p =", cm.p, "n =", cm.n)

full = materialize_join(spark, rels, tree, spec.fact).toPandas()
X, y, cv = one_hot(full, cont, cats, label, cm.cat_values)
# check sigma against X^T X
feat = [i for i in range(cm.p) if i != cm.index[label]]
sxx = cm.sigma[np.ix_(feat, feat)]
err = np.abs(sxx - X.T @ X).max() / max(1.0, np.abs(sxx).max())
print("sigma vs XtX rel err:", err)
assert err < 1e-8, "covar mismatch"

m1 = learn_bgd(cm, label, lambda_=1e-3)
m2 = learn_closed_form(cm, label, lambda_=1e-3)
t3 = closed_form_materialized(X, y, lambda_=1e-3)
print("bgd iters:", m1.iterations)
print("theta diff closed vs materialized:", np.abs(m2.theta - t3).max())
assert np.abs(m2.theta - t3).max() < 1e-6
r1, r2 = m1.rmse(X, y), m2.rmse(X, y)
print("train rmse bgd vs closed:", r1, r2)
assert abs(r1 - r2) / max(r2, 1e-9) < 1e-4

# ---- decision tree ---------------------------------------------------------
dt = learn_tree(
    spark, rels, eng,
    cont=("txns", "price"), cats=("promo", "family"), label="units",
    kind="regression", max_depth=2, min_split=20, n_buckets=4,
)
print("tree nodes:", dt.n_nodes())
bl = pandas_cart(
    full, cont=("txns", "price"), cats=("promo", "family"), label="units",
    kind="regression", max_depth=2, min_split=20,
    thresholds={a: dt_t for a, dt_t in
                __import__("repro.apps.dtree", fromlist=["compute_thresholds"])
                .compute_thresholds(rels, tree.db, ("txns", "price"), 4).items()},
)
print("lmfao root split:", dt.root.split)
print("pandas root split:", bl[0]["split"])
assert dt.root.split == bl[0]["split"], "root split mismatch"

# ---- MI + chow-liu ---------------------------------------------------------
attrs = ("promo", "family", "perishable")
qs = mi_app.mi_queries(attrs)
plan = eng.compile(qs)
run = eng.run(spark, rels, plan)
res = {q.name: run.pandas(q.name) for q in qs}
run.cleanup()
mi = mi_app.mutual_information(res, attrs)
print("MI:", {k: round(v, 6) for k, v in mi.items()})
edges = mi_app.chow_liu_tree(mi, attrs)
print("chow-liu edges:", edges)

# direct check on materialized join
import math
def mi_direct(a, b):
    n = len(full)
    j = full.groupby([a, b]).size()
    ma = full.groupby(a).size()
    mb = full.groupby(b).size()
    s = 0.0
    for (va, vb), d in j.items():
        s += d / n * math.log(n * d / (ma[va] * mb[vb]))
    return s
for (a, b), v in mi.items():
    dv = mi_direct(a, b)
    assert abs(v - dv) < 1e-9, (a, b, v, dv)
print("MI matches direct computation")

# ---- cube ------------------------------------------------------------------
qs = cube_app.cube_queries(spec.cube_dims, spec.cube_measures)
plan = eng.compile(qs)
run = eng.run(spark, rels, plan)
res = {q.name: run.pandas(q.name) for q in qs}
run.cleanup()
cube = cube_app.assemble_cube(res, spec.cube_dims, spec.cube_measures)
print("cube rows:", len(cube))
# oracle: DuckDB GROUPING SETS over the materialized join
import duckdb
con = duckdb.connect()
con.register("joined", full)
d0, d1, d2 = spec.cube_dims
msql = ", ".join(
    f"SUM(CAST({m} AS DOUBLE)) AS m{i}" for i, m in enumerate(spec.cube_measures)
)
exp = con.execute(
    f"SELECT COALESCE({d0},-1) AS {d0}, COALESCE({d1},-1) AS {d1}, "
    f"COALESCE({d2},-1) AS {d2}, {msql} FROM joined GROUP BY CUBE({d0},{d1},{d2})"
).fetchdf()
import pandas as pd
a = cube.sort_values(list(cube.columns)).reset_index(drop=True)
b = exp[list(cube.columns)].sort_values(list(cube.columns)).reset_index(drop=True)
pd.testing.assert_frame_equal(a, b, check_dtype=False, atol=1e-6)
print("cube matches DuckDB CUBE")

print("APPS SMOKE OK")
spark.stop()
