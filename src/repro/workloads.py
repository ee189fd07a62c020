"""The paper's four aggregate-batch workloads (§4.1), per dataset.

Builds the exact query batches used in Tables 2 and 3: covar matrix (CM),
one regression-tree node (RT), pairwise mutual information (MI), and a
3-dimensional data cube with 5 measures (DC) — plus the count query used as
the sharing yardstick.
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from repro.apps.covar import covar_queries
from repro.apps.cube import cube_queries
from repro.apps.dtree import Node, compute_thresholds, node_queries
from repro.apps.mi import mi_queries
from repro.core.expr import count
from repro.core.query import Query
from repro.datasets.common import DatasetSpec

WORKLOADS = ("count", "cm", "rt", "mi", "dc")


def build_workload(
    spec: DatasetSpec,
    workload: str,
    relations: dict[str, DataFrame] | None = None,
    *,
    n_buckets: int = 20,
) -> list[Query]:
    """Queries for one (dataset, workload) cell.

    ``relations`` is only needed for RT (split thresholds come from data
    quantiles, as the paper provides 20 buckets per continuous attribute to
    all systems).
    """
    if workload == "count":
        return [Query("count", (), (count(),))]
    if workload == "cm":
        cont = tuple(spec.db.attrs_of_kind("cont"))  # label included
        return covar_queries(cont, spec.cm_cats)
    if workload == "rt":
        assert relations is not None, "RT workload needs relations for buckets"
        cont = spec.continuous_features()
        cats = tuple(c for c in spec.cm_cats if c != spec.label)
        thresholds = compute_thresholds(relations, spec.db, cont, n_buckets)
        kind = "classification" if spec.db.kind(spec.label) == "cat" else "regression"
        return node_queries(
            Node(0, (), 0), cont, cats, spec.label, thresholds, kind
        )
    if workload == "mi":
        return mi_queries(spec.mi_attrs)
    if workload == "dc":
        return cube_queries(spec.cube_dims, spec.cube_measures)
    raise ValueError(f"unknown workload {workload!r}")
