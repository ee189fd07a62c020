"""LMFAO core: the layered batch-aggregate optimizer and executor.

Layers (paper Figure 1) map to modules:

- ``expr``       aggregate language (sums of products of functions)
- ``schema``     database catalog
- ``join_tree``  Join Tree layer
- ``roots``      Find Roots layer
- ``views``      Aggregate Pushdown + Merge Views layers
- ``group``      Group Views layer (+ dependency graph of groups)
- ``executor``   Multi-Output execution + Parallelization layers
- ``engine``     facade: compile a batch into a Plan, run it on Spark
- ``sql``        portable SQL rendering (baselines + DuckDB oracle)
"""
from repro.core.engine import LMFAO, Plan  # noqa: F401
from repro.core.expr import Factor, Product, SumProduct  # noqa: F401
from repro.core.join_tree import JoinTree  # noqa: F401
from repro.core.query import Query  # noqa: F401
from repro.core.schema import Attribute, Database, Relation  # noqa: F401
