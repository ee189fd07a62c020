"""Batch query representation (paper §1.1 / §2 form (1)).

``Q(F1..Ff; alpha1..alphal) += R1(w1), ..., Rm(wm)`` — group-by attributes
plus a tuple of SUM-of-product aggregates over the natural join of all
database relations. A *batch* is simply a list of Query objects; LMFAO
compiles the whole batch together so views are shared across queries.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.expr import SumProduct


@dataclass(frozen=True)
class Query:
    """One group-by aggregate query in a batch.

    ``agg_names`` name the output columns (defaulted to ``agg0..aggN``); they
    are used verbatim in the engine output, the rendered SQL, and the oracle,
    so results compare column-for-column.
    """

    name: str
    group_by: tuple[str, ...]
    aggregates: tuple[SumProduct, ...]
    agg_names: tuple[str, ...] = field(default=())

    def __post_init__(self) -> None:
        if not self.aggregates:
            raise ValueError("query needs at least one aggregate")
        if len(set(self.group_by)) != len(self.group_by):
            raise ValueError("duplicate group-by attribute")
        if not self.agg_names:
            object.__setattr__(
                self,
                "agg_names",
                tuple(f"agg{i}" for i in range(len(self.aggregates))),
            )
        if len(self.agg_names) != len(self.aggregates):
            raise ValueError("agg_names and aggregates length mismatch")
        if len(set(self.agg_names)) != len(self.agg_names):
            raise ValueError("duplicate aggregate names")
        if set(self.group_by) & set(self.agg_names):
            raise ValueError("aggregate names collide with group-by attrs")

    @property
    def n_aggregates(self) -> int:
        return len(self.aggregates)

    @property
    def referenced_attrs(self) -> frozenset[str]:
        out = frozenset(self.group_by)
        for a in self.aggregates:
            out |= a.attrs
        return out
