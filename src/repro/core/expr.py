"""Aggregate-function language: sums of products of functions (paper §1.1).

LMFAO aggregates are ``alpha = sum_j prod_k f_jk`` where each ``f`` is a
function of zero or more attributes. The factors needed by the paper's
applications are:

- ``const(c)``          nullary constant (``f() = c``)
- ``ident(x)``          identity (``SUM(x)``)
- ``power(x, k)``       monomial ``x**k`` (covar / polynomial regression)
- ``delta(x, op, t)``   Kronecker delta ``1_{x op t}`` (decision-tree splits)
- ``fn(name, *attrs)``  named n-ary function from ``FN_REGISTRY`` (UDAFs such
  as ``g(price)`` in the paper's running example)

Every factor renders three ways so the engine, the per-query SQL baselines,
the DuckDB oracle, and the numpy ML baselines all evaluate *the same*
function: ``to_spark()`` (Catalyst Column), ``to_sql()`` (portable SQL that
runs in both Spark SQL and DuckDB), and ``to_numpy()`` (vectorized callable
over a pandas DataFrame).
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F

_OPS = {"<", "<=", ">", ">=", "==", "!="}
_SQL_OPS = {"<": "<", "<=": "<=", ">": ">", ">=": ">=", "==": "=", "!=": "<>"}
_NP_OPS = {
    "<": np.less,
    "<=": np.less_equal,
    ">": np.greater,
    ">=": np.greater_equal,
    "==": np.equal,
    "!=": np.not_equal,
}


@dataclass(frozen=True)
class _Fn:
    """A named scalar function with one renderer per evaluation substrate."""

    arity: int
    spark: Callable[..., Column]
    sql: str  # format template, {0}, {1}, ... are the SQL column names
    numpy: Callable[..., np.ndarray]


#: Named UDAF building blocks. All are expressible in Catalyst (no Python
#: UDFs) so the engine stays whole-stage-codegen'd, and each has an exact
#: DuckDB-compatible SQL rendering for the oracle.
FN_REGISTRY: dict[str, _Fn] = {
    # g(price)-style smooth unary transforms. log1p is taken of |x| so the
    # function is total — DuckDB raises on LN of a negative argument.
    "log1p": _Fn(
        1,
        lambda c: F.log1p(F.abs(c)),
        "LN(1 + ABS({0}))",
        lambda x: np.log1p(np.abs(x)),
    ),
    "sqrt_abs": _Fn(
        1, lambda c: F.sqrt(F.abs(c)), "SQRT(ABS({0}))", lambda x: np.sqrt(np.abs(x))
    ),
    # h(date, family)-style binary interaction spanning two relations
    "xy_plus1": _Fn(
        2,
        lambda a, b: a * b + F.lit(1.0),
        "({0} * {1} + 1.0)",
        lambda a, b: a * b + 1.0,
    ),
}


@dataclass(frozen=True)
class Factor:
    """One function in a product. ``kind`` selects the semantics.

    ``attrs`` are the attribute names the function reads (possibly empty for
    constants); ``params`` carries kind-specific extras and must stay
    hashable because factor signatures drive view/aggregate dedup.
    """

    kind: str
    attrs: tuple[str, ...] = ()
    params: tuple = ()

    def __post_init__(self) -> None:
        if self.kind not in {"const", "id", "pow", "delta", "fn"}:
            raise ValueError(f"unknown factor kind {self.kind!r}")

    # -- renderers --------------------------------------------------------
    def to_spark(self) -> Column:
        if self.kind == "const":
            return F.lit(float(self.params[0]))
        if self.kind == "id":
            return F.col(self.attrs[0]).cast("double")
        if self.kind == "pow":
            k = int(self.params[0])
            c = F.col(self.attrs[0]).cast("double")
            out = c
            for _ in range(k - 1):
                out = out * c
            return out
        if self.kind == "delta":
            op, t = self.params
            c = F.col(self.attrs[0])
            lit = F.lit(t)
            cond = {
                "<": c < lit,
                "<=": c <= lit,
                ">": c > lit,
                ">=": c >= lit,
                "==": c == lit,
                "!=": c != lit,
            }[op]
            return F.when(cond, F.lit(1.0)).otherwise(F.lit(0.0))
        fn = FN_REGISTRY[self.params[0]]
        return fn.spark(*[F.col(a).cast("double") for a in self.attrs])

    def to_sql(self) -> str:
        if self.kind == "const":
            return repr(float(self.params[0]))
        if self.kind == "id":
            return f"CAST({self.attrs[0]} AS DOUBLE)"
        if self.kind == "pow":
            k = int(self.params[0])
            term = f"CAST({self.attrs[0]} AS DOUBLE)"
            return "(" + " * ".join([term] * k) + ")"
        if self.kind == "delta":
            op, t = self.params
            lit = repr(t) if not isinstance(t, bool) else str(t).upper()
            return (
                f"(CASE WHEN {self.attrs[0]} {_SQL_OPS[op]} {lit} "
                "THEN 1.0 ELSE 0.0 END)"
            )
        fn = FN_REGISTRY[self.params[0]]
        args = [f"CAST({a} AS DOUBLE)" for a in self.attrs]
        return "(" + fn.sql.format(*args) + ")"

    def to_numpy(self, pdf: pd.DataFrame) -> np.ndarray:
        if self.kind == "const":
            return np.full(len(pdf), float(self.params[0]))
        if self.kind == "id":
            return pdf[self.attrs[0]].to_numpy(dtype=float)
        if self.kind == "pow":
            return pdf[self.attrs[0]].to_numpy(dtype=float) ** int(self.params[0])
        if self.kind == "delta":
            op, t = self.params
            return _NP_OPS[op](pdf[self.attrs[0]].to_numpy(), t).astype(float)
        fn = FN_REGISTRY[self.params[0]]
        return np.asarray(
            fn.numpy(*[pdf[a].to_numpy(dtype=float) for a in self.attrs]), dtype=float
        )

    def __repr__(self) -> str:  # compact, used in plan dumps
        if self.kind == "const":
            return f"{self.params[0]:g}"
        if self.kind == "id":
            return self.attrs[0]
        if self.kind == "pow":
            return f"{self.attrs[0]}^{self.params[0]}"
        if self.kind == "delta":
            return f"1[{self.attrs[0]}{self.params[0]}{self.params[1]}]"
        return f"{self.params[0]}({','.join(self.attrs)})"


# -- constructors ----------------------------------------------------------
def const(c: float) -> Factor:
    """Constant function f() = c."""
    return Factor("const", (), (float(c),))


def ident(attr: str) -> Factor:
    """Identity function f(X) = X."""
    return Factor("id", (attr,))


def power(attr: str, k: int) -> Factor:
    """Monomial f(X) = X**k (k >= 1)."""
    if k < 1:
        raise ValueError("power exponent must be >= 1")
    return Factor("pow", (attr,), (int(k),))


def delta(attr: str, op: str, t) -> Factor:
    """Kronecker delta f(X) = 1_{X op t}; op in <, <=, >, >=, ==, !=."""
    if op not in _OPS:
        raise ValueError(f"unknown comparison op {op!r}")
    if isinstance(t, float) and not math.isfinite(t):
        raise ValueError("delta threshold must be finite")
    return Factor("delta", (attr,), (op, t))


def fn(name: str, *attrs: str) -> Factor:
    """Named n-ary function from FN_REGISTRY."""
    spec = FN_REGISTRY[name]
    if len(attrs) != spec.arity:
        raise ValueError(f"{name} expects {spec.arity} attrs, got {len(attrs)}")
    return Factor("fn", tuple(attrs), (name,))


@dataclass(frozen=True)
class Product:
    """A product of factors; the empty product is the constant 1 (COUNT).

    Factors are canonically sorted so structurally-equal products hash equal
    — this powers the Merge Views layer's aggregate dedup.
    """

    factors: tuple[Factor, ...] = ()

    def __post_init__(self) -> None:
        object.__setattr__(
            self, "factors", tuple(sorted(self.factors, key=lambda f: repr(f)))
        )

    @property
    def attrs(self) -> frozenset[str]:
        return frozenset(a for f in self.factors for a in f.attrs)

    def to_spark(self) -> Column:
        out = F.lit(1.0)
        for f_ in self.factors:
            out = out * f_.to_spark()
        return out

    def to_sql(self) -> str:
        if not self.factors:
            return "1.0"
        return " * ".join(f_.to_sql() for f_ in self.factors)

    def to_numpy(self, pdf: pd.DataFrame) -> np.ndarray:
        out = np.ones(len(pdf))
        for f_ in self.factors:
            out = out * f_.to_numpy(pdf)
        return out

    def __repr__(self) -> str:
        return "*".join(map(repr, self.factors)) or "1"


@dataclass(frozen=True)
class SumProduct:
    """A sum of products — one user aggregate ``alpha`` (paper §1.1)."""

    products: tuple[Product, ...] = field(default_factory=lambda: (Product(),))

    @property
    def attrs(self) -> frozenset[str]:
        return frozenset(a for p in self.products for a in p.attrs)

    def to_sql(self) -> str:
        return " + ".join(p.to_sql() for p in self.products)

    def to_numpy(self, pdf: pd.DataFrame) -> np.ndarray:
        out = np.zeros(len(pdf))
        for p in self.products:
            out = out + p.to_numpy(pdf)
        return out

    def __repr__(self) -> str:
        return " + ".join(map(repr, self.products))


def count() -> SumProduct:
    """The COUNT(*) aggregate: SUM over the empty product."""
    return SumProduct((Product(),))


def sum_of(*factors: Factor) -> SumProduct:
    """SUM of a single product of the given factors."""
    return SumProduct((Product(tuple(factors)),))
