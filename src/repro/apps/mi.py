"""Pairwise mutual information and Chow-Liu trees (paper §2, query (7)).

The data-intensive part is a batch of count queries grouped by every subset
of every attribute pair: {} once, {Xi} per attribute, {Xi,Xj} per pair. The
MI of a pair is then the 4-ary aggregate f(a,b,c,d) = d/a * log(a*d/(b*c))
summed over the pair's joint counts, and the Chow-Liu algorithm [16] is a
maximum spanning tree over the MI weights.
"""
from __future__ import annotations

import math

import pandas as pd

from repro.core.expr import count
from repro.core.query import Query


def mi_queries(attrs: tuple[str, ...]) -> list[Query]:
    """The MI batch: one scalar count, one count per attr, one per pair."""
    queries = [Query("mi_total", (), (count(),))]
    for a in attrs:
        queries.append(Query(f"mi_1__{a}", (a,), (count(),)))
    for i, a in enumerate(attrs):
        for b in attrs[i + 1 :]:
            queries.append(Query(f"mi_2__{a}__{b}", (a, b), (count(),)))
    return queries


def mutual_information(
    results: dict[str, pd.DataFrame], attrs: tuple[str, ...]
) -> dict[tuple[str, str], float]:
    """MI for every pair from the count-query results."""
    total = float(results["mi_total"].iloc[0]["agg0"])
    marg: dict[str, dict] = {}
    for a in attrs:
        df = results[f"mi_1__{a}"]
        marg[a] = dict(zip(df[a], df["agg0"].astype(float)))
    out: dict[tuple[str, str], float] = {}
    for i, a in enumerate(attrs):
        for b in attrs[i + 1 :]:
            df = results[f"mi_2__{a}__{b}"]
            mi = 0.0
            for _, row in df.iterrows():
                d = float(row["agg0"])
                if d <= 0:
                    continue
                mi += (
                    d
                    / total
                    * math.log((total * d) / (marg[a][row[a]] * marg[b][row[b]]))
                )
            out[(a, b)] = mi
    return out


def chow_liu_tree(
    mi: dict[tuple[str, str], float], attrs: tuple[str, ...]
) -> list[tuple[str, str]]:
    """Maximum spanning tree over MI weights (Prim's algorithm): the optimal
    tree-shaped Bayesian network structure."""

    def w(a: str, b: str) -> float:
        return mi.get((a, b), mi.get((b, a), 0.0))

    in_tree = {attrs[0]}
    edges: list[tuple[str, str]] = []
    while len(in_tree) < len(attrs):
        best = None
        for a in sorted(in_tree):
            for b in attrs:
                if b in in_tree:
                    continue
                if best is None or w(a, b) > best[0]:
                    best = (w(a, b), a, b)
        assert best is not None
        edges.append((best[1], best[2]))
        in_tree.add(best[2])
    return edges
