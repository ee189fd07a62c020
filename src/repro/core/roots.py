"""Find Roots layer (paper §3.3).

Each query in the batch is evaluated over the same join tree but possibly
rooted at a different node. The paper's heuristic (quoted in §3.3):

1. For each query, weight each relation by the fraction of the query's
   group-by attributes it contains; queries without group-by attributes
   spread an equal weight of 1/m over all relations (any relation can be
   their root).
2. Assign roots in decreasing order of accumulated relation weight: the
   heaviest relation becomes the root of every query that considered it a
   possible root, then the next heaviest for the remaining queries, etc.
3. Ties are broken toward the larger relation (avoids building large views
   over the big fact table).
"""
from __future__ import annotations

from repro.core.join_tree import JoinTree
from repro.core.query import Query


def choose_roots(
    tree: JoinTree,
    queries: list[Query],
    sizes: dict[str, int] | None = None,
) -> dict[str, str]:
    """Map each query name to its chosen root relation."""
    sizes = sizes or {n: 1 for n in tree.nodes}
    m = len(tree.nodes)
    weights: dict[str, float] = {n: 0.0 for n in tree.nodes}
    possible: dict[str, set[str]] = {}
    for q in queries:
        if q.group_by:
            cand = {
                n: len(set(q.group_by) & tree.db.schema_of(n))
                for n in tree.nodes
            }
            cand = {n: c for n, c in cand.items() if c > 0}
            for n, c in cand.items():
                weights[n] += c / len(q.group_by)
            possible[q.name] = set(cand)
        else:
            for n in tree.nodes:
                weights[n] += 1.0 / m
            possible[q.name] = set(tree.nodes)

    order = sorted(
        tree.nodes, key=lambda n: (weights[n], sizes.get(n, 1), n), reverse=True
    )
    roots: dict[str, str] = {}
    for rel in order:
        for q in queries:
            if q.name not in roots and rel in possible[q.name]:
                roots[q.name] = rel
    return roots


def single_root(
    tree: JoinTree,
    queries: list[Query],
    sizes: dict[str, int] | None = None,
) -> dict[str, str]:
    """Ablation: force all queries onto one root (the globally heaviest).

    Used for the multi-root on/off comparison (paper Figure 5).
    """
    multi = choose_roots(tree, queries, sizes)
    counts: dict[str, int] = {}
    for r in multi.values():
        counts[r] = counts.get(r, 0) + 1
    sizes = sizes or {n: 1 for n in tree.nodes}
    best = max(tree.nodes, key=lambda n: (counts.get(n, 0), sizes.get(n, 1), n))
    return {q.name: best for q in queries}
