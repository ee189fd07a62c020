"""Join Tree layer (paper §3.1).

A join tree of the natural join of relations R1..Rm is an undirected tree
over the relations such that for every pair of nodes, their shared attributes
appear in every node on the path between them (running intersection / the
connectedness property). Acyclic joins always admit one; the paper handles
cyclic joins by hypertree decomposition first — all four evaluation datasets
are acyclic, so we validate rather than decompose.
"""
from __future__ import annotations

from functools import lru_cache

from repro.core.schema import Database


class JoinTree:
    """An (undirected) join tree over ``db`` with explicit ``edges``.

    Provides the navigation primitives the later layers need: neighbors,
    per-edge join keys, subtree schemas, and a BFS join order for rendering
    the plain NATURAL JOIN SQL that baselines and the oracle execute.
    """

    def __init__(self, db: Database, edges: list[tuple[str, str]]):
        self.db = db
        self.nodes: tuple[str, ...] = tuple(db.relations)
        self.edges: tuple[tuple[str, str], ...] = tuple(
            tuple(sorted(e)) for e in edges
        )
        self._adj: dict[str, list[str]] = {n: [] for n in self.nodes}
        for a, b in self.edges:
            if a not in self._adj or b not in self._adj:
                raise ValueError(f"edge ({a},{b}) references unknown relation")
            self._adj[a].append(b)
            self._adj[b].append(a)
        self._validate()

    # -- structure ---------------------------------------------------------
    def _validate(self) -> None:
        if len(self.edges) != len(self.nodes) - 1:
            raise ValueError("a join tree over m relations needs m-1 edges")
        # connectivity
        seen = set()
        stack = [self.nodes[0]]
        while stack:
            n = stack.pop()
            if n in seen:
                continue
            seen.add(n)
            stack.extend(self._adj[n])
        if seen != set(self.nodes):
            raise ValueError("join tree is not connected")
        # running intersection: shared attrs of any two nodes lie on the path
        for i, a in enumerate(self.nodes):
            for b in self.nodes[i + 1 :]:
                shared = self.db.schema_of(a) & self.db.schema_of(b)
                if not shared:
                    continue
                for mid in self._path(a, b)[1:-1]:
                    if not shared <= self.db.schema_of(mid):
                        raise ValueError(
                            f"running intersection violated on path {a}-{b} "
                            f"at {mid}: {shared}"
                        )
        # every adjacent pair must actually share a join key
        for a, b in self.edges:
            if not self.keys(a, b):
                raise ValueError(f"edge ({a},{b}) has no shared attributes")

    def _path(self, a: str, b: str) -> list[str]:
        parent: dict[str, str | None] = {a: None}
        stack = [a]
        while stack:
            n = stack.pop()
            if n == b:
                break
            for m in self._adj[n]:
                if m not in parent:
                    parent[m] = n
                    stack.append(m)
        path = [b]
        while parent[path[-1]] is not None:
            path.append(parent[path[-1]])  # type: ignore[arg-type]
        return path[::-1]

    # -- navigation --------------------------------------------------------
    def neighbors(self, node: str) -> tuple[str, ...]:
        return tuple(self._adj[node])

    def keys(self, a: str, b: str) -> tuple[str, ...]:
        """Join attributes of an adjacent pair, sorted for determinism."""
        return tuple(sorted(self.db.schema_of(a) & self.db.schema_of(b)))

    @lru_cache(maxsize=None)
    def subtree_nodes(self, node: str, parent: str | None) -> frozenset[str]:
        """Relations in the subtree rooted at ``node`` away from ``parent``."""
        out = {node}
        for m in self._adj[node]:
            if m != parent:
                out |= self.subtree_nodes(m, node)
        return frozenset(out)

    @lru_cache(maxsize=None)
    def subtree_attrs(self, node: str, parent: str | None) -> frozenset[str]:
        """omega_{T_node}: all attributes in the subtree away from parent."""
        out: frozenset[str] = frozenset()
        for n in self.subtree_nodes(node, parent):
            out |= self.db.schema_of(n)
        return out

    def bfs_order(self, root: str | None = None) -> list[str]:
        """Relations in an order where each (after the first) joins the prefix."""
        root = root or self.nodes[0]
        order, seen = [root], {root}
        i = 0
        while i < len(order):
            for m in self._adj[order[i]]:
                if m not in seen:
                    seen.add(m)
                    order.append(m)
            i += 1
        return order

    def home_of(self, attr: str, near: str, parent: str | None = None) -> str:
        """The unique child subtree of ``near`` (away from ``parent``) holding
        ``attr``; returns that child's name. Raises if attr is local/absent."""
        for m in self._adj[near]:
            if m != parent and attr in self.subtree_attrs(m, near):
                return m
        raise KeyError(f"{attr} not below {near}")
