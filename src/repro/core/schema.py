"""Database catalog: relations, attributes and their kinds.

Attribute names are globally unique across a database except for join keys,
which deliberately share names across relations (natural-join semantics, as
in the paper's query formulation §2).
"""
from __future__ import annotations

from dataclasses import dataclass

KINDS = {"key", "cont", "cat"}


@dataclass(frozen=True)
class Attribute:
    """A named attribute with a kind.

    - ``key``  join key (never a feature)
    - ``cont`` continuous feature / measure
    - ``cat``  categorical feature (integer-coded, per the paper's own
      TPC-DS preprocessing)
    """

    name: str
    kind: str = "cont"

    def __post_init__(self) -> None:
        if self.kind not in KINDS:
            raise ValueError(f"unknown attribute kind {self.kind!r}")


@dataclass(frozen=True)
class Relation:
    """A relation schema: a name plus an ordered tuple of attributes."""

    name: str
    attributes: tuple[Attribute, ...]

    @property
    def schema(self) -> tuple[str, ...]:
        return tuple(a.name for a in self.attributes)

    @property
    def attr_set(self) -> frozenset[str]:
        return frozenset(self.schema)


class Database:
    """Catalog over a set of relations; validates name discipline.

    Non-key attributes must be unique to one relation; key attributes may be
    shared (they define the natural joins).
    """

    def __init__(self, relations: list[Relation]):
        self.relations: dict[str, Relation] = {}
        self._attr_kind: dict[str, str] = {}
        self._homes: dict[str, list[str]] = {}
        for r in relations:
            if r.name in self.relations:
                raise ValueError(f"duplicate relation {r.name}")
            if len(set(r.schema)) != len(r.schema):
                raise ValueError(f"duplicate attribute within {r.name}")
            self.relations[r.name] = r
            for a in r.attributes:
                prev = self._attr_kind.get(a.name)
                if prev is not None and (prev != a.kind or a.kind != "key"):
                    raise ValueError(
                        f"attribute {a.name} appears in multiple relations "
                        "but is not a key in all of them"
                    )
                self._attr_kind[a.name] = a.kind
                self._homes.setdefault(a.name, []).append(r.name)

    @property
    def attrs(self) -> frozenset[str]:
        return frozenset(self._attr_kind)

    def kind(self, attr: str) -> str:
        return self._attr_kind[attr]

    def attrs_of_kind(self, kind: str) -> tuple[str, ...]:
        """All attribute names of a kind, in deterministic (sorted) order."""
        return tuple(sorted(a for a, k in self._attr_kind.items() if k == kind))

    def relations_containing(self, attr: str) -> tuple[str, ...]:
        return tuple(self._homes[attr])

    def schema_of(self, relation: str) -> frozenset[str]:
        return self.relations[relation].attr_set
