"""Conjunctive queries (§3.1).

A CQ is ``π_y (R_1(e_1) ⋈ … ⋈ R_n(e_n))`` over named attributes.
Relations inside one :class:`CQ` must have distinct *names* (self-joins
are modelled as distinct copies of the same logical stream, per §3.1:
"we consider them as two identical copies of R, and for any update to
R, we apply the update to both copies").
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable


@dataclass(frozen=True)
class Relation:
    """One atom ``R(e)``: a name plus an ordered tuple of attributes.

    ``stream`` names the logical input stream feeding this atom; two
    atoms sharing a ``stream`` are copies of the same relation
    (self-join). Defaults to ``name``.
    """

    name: str
    attrs: tuple[str, ...]
    stream: str | None = None

    def __post_init__(self) -> None:
        if len(set(self.attrs)) != len(self.attrs):
            raise ValueError(f"duplicate attribute in {self.name}{self.attrs}")
        if self.stream is None:
            object.__setattr__(self, "stream", self.name)

    @property
    def attr_set(self) -> frozenset[str]:
        return frozenset(self.attrs)


@dataclass(frozen=True)
class CQ:
    """A conjunctive query: atoms plus output attributes ``y``.

    ``output`` is ordered — enumeration and delta emission use this
    order. ``selections`` maps a relation name to a predicate applied
    to incoming tuples of that relation (§7.2: selections cost O(1)
    and are pushed to the update stream).
    """

    relations: tuple[Relation, ...]
    output: tuple[str, ...]
    name: str = "Q"
    selections: tuple[tuple[str, object], ...] = field(default=())

    def __post_init__(self) -> None:
        names = [r.name for r in self.relations]
        if len(set(names)) != len(names):
            raise ValueError(f"relation names must be distinct: {names}")
        missing = set(self.output) - self.all_attrs
        if missing:
            raise ValueError(f"output attrs {missing} not in any relation")

    @property
    def all_attrs(self) -> frozenset[str]:
        return frozenset(a for r in self.relations for a in r.attrs)

    @property
    def output_set(self) -> frozenset[str]:
        return frozenset(self.output)

    @property
    def is_full(self) -> bool:
        """A full join query outputs every attribute (§3.1)."""
        return self.output_set == self.all_attrs

    def relation(self, name: str) -> Relation:
        for r in self.relations:
            if r.name == name:
                return r
        raise KeyError(name)

    def atoms_of_stream(self, stream: str) -> list[Relation]:
        """All copies fed by one logical stream (self-join fan-out)."""
        return [r for r in self.relations if r.stream == stream]

    def hyperedges(self) -> list[frozenset[str]]:
        return [r.attr_set for r in self.relations]

    def with_output(self, output: Iterable[str]) -> "CQ":
        return CQ(self.relations, tuple(output), self.name, self.selections)
