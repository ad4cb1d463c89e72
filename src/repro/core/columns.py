"""Parties, column definitions and trust sets (§4.2–4.3).

A *trust set* is the set of party names authorized to see a column's
cleartext values. Per the paper: the storing party is implicitly in the
trust set of all its input columns; a public column has all parties in
its trust set; trust sets propagate through operators by intersection
over the operand columns each result column depends on (§5.1).
"""
from __future__ import annotations

from dataclasses import dataclass, field

INT = "int"


@dataclass(frozen=True)
class Party:
    """A computation participant, identified by its endpoint name."""

    name: str

    def __repr__(self) -> str:
        return f"Party({self.name})"


@dataclass(frozen=True)
class Column:
    """An input-schema column with an optional trust annotation.

    ``trust`` lists parties (beyond the implicit owner) authorized to
    learn this column in the clear; ``public=True`` marks the column
    readable by every party.
    """

    name: str
    dtype: str = INT
    trust: tuple[Party, ...] = field(default_factory=tuple)
    public: bool = False

    def trust_set(self, owner: Party, all_parties: list[Party]) -> frozenset[str]:
        """Resolve the declared annotation to a concrete party-name set."""
        if self.public:
            return frozenset(p.name for p in all_parties)
        return frozenset({owner.name} | {p.name for p in self.trust})
