"""Atomic unary predicates and predicate bit-vectors (paper Section 5.4).

A predicate in CEQL is a condition on a *single* tuple: either a type check
(``type == 'SELL'``) or an attribute comparison (``price > 100``). CEA
transition guards are **conjunctions** of such atoms (disjunctions in FILTER
clauses are expanded at the formula level, per the paper's footnote 1), so a
guard is represented as a ``frozenset`` of :class:`Atom`.

Following Section 5.4, CORE collects every distinct atom of a query into a
list ``P_1..P_k`` and evaluates each arriving tuple **once** against it,
producing a bit-vector that is then the tuple's internal representation: the
engines test guards against the bit-vector, and the determinization cache is
keyed on ``(state, bit-vector)``.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any, FrozenSet, Iterable, Mapping, Tuple

_OPS = ("==", "!=", "<", "<=", ">", ">=")


@dataclass(frozen=True)
class Atom:
    """One atomic predicate ``attr op value`` over a single tuple.

    ``attr == "type"`` with op ``==`` is the event-type predicate ``P_R``.
    A tuple that lacks ``attr`` (NULL) satisfies no comparison atom.
    """

    attr: str
    op: str
    value: Any

    def __post_init__(self) -> None:
        if self.op not in _OPS:
            raise ValueError(f"unsupported predicate op {self.op!r}")

    def eval(self, t: Mapping[str, Any]) -> bool:
        """Evaluate this atom on tuple ``t`` (a mapping; missing attr = NULL)."""
        v = t.get(self.attr)
        if v is None:
            return False
        op = self.op
        try:
            if op == "==":
                return v == self.value
            if op == "!=":
                return v != self.value
            if op == "<":
                return v < self.value
            if op == "<=":
                return v <= self.value
            if op == ">":
                return v > self.value
            return v >= self.value
        except TypeError:
            # Incomparable types (e.g. string attr vs numeric constant).
            return False

    def __repr__(self) -> str:  # compact, used in automaton dumps
        return f"{self.attr}{self.op}{self.value!r}"


def type_atom(event_type: str) -> Atom:
    """The predicate ``P_R`` = all tuples of type ``event_type``."""
    return Atom("type", "==", event_type)


# A transition guard: conjunction of atoms; the empty set is TRUE.
Guard = FrozenSet[Atom]

TRUE: Guard = frozenset()


def guard(*atoms: Atom) -> Guard:
    """Build a conjunction guard from atoms."""
    return frozenset(atoms)


class PredicateIndex:
    """Maps the distinct atoms of a query to bit positions.

    ``bitvector(t)`` evaluates every atom once on ``t`` and returns a
    ``Tuple[bool, ...]`` — hashable, so it doubles as the cache key for
    on-the-fly determinization (Section 5.4). ``satisfies(g, bv)`` tests a
    conjunction guard against a bit-vector without touching the tuple again.
    """

    def __init__(self, atoms: Iterable[Atom]):
        self._atoms: Tuple[Atom, ...] = tuple(dict.fromkeys(atoms))
        self._ids = {a: i for i, a in enumerate(self._atoms)}

    @property
    def atoms(self) -> Tuple[Atom, ...]:
        return self._atoms

    def __len__(self) -> int:
        return len(self._atoms)

    def bitvector(self, t: Mapping[str, Any]) -> Tuple[bool, ...]:
        return tuple(a.eval(t) for a in self._atoms)

    def satisfies(self, g: Guard, bv: Tuple[bool, ...]) -> bool:
        ids = self._ids
        return all(bv[ids[a]] for a in g)
