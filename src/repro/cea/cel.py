"""CEL abstract syntax (paper Section 3).

Grammar::

    phi := R | phi AS X | phi FILTER X[P] | phi OR phi | phi ; phi
         | phi+ | pi_L(phi)

``R`` is an event type (types are also variables, T ⊆ X), ``X`` a variable,
``P`` a conjunction of atomic predicates, ``L`` a set of variables.

All nodes are frozen dataclasses so formulas are hashable (used as cache keys
and in Hypothesis tests).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import FrozenSet, Iterator

from .predicates import Atom, Guard


class CEL:
    """Base class for CEL formulas."""

    def variables(self) -> FrozenSet[str]:
        """All variables (including event types) syntactically bound here."""
        out = set()
        for node in self.walk():
            if isinstance(node, EventType):
                out.add(node.name)
            elif isinstance(node, As):
                out.add(node.var)
        return frozenset(out)

    def event_types(self) -> FrozenSet[str]:
        return frozenset(
            n.name for n in self.walk() if isinstance(n, EventType)
        )

    def walk(self) -> Iterator["CEL"]:
        yield self
        for child in self.children():
            yield from child.walk()

    def children(self) -> tuple:
        return ()


@dataclass(frozen=True)
class EventType(CEL):
    """Atomic formula ``R``: matches one tuple of type ``R``, binding it to R."""

    name: str

    def __str__(self) -> str:
        return self.name


@dataclass(frozen=True)
class As(CEL):
    """``phi AS X``: gathers every position of the valuation into variable X."""

    sub: CEL
    var: str

    def children(self) -> tuple:
        return (self.sub,)

    def __str__(self) -> str:
        return f"({self.sub} AS {self.var})"


@dataclass(frozen=True)
class Filter(CEL):
    """``phi FILTER X[P]``: keep valuations whose X-positions all satisfy P.

    ``pred`` is a conjunction (Guard). Disjunctive filters are expanded into
    OR at parse time per the paper's footnote 1.
    """

    sub: CEL
    var: str
    pred: Guard

    def children(self) -> tuple:
        return (self.sub,)

    def __str__(self) -> str:
        conj = " AND ".join(map(repr, sorted(self.pred, key=repr)))
        return f"({self.sub} FILTER {self.var}[{conj}])"


@dataclass(frozen=True)
class Or(CEL):
    """Disjunction of two formulas."""

    left: CEL
    right: CEL

    def children(self) -> tuple:
        return (self.left, self.right)

    def __str__(self) -> str:
        return f"({self.left} OR {self.right})"


@dataclass(frozen=True)
class Seq(CEL):
    """Non-contiguous sequencing ``phi1 ; phi2`` (V1.end < V2.start)."""

    left: CEL
    right: CEL

    def children(self) -> tuple:
        return (self.left, self.right)

    def __str__(self) -> str:
        return f"({self.left} ; {self.right})"


@dataclass(frozen=True)
class Plus(CEL):
    """Iteration ``phi+``: one or more applications of ``;`` over phi."""

    sub: CEL

    def children(self) -> tuple:
        return (self.sub,)

    def __str__(self) -> str:
        return f"({self.sub})+"


@dataclass(frozen=True)
class Project(CEL):
    """``pi_L(phi)``: empty out every variable not in L."""

    sub: CEL
    keep: FrozenSet[str]

    def children(self) -> tuple:
        return (self.sub,)

    def __str__(self) -> str:
        return f"pi_{{{','.join(sorted(self.keep))}}}({self.sub})"


def seq(*parts: CEL) -> CEL:
    """Left-fold a sequence ``p1 ; p2 ; ... ; pn`` (n >= 1)."""
    if not parts:
        raise ValueError("seq() needs at least one formula")
    out = parts[0]
    for p in parts[1:]:
        out = Seq(out, p)
    return out


def filtered(sub: CEL, var: str, *atoms: Atom) -> CEL:
    """Sugar: ``sub FILTER var[atom1 AND atom2 ...]``."""
    return Filter(sub, var, frozenset(atoms))
