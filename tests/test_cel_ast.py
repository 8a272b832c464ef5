"""Unit tests for the CEL AST helpers."""
import pytest

from repro.cea import cel
from repro.cea.predicates import Atom


def test_seq_fold():
    phi = cel.seq(cel.EventType("A"), cel.EventType("B"), cel.EventType("C"))
    assert isinstance(phi, cel.Seq)
    assert isinstance(phi.left, cel.Seq)
    assert phi.right == cel.EventType("C")


def test_seq_requires_one():
    with pytest.raises(ValueError):
        cel.seq()


def test_variables_include_types_and_as():
    phi = cel.As(cel.Seq(cel.EventType("A"), cel.EventType("B")), "x")
    assert phi.variables() == frozenset({"A", "B", "x"})
    assert phi.event_types() == frozenset({"A", "B"})


def test_walk_yields_all_nodes():
    phi = cel.Or(cel.EventType("A"), cel.Plus(cel.EventType("B")))
    kinds = [type(n).__name__ for n in phi.walk()]
    assert kinds == ["Or", "EventType", "Plus", "EventType"]


def test_formulas_are_hashable_and_equal_by_value():
    a = cel.Seq(cel.EventType("A"), cel.EventType("B"))
    b = cel.Seq(cel.EventType("A"), cel.EventType("B"))
    assert a == b and hash(a) == hash(b)


def test_filtered_sugar():
    phi = cel.filtered(cel.EventType("A"), "A", Atom("v", ">", 1))
    assert isinstance(phi, cel.Filter)
    assert phi.var == "A" and Atom("v", ">", 1) in phi.pred


def test_str_renderings():
    phi = cel.Project(
        cel.Plus(cel.Or(cel.EventType("A"), cel.EventType("B"))),
        frozenset({"A"}),
    )
    s = str(phi)
    assert "OR" in s and "+" in s and "pi_{A}" in s
