"""Unit tests for atomic predicates and bit-vectors (paper Section 5.4)."""
import pytest

from repro.cea.predicates import Atom, PredicateIndex, TRUE, guard, type_atom


@pytest.mark.parametrize(
    "op,value,attr_value,expected",
    [
        ("==", 5, 5, True),
        ("==", 5, 6, False),
        ("!=", 5, 6, True),
        ("!=", 5, 5, False),
        ("<", 5, 4, True),
        ("<", 5, 5, False),
        ("<=", 5, 5, True),
        ("<=", 5, 6, False),
        (">", 5, 6, True),
        (">", 5, 5, False),
        (">=", 5, 5, True),
        (">=", 5, 4, False),
        ("==", "MSFT", "MSFT", True),
        ("==", "MSFT", "ORCL", False),
    ],
)
def test_atom_eval(op, value, attr_value, expected):
    assert Atom("x", op, value).eval({"x": attr_value}) is expected


def test_atom_missing_attribute_is_null():
    # NULL satisfies no comparison (Section 3: t(a) = NULL).
    for op in ("==", "!=", "<", "<=", ">", ">="):
        assert Atom("x", op, 1).eval({"y": 1}) is False


def test_atom_none_value_is_null():
    assert Atom("x", "==", 1).eval({"x": None}) is False


def test_atom_incomparable_types():
    assert Atom("x", "<", 5).eval({"x": "abc"}) is False


def test_atom_rejects_bad_op():
    with pytest.raises(ValueError):
        Atom("x", "~", 1)


def test_type_atom():
    assert type_atom("SELL").eval({"type": "SELL"})
    assert not type_atom("SELL").eval({"type": "BUY"})


def test_index_bitvector_and_guards():
    a1 = Atom("price", ">", 100)
    a2 = type_atom("SELL")
    idx = PredicateIndex([a1, a2, a1])  # duplicates collapse
    assert len(idx) == 2
    bv = idx.bitvector({"type": "SELL", "price": 200})
    assert bv == (True, True)
    assert idx.satisfies(guard(a1, a2), bv)
    bv2 = idx.bitvector({"type": "SELL", "price": 50})
    assert not idx.satisfies(guard(a1, a2), bv2)
    assert idx.satisfies(guard(a2), bv2)


def test_true_guard_always_satisfied():
    idx = PredicateIndex([])
    assert idx.satisfies(TRUE, idx.bitvector({"anything": 1}))


def test_bitvector_is_hashable_cache_key():
    idx = PredicateIndex([Atom("v", "<", 3)])
    assert hash(idx.bitvector({"v": 1})) == hash((True,))
