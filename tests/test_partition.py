"""Tests for PARTITION BY routing (paper Sections 3 and 5.4)."""
import pytest

from repro.cea import cel
from repro.cea.automaton import compile_cel
from repro.engines import make_partitioned

A, B = cel.EventType("A"), cel.EventType("B")
SEQ = compile_cel(cel.Seq(A, B))


def _events(spec):
    """spec: list of (type, name) pairs."""
    return [{"type": t, "name": n} for (t, n) in spec]


def test_partitions_are_independent():
    eng = make_partitioned("core", SEQ, ["name"])
    stream = _events([("A", "x"), ("B", "y"), ("B", "x")])
    out = []
    for i, t in enumerate(stream):
        out.extend(eng.process(t, pos=i))
    # B@1 is in partition y (no preceding A there); B@2 completes x's match.
    assert out == [(0, 2, (0, 2))]


def test_null_partition_attribute_excluded():
    eng = make_partitioned("core", SEQ, ["name"])
    stream = [{"type": "A", "name": "x"}, {"type": "B"}, {"type": "B", "name": "x"}]
    out = []
    for i, t in enumerate(stream):
        out.extend(eng.process(t, pos=i))
    assert out == [(0, 2, (0, 2))]


def test_multi_attribute_partitioning():
    eng = make_partitioned("core", SEQ, ["name", "vol"])
    stream = [
        {"type": "A", "name": "x", "vol": 1},
        {"type": "B", "name": "x", "vol": 2},  # different vol -> no match
        {"type": "B", "name": "x", "vol": 1},
    ]
    out = []
    for i, t in enumerate(stream):
        out.extend(eng.process(t, pos=i))
    assert out == [(0, 2, (0, 2))]
    assert eng.n_partitions == 2


def test_positions_are_global():
    eng = make_partitioned("core", SEQ, ["name"])
    stream = _events([("X", "q")] * 5 + [("A", "x"), ("B", "x")])
    out = []
    for i, t in enumerate(stream):
        out.extend(eng.process(t, pos=i))
    assert out == [(5, 6, (5, 6))]


@pytest.mark.parametrize("system", ["core", "sase", "esper", "flink"])
def test_all_systems_agree_under_partitioning(system):
    ref = None
    stream = _events(
        [("A", "x"), ("A", "y"), ("B", "x"), ("B", "y"), ("A", "x"), ("B", "y")]
    )
    eng = make_partitioned(system, SEQ, ["name"], window=4)
    got = set()
    for i, t in enumerate(stream):
        got |= set(eng.process(t, pos=i))
    expected = {(0, 2, (0, 2)), (1, 3, (1, 3)), (1, 5, (1, 5))}
    assert got == expected


def test_window_counts_global_positions():
    # Count-based windows use global arrival positions (the merged-stream
    # arrival time), so a sparse partition can expire.
    eng = make_partitioned("core", SEQ, ["name"], window=3)
    stream = _events([("A", "x")] + [("X", "q")] * 5 + [("B", "x")])
    out = []
    for i, t in enumerate(stream):
        out.extend(eng.process(t, pos=i))
    assert out == []


def test_requires_attributes():
    with pytest.raises(ValueError):
        make_partitioned("core", SEQ, [])


def test_counters():
    eng = make_partitioned("core", SEQ, ["name"])
    stream = _events([("A", "x"), ("B", "x")])
    for i, t in enumerate(stream):
        eng.process(t, pos=i)
    assert eng.n_events == 2 and eng.n_outputs == 1 and eng.n_partitions == 1


def test_reset_clears_partitions():
    eng = make_partitioned("core", SEQ, ["name"])
    eng.process({"type": "A", "name": "x"}, pos=0)
    eng.reset()
    assert eng.n_partitions == 0
