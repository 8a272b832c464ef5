"""Unit tests for Algorithm 2 (output-linear-delay enumeration)."""
from repro.core.enumerate import enumerate_matches
from repro.core.tecs import TECS


def test_single_path():
    t = TECS()
    n = t.extend(t.extend(t.bottom(1, 1.0), 3), 5)
    out = enumerate_matches(n, 5, 5.0, None)
    assert out == [(1, 5, (3, 5))]


def test_union_enumerates_both_branches_no_duplicates():
    t = TECS()
    b0 = t.bottom(0, 0.0)
    b1 = t.bottom(1, 1.0)
    o0 = t.extend(b0, 2)
    o1 = t.extend(b1, 2)
    # wrap to equal max-start via bottoms at same ts is not needed: build
    # union-list and merge (the engine's path for differing max-starts).
    u = t.merge([o1, o0])
    out = enumerate_matches(u, 2, 2.0, None)
    assert sorted(out) == [(0, 2, (2,)), (1, 2, (2,))]


def test_window_prunes_old_starts():
    t = TECS()
    o_old = t.extend(t.bottom(0, 0.0), 9)
    o_new = t.extend(t.bottom(7, 7.0), 9)
    u = t.merge([o_new, o_old])
    out = enumerate_matches(u, 9, 9.0, 4)
    assert out == [(7, 9, (9,))]
    # window large enough: both
    out2 = enumerate_matches(u, 9, 9.0, 100)
    assert sorted(out2) == [(0, 9, (9,)), (7, 9, (9,))]


def test_root_out_of_window_returns_empty():
    t = TECS()
    n = t.extend(t.bottom(0, 0.0), 1)
    assert enumerate_matches(n, 50, 50.0, 10) == []


def test_limit_caps_enumeration():
    t = TECS()
    nodes = [t.extend(t.bottom(i, float(i)), 8) for i in range(8, 0, -1)]
    u = t.merge(nodes)
    out = enumerate_matches(u, 8, 8.0, None, limit=3)
    assert len(out) == 3


def test_positions_ascending_along_deep_path():
    t = TECS()
    n = t.bottom(0, 0.0)
    for j in range(1, 6):
        n = t.extend(n, j)
    out = enumerate_matches(n, 5, 5.0, None)
    assert out == [(0, 5, (1, 2, 3, 4, 5))]


def test_appends_to_existing_list():
    t = TECS()
    n = t.extend(t.bottom(1, 1.0), 2)
    acc = [("sentinel",)]
    out = enumerate_matches(n, 2, 2.0, None, out=acc)
    assert out is acc and len(acc) == 2


def test_shared_subgraph_enumerated_once_per_path():
    # DAG sharing: two output nodes over the same bottom — each full path
    # yields exactly one complex event.
    t = TECS()
    b = t.bottom(0, 0.0)
    o1 = t.extend(b, 1)
    o2 = t.extend(b, 2)
    # simulate engine merge at a later position
    u = t.merge([o2, o1]) if o2.max_start >= o1.max_start else t.merge([o1, o2])
    out = enumerate_matches(u, 3, 3.0, None)
    assert sorted(out) == [(0, 3, (1,)), (0, 3, (2,))]
