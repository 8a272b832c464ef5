"""Tests for the CEQL parser and query compiler."""
import pytest

from repro.cea import cel
from repro.cea.ceql import CEQLSyntaxError, compile_query, parse
from repro.cea.predicates import Atom
from repro.harness.stock_queries import STOCK_QUERIES


def test_example1_query_parses():
    q = parse(
        """
        SELECT * FROM Stock
        WHERE (SELL as ms; (BUY OR SELL) as orc; (BUY OR SELL) as cs; SELL as am)
        FILTER ms[name="MSFT"] AND ms[price > 26.0]
        AND orc[name = "ORCL"] AND orc[price < 11.14]
        AND cs[name="CSCO"] AND am[name="AMZN"] AND am[price >= 18.97]
        WITHIN 30 minutes
        """
    )
    assert q.select == "*"
    assert q.window == 30 * 60_000
    assert q.time_attr == "ts"
    assert len(q.filters) == 7


def test_q1_shape():
    q = parse(
        "SELECT * FROM Stock WHERE SELL as msft; SELL as intel; SELL as amzn"
    )
    phi = q.pattern
    assert isinstance(phi, cel.Seq)
    assert isinstance(phi.right, cel.As) and phi.right.var == "amzn"


def test_select_variable_becomes_projection():
    q = parse("SELECT b FROM Stock WHERE SELL as s; BUY as b")
    phi = q.formula()
    assert isinstance(phi, cel.Project) and phi.keep == frozenset({"b"})


def test_select_strategy():
    q = parse("SELECT MAX * FROM S WHERE SELL as s")
    assert q.strategy == "max"
    q2 = parse("SELECT NEXT * FROM S WHERE SELL as s")
    assert q2.strategy == "next"


def test_partition_by_attrs():
    q = parse("SELECT * FROM S WHERE A as a PARTITION BY [name], [volume]")
    assert q.partition_by == ["name", "volume"]


def test_within_events_is_count_based():
    q = parse("SELECT * FROM S WHERE A; B WITHIN 100 events")
    assert q.window == 100 and q.time_attr is None


def test_within_attribute_window():
    q = parse("SELECT * FROM S WHERE A; B WITHIN 30000 [stock_time]")
    assert q.window == 30000 and q.time_attr == "stock_time"


@pytest.mark.parametrize(
    "unit,ms", [("ms", 1), ("seconds", 1000), ("minutes", 60000), ("hours", 3600000)]
)
def test_within_time_units(unit, ms):
    q = parse(f"SELECT * FROM S WHERE A; B WITHIN 2 {unit}")
    assert q.window == 2 * ms and q.time_attr == "ts"


def test_consume_by_any():
    q = parse("SELECT * FROM S WHERE A; B CONSUME BY ANY")
    assert q.consume is True


def test_plus_binds_before_as():
    q = parse("SELECT * FROM S WHERE SELL+ as s1")
    assert isinstance(q.pattern, cel.As)
    assert isinstance(q.pattern.sub, cel.Plus)


def test_or_precedence_lower_than_seq():
    q = parse("SELECT * FROM S WHERE A; B OR C; D")
    assert isinstance(q.pattern, cel.Or)
    assert isinstance(q.pattern.left, cel.Seq)


def test_parentheses_override():
    q = parse("SELECT * FROM S WHERE A; (B OR C); D")
    phi = q.pattern
    assert isinstance(phi, cel.Seq)
    assert isinstance(phi.left, cel.Seq) and isinstance(phi.left.right, cel.Or)


def test_filter_desugars_to_nested_filters():
    q = parse("SELECT * FROM S WHERE A as a; B as b FILTER a[v > 1] AND b[v < 2]")
    phi = q.formula()
    assert isinstance(phi, cel.Filter) and isinstance(phi.sub, cel.Filter)


def test_filter_or_desugars_to_disjunction():
    q = parse("SELECT * FROM S WHERE A as a FILTER a[v > 5] OR a[v < 1]")
    phi = q.formula()
    assert isinstance(phi, cel.Or)
    assert isinstance(phi.left, cel.Filter) and isinstance(phi.right, cel.Filter)


def test_filter_op_normalization():
    q = parse("SELECT * FROM S WHERE A as a FILTER a[name = 'X'] AND a[v <> 3]")
    (d1, d2) = q.filters
    assert d1[0][1] == Atom("name", "==", "X")
    assert d2[0][1] == Atom("v", "!=", 3)


def test_string_and_numeric_literals():
    q = parse('SELECT * FROM S WHERE A as a FILTER a[name = "MSFT"] AND a[p >= 18.92]')
    atoms = [a for (_, a) in (d[0] for d in q.filters)]
    assert atoms[0].value == "MSFT" and atoms[1].value == 18.92


def test_multiple_streams_recorded():
    q = parse("SELECT * FROM S1, S2 WHERE A")
    assert q.streams == ["S1", "S2"]


@pytest.mark.parametrize(
    "bad",
    [
        "WHERE A",  # missing SELECT
        "SELECT * WHERE A",  # missing FROM
        "SELECT * FROM S",  # missing WHERE
        "SELECT * FROM S WHERE A WITHIN x",  # bad window
        "SELECT * FROM S WHERE A WITHIN 5 fortnights",  # bad unit
        "SELECT * FROM S WHERE (A; B",  # unbalanced
        "SELECT * FROM S WHERE A FILTER a[",  # truncated filter
    ],
)
def test_syntax_errors(bad):
    with pytest.raises(CEQLSyntaxError):
        parse(bad)


@pytest.mark.parametrize("qname", sorted(STOCK_QUERIES))
def test_stock_queries_compile(qname):
    cq = compile_query(STOCK_QUERIES[qname])
    assert cq.window == 30000
    assert cq.time_attr == "stock_time"
    assert cq.consume is True
    assert cq.cea.n_states > 1
    if qname in ("Q3", "Q6"):
        assert cq.partition_by == ("volume",)
    else:
        assert cq.partition_by == ()


def test_compiled_query_ts_of():
    cq = compile_query("SELECT * FROM S WHERE A; B WITHIN 10 [t]")
    assert cq.ts_of({"t": 42}, 7) == 42.0
    assert cq.ts_of({}, 7) == 7.0  # missing attr falls back to position
    cq2 = compile_query("SELECT * FROM S WHERE A; B WITHIN 10 events")
    assert cq2.ts_of({"t": 42}, 7) == 7.0


def test_compile_query_accepts_string():
    cq = compile_query("SELECT * FROM S WHERE A; B")
    assert cq.window is None and cq.cea.finals
