"""GVDL parser tests (pure Python)."""
import pytest

from repro.gvdl.parser import (
    AggregateViewDef,
    BinOp,
    FilteredViewDef,
    Ident,
    Lit,
    Not,
    ParseError,
    ViewCollectionDef,
    parse,
    parse_predicate,
)


# ------------------------------------------------------------ filtered views
def test_listing1_filtered_view():
    """The paper's Listing 1 parses."""
    stmt = parse(
        "create view CA-Long-Calls on Calls "
        "edges where src.state = 'CA' and dst.state = 'CA' "
        "and duration > 10 and year = 2019"
    )
    assert isinstance(stmt, FilteredViewDef)
    assert stmt.name == "CA-Long-Calls"
    assert stmt.source == "Calls"
    assert isinstance(stmt.predicate, BinOp) and stmt.predicate.op == "and"


def test_filtered_view_simple_predicate():
    stmt = parse("create view v on g edges where duration > 10")
    assert stmt.predicate == BinOp(">", Ident(None, "duration"), Lit(10))


def test_src_dst_qualifiers():
    p = parse_predicate("src.city = 'NY' and dst.city != 'LA'")
    assert p.left == BinOp("=", Ident("src", "city"), Lit("NY"))
    assert p.right == BinOp("!=", Ident("dst", "city"), Lit("LA"))


def test_or_precedence_lower_than_and():
    p = parse_predicate("a = 1 or b = 2 and c = 3")
    assert p.op == "or"
    assert p.right.op == "and"


def test_parentheses_override_precedence():
    p = parse_predicate("(a = 1 or b = 2) and c = 3")
    assert p.op == "and"
    assert p.left.op == "or"


def test_not_operator():
    p = parse_predicate("not a = 1")
    assert isinstance(p, Not)


def test_double_not():
    p = parse_predicate("not not a = 1")
    assert isinstance(p, Not) and isinstance(p.operand, Not)


def test_boolean_literals():
    p = parse_predicate("flag = true or flag = false")
    assert p.left.right == Lit(True)
    assert p.right.right == Lit(False)


def test_float_literal():
    p = parse_predicate("weight <= 2.5")
    assert p.right == Lit(2.5)


def test_unicode_leq():
    p = parse_predicate("duration ≤ 1 and year ≤ 2010")
    assert p.left.op == "<="


def test_bare_boolean_property():
    p = parse_predicate("active and duration > 1")
    assert p.left == Ident(None, "active")


# ---------------------------------------------------------- view collections
def test_listing3_view_collection():
    """The paper's Listing 3 (abbreviated) parses."""
    stmt = parse(
        "create view collection call-analysis on Calls "
        "[D1-Y2010: duration ≤ 1 and year ≤ 2010], "
        "[D2-Y2010: duration ≤ 2 and year ≤ 2010], "
        "[D3-Y2010: duration ≤ 3 and year ≤ 2010]"
    )
    assert isinstance(stmt, ViewCollectionDef)
    assert stmt.name == "call-analysis"
    assert [n for n, _ in stmt.views] == ["D1-Y2010", "D2-Y2010", "D3-Y2010"]


def test_collection_single_view():
    stmt = parse("create view collection c on g [v1: x = 1]")
    assert len(stmt.views) == 1


def test_collection_missing_bracket():
    with pytest.raises(ParseError):
        parse("create view collection c on g v1: x = 1]")


def test_collection_trailing_garbage():
    with pytest.raises(ParseError):
        parse("create view collection c on g [v1: x = 1] extra")


# ------------------------------------------------------------ aggregate views
def test_aggregate_view_listing4_style():
    stmt = parse(
        "create aggregate view city_calls on Calls "
        "nodes group by city aggregate count(*) as num_phones "
        "edges aggregate sum(duration) as total_duration"
    )
    assert isinstance(stmt, AggregateViewDef)
    assert stmt.group_by == ("city",)
    assert stmt.node_aggs[0].func == "count"
    assert stmt.node_aggs[0].arg == "*"
    assert stmt.node_aggs[0].alias == "num_phones"
    assert stmt.edge_aggs[0].func == "sum"
    assert stmt.edge_aggs[0].alias == "total_duration"


def test_aggregate_view_with_node_where():
    stmt = parse(
        "create aggregate view tri on Calls "
        "nodes where profession = 'doctor' or profession = 'lawyer' "
        "group by profession, city "
        "edges aggregate count(*) as total_calls"
    )
    assert stmt.node_where is not None
    assert stmt.group_by == ("profession", "city")


def test_aggregate_view_no_aggs():
    stmt = parse("create aggregate view a on g nodes group by city")
    assert stmt.node_aggs == () and stmt.edge_aggs == ()


def test_aggregate_default_alias():
    stmt = parse(
        "create aggregate view a on g nodes group by c aggregate sum(x), count(*)"
    )
    assert stmt.node_aggs[0].alias == "sum_x"
    assert stmt.node_aggs[1].alias == "count_star"


def test_aggregate_unknown_function():
    with pytest.raises(ParseError):
        parse("create aggregate view a on g nodes group by c aggregate median(x)")


# ----------------------------------------------------------------- errors
@pytest.mark.parametrize(
    "bad",
    [
        "view v on g edges where x = 1",  # missing create
        "create view v edges where x = 1",  # missing on
        "create view v on g where x = 1",  # missing edges
        "create view v on g edges x = 1",  # missing where
        "create view v on g edges where",  # missing predicate
        "create view v on g edges where x = ",  # dangling comparison
        "create view v on g edges where (x = 1",  # unbalanced paren
    ],
)
def test_syntax_errors(bad):
    with pytest.raises(ParseError):
        parse(bad)


def test_predicate_roundtrip_structure():
    p = parse_predicate("src.year >= 1936 and src.year <= 1945 and dst.year >= 1936")
    # left-assoc: ((a and b) and c)
    assert p.op == "and" and p.left.op == "and"
