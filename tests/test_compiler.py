"""GVDL compiler tests: Spark Column and DuckDB SQL must agree.

Every predicate is evaluated (a) by Spark over the edge-view frame and
(b) by DuckDB over the same rows via the compiled SQL — checked with the
result-equality oracle.
"""
import pytest

from repro.datasets import call_graph
from repro.gvdl import parse_predicate, to_spark_column, to_sql
from repro.gvdl.parser import BinOp, Ident, Lit, Not
from repro.oracle import assert_equivalent
from repro.storage.store import GraphStore

PREDICATES = [
    "duration > 10",
    "duration <= 5",
    "year = 2019",
    "year != 2019",
    "src.state = 'CA' and dst.state = 'CA'",
    "src.city = 'NY' or dst.city = 'NY'",
    "duration > 10 and year = 2019",
    "not duration > 10",
    "(src.profession = 'doctor' or src.profession = 'lawyer') and duration >= 5",
    "src.state = dst.state",
    "duration ≤ 10 and year ≥ 2019",
    "not (src.city = 'LA' or dst.city = 'LA')",
]


@pytest.fixture(scope="module")
def store(spark):
    nodes, edges = call_graph()
    return GraphStore(spark, nodes, edges, name="Calls")


@pytest.mark.parametrize("pred", PREDICATES)
def test_spark_vs_duckdb(store, pred):
    ast = parse_predicate(pred)
    got = store.edge_view_frame().where(to_spark_column(ast)).select(
        "eid", "src", "dst", "duration", "year"
    )
    sql = (
        "SELECT eid, src, dst, duration, year FROM evf WHERE " + to_sql(ast)
    )
    assert_equivalent(got, sql, evf=store.edge_view_frame_pd())


def test_ident_column_mapping():
    from repro.gvdl.compiler import ident_column

    assert ident_column(Ident(None, "duration")) == "duration"
    assert ident_column(Ident("src", "city")) == "src_city"
    assert ident_column(Ident("dst", "state")) == "dst_state"


def test_sql_string_escaping():
    sql = to_sql(BinOp("=", Ident(None, "name"), Lit("O'Brien")))
    assert sql == "(name = 'O''Brien')"


def test_sql_boolean_literals():
    assert to_sql(Lit(True)) == "TRUE"
    assert to_sql(Not(Lit(False))) == "(NOT FALSE)"


def test_sql_nested_parens():
    ast = parse_predicate("a = 1 or b = 2 and c = 3")
    assert to_sql(ast) == "((a = 1) OR ((b = 2) AND (c = 3)))"


def test_spark_filter_counts(store):
    ast = parse_predicate("duration > 10 and year = 2019")
    n = store.edge_view_frame().where(to_spark_column(ast)).count()
    pdf = store.edge_view_frame_pd()
    assert n == len(pdf[(pdf.duration > 10) & (pdf.year == 2019)])
