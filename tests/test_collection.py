"""End-to-end view-collection materialization tests (paper §3.2.1)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.collection import (
    collection_from_gvdl,
    from_edge_sets,
    materialize_collection,
)
from repro.datasets import call_graph
from repro.gvdl import parse_predicate, to_spark_column, to_sql
from repro.oracle import assert_equivalent
from repro.storage.store import GraphStore

GVDL = """create view collection call_analysis on Calls
 [D5: duration <= 5 and year <= 2019],
 [D10: duration <= 10 and year <= 2019],
 [D15: duration <= 15 and year <= 2019],
 [D30: duration <= 30 and year <= 2019]"""


@pytest.fixture(scope="module")
def store(spark):
    nodes, edges = call_graph()
    return GraphStore(spark, nodes, edges, name="Calls")


@pytest.fixture(scope="module")
def coll(store):
    return collection_from_gvdl(store, GVDL, order="given")


def test_names_and_k(coll):
    assert coll.k == 4
    assert coll.names == ["D5", "D10", "D15", "D30"]


def test_view_sizes_monotone_for_inclusion_chain(coll):
    assert coll.view_sizes == sorted(coll.view_sizes)


def test_first_delta_is_first_view(coll):
    assert coll.diff_counts[0] == coll.view_sizes[0]


def test_inclusion_chain_has_no_deletions(coll):
    for t in range(1, coll.k):
        assert (coll.delta_pd(t).sign == 1).all()


def test_view_edges_match_duckdb(spark, store, coll):
    """Each materialized view must equal the predicate evaluated by DuckDB."""
    preds = {
        "D5": "duration <= 5 and year <= 2019",
        "D15": "duration <= 15 and year <= 2019",
    }
    for name, pred in preds.items():
        t = coll.names.index(name)
        got = spark.createDataFrame(
            coll.view_edges_pd(t)[["src", "dst"]], schema="src long, dst long"
        )
        sql = f"SELECT src, dst FROM evf WHERE {to_sql(parse_predicate(pred))}"
        assert_equivalent(got, sql, evf=store.edge_view_frame_pd())


def test_delta_pd_requires_t_ge_1(coll):
    with pytest.raises(ValueError):
        coll.delta_pd(0)


def test_optimized_order_no_worse_than_given(store):
    c_given = collection_from_gvdl(store, GVDL, order="given")
    c_opt = collection_from_gvdl(store, GVDL, order="optimize")
    assert sum(c_opt.diff_counts) <= sum(c_given.diff_counts)
    assert c_opt.hamming is not None


def test_explicit_order(store):
    c = collection_from_gvdl(store, GVDL, order=[3, 2, 1, 0])
    assert c.names == ["D30", "D15", "D10", "D5"]
    assert c.view_sizes == sorted(c.view_sizes, reverse=True)


def test_bad_explicit_order(store):
    with pytest.raises(ValueError):
        collection_from_gvdl(store, GVDL, order=[0, 0, 1, 2])


def test_cct_recorded(coll):
    assert set(coll.cct) >= {"ebm", "ordering", "diffstream", "total"}
    assert coll.cct["total"] > 0


def test_gvdl_type_check(store):
    with pytest.raises(TypeError):
        collection_from_gvdl(store, "create view v on g edges where duration > 1")


def test_programmatic_views(store):
    from pyspark.sql import functions as F

    views = [("short", F.col("duration") <= 5), ("ca", F.col("src_state") == "CA")]
    c = materialize_collection(store, "prog", views, order="given")
    assert c.k == 2 and c.names == ["short", "ca"]


def test_from_edge_sets_roundtrip(spark):
    nodes = pd.DataFrame({"vid": range(6)})
    v0 = pd.DataFrame({"src": [0, 1], "dst": [1, 2]})
    v1 = pd.DataFrame({"src": [0, 1, 3], "dst": [1, 2, 4]})
    v2 = pd.DataFrame({"src": [1, 3], "dst": [2, 4]})
    coll = from_edge_sets(spark, "c", [v0, v1, v2], nodes)
    for t, v in enumerate([v0, v1, v2]):
        got = set(zip(coll.view_edges_pd(t).src, coll.view_edges_pd(t).dst))
        assert got == set(zip(v.src, v.dst))
