"""GraphStore tests."""
import pandas as pd
import pytest

from repro.datasets import call_graph, social_graph
from repro.oracle import assert_equivalent
from repro.storage.store import GraphStore


@pytest.fixture(scope="module")
def store(spark):
    nodes, edges = call_graph()
    return GraphStore(spark, nodes, edges, name="Calls")


def test_eids_assigned_dense(store):
    eids = store.edges_pd.eid
    assert list(eids) == list(range(len(eids)))


def test_counts(store):
    assert store.n_nodes == 8 and store.n_edges == 16


def test_prop_names(store):
    assert store.edge_prop_names() == ["duration", "year"]
    assert set(store.node_prop_names()) == {"profession", "city", "state"}


def test_edge_view_frame_columns(store):
    cols = set(store.edge_view_frame().columns)
    assert {"eid", "src", "dst", "duration", "year", "src_city", "dst_state"} <= cols


def test_edge_view_frame_matches_duckdb(store):
    """The src_/dst_ property join is checked against a DuckDB double join."""
    got = store.edge_view_frame().select(
        "eid", "src", "dst", "duration", "src_city", "dst_city"
    )
    sql = """
        SELECT e.eid, e.src, e.dst, e.duration,
               ns.city AS src_city, nd.city AS dst_city
        FROM e JOIN n ns ON e.src = ns.vid JOIN n nd ON e.dst = nd.vid
    """
    assert_equivalent(got, sql, e=store.edges_pd, n=store.nodes_pd)


def test_edge_view_frame_pd_agrees_with_spark(store):
    got_pd = store.edge_view_frame_pd()
    got_spark = store.edge_view_frame().toPandas()
    a = got_pd.sort_values("eid").reset_index(drop=True)
    b = got_spark[a.columns].sort_values("eid").reset_index(drop=True)
    pd.testing.assert_frame_equal(a, b, check_dtype=False)


def test_vertices(store):
    v = store.vertices()
    assert list(v.columns) == ["vid"] and len(v) == 8


def test_missing_vid_column(spark):
    with pytest.raises(ValueError):
        GraphStore(spark, pd.DataFrame({"x": [1]}), pd.DataFrame({"src": [0], "dst": [1]}))


def test_missing_src_column(spark):
    with pytest.raises(ValueError):
        GraphStore(spark, pd.DataFrame({"vid": [0]}), pd.DataFrame({"a": [0]}))


def test_save_load_roundtrip(spark, tmp_path):
    nodes, edges = social_graph(50, 150, seed=0)
    s1 = GraphStore(spark, nodes, edges, name="g")
    s1.save(str(tmp_path / "g"))
    s2 = GraphStore.load(spark, str(tmp_path / "g"), name="g")
    pd.testing.assert_frame_equal(
        s1.edges_pd.sort_values("eid").reset_index(drop=True),
        s2.edges_pd.sort_values("eid").reset_index(drop=True),
        check_dtype=False,
    )
    assert s2.n_nodes == s1.n_nodes


def test_from_csv(spark, tmp_path):
    nodes, edges = call_graph()
    nodes.to_csv(tmp_path / "n.csv", index=False)
    edges.to_csv(tmp_path / "e.csv", index=False)
    s = GraphStore.from_csv(spark, str(tmp_path / "n.csv"), str(tmp_path / "e.csv"))
    assert s.n_nodes == 8 and s.n_edges == 16
