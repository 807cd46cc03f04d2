"""Aggregate-view tests (paper §6, Listing 4) — DuckDB oracle-checked."""
import pytest

from repro.datasets import call_graph
from repro.oracle import assert_equivalent
from repro.storage.store import GraphStore
from repro.views.aggregate import aggregate_view_from_gvdl

CITY_CALLS = """create aggregate view city_calls on Calls
 nodes group by city aggregate count(*) as num_phones
 edges aggregate sum(duration) as total_duration"""


@pytest.fixture(scope="module")
def store(spark):
    nodes, edges = call_graph()
    return GraphStore(spark, nodes, edges, name="Calls")


def test_city_calls_super_nodes(store):
    """The paper's city-calls-city example: super-node aggregates."""
    sn, _ = aggregate_view_from_gvdl(store, CITY_CALLS)
    sql = """
        SELECT city, COUNT(*) AS num_nodes, COUNT(*) AS num_phones
        FROM n GROUP BY city
    """
    assert_equivalent(sn, sql, n=store.nodes_pd)


def test_city_calls_super_edges(store):
    """Super-edges: total call duration between city groups."""
    _, se = aggregate_view_from_gvdl(store, CITY_CALLS)
    sql = """
        SELECT ns.city AS src_city, nd.city AS dst_city,
               COUNT(*) AS num_edges, SUM(e.duration) AS total_duration
        FROM e JOIN n ns ON e.src = ns.vid JOIN n nd ON e.dst = nd.vid
        GROUP BY ns.city, nd.city
    """
    assert_equivalent(se, sql, e=store.edges_pd, n=store.nodes_pd)


def test_multi_property_group_by(store):
    text = """create aggregate view pc on Calls
     nodes group by profession, city
     edges aggregate count(*) as total_calls, max(duration) as longest"""
    sn, se = aggregate_view_from_gvdl(store, text)
    sql = """
        SELECT ns.profession AS src_profession, ns.city AS src_city,
               nd.profession AS dst_profession, nd.city AS dst_city,
               COUNT(*) AS num_edges, COUNT(*) AS total_calls,
               MAX(e.duration) AS longest
        FROM e JOIN n ns ON e.src = ns.vid JOIN n nd ON e.dst = nd.vid
        GROUP BY 1, 2, 3, 4
    """
    assert_equivalent(se, sql, e=store.edges_pd, n=store.nodes_pd)


def test_node_where_filters_nodes_and_edges(store):
    """Listing 4's first example: only selected professions take part."""
    text = """create aggregate view tri on Calls
     nodes where profession = 'doctor' or profession = 'lawyer'
     group by profession, city
     edges aggregate count(*) as total_calls"""
    sn, se = aggregate_view_from_gvdl(store, text)
    sql_nodes = """
        SELECT profession, city, COUNT(*) AS num_nodes FROM n
        WHERE profession IN ('doctor', 'lawyer') GROUP BY 1, 2
    """
    assert_equivalent(sn, sql_nodes, n=store.nodes_pd)
    sql_edges = """
        SELECT ns.profession AS src_profession, ns.city AS src_city,
               nd.profession AS dst_profession, nd.city AS dst_city,
               COUNT(*) AS num_edges, COUNT(*) AS total_calls
        FROM e JOIN n ns ON e.src = ns.vid JOIN n nd ON e.dst = nd.vid
        WHERE ns.profession IN ('doctor', 'lawyer')
          AND nd.profession IN ('doctor', 'lawyer')
        GROUP BY 1, 2, 3, 4
    """
    assert_equivalent(se, sql_edges, e=store.edges_pd, n=store.nodes_pd)


def test_avg_and_min_aggregates(store):
    text = """create aggregate view st on Calls
     nodes group by state
     edges aggregate avg(duration) as avg_dur, min(year) as first_year"""
    _, se = aggregate_view_from_gvdl(store, text)
    sql = """
        SELECT ns.state AS src_state, nd.state AS dst_state,
               COUNT(*) AS num_edges, AVG(e.duration) AS avg_dur,
               MIN(e.year) AS first_year
        FROM e JOIN n ns ON e.src = ns.vid JOIN n nd ON e.dst = nd.vid
        GROUP BY 1, 2
    """
    assert_equivalent(se, sql, e=store.edges_pd, n=store.nodes_pd)


def test_node_where_rejects_qualifiers(store):
    text = """create aggregate view bad on Calls
     nodes where src.city = 'NY' group by city"""
    with pytest.raises(ValueError):
        aggregate_view_from_gvdl(store, text)


def test_type_check(store):
    with pytest.raises(TypeError):
        aggregate_view_from_gvdl(store, "create view v on g edges where x = 1")


def test_star_only_valid_for_count(store):
    text = "create aggregate view a on Calls nodes group by city aggregate sum(*)"
    with pytest.raises(ValueError):
        aggregate_view_from_gvdl(store, text)
