"""Engine scratch-mode tests: every algorithm vs the Python references,
plus DuckDB recursive-CTE oracle checks for BFS/WCC/SSSP on small graphs.
"""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import social_graph
from repro.differential.algorithms import BFS, MPSP, BellmanFord, PageRank, WCC
from repro.differential.engine import ViewEdges, engine_conf, run_view
from repro.graph_oracle import (
    bfs_sql,
    ref_bfs,
    ref_mpsp,
    ref_pagerank,
    ref_sssp,
    ref_wcc,
    sssp_sql,
    wcc_sql,
)
from repro.oracle import assert_equivalent

INF = float("inf")


@pytest.fixture(scope="module")
def graph():
    nodes, edges = social_graph(120, 420, seed=2)
    return nodes, edges


@pytest.fixture(scope="module")
def source(graph):
    _, edges = graph
    return int(edges.src.value_counts().idxmax())


def run(spark, edges, spec, nodes):
    with engine_conf(spark):
        v = ViewEdges(spark, edges, undirected=spec.undirected)
        res = run_view(spark, v, spec, nodes[["vid"]])
        v.unpersist()
    return res


def as_dict(res):
    return res.final_pd().set_index("vid")["val"].to_dict()


# ----------------------------------------------------------- vs references
def test_wcc_matches_union_find(spark, graph):
    nodes, edges = graph
    got = as_dict(run(spark, edges, WCC(), nodes))
    ref = ref_wcc(edges, list(nodes.vid))
    assert got == {k: float(v) for k, v in ref.items()}


def test_bfs_matches_reference(spark, graph, source):
    nodes, edges = graph
    got = as_dict(run(spark, edges, BFS(source), nodes))
    assert got == ref_bfs(edges, source, list(nodes.vid))


def test_bellman_ford_matches_dijkstra(spark, graph, source):
    nodes, edges = graph
    got = as_dict(run(spark, edges, BellmanFord(source), nodes))
    ref = ref_sssp(edges, source, list(nodes.vid))
    for k, v in ref.items():
        assert got[k] == v or abs(got[k] - v) < 1e-9


@pytest.mark.parametrize("iters", [1, 3, 10])
def test_pagerank_matches_power_iteration(spark, graph, iters):
    nodes, edges = graph
    got = as_dict(run(spark, edges, PageRank(iters=iters), nodes))
    ref = ref_pagerank(edges, list(nodes.vid), iters=iters)
    for k, v in ref.items():
        assert abs(got[k] - v) < 1e-9


def test_mpsp_matches_dijkstra(spark, graph, source):
    nodes, edges = graph
    pairs = [(source, 3), (source, 77), (11, 50), (5, source)]
    spec = MPSP(pairs)
    res = run(spark, edges, spec, nodes)
    got = spec.pair_distances(res)
    ref = ref_mpsp(edges, pairs, list(nodes.vid))
    assert all(a == b or abs(a - b) < 1e-9 for a, b in zip(got, ref))


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_wcc_random_seeds(spark, seed):
    nodes, edges = social_graph(80, 250, seed=seed)
    got = as_dict(run(spark, edges, WCC(), nodes))
    ref = ref_wcc(edges, list(nodes.vid))
    assert got == {k: float(v) for k, v in ref.items()}


# ---------------------------------------------- DuckDB recursive-CTE oracle
def test_bfs_vs_duckdb_recursive(spark):
    nodes, edges = social_graph(50, 140, seed=4)
    src = int(edges.src.value_counts().idxmax())
    res = run(spark, edges, BFS(src), nodes)
    reachable = res.final_pd().query("val < @INF", local_dict={"INF": INF})
    got = spark.createDataFrame(reachable, schema="vid long, val double")
    assert_equivalent(got, bfs_sql(src, 50), e=edges[["src", "dst"]])


def test_wcc_vs_duckdb_recursive(spark):
    nodes, edges = social_graph(40, 90, seed=5)
    res = run(spark, edges, WCC(), nodes)
    got = spark.createDataFrame(res.final_pd(), schema="vid long, val double")
    rev = edges.rename(columns={"src": "dst", "dst": "src"})
    ue = pd.concat([edges[["src", "dst"]], rev[["src", "dst"]]]).drop_duplicates()
    assert_equivalent(got, wcc_sql(), v=nodes[["vid"]], ue=ue)


def test_sssp_vs_duckdb_recursive(spark):
    nodes, edges = social_graph(22, 45, seed=6)
    src = int(edges.src.value_counts().idxmax())
    res = run(spark, edges, BellmanFord(src), nodes)
    reachable = res.final_pd().query("val < @INF", local_dict={"INF": INF})
    got = spark.createDataFrame(reachable, schema="vid long, val double")
    assert_equivalent(got, sssp_sql(src, 22), e=edges)


# ------------------------------------------------------------- trajectories
def test_history_is_exact_trajectory(spark, graph, source):
    """history[i] must be the exact Jacobi iterate (min over ≤i-hop walks)."""
    nodes, edges = graph
    res = run(spark, edges, BFS(source), nodes)
    # recompute trajectory in numpy
    idx = res.idx
    state = res.spec.init_values(idx)
    e = edges
    pos = {v: i for i, v in enumerate(idx)}
    for i in range(1, len(res.history)):
        new = res.spec.init_values(idx)
        for s, d in zip(e.src, e.dst):
            new[pos[d]] = min(new[pos[d]], state[pos[s]] + 1)
        assert np.array_equal(new, res.history[i]), f"iteration {i}"
        state = new


def test_history_ends_with_fixpoint(spark, graph):
    nodes, edges = graph
    res = run(spark, edges, WCC(), nodes)
    assert np.array_equal(res.history[-1], res.history[-2])


def test_frontier_shrinks(spark, graph, source):
    """Scratch mode is frontier-based: affected counts must shrink."""
    nodes, edges = graph
    res = run(spark, edges, BFS(source), nodes)
    aff = res.extras["affected_per_iter"]
    assert aff[-1] <= aff[1]
    assert res.affected_total < res.iters * len(nodes)


def test_isolated_vertices_keep_init(spark):
    nodes = pd.DataFrame({"vid": [0, 1, 2, 9]})
    edges = pd.DataFrame({"src": [0], "dst": [1], "weight": [1.0]})
    got = as_dict(run(spark, edges, BFS(0), nodes))
    assert got == {0: 0.0, 1: 1.0, 2: INF, 9: INF}


def test_empty_graph(spark):
    nodes = pd.DataFrame({"vid": [0, 1]})
    edges = pd.DataFrame({"src": pd.Series(dtype="int64"),
                          "dst": pd.Series(dtype="int64"),
                          "weight": pd.Series(dtype="float64")})
    got = as_dict(run(spark, edges, WCC(), nodes))
    assert got == {0: 0.0, 1: 1.0}
