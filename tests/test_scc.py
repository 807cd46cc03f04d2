"""SCC (doubly-iterative coloring, §7.1) vs iterative Tarjan."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import citation_graph, social_graph
from repro.differential.engine import ViewEdges, engine_conf
from repro.differential.scc import SCC
from repro.graph_oracle import ref_scc


def run_scc(spark, nodes, edges):
    with engine_conf(spark):
        v = ViewEdges(spark, edges)
        res = SCC().run(spark, v, nodes[["vid"]])
        v.unpersist()
    return res.final_pd().set_index("vid")["val"].astype("int64").to_dict(), res


def test_simple_cycle(spark):
    nodes = pd.DataFrame({"vid": range(4)})
    edges = pd.DataFrame({"src": [0, 1, 2, 2], "dst": [1, 2, 0, 3], "weight": 1.0})
    got, _ = run_scc(spark, nodes, edges)
    assert got[0] == got[1] == got[2] == 2
    assert got[3] == 3


def test_two_components_and_bridge(spark):
    nodes = pd.DataFrame({"vid": range(6)})
    edges = pd.DataFrame(
        {"src": [0, 1, 1, 3, 4, 5], "dst": [1, 0, 3, 4, 5, 3], "weight": 1.0}
    )
    got, _ = run_scc(spark, nodes, edges)
    ref = ref_scc(edges, list(nodes.vid))
    assert got == ref


def test_dag_all_singletons(spark):
    nodes = pd.DataFrame({"vid": range(5)})
    edges = pd.DataFrame({"src": [0, 1, 2, 3], "dst": [1, 2, 3, 4], "weight": 1.0})
    got, res = run_scc(spark, nodes, edges)
    assert got == {i: i for i in range(5)}
    # trimming must handle the whole DAG without any Spark propagation
    assert res.spark_jobs == 0


def test_self_loop_is_singleton(spark):
    nodes = pd.DataFrame({"vid": [0, 1]})
    edges = pd.DataFrame({"src": [0, 0], "dst": [0, 1], "weight": 1.0})
    got, _ = run_scc(spark, nodes, edges)
    assert got == {0: 0, 1: 1}


@pytest.mark.parametrize("seed", [0, 1])
def test_random_social_graph(spark, seed):
    nodes, edges = social_graph(120, 500, seed=seed)
    got, _ = run_scc(spark, nodes, edges)
    assert got == ref_scc(edges, list(nodes.vid))


def test_citation_graph_with_mutual_edges(spark):
    nodes, edges = citation_graph(300, 4.0, seed=2, mutual_frac=0.1)
    got, _ = run_scc(spark, nodes, edges)
    assert got == ref_scc(edges, list(nodes.vid))


def test_id_convention_is_max_vid(spark):
    nodes = pd.DataFrame({"vid": [10, 20, 30]})
    edges = pd.DataFrame({"src": [10, 20], "dst": [20, 10], "weight": 1.0})
    got, _ = run_scc(spark, nodes, edges)
    assert got[10] == got[20] == 20
    assert got[30] == 30


def test_empty_graph(spark):
    nodes = pd.DataFrame({"vid": range(3)})
    edges = pd.DataFrame(
        {"src": pd.Series(dtype="int64"), "dst": pd.Series(dtype="int64"),
         "weight": pd.Series(dtype="float64")}
    )
    got, _ = run_scc(spark, nodes, edges)
    assert got == {0: 0, 1: 1, 2: 2}
