"""Synthetic dataset generator tests (pure pandas/numpy)."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import (
    bf_example_graph,
    call_graph,
    citation_graph,
    community_graph,
    social_graph,
)


# ------------------------------------------------------------- social graph
def test_social_graph_shape():
    nodes, edges = social_graph(500, 2000, seed=0)
    assert len(nodes) == 500
    assert len(edges) <= 2000
    assert len(edges) > 1500  # oversampling keeps us near the target


def test_social_graph_deterministic():
    _, e1 = social_graph(300, 1000, seed=5)
    _, e2 = social_graph(300, 1000, seed=5)
    pd.testing.assert_frame_equal(e1, e2)


def test_social_graph_seed_changes_graph():
    _, e1 = social_graph(300, 1000, seed=5)
    _, e2 = social_graph(300, 1000, seed=6)
    assert not e1.equals(e2)


def test_social_graph_no_self_loops_or_dups():
    _, e = social_graph(200, 800, seed=1)
    assert (e.src != e.dst).all()
    assert not e.duplicated(["src", "dst"]).any()


def test_social_graph_ids_in_range():
    nodes, e = social_graph(150, 500, seed=2)
    assert e.src.between(0, 149).all() and e.dst.between(0, 149).all()


def test_social_graph_degree_skew():
    _, e = social_graph(1000, 6000, seed=3)
    deg = e.src.value_counts()
    # power-law-ish: the top vertex has far more than the mean degree
    assert deg.iloc[0] > 5 * deg.mean()


def test_social_graph_weights():
    _, e = social_graph(100, 300, seed=4)
    assert e.weight.between(1.0, 10.0).all()


# ------------------------------------------------------------ citation graph
def test_citation_graph_properties():
    nodes, edges = citation_graph(1000, 4.0, seed=0)
    assert set(nodes.columns) == {"vid", "year", "n_authors"}
    assert nodes.year.between(1936, 2020).all()
    assert nodes.n_authors.between(1, 30).all()


def test_citation_graph_years_sorted():
    nodes, _ = citation_graph(500, 3.0, seed=1)
    assert (nodes.year.diff().dropna() >= 0).all()


def test_citation_graph_volume_grows():
    nodes, _ = citation_graph(2000, 3.0, seed=2)
    early = (nodes.year <= 1978).sum()
    late = (nodes.year > 1978).sum()
    assert late > 3 * early


def test_citation_graph_mostly_backward_edges():
    nodes, edges = citation_graph(800, 4.0, seed=3, mutual_frac=0.02)
    frac_backward = (edges.src > edges.dst).mean()
    assert frac_backward > 0.9


def test_citation_graph_has_cycles():
    """mutual_frac creates 2-cycles so SCC is non-trivial."""
    _, edges = citation_graph(800, 4.0, seed=3, mutual_frac=0.05)
    pairs = set(zip(edges.src, edges.dst))
    assert any((d, s) in pairs for s, d in pairs)


def test_citation_graph_deterministic():
    n1, e1 = citation_graph(400, 3.0, seed=9)
    n2, e2 = citation_graph(400, 3.0, seed=9)
    pd.testing.assert_frame_equal(n1, n2)
    pd.testing.assert_frame_equal(e1, e2)


# ----------------------------------------------------------- community graph
def test_community_graph_masks():
    nodes, edges = community_graph(400, 2000, 8, seed=0)
    assert (nodes.cmask > 0).all()
    assert (nodes.cmask < (1 << 8)).all()


def test_community_graph_zipf_sizes():
    nodes, _ = community_graph(2000, 5000, 10, seed=1)
    sizes = [(nodes.cmask & (1 << c) > 0).sum() for c in range(10)]
    assert sizes[0] > sizes[5] > 0  # skewed sizes


def test_community_graph_intra_edges_dominate():
    nodes, edges = community_graph(800, 4000, 6, seed=2, p_intra=0.8)
    m = nodes.set_index("vid").cmask
    share = (m.loc[edges.src].to_numpy() & m.loc[edges.dst].to_numpy() > 0).mean()
    assert share > 0.6


def test_community_graph_deterministic():
    n1, e1 = community_graph(300, 900, 5, seed=4)
    n2, e2 = community_graph(300, 900, 5, seed=4)
    pd.testing.assert_frame_equal(n1, n2)
    pd.testing.assert_frame_equal(e1, e2)


def test_community_graph_overlap():
    nodes, _ = community_graph(2000, 4000, 8, seed=5, overlap=0.3)
    popcount = nodes.cmask.map(lambda m: bin(int(m)).count("1"))
    assert (popcount > 1).sum() > 0


# -------------------------------------------------------------- call graph
def test_call_graph_schema():
    nodes, edges = call_graph()
    assert {"vid", "profession", "city", "state"} == set(nodes.columns)
    assert {"src", "dst", "duration", "year"} == set(edges.columns)
    assert len(nodes) == 8 and len(edges) == 16


def test_call_graph_valid_endpoints():
    nodes, edges = call_graph()
    vids = set(nodes.vid)
    assert set(edges.src) <= vids and set(edges.dst) <= vids


# ------------------------------------------------------------ BF example
def test_bf_example_versions():
    nodes, versions = bf_example_graph(50)
    assert len(versions) == 3
    assert len(nodes) == 54
    g0, g1, g2 = versions
    w1 = lambda g: float(g[(g.src == 0) & (g.dst == 1)].weight.iloc[0])
    w2 = lambda g: float(g[(g.src == 0) & (g.dst == 2)].weight.iloc[0])
    assert (w1(g0), w2(g0)) == (2.0, 10.0)
    assert (w1(g1), w2(g1)) == (1.0, 10.0)
    assert (w1(g2), w2(g2)) == (1.0, 1.0)


def test_bf_example_z_component_static():
    _, versions = bf_example_graph(50)
    z = [g[(g.src >= 4) | (g.dst >= 4)].reset_index(drop=True) for g in versions]
    pd.testing.assert_frame_equal(z[0], z[1])
    pd.testing.assert_frame_equal(z[0], z[2])


def test_bf_example_z_shallow():
    """The z-component must be shallow so the trace stays short."""
    from repro.graph_oracle import ref_sssp

    nodes, versions = bf_example_graph(200)
    d = ref_sssp(versions[0], 0, list(nodes.vid))
    finite = [v for v in d.values() if v != float("inf")]
    assert max(finite) <= 12
