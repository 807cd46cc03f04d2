"""Tiny-scale runs of the table harnesses: every table's code path executes
end-to-end and produces sane rows (full-scale numbers come from benchmarks/).
"""
import pytest

from repro.experiments.table2 import build_perturbed_collection, run_table2
from repro.experiments.table3 import gvdl_c_aut, gvdl_c_ex_sh_sl, gvdl_c_sl, run_table3
from repro.experiments.table4 import removal_views, run_table4


# -------------------------------------------------------------- table 2
def test_build_perturbed_collection():
    import numpy as np
    import pandas as pd

    g = np.random.default_rng(0)
    base = pd.DataFrame({"src": range(50), "dst": range(1, 51), "weight": 1.0})
    pool = pd.DataFrame({"src": range(100, 160), "dst": range(101, 161), "weight": 1.0})
    views = build_perturbed_collection(base, pool, 4, 5, 5, seed=1)
    assert len(views) == 4
    assert len(views[0]) == 50
    for v in views[1:]:
        assert abs(len(v) - 50) <= 5


def test_table2_tiny(spark):
    rows = run_table2(
        spark, n_vertices=300, n_edges=900, n_views=3, small_diff=10, pr_iters=3
    )
    assert len(rows) == 8  # 2 collections × 2 algos × 2 modes
    combos = {(r["collection"], r["algo"], r["mode"]) for r in rows}
    assert ("C_small", "BF", "diff") in combos
    assert all(r["seconds"] > 0 for r in rows)
    small = [r for r in rows if r["collection"] == "C_small"][0]["total_diffs"]
    large = [r for r in rows if r["collection"] == "C_large"][0]["total_diffs"]
    assert large > 10 * small


# -------------------------------------------------------------- table 3
def test_gvdl_collections_parse():
    from repro.gvdl import parse
    from repro.gvdl.parser import ViewCollectionDef

    for text, n in [(gvdl_c_sl(), 16), (gvdl_c_ex_sh_sl(), 16), (gvdl_c_aut(), 25)]:
        stmt = parse(text)
        assert isinstance(stmt, ViewCollectionDef)
        assert len(stmt.views) == n


def test_table3_tiny(spark):
    rows = run_table3(
        spark,
        n_papers=400,
        avg_citations=3.0,
        pr_iters=3,
        ell=3,
        algos=("WCC", "PR"),
        collections=("C_sl",),
    )
    assert len(rows) == 2
    for r in rows:
        assert r["n_views"] == 16
        assert set("DS") >= set(r["adaptive_modes"])
        assert r["adaptive_modes"][0] == "S" and r["adaptive_modes"][1] == "D"


# -------------------------------------------------------------- table 4
def test_removal_views_counts():
    assert len(removal_views(10, 5)) == 252
    assert len(removal_views(7, 4)) == 35


def test_removal_views_masks_disjoint_names():
    names = [n for n, _ in removal_views(5, 2)]
    assert len(set(names)) == 10


def test_table4_tiny(spark):
    from repro.datasets import community_graph

    rows = run_table4(
        spark,
        datasets={"tiny": community_graph(250, 1200, 8, seed=0)},
        configs=((6, 3),),
        n_random=2,
    )
    assert len(rows) == 3  # Ord + R1 + R2
    ordv = [r for r in rows if r["variant"] == "Ord."][0]
    rand = [r for r in rows if r["variant"].startswith("R")]
    assert all(ordv["n_diffs"] <= r["n_diffs"] for r in rand)
    assert all(r["cct_s"] > 0 for r in rows)
