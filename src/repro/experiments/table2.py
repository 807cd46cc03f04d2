"""Table 2 (paper §5): algorithm stability — diff-only vs scratch.

The paper takes 10M Orkut edges and builds two artificial 20-view
collections: C_1K (±500 random edges per view) and C_3.5M (+2M/−1.5M per
view), then runs Bellman-Ford and PageRank diff-only and from scratch.
Paper's result (runtimes, seconds):

    C_1K   BF:  diff 1.4   scratch 13.5      PR: diff 66.5   scratch 136.2
    C_3.5M BF:  diff 13.0  scratch 25.7      PR: diff 281.9  scratch 193.2

i.e. diff wins everywhere except PR on the dissimilar collection, because
PR is unstable (one changed edge perturbs all of a vertex's messages).

Scaled here: a power-law base graph with reproduction-scale |E|, a small
collection (±~0.1% of edges per view) and a large one (+20%/−15% per
view), same fractions as the paper's setup.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.collection import from_edge_sets
from repro.core.executor import run_collection
from repro.datasets import social_graph
from repro.differential.algorithms import BellmanFord, PageRank
from repro.experiments.common import save_results


def build_perturbed_collection(
    base: pd.DataFrame,
    pool: pd.DataFrame,
    n_views: int,
    n_add: int,
    n_remove: int,
    *,
    seed: int = 0,
) -> list[pd.DataFrame]:
    """View 0 = base; each later view removes ``n_remove`` random current
    edges and adds ``n_add`` unused edges from ``pool`` (paper §5's
    controlled add/remove construction)."""
    g = np.random.default_rng(seed)
    views = [base.reset_index(drop=True)]
    cur = base
    pool_pos = 0
    for _ in range(n_views - 1):
        keep = np.ones(len(cur), dtype=bool)
        drop = g.choice(len(cur), size=min(n_remove, len(cur) - 1), replace=False)
        keep[drop] = False
        add = pool.iloc[pool_pos : pool_pos + n_add]
        pool_pos += n_add
        cur = pd.concat([cur[keep], add], ignore_index=True)
        views.append(cur.reset_index(drop=True))
    return views


def run_table2(
    spark: SparkSession,
    *,
    n_vertices: int = 40_000,
    n_edges: int = 160_000,
    n_views: int = 8,
    small_diff: int = 20,
    large_add_frac: float = 0.20,
    large_rem_frac: float = 0.15,
    pr_iters: int = 10,
    seed: int = 7,
) -> list[dict]:
    nodes, all_edges = social_graph(n_vertices, int(n_edges * 3), seed=seed)
    base = all_edges.head(n_edges).reset_index(drop=True)
    pool = all_edges.tail(len(all_edges) - n_edges).reset_index(drop=True)

    collections = {
        "C_small": build_perturbed_collection(
            base, pool, n_views, small_diff // 2, small_diff // 2, seed=seed + 1
        ),
        "C_large": build_perturbed_collection(
            base,
            pool,
            n_views,
            int(n_edges * large_add_frac),
            int(n_edges * large_rem_frac),
            seed=seed + 2,
        ),
    }
    # BF source: the highest-out-degree vertex, so the computation reaches
    # a large part of the graph in every view (paper: "the first vertex to
    # contain an outgoing edge"; see DESIGN.md §6).
    source = int(base["src"].value_counts().idxmax())
    algos = {
        "BF": lambda: BellmanFord(source=source),
        "PR": lambda: PageRank(iters=pr_iters),
    }
    rows: list[dict] = []
    for cname, edge_sets in collections.items():
        coll = from_edge_sets(spark, cname, edge_sets, nodes)
        total_diffs = sum(coll.diff_counts[1:])
        for aname, mk in algos.items():
            for strategy in ("diff", "scratch"):
                rep = run_collection(coll, mk(), strategy, keep_results=False, warmup=True)
                rows.append(
                    {
                        "collection": cname,
                        "algo": aname,
                        "mode": strategy,
                        "seconds": round(rep.total_seconds, 2),
                        "n_views": coll.k,
                        "total_diffs": total_diffs,
                    }
                )
        coll.unpersist()
    save_results("table2", rows)
    return rows
