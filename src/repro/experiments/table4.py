"""Table 4 (paper §7.4): collection ordering — #diffs and creation time.

Perturbation analysis on graphs with ground-truth communities: take the
largest N communities and build one view per k-combination removed
(C(10,5) = 252 views, C(7,4) = 35 views). Compare the optimizer's order
(``Ord.``) against three random orders (R1–R3) on (i) the total number of
edge differences in the materialized stream and (ii) the collection
creation time (CCT: EBM + [ordering] + difference-stream materialization).

Paper's results: Ord. generates 9.5–16.8× (10C5) and 3.5–4× (7C4) fewer
diffs; its CCT is 1.1–1.7× the random orders' (the ordering overhead).

Community-removal predicates need bitmask tests, which GVDL does not
express, so views are programmatic Spark ``Column``s over the node
``cmask`` property (DESIGN.md §4).
"""
from __future__ import annotations

from itertools import combinations

import numpy as np
from pyspark.sql import Column, SparkSession
from pyspark.sql import functions as F

from repro.core.collection import materialize_collection
from repro.datasets import community_graph
from repro.experiments.common import save_results
from repro.storage.store import GraphStore


def removal_views(n_top: int, k: int) -> list[tuple[str, Column]]:
    """One view per k-combination S of the top-``n_top`` communities:
    keep an edge iff neither endpoint belongs to any community in S."""
    views = []
    for combo in combinations(range(n_top), k):
        mask = 0
        for c in combo:
            mask |= 1 << c
        name = "rm_" + "_".join(map(str, combo))
        pred = (F.col("src_cmask").bitwiseAND(F.lit(mask)) == 0) & (
            F.col("dst_cmask").bitwiseAND(F.lit(mask)) == 0
        )
        views.append((name, pred))
    return views


def run_table4(
    spark: SparkSession,
    *,
    datasets: dict | None = None,
    configs: tuple[tuple[int, int], ...] = ((10, 5), (7, 4)),
    n_random: int = 3,
    seed: int = 11,
) -> list[dict]:
    if datasets is None:
        datasets = {
            "LJ-like": community_graph(3_000, 30_000, 12, seed=seed),
            "WTC-like": community_graph(2_500, 25_000, 12, seed=seed + 1),
        }
    rows: list[dict] = []
    rng = np.random.default_rng(seed)
    for dname, (nodes, edges) in datasets.items():
        store = GraphStore(spark, nodes, edges, name=dname)
        for n_top, k in configs:
            views = removal_views(n_top, k)
            cname = f"{n_top}C{k}"
            coll = materialize_collection(store, f"{dname}-{cname}", views)
            rows.append(
                {
                    "dataset": dname,
                    "collection": cname,
                    "variant": "Ord.",
                    "n_views": coll.k,
                    "n_diffs": int(sum(coll.diff_counts)),
                    "cct_s": round(coll.cct["total"], 2),
                    "cct_breakdown": {
                        s: round(v, 2) for s, v in coll.cct.items()
                    },
                }
            )
            coll.unpersist()
            for r in range(n_random):
                perm = rng.permutation(len(views)).tolist()
                collr = materialize_collection(
                    store, f"{dname}-{cname}-R{r + 1}", views, order=perm
                )
                rows.append(
                    {
                        "dataset": dname,
                        "collection": cname,
                        "variant": f"R{r + 1}",
                        "n_views": collr.k,
                        "n_diffs": int(sum(collr.diff_counts)),
                        "cct_s": round(collr.cct["total"], 2),
                        "cct_breakdown": {
                            s: round(v, 2) for s, v in collr.cct.items()
                        },
                    }
                )
                collr.unpersist()
        store.unpersist()
    save_results("table4", rows)
    return rows
