"""Table 1 (paper §2): the Bellman-Ford differential trace.

Three versions of the example graph — G1 changes (s,w1)'s cost 2→1, G2
changes (s,w2)'s cost 10→1 — while a large z-component hangs off s. The
paper's point: after G0 is computed, DD touches only ~30 differences, all
in the tiny w-component, "despite the fact that the graph contains
billions of edges" among the z vertices.

This harness runs Bellman-Ford differentially across the three versions
and reports, per version, the number of affected state recomputations per
iteration — which must be tiny and independent of the z-component size —
plus the w-vertex distances (checked against Dijkstra in the tests).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.collection import from_edge_sets
from repro.core.executor import run_collection
from repro.datasets import bf_example_graph
from repro.differential.algorithms import BellmanFord
from repro.differential.engine import ViewEdges, engine_conf, run_view
from repro.experiments.common import save_results


def run_table1(spark: SparkSession, *, n_z: int = 200) -> dict:
    nodes, versions = bf_example_graph(n_z)
    coll = from_edge_sets(
        spark, "bf-example", versions, nodes, names=["G0", "G1", "G2"]
    )
    algo = BellmanFord(source=0)
    per_version = []
    with engine_conf(spark):
        prev = None
        for t in range(coll.k):
            view = ViewEdges(spark, coll.view_edges_pd(t))
            if prev is None:
                res = run_view(spark, view, algo, coll.vertices)
            else:
                res = run_view(
                    spark, view, algo, coll.vertices, prev=prev, delta_pd=coll.delta_pd(t)
                )
            final = res.final_pd().set_index("vid")["val"]
            per_version.append(
                {
                    "version": coll.names[t],
                    "mode": res.mode,
                    "iters": res.iters,
                    "affected_total": res.affected_total,
                    "affected_per_iter": res.extras["affected_per_iter"],
                    "changed_per_iter": res.extras["changed_per_iter"],
                    "dist_w1": float(final.loc[1]),
                    "dist_w2": float(final.loc[2]),
                    "dist_w3": float(final.loc[3]),
                }
            )
            prev = res
    coll.unpersist()
    out = {"n_z": n_z, "n_vertices": 4 + n_z, "versions": per_version}
    save_results("table1", out)
    return out
