"""Benchmark: Table 1 — the Bellman-Ford differential trace.

Regenerates the paper's §2 demonstration at benchmark scale and records
that differential maintenance work is independent of the z-component size.
"""
from repro.experiments.common import render_rows
from repro.experiments.table1 import run_table1


def test_table1_bf_trace(benchmark, spark):
    out = benchmark.pedantic(
        lambda: run_table1(spark, n_z=2_000), rounds=1, iterations=1
    )
    print("\nTable 1 — BF differential trace (|V| = %d)" % out["n_vertices"])
    print(
        render_rows(
            out["versions"],
            ["version", "mode", "iters", "affected_total",
             "dist_w1", "dist_w2", "dist_w3"],
        )
    )
    for v in out["versions"][1:]:
        assert v["affected_total"] <= 12
