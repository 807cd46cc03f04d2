"""Benchmark: Table 4 — collection ordering (#diffs + CCT), optimizer vs
three random orders, 10C5 and 7C4 community-removal collections on two
community graphs (paper §7.4).
"""
from repro.experiments.common import render_rows
from repro.experiments.table4 import run_table4


def test_table4_ordering(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: run_table4(spark, n_random=3), rounds=1, iterations=1
    )
    print("\nTable 4 — #diffs and collection creation time (s)")
    print(render_rows(
        rows, ["dataset", "collection", "variant", "n_views", "n_diffs", "cct_s"]
    ))
    # Paper's shape: the optimizer's order produces several× fewer diffs
    # than every random order, on every dataset/config.
    by_key = {}
    for r in rows:
        by_key.setdefault((r["dataset"], r["collection"]), {})[r["variant"]] = r
    for (_, _), variants in by_key.items():
        ord_diffs = variants["Ord."]["n_diffs"]
        for name, r in variants.items():
            if name != "Ord.":
                assert r["n_diffs"] > ord_diffs
