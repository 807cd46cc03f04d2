"""Reproduce Table 2 (paper §5): diff-only vs scratch for BF and PageRank
on small-diff and large-diff view collections.

Usage: spark-submit jobs/table2_stability.py [--n-edges 50000 --n-views 8]
"""
import argparse
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _session import get_spark  # noqa: E402

from repro.experiments.common import render_rows  # noqa: E402
from repro.experiments.table2 import run_table2  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n-vertices", type=int, default=15_000)
    ap.add_argument("--n-edges", type=int, default=50_000)
    ap.add_argument("--n-views", type=int, default=8)
    ap.add_argument("--pr-iters", type=int, default=10)
    args = ap.parse_args()
    spark = get_spark("table2")
    rows = run_table2(
        spark,
        n_vertices=args.n_vertices,
        n_edges=args.n_edges,
        n_views=args.n_views,
        pr_iters=args.pr_iters,
    )
    print("\nTable 2 — runtimes (s), diff-only vs scratch")
    print(render_rows(rows, ["collection", "algo", "mode", "seconds", "total_diffs"]))
    spark.stop()


if __name__ == "__main__":
    main()
