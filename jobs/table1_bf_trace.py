"""Reproduce Table 1 (paper §2): the Bellman-Ford differential trace.

Usage: spark-submit jobs/table1_bf_trace.py [--n-z 500]
"""
import argparse
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _session import get_spark  # noqa: E402

from repro.experiments.common import render_rows  # noqa: E402
from repro.experiments.table1 import run_table1  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n-z", type=int, default=500, help="z-component size")
    args = ap.parse_args()
    spark = get_spark("table1")
    out = run_table1(spark, n_z=args.n_z)
    print(f"\nTable 1 — BF differential trace (|V| = {out['n_vertices']})")
    print(
        render_rows(
            out["versions"],
            ["version", "mode", "iters", "affected_total", "dist_w1", "dist_w2", "dist_w3"],
        )
    )
    spark.stop()


if __name__ == "__main__":
    main()
