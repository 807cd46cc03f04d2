"""Reproduce Table 3 (paper §7.3): WCC/BFS/SCC/PR × {diff, scratch,
adaptive} on the three citation view collections.

Usage: spark-submit jobs/table3_splitting.py [--n-papers 8000]
"""
import argparse
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _session import get_spark  # noqa: E402

from repro.experiments.common import render_rows  # noqa: E402
from repro.experiments.table3 import run_table3  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n-papers", type=int, default=8_000)
    ap.add_argument("--ell", type=int, default=4)
    ap.add_argument("--algos", type=str, default="WCC,BFS,SCC,PR")
    args = ap.parse_args()
    spark = get_spark("table3")
    rows = run_table3(
        spark,
        n_papers=args.n_papers,
        ell=args.ell,
        algos=tuple(args.algos.split(",")),
    )
    print("\nTable 3 — runtimes (s), diff vs scratch vs adaptive")
    print(
        render_rows(
            rows,
            ["collection", "algo", "diff_s", "scratch_s", "adaptive_s",
             "adaptive_vs_best", "adaptive_modes"],
        )
    )
    spark.stop()


if __name__ == "__main__":
    main()
