"""Reproduce Table 4 (paper §7.4): collection ordering — number of diffs and
collection creation time for the optimizer order vs 3 random orders.

Usage: spark-submit jobs/table4_ordering.py
"""
import argparse
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _session import get_spark  # noqa: E402

from repro.experiments.common import render_rows  # noqa: E402
from repro.experiments.table4 import run_table4  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n-random", type=int, default=3)
    args = ap.parse_args()
    spark = get_spark("table4")
    rows = run_table4(spark, n_random=args.n_random)
    print("\nTable 4 — #diffs and collection creation time (s)")
    print(
        render_rows(
            rows, ["dataset", "collection", "variant", "n_views", "n_diffs", "cct_s"]
        )
    )
    spark.stop()


if __name__ == "__main__":
    main()
