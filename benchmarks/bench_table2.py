"""Benchmark: Table 2 — diff-only vs scratch for BF and PageRank on
small-diff and large-diff collections (paper §5).

Rows are saved to results/table2.json and printed; EXPERIMENTS.md records
paper-vs-measured.
"""
from repro.experiments.common import render_rows
from repro.experiments.table2 import run_table2


def test_table2_stability(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: run_table2(spark),
        rounds=1,
        iterations=1,
    )
    print("\nTable 2 — runtimes (s), diff-only vs scratch")
    print(render_rows(rows, ["collection", "algo", "mode", "seconds", "total_diffs"]))

    def sec(coll, algo, mode):
        return [
            r["seconds"]
            for r in rows
            if (r["collection"], r["algo"], r["mode"]) == (coll, algo, mode)
        ][0]

    # Paper's shape (Table 2): the stable algorithm (BF) wins clearly
    # differentially on the similar collection; the unstable one (PR) gets
    # no differential advantage on the dissimilar collection (at paper
    # scale it loses 1.5×; at ours it is a tie-to-loss — asserted as "no
    # >10% win"); and diff's worst case stays bounded (§5's ~2× argument).
    # PR on C_small is reported, not asserted — its direction depends on
    # how fast the affected set saturates at this scale.
    assert sec("C_small", "BF", "diff") < 0.8 * sec("C_small", "BF", "scratch")
    assert sec("C_large", "PR", "diff") > 0.9 * sec("C_large", "PR", "scratch")
    assert sec("C_large", "BF", "diff") < 2.5 * sec("C_large", "BF", "scratch")
