"""Table 3 (paper §7.3): adaptive splitting on three citation collections.

Paper's collections on the Paper-Citations graph, reproduced with GVDL
predicates on the synthetic citation graph:

- **C_sl** ("slide"): decade windows [1936,1945], [1941,1950], …,
  [2011,2020] (16 views) — every transition adds and removes ~5 years.
- **C_ex_sh_sl** ("expand-shrink-slide"): [1995,2000] expands by one year
  to [1995,2005], shrinks to [2000,2005], slides to [2005,2010] (16 views).
- **C_aut** ("authors"): cartesian product of 5 non-overlapping 5-year
  windows ([1996,2000]…[2016,2020]) × author-count windows [0,5]…[0,25] —
  addition-only runs punctuated by non-overlapping year slides, the
  designed splitting points (25 views).

Algorithms: WCC, BFS, SCC, PR; strategies diff / scratch / adaptive.
Paper's headline: adaptive matches or beats the better of diff and
scratch (up to 1.8×), and picks the year-slide split points on C_aut.

Paper numbers (seconds) for reference in EXPERIMENTS.md.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.collection import collection_from_gvdl
from repro.core.executor import run_collection
from repro.datasets import citation_graph
from repro.differential.algorithms import BFS, PageRank, WCC
from repro.differential.scc import SCC
from repro.experiments.common import save_results
from repro.storage.store import GraphStore


def _win(a: int, b: int, extra: str = "") -> str:
    p = (
        f"src.year >= {a} and src.year <= {b} "
        f"and dst.year >= {a} and dst.year <= {b}"
    )
    return p + (f" and {extra}" if extra else "")


def gvdl_c_sl() -> str:
    views = []
    for start in range(1936, 2012, 5):
        views.append(f"[Y{start}_{start + 9}: {_win(start, start + 9)}]")
    return "create view collection C_sl on citations " + ", ".join(views)


def gvdl_c_ex_sh_sl() -> str:
    views = []
    for hi in range(2000, 2006):  # expand [1995,2000] → [1995,2005]
        views.append(f"[E1995_{hi}: {_win(1995, hi)}]")
    for lo in range(1996, 2001):  # shrink → [2000,2005]
        views.append(f"[S{lo}_2005: {_win(lo, 2005)}]")
    for lo in range(2001, 2006):  # slide → [2005,2010]
        views.append(f"[L{lo}_{lo + 5}: {_win(lo, lo + 5)}]")
    return "create view collection C_ex_sh_sl on citations " + ", ".join(views)


def gvdl_c_aut() -> str:
    views = []
    for ystart in range(1996, 2017, 5):
        for amax in range(5, 26, 5):
            extra = f"src.n_authors <= {amax} and dst.n_authors <= {amax}"
            views.append(
                f"[Y{ystart}_A{amax}: {_win(ystart, ystart + 4, extra)}]"
            )
    return "create view collection C_aut on citations " + ", ".join(views)


def run_table3(
    spark: SparkSession,
    *,
    n_papers: int = 8_000,
    avg_citations: float = 5.0,
    seed: int = 3,
    pr_iters: int = 10,
    ell: int = 4,
    algos: tuple[str, ...] = ("WCC", "BFS", "SCC", "PR"),
    collections: tuple[str, ...] = ("C_sl", "C_ex_sh_sl", "C_aut"),
) -> list[dict]:
    nodes, edges = citation_graph(n_papers, avg_citations, seed=seed)
    store = GraphStore(spark, nodes, edges, name="citations")
    gvdl = {
        "C_sl": gvdl_c_sl(),
        "C_ex_sh_sl": gvdl_c_ex_sh_sl(),
        "C_aut": gvdl_c_aut(),
    }
    # BFS source: highest-out-degree vertex of the base graph (DESIGN.md §6).
    source = int(edges["src"].value_counts().idxmax())
    mk = {
        "WCC": lambda: WCC(),
        "BFS": lambda: BFS(source=source),
        "SCC": lambda: SCC(),
        "PR": lambda: PageRank(iters=pr_iters),
    }
    rows: list[dict] = []
    for cname in collections:
        # The definition order carries the collections' designed structure
        # (slide / expand-shrink-slide / cartesian), as in the paper.
        coll = collection_from_gvdl(store, gvdl[cname], order="given")
        for aname in algos:
            per_strategy = {}
            for strategy in ("diff", "scratch", "adaptive"):
                rep = run_collection(
                    coll, mk[aname](), strategy, ell=ell, keep_results=False, warmup=True
                )
                per_strategy[strategy] = rep
            best = min(
                per_strategy["diff"].total_seconds,
                per_strategy["scratch"].total_seconds,
            )
            rows.append(
                {
                    "collection": cname,
                    "algo": aname,
                    "diff_s": round(per_strategy["diff"].total_seconds, 2),
                    "scratch_s": round(per_strategy["scratch"].total_seconds, 2),
                    "adaptive_s": round(per_strategy["adaptive"].total_seconds, 2),
                    "adaptive_vs_best": round(
                        per_strategy["adaptive"].total_seconds / best, 2
                    )
                    if best > 0
                    else None,
                    "adaptive_modes": "".join(
                        "D" if m == "diff" else "S"
                        for m in per_strategy["adaptive"].modes
                    ),
                    "n_views": coll.k,
                }
            )
        coll.unpersist()
    store.unpersist()
    # Partial runs (one collection, as the per-collection benchmarks do)
    # save under a suffixed name so they never clobber the merged file the
    # benchmark maintains at results/table3.json.
    name = "table3" if len(collections) >= 3 else "table3_" + "_".join(collections)
    save_results(name, rows)
    return rows
