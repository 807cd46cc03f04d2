"""Synthetic graph datasets standing in for the paper's real-world graphs.

Substitutions (see DESIGN.md §2):

- :func:`social_graph`   — Orkut stand-in (Table 2): power-law endpoints.
- :func:`citation_graph` — Semantic-Scholar Paper-Citations stand-in
  (Table 3): DAG-ish, ``year``/``n_authors`` vertex properties.
- :func:`community_graph`— com-LiveJournal / wiki-topcats stand-in
  (Table 4): planted communities with a per-node membership bitmask.
- :func:`call_graph`     — the paper's Figure-1 running example (GVDL and
  aggregate-view tests).
- :func:`bf_example_graph` — the Table-1 Bellman-Ford example (s, w1..w3
  plus a large "z" component that differential computation never touches).

All generators are deterministic in ``seed`` and return driver-side pandas
frames (the canonical representation fed to :class:`repro.storage.GraphStore`
and to the DuckDB oracle); Spark frames are produced by the storage layer.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

_INF = float("inf")


def _dedupe_edges(src: np.ndarray, dst: np.ndarray) -> pd.DataFrame:
    """Drop self-loops and duplicate (src, dst) pairs, keeping first."""
    df = pd.DataFrame({"src": src.astype("int64"), "dst": dst.astype("int64")})
    df = df[df.src != df.dst]
    return df.drop_duplicates(["src", "dst"]).reset_index(drop=True)


def social_graph(
    n_vertices: int, n_edges: int, *, seed: int = 0, alpha: float = 0.7
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Power-law-ish directed graph (Orkut stand-in).

    Endpoints are drawn from a zipf(alpha)-weighted distribution over vertex
    ranks, giving heavy-tailed degrees and a giant connected component.
    Returns ``(nodes, edges)``; edges carry a ``weight`` in [1, 10).
    """
    g = np.random.default_rng(seed)
    ranks = np.arange(1, n_vertices + 1, dtype="float64")
    w = ranks**-alpha
    w /= w.sum()
    # Oversample, then dedupe down to ~n_edges.
    m = int(n_edges * 1.4) + 16
    src = g.choice(n_vertices, size=m, p=w)
    dst = g.choice(n_vertices, size=m, p=w)
    edges = _dedupe_edges(src, dst).head(n_edges).reset_index(drop=True)
    edges["weight"] = (g.random(len(edges)) * 9 + 1).round(3)
    nodes = pd.DataFrame({"vid": np.arange(n_vertices, dtype="int64")})
    return nodes, edges


def citation_graph(
    n_papers: int,
    avg_citations: float = 5.0,
    *,
    seed: int = 0,
    year_lo: int = 1936,
    year_hi: int = 2020,
    mutual_frac: float = 0.02,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Citation graph stand-in (Paper Citations, Table 3).

    Papers are ordered by publication time; volume grows with year
    (quadratic weighting). Each paper cites earlier papers with a
    recency-biased geometric gap, so edges point mostly backwards in time;
    ``mutual_frac`` of edges are reversed duplicates (mutual citations) so
    SCC has non-trivial components. Vertex properties: ``year`` and
    ``n_authors`` (1..30, skewed small).
    """
    g = np.random.default_rng(seed)
    years = np.arange(year_lo, year_hi + 1)
    yw = (np.arange(1, len(years) + 1, dtype="float64")) ** 2
    yw /= yw.sum()
    paper_years = np.sort(g.choice(years, size=n_papers, p=yw))
    n_authors = np.minimum(30, 1 + g.geometric(0.25, size=n_papers)).astype("int64")
    nodes = pd.DataFrame(
        {
            "vid": np.arange(n_papers, dtype="int64"),
            "year": paper_years.astype("int64"),
            "n_authors": n_authors,
        }
    )
    m = int(n_papers * avg_citations)
    src = g.integers(1, n_papers, size=m)  # paper 0 cites nobody
    gap = np.minimum(src, 1 + g.geometric(np.full(m, 4.0 / n_papers)))
    dst = src - gap
    edges = _dedupe_edges(src, dst)
    n_mutual = int(len(edges) * mutual_frac)
    if n_mutual:
        rev = edges.sample(n=n_mutual, random_state=seed)[["dst", "src"]]
        rev.columns = ["src", "dst"]
        edges = (
            pd.concat([edges, rev], ignore_index=True)
            .drop_duplicates(["src", "dst"])
            .reset_index(drop=True)
        )
    edges["weight"] = (g.random(len(edges)) * 9 + 1).round(3)
    return nodes, edges


def community_graph(
    n_vertices: int,
    n_edges: int,
    n_communities: int,
    *,
    seed: int = 0,
    p_intra: float = 0.8,
    overlap: float = 0.15,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Planted-community graph (LJ / wiki-topcats stand-in, Table 4).

    Community sizes are zipf-skewed. Each vertex belongs to its home
    community and, with probability ``overlap``, one extra community.
    ``p_intra`` of edges connect two members of the same community. Nodes
    carry ``cmask``: a bitmask over the communities (bit c set iff the node
    belongs to community c, for c < 63).
    """
    g = np.random.default_rng(seed)
    cw = np.arange(1, n_communities + 1, dtype="float64") ** -1.0
    cw /= cw.sum()
    home = g.choice(n_communities, size=n_vertices, p=cw)
    extra = g.choice(n_communities, size=n_vertices, p=cw)
    has_extra = g.random(n_vertices) < overlap
    cmask = (1 << home.astype("int64")) | np.where(
        has_extra, 1 << extra.astype("int64"), 0
    )
    members: list[np.ndarray] = [
        np.flatnonzero((cmask >> c) & 1) for c in range(n_communities)
    ]
    m = int(n_edges * 1.5) + 16
    intra = g.random(m) < p_intra
    comm = g.choice(n_communities, size=m, p=cw)
    src = np.empty(m, dtype="int64")
    dst = np.empty(m, dtype="int64")
    rand_src = g.integers(0, n_vertices, size=m)
    rand_dst = g.integers(0, n_vertices, size=m)
    for c in range(n_communities):
        sel = intra & (comm == c)
        mem = members[c]
        if len(mem) >= 2:
            src[sel] = g.choice(mem, size=sel.sum())
            dst[sel] = g.choice(mem, size=sel.sum())
        else:
            intra[sel] = False
    src[~intra] = rand_src[~intra]
    dst[~intra] = rand_dst[~intra]
    edges = _dedupe_edges(src, dst).head(n_edges).reset_index(drop=True)
    edges["weight"] = (g.random(len(edges)) * 9 + 1).round(3)
    nodes = pd.DataFrame(
        {"vid": np.arange(n_vertices, dtype="int64"), "cmask": cmask}
    )
    return nodes, edges


def call_graph() -> tuple[pd.DataFrame, pd.DataFrame]:
    """The paper's Figure-1 phone-call running example, slightly enlarged.

    Node properties: ``profession``, ``city``, ``state``. Edge properties:
    ``duration`` (minutes) and ``year``. Deterministic and tiny — used by
    GVDL, EBM and aggregate-view tests where the DuckDB oracle re-runs the
    same predicates.
    """
    nodes = pd.DataFrame(
        {
            "vid": np.arange(8, dtype="int64"),
            "profession": [
                "doctor", "lawyer", "teacher", "doctor",
                "lawyer", "teacher", "doctor", "engineer",
            ],
            "city": ["NY", "LA", "DC", "NY", "LA", "DC", "SF", "SF"],
            "state": ["NY", "CA", "DC", "NY", "CA", "DC", "CA", "CA"],
        }
    )
    e = [
        # src, dst, duration, year
        (0, 1, 5, 2019), (1, 0, 12, 2019), (0, 3, 3, 2018),
        (3, 0, 7, 2019), (1, 4, 20, 2020), (4, 1, 2, 2019),
        (2, 5, 9, 2019), (5, 2, 15, 2018), (6, 7, 30, 2019),
        (7, 6, 11, 2019), (6, 1, 8, 2020), (4, 7, 25, 2019),
        (2, 0, 6, 2020), (5, 3, 14, 2019), (3, 6, 18, 2019),
        (7, 2, 4, 2018),
    ]
    edges = pd.DataFrame(e, columns=["src", "dst", "duration", "year"])
    edges[["src", "dst"]] = edges[["src", "dst"]].astype("int64")
    edges[["duration", "year"]] = edges[["duration", "year"]].astype("int64")
    return nodes, edges


def bf_example_graph(n_z: int = 200) -> tuple[pd.DataFrame, list[pd.DataFrame]]:
    """The Table-1 Bellman-Ford example: three versions of one graph.

    Vertices: ``s``=0, ``w1``=1, ``w2``=2, ``w3``=3 plus a z-component of
    ``n_z`` vertices hanging off ``s`` as a shallow hub tree (the paper's
    "billions of edges among the z_jk vertices" — scaled down but
    structurally equivalent: large, shallow, and its distances never change
    across versions, so differential computation must never touch it).

    Versions: G0 = base; G1 changes (s,w1) cost 2→1; G2 changes
    (s,w2) cost 10→1. Returns ``(nodes, [edges_G0, edges_G1, edges_G2])``.
    """
    nodes = pd.DataFrame({"vid": np.arange(4 + n_z, dtype="int64")})
    base = [(0, 1, 2.0), (0, 2, 10.0), (1, 2, 2.0), (2, 3, 2.0)]
    n_hubs = max(1, min(8, n_z))
    z = [(0, 4 + h, 1.0) for h in range(n_hubs)] + [
        (4 + (i % n_hubs), 4 + i, 1.0) for i in range(n_hubs, n_z)
    ]

    def mk(extra_w1: float, extra_w2: float) -> pd.DataFrame:
        rows = [(0, 1, extra_w1), (0, 2, extra_w2)] + base[2:] + z
        df = pd.DataFrame(rows, columns=["src", "dst", "weight"])
        df[["src", "dst"]] = df[["src", "dst"]].astype("int64")
        return df

    g0 = mk(2.0, 10.0)
    g1 = mk(1.0, 10.0)
    g2 = mk(1.0, 1.0)
    return nodes, [g0, g1, g2]
