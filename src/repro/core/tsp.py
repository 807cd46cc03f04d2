"""Christofides 1.5-approximate TSP, used by the collection-ordering
optimizer (paper §4: CBMP_1.5 = pad a zero column, build the Hamming
clique, solve TSP with Christofides).

Pure NumPy/Python on the (k+1)×(k+1) distance matrix — k is the number of
views, "a query-dependent parameter … small in practice" (paper §4), so the
O(k²)–O(k³) driver-side work is intentional (Algorithm 1 runs Christofides
"in a single TD worker").

Components:
- :func:`prim_mst` — exact minimum spanning tree.
- :func:`min_weight_matching` — minimum-weight perfect matching on the
  odd-degree vertices: exact bitmask DP for ≤ 14 vertices, greedy above
  (Blossom out of scope; see DESIGN.md §6).
- :func:`eulerian_circuit` — Hierholzer on the MST+matching multigraph.
- :func:`christofides` — shortcut the Euler tour to a Hamiltonian cycle.
"""
from __future__ import annotations

from functools import lru_cache

import numpy as np


def prim_mst(dist: np.ndarray) -> list[tuple[int, int]]:
    """Exact MST of a complete graph given a symmetric distance matrix."""
    n = len(dist)
    if n == 1:
        return []
    in_tree = np.zeros(n, dtype=bool)
    best = dist[0].astype("float64").copy()
    parent = np.zeros(n, dtype=int)
    in_tree[0] = True
    best[0] = np.inf
    edges: list[tuple[int, int]] = []
    for _ in range(n - 1):
        v = int(np.argmin(np.where(in_tree, np.inf, best)))
        edges.append((int(parent[v]), v))
        in_tree[v] = True
        upd = ~in_tree & (dist[v] < best)
        best[upd] = dist[v][upd]
        parent[upd] = v
    return edges


def _exact_matching(dist: np.ndarray, verts: list[int]) -> list[tuple[int, int]]:
    """Exact minimum-weight perfect matching via bitmask DP (|verts| ≤ 14)."""
    m = len(verts)

    @lru_cache(maxsize=None)
    def solve(mask: int) -> tuple[float, tuple[tuple[int, int], ...]]:
        if mask == 0:
            return 0.0, ()
        i = (mask & -mask).bit_length() - 1
        rest = mask ^ (1 << i)
        best = (np.inf, ())
        j = rest
        while j:
            b = (j & -j).bit_length() - 1
            j ^= 1 << b
            cost, pairs = solve(rest ^ (1 << b))
            cost += float(dist[verts[i], verts[b]])
            if cost < best[0]:
                best = (cost, pairs + ((verts[i], verts[b]),))
        return best

    _, pairs = solve((1 << m) - 1)
    solve.cache_clear()
    return list(pairs)


def _greedy_matching(dist: np.ndarray, verts: list[int]) -> list[tuple[int, int]]:
    """Greedy min-weight matching: repeatedly pair the closest free pair."""
    free = set(verts)
    pairs: list[tuple[int, int]] = []
    cand = sorted(
        ((float(dist[u, v]), u, v) for i, u in enumerate(verts) for v in verts[i + 1 :]),
    )
    for _, u, v in cand:
        if u in free and v in free:
            pairs.append((u, v))
            free.discard(u)
            free.discard(v)
    return pairs


def min_weight_matching(dist: np.ndarray, verts: list[int]) -> list[tuple[int, int]]:
    """Minimum-weight perfect matching on ``verts`` (|verts| is even)."""
    if len(verts) % 2:
        raise ValueError("perfect matching needs an even vertex count")
    if not verts:
        return []
    if len(verts) <= 14:
        return _exact_matching(dist, verts)
    return _greedy_matching(dist, verts)


def eulerian_circuit(n: int, multi_edges: list[tuple[int, int]], start: int = 0) -> list[int]:
    """Hierholzer's algorithm on a connected multigraph with even degrees."""
    adj: list[list[int]] = [[] for _ in range(n)]
    for idx, (u, v) in enumerate(multi_edges):
        adj[u].append(idx)
        adj[v].append(idx)
    used = [False] * len(multi_edges)
    stack = [start]
    circuit: list[int] = []
    ptr = [0] * n
    while stack:
        v = stack[-1]
        advanced = False
        while ptr[v] < len(adj[v]):
            idx = adj[v][ptr[v]]
            ptr[v] += 1
            if used[idx]:
                continue
            used[idx] = True
            a, b = multi_edges[idx]
            stack.append(b if a == v else a)
            advanced = True
            break
        if not advanced:
            circuit.append(stack.pop())
    circuit.reverse()
    return circuit


def christofides(dist: np.ndarray, start: int = 0) -> list[int]:
    """1.5-approximate TSP tour (cycle as a vertex list, without repeating
    the start at the end) for a symmetric matrix satisfying the triangle
    inequality — Hamming distance does (paper §4, ref [17])."""
    n = len(dist)
    if n <= 2:
        return list(range(n))
    mst = prim_mst(dist)
    deg = np.zeros(n, dtype=int)
    for u, v in mst:
        deg[u] += 1
        deg[v] += 1
    odd = [int(v) for v in np.flatnonzero(deg % 2 == 1)]
    matching = min_weight_matching(dist, odd)
    circuit = eulerian_circuit(n, mst + matching, start=start)
    seen: set[int] = set()
    tour: list[int] = []
    for v in circuit:
        if v not in seen:
            seen.add(v)
            tour.append(v)
    return tour


def two_opt(dist: np.ndarray, tour: list[int], max_passes: int = 10) -> list[int]:
    """2-opt local refinement of a TSP cycle.

    Compensates for the greedy (non-Blossom) matching on large odd sets
    (DESIGN.md §6): repeatedly reverses the segment between two edges when
    that shortens the cycle, until a pass finds no improvement. Only ever
    improves the tour, so all approximation guarantees are preserved.
    """
    arr = np.asarray(tour, dtype=int)
    n = len(arr)
    if n < 4:
        return list(arr)
    for _ in range(max_passes):
        improved = False
        for i in range(n - 2):
            a, b = arr[i], arr[i + 1]
            # candidate second edges (c, d) = (arr[j], arr[j+1]) for j > i+1
            js = np.arange(i + 2, n - 1 if i == 0 else n)
            c = arr[js]
            d = arr[(js + 1) % n]
            gain = dist[a, b] + dist[c, d] - dist[a, c] - dist[b, d]
            k = int(np.argmax(gain)) if len(gain) else -1
            if k >= 0 and gain[k] > 1e-12:
                j = int(js[k])
                arr[i + 1 : j + 1] = arr[i + 1 : j + 1][::-1]
                improved = True
        if not improved:
            break
    return list(int(v) for v in arr)


def tour_length(dist: np.ndarray, tour: list[int]) -> float:
    """Total cycle length of ``tour`` (closing edge included)."""
    return float(
        sum(dist[tour[i], tour[(i + 1) % len(tour)]] for i in range(len(tour)))
    )
