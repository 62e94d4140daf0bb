"""t-Spanner sparsifier (SP-t, §2.3.6): the Althöfer greedy algorithm.

Scan edges by ascending weight; add edge (u, v, w) iff the distance
between u and v in the spanner built so far exceeds ``t * w``. The result
guarantees d_H(u, v) <= t * d_G(u, v) for all pairs and preserves
connectivity exactly. Prune rate is not controllable (Table 2: PRC ✗) —
``t`` sets the density.

The greedy scan is inherently sequential (each decision depends on all
previous ones), so it runs on the driver with a ``t*w``-bounded Dijkstra
per edge over an incrementally grown adjacency list (DESIGN.md §2).
Undirected-only per Table 2: directed inputs are symmetrized first.
"""
from __future__ import annotations

import heapq

import numpy as np
import pandas as pd

from repro.core.graph import Graph


def _bounded_dist(adj: list[list[tuple[int, float]]], u: int, v: int, bound: float) -> float:
    """Dijkstra distance from u to v, abandoning paths longer than bound."""
    dist = {u: 0.0}
    heap = [(0.0, u)]
    while heap:
        d, x = heapq.heappop(heap)
        if x == v:
            return d
        if d > dist.get(x, np.inf):
            continue
        for y, w in adj[x]:
            nd = d + w
            if nd <= bound and nd < dist.get(y, np.inf):
                dist[y] = nd
                heapq.heappush(heap, (nd, y))
    return np.inf


def spanner_sparsify(g: Graph, rho: float = 0.0, *, seed: int = 0, t: float = 2.0) -> Graph:
    """Greedy t-spanner; ``rho``/``seed`` ignored (deterministic)."""
    gu = g.symmetrized()
    src, dst, w = gu.to_arrays()
    order = np.lexsort((dst, src, w))
    adj: list[list[tuple[int, float]]] = [[] for _ in range(gu.n)]
    keep = []
    for i in order:
        u, v, wi = int(src[i]), int(dst[i]), float(w[i])
        if _bounded_dist(adj, u, v, t * wi) > t * wi:
            keep.append(i)
            adj[u].append((v, wi))
            adj[v].append((u, wi))
    keep_arr = np.array(keep, dtype=np.int64)
    pdf = pd.DataFrame({"src": src[keep_arr], "dst": dst[keep_arr], "weight": w[keep_arr]})
    return Graph.from_pandas(
        g.spark, pdf, directed=False, weighted=gu.weighted, n=gu.n,
        name=f"{g.name}|SP-{t:g}",
    )
