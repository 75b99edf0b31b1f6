"""Kruskal's MST over explicit edge arrays.

Used as the per-batch subroutine of GFK/MemoGFK (Algorithms 2-3): each
call receives a batch of edges whose weights are no smaller than any
previously-processed batch, and the union-find persists across calls,
so processing batches in weight order is exactly Kruskal's algorithm.
"""
from __future__ import annotations

import numpy as np

from .unionfind import UnionFind


def kruskal_batch(
    us: np.ndarray,
    vs: np.ndarray,
    ws: np.ndarray,
    uf: UnionFind,
    out_edges: list[tuple[int, int, float]],
) -> int:
    """Process one batch of edges in non-decreasing weight order,
    appending accepted MST edges to ``out_edges``. Returns the number
    of edges accepted."""
    order = np.argsort(ws, kind="stable")
    added = 0
    for i in order:
        u, v = int(us[i]), int(vs[i])
        if uf.union(u, v):
            out_edges.append((u, v, float(ws[i])))
            added += 1
    return added


def mst(n: int, us: np.ndarray, vs: np.ndarray, ws: np.ndarray) -> np.ndarray:
    """One-shot Kruskal. Returns (m, 3) array of [u, v, w] rows; m may be
    < n-1 if the edge set does not connect the graph."""
    uf = UnionFind(n)
    out: list[tuple[int, int, float]] = []
    kruskal_batch(np.asarray(us), np.asarray(vs), np.asarray(ws), uf, out)
    return np.asarray(out, dtype=np.float64).reshape(-1, 3)
