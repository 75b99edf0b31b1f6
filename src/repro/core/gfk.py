"""Parallel GeoFilterKruskal (Algorithm 2) over a materialized WSPD.

Round structure (exactly the paper's):

1. Split pairs by cardinality |A| + |B| <= beta into S_l / S_u.
2. rho_hi = min d(A, B) over S_u — a lower bound on every edge S_u can
   ever produce.
3. Compute BCCPs of S_l (cached across rounds); S_l1 = pairs with
   BCCP <= rho_hi.
4. Feed S_l1's edges to Kruskal (shared union-find).
5. Filter out remaining pairs whose two sides are already fully inside
   one component.
6. beta *= 2 (doubling => O(log n) rounds; the paper's depth argument).

``spark_ctx`` (a ``repro.engine.distribute.SparkBccp``) switches the
BCCP batch of step 3 from a driver loop to a Spark ``mapInPandas``
fan-out — the "48 cores" configuration of Tables 2/4/5.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from ..geometry.kdtree import KDTree
from ..graph.kruskal import kruskal_batch
from ..graph.unionfind import UnionFind
from . import bccp as bccp_mod
from .wspd import pair_node_dist, pair_point_count


@dataclass
class GfkStats:
    """Instrumentation for the memory/time claims in Section 5."""

    rounds: int = 0
    bccp_computed: int = 0
    pairs_materialized: int = 0       # peak simultaneously-live pairs
    bccp_work_cells: int = 0          # sum |A||B| actually evaluated
    extra: dict = field(default_factory=dict)


def mono_labels(tree: KDTree, uf: UnionFind) -> np.ndarray:
    """Per-node connectivity summary: mono[v] = component label if every
    point under node v is in one union-find component, else -1.

    This is how both the GFK filter (f_diff, Line 9 of Algorithm 2) and
    the MemoGFK traversal prunes test "A and B already connected"
    without touching individual points: a pair is discardable iff
    mono[a] == mono[b] != -1.

    Vectorized via the contiguous-range property: node v's range
    [lo, hi) is label-uniform iff it contains no label change point of
    the reordered label array.
    """
    lab = uf.labels()[tree.perm]  # labels in reordered point order
    # Positions p where lab[p] != lab[p-1], sorted ascending.
    changes = np.flatnonzero(lab[1:] != lab[:-1]) + 1
    lo, hi = tree.lo, tree.hi
    # Range uniform iff no change point p with lo < p < hi.
    n_changes = np.searchsorted(changes, hi, side="left") - np.searchsorted(
        changes, lo + 1, side="left"
    )
    return np.where(n_changes == 0, lab[lo], -1)


def _compute_bccps(
    tree: KDTree,
    pairs: np.ndarray,
    cache: dict[tuple[int, int], tuple[int, int, float]],
    star: bool,
    stats: GfkStats,
    spark_ctx=None,
) -> np.ndarray:
    """Fill ``cache`` for every pair lacking an entry; return the (k, 3)
    [u, v, w] edge array for ``pairs`` in order."""
    missing = [
        (int(a), int(b)) for a, b in pairs if (int(a), int(b)) not in cache
    ]
    if missing:
        stats.bccp_computed += len(missing)
        sz = (tree.hi - tree.lo).astype(np.int64)
        for a, b in missing:
            stats.bccp_work_cells += int(sz[a]) * int(sz[b])
        if spark_ctx is not None:
            for (a, b), edge in spark_ctx.bccp_many(missing, star=star):
                cache[(a, b)] = edge
        else:
            fn = bccp_mod.bccp_star if star else bccp_mod.bccp
            for a, b in missing:
                cache[(a, b)] = fn(tree, a, b)
    out = np.empty((pairs.shape[0], 3))
    for i, (a, b) in enumerate(pairs):
        out[i] = cache[(int(a), int(b))]
    return out


def gfk_mst(
    tree: KDTree,
    pairs: np.ndarray,
    star: bool = False,
    spark_ctx=None,
) -> tuple[np.ndarray, GfkStats]:
    """Run Algorithm 2 on a materialized WSPD ``pairs``.

    ``star=True`` computes BCCP* (mutual reachability) — requires
    ``attach_core_distances`` on the tree. Returns ((n-1, 3) MST edges,
    stats).
    """
    n = tree.n
    uf = UnionFind(n)
    out_edges: list[tuple[int, int, float]] = []
    cache: dict[tuple[int, int], tuple[int, int, float]] = {}
    stats = GfkStats(pairs_materialized=int(pairs.shape[0]))

    card = pair_point_count(tree, pairs)
    ndist = pair_node_dist(tree, pairs)
    if star:
        lbs = np.maximum(
            ndist,
            np.maximum(tree.cd_min[pairs[:, 0]], tree.cd_min[pairs[:, 1]]),
        )
    else:
        lbs = ndist
    active = np.arange(pairs.shape[0])
    beta = 2
    while len(out_edges) < n - 1 and active.size > 0:
        stats.rounds += 1
        in_l = card[active] <= beta
        s_l = active[in_l]
        s_u = active[~in_l]
        rho_hi = float(lbs[s_u].min()) if s_u.size else np.inf
        edges_l = _compute_bccps(tree, pairs[s_l], cache, star, stats, spark_ctx)
        take = edges_l[:, 2] <= rho_hi
        batch = edges_l[take]
        if batch.size:
            kruskal_batch(
                batch[:, 0].astype(np.int64),
                batch[:, 1].astype(np.int64),
                batch[:, 2],
                uf,
                out_edges,
            )
        remaining = np.concatenate([s_l[~take], s_u])
        if remaining.size:
            mono = mono_labels(tree, uf)
            ma = mono[pairs[remaining, 0]]
            mb = mono[pairs[remaining, 1]]
            keep = ~((ma != -1) & (ma == mb))
            active = remaining[keep]
        else:
            active = remaining
        beta *= 2
    return np.asarray(out_edges, dtype=np.float64).reshape(-1, 3), stats
