"""Parallel MemoGFK (Algorithm 3) — the memory-optimized GFK.

The full WSPD is never materialized. Each round:

* ``get_rho`` — first pruned kd-tree traversal: a WRITEMIN over the
  BCCP lower bounds of (implicit) well-separated pairs with cardinality
  > beta that are not yet connected, yielding rho_hi.
* ``get_pairs`` — second pruned traversal: retrieve only well-separated
  pairs whose BCCP lies in [rho_lo, rho_hi), pruning on the bounding-
  sphere bounds (Figure 3) and on union-find connectivity.
* the retrieved edges go to Kruskal; rho_lo = rho_hi; beta *= 2.

Both traversals are level-synchronous vectorized versions of the
FINDPAIR recursion (same visitation DAG, frontier kept in NumPy
arrays); get_rho's WRITEMIN is applied per level, which can only make
rho_hi-based pruning *weaker* than the sequential DFS, never wrong.

One function serves three paper variants:

* Euclidean BCCP, s=2 separation             -> EMST-MemoGFK
* BCCP*, s=2 separation                      -> HDBSCAN*-GanTao (exact)
* BCCP*, the paper's new well-separation     -> HDBSCAN*-MemoGFK

``spark_ctx`` (repro.engine.distribute.SparkBccp) fans the per-round
BCCP batch out to executors — the "48 cores" configuration.
"""
from __future__ import annotations

import numpy as np

from ..geometry.kdtree import KDTree
from ..graph.kruskal import kruskal_batch
from ..graph.unionfind import UnionFind
from . import bccp as bccp_mod
from .gfk import GfkStats, mono_labels
from .wspd import (
    root_seeds,
    split_frontier,
    v_gap,
    v_gap_max,
    v_well_separated,
)


def _v_bounds(
    tree: KDTree, A: np.ndarray, B: np.ndarray, star: bool
) -> tuple[np.ndarray, np.ndarray]:
    """Vectorized (lower, upper) bounds on BCCP/BCCP* per frontier pair
    (Figure 3a: the pair's line-segment representation)."""
    lb = v_gap(tree, A, B)
    ub = v_gap_max(tree, A, B)
    if star:
        lb = np.maximum(lb, np.maximum(tree.cd_min[A], tree.cd_min[B]))
        ub = np.maximum(ub, np.maximum(tree.cd_max[A], tree.cd_max[B]))
    return lb, ub


def _seeds(tree: KDTree, mono: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """FINDPAIR seeds, skipping internal nodes that are already fully
    inside one component (the paper's connectivity prune)."""
    A, B = root_seeds(tree)
    internal = np.flatnonzero(tree.left >= 0)
    keep = mono[internal] == -1
    return A[keep], B[keep]


def get_rho(
    tree: KDTree,
    beta: int,
    mono: np.ndarray,
    kind: str | float,
    star: bool,
) -> float:
    """GETRHO (Algorithm 3, Line 4): lower bound on the lightest edge
    any not-yet-connected pair with cardinality > beta can produce."""
    sz = (tree.hi - tree.lo).astype(np.int64)
    rho_hi = np.inf
    A, B = _seeds(tree, mono)
    while A.size:
        keep = sz[A] + sz[B] > beta  # S_l pairs (and descendants) pruned
        keep &= ~((mono[A] != -1) & (mono[A] == mono[B]))
        A, B = A[keep], B[keep]
        if not A.size:
            break
        lb, _ = _v_bounds(tree, A, B, star)
        live = lb < rho_hi
        A, B, lb = A[live], B[live], lb[live]
        if not A.size:
            break
        ws = v_well_separated(tree, A, B, kind)
        if np.any(ws):
            rho_hi = min(rho_hi, float(lb[ws].min()))  # WRITEMIN
        A, B, stuck = split_frontier(tree, A[~ws], B[~ws])
        # ``stuck`` = coincident singleton pairs: zero-weight edges that
        # the first get_pairs round will pick up; they never bound rho.
    return float(rho_hi)


def get_pairs(
    tree: KDTree,
    rho_lo: float,
    rho_hi: float,
    mono: np.ndarray,
    kind: str | float,
    star: bool,
    cache: dict[tuple[int, int], tuple[int, int, float]],
    stats: GfkStats,
    spark_ctx=None,
) -> np.ndarray:
    """GETPAIRS (Algorithm 3, Line 5): edges of well-separated pairs
    with BCCP in [rho_lo, rho_hi), via a bounds-pruned traversal.

    Prunes (Figure 3b): d_max(A,B) < rho_lo (descendants' BCCPs below
    range), lb >= rho_hi (descendants' BCCPs above range), or A, B
    already in one component. Well-separated survivors get their BCCP
    computed (driver loop, or one Spark fan-out) and cached; only
    in-range ones are materialized as edges.
    """
    candidates: list[np.ndarray] = []
    A, B = _seeds(tree, mono)
    while A.size:
        keep = ~((mono[A] != -1) & (mono[A] == mono[B]))
        A, B = A[keep], B[keep]
        if not A.size:
            break
        lb, ub = _v_bounds(tree, A, B, star)
        live = (ub >= rho_lo) & (lb < rho_hi)
        A, B = A[live], B[live]
        if not A.size:
            break
        ws = v_well_separated(tree, A, B, kind)
        if np.any(ws):
            candidates.append(np.stack([A[ws], B[ws]], axis=1))
        A, B, stuck = split_frontier(tree, A[~ws], B[~ws])
        if stuck.size:
            candidates.append(stuck)  # coincident singletons: w = 0 edges
    if not candidates:
        return np.empty((0, 3))
    cand = np.concatenate(candidates, axis=0)
    stats.pairs_materialized = max(stats.pairs_materialized, cand.shape[0])

    missing = [
        (int(a), int(b)) for a, b in cand if (int(a), int(b)) not in cache
    ]
    if missing:
        stats.bccp_computed += len(missing)
        sz = tree.hi - tree.lo
        for a, b in missing:
            stats.bccp_work_cells += int(sz[a]) * int(sz[b])
        if spark_ctx is not None:
            for (a, b), edge in spark_ctx.bccp_many(missing, star=star):
                cache[(a, b)] = edge
        else:
            fn = bccp_mod.bccp_star if star else bccp_mod.bccp
            for a, b in missing:
                cache[(a, b)] = fn(tree, a, b)

    rows = [
        cache[(int(a), int(b))]
        for a, b in cand
        if rho_lo <= cache[(int(a), int(b))][2] < rho_hi
    ]
    return np.asarray(rows, dtype=np.float64).reshape(-1, 3)


def memogfk_mst(
    tree: KDTree,
    star: bool = False,
    separation: str | float = "s2",
    spark_ctx=None,
    max_rounds: int = 128,
) -> tuple[np.ndarray, GfkStats]:
    """Run Algorithm 3. Returns ((n-1, 3) [u, v, w] MST edges, stats).

    ``separation="hdbscan"`` + ``star=True`` is HDBSCAN*-MemoGFK;
    ``separation="s2"`` + ``star=True`` is the exact GanTao baseline;
    ``separation="s2"`` + ``star=False`` is EMST-MemoGFK.
    """
    n = tree.n
    uf = UnionFind(n)
    out_edges: list[tuple[int, int, float]] = []
    cache: dict[tuple[int, int], tuple[int, int, float]] = {}
    stats = GfkStats()
    beta = 2
    rho_lo = 0.0
    while len(out_edges) < n - 1:
        stats.rounds += 1
        if stats.rounds > max_rounds:
            raise RuntimeError("MemoGFK failed to converge (bug)")
        mono = mono_labels(tree, uf)
        rho_hi = get_rho(tree, beta, mono, separation, star)
        batch = get_pairs(
            tree,
            rho_lo,
            rho_hi,
            mono,
            separation,
            star,
            cache,
            stats,
            spark_ctx,
        )
        if batch.size:
            kruskal_batch(
                batch[:, 0].astype(np.int64),
                batch[:, 1].astype(np.int64),
                batch[:, 2],
                uf,
                out_edges,
            )
        if (
            not np.isfinite(rho_hi)
            and batch.size == 0
            and len(out_edges) < n - 1
        ):
            raise RuntimeError("MemoGFK exhausted pairs before spanning (bug)")
        rho_lo = rho_hi
        beta *= 2
    return np.asarray(out_edges, dtype=np.float64).reshape(-1, 3), stats
