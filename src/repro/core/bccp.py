"""Bichromatic closest pair kernels (BCCP and BCCP*).

BCCP(A, B): the two points u in A, v in B minimizing Euclidean
distance. BCCP*(A, B): the pair minimizing the *mutual reachability*
distance max{cd(u), cd(v), d(u, v)} (Section 2.3).

These kernels are the quadratic work of Theorems 3.1/3.3 and are the
unit of Spark fan-out: a pair is four integers (two kd-tree point
ranges), and executors run these same NumPy kernels over broadcast
point/core-distance arrays (see ``repro.engine.distribute``).
"""
from __future__ import annotations

import numpy as np

from ..geometry.kdtree import KDTree

# Cap on the number of matrix cells materialized per chunk; large pairs
# are processed in row blocks so memory stays bounded.
_CHUNK_CELLS = 4_000_000


def bccp_kernel(P: np.ndarray, Q: np.ndarray) -> tuple[int, int, float]:
    """Closest cross pair between point blocks P (a, d) and Q (b, d).
    Returns (i, j, dist) with i indexing P and j indexing Q.

    The squared-distance matrix uses the fast expanded (matmul) form;
    the winning pair's distance is then recomputed from coordinate
    differences, which is exact to machine precision (the expanded form
    suffers catastrophic cancellation for near-coincident points).
    """
    a = P.shape[0]
    rows = max(1, _CHUNK_CELLS // max(1, Q.shape[0]))
    best = (0, 0, np.inf)
    for lo in range(0, a, rows):
        blk = P[lo : lo + rows]
        d2 = (
            np.einsum("id,id->i", blk, blk)[:, None]
            + np.einsum("jd,jd->j", Q, Q)[None, :]
            - 2.0 * (blk @ Q.T)
        )
        flat = int(np.argmin(d2))
        i, j = divmod(flat, Q.shape[0])
        dist = float(np.linalg.norm(blk[i] - Q[j]))
        if dist < best[2]:
            best = (lo + i, j, dist)
    return best


def bccp_star_kernel(
    P: np.ndarray, Q: np.ndarray, cdP: np.ndarray, cdQ: np.ndarray
) -> tuple[int, int, float]:
    """BCCP under mutual reachability distance. Returns (i, j, d_m)."""
    a = P.shape[0]
    rows = max(1, _CHUNK_CELLS // max(1, Q.shape[0]))
    best = (0, 0, np.inf)
    for lo in range(0, a, rows):
        blk = P[lo : lo + rows]
        d2 = (
            np.einsum("id,id->i", blk, blk)[:, None]
            + np.einsum("jd,jd->j", Q, Q)[None, :]
            - 2.0 * (blk @ Q.T)
        )
        d = np.sqrt(np.maximum(d2, 0.0))
        dm = np.maximum(d, np.maximum(cdP[lo : lo + rows, None], cdQ[None, :]))
        flat = int(np.argmin(dm))
        i, j = divmod(flat, Q.shape[0])
        # Recompute the winner's Euclidean leg exactly (see bccp_kernel).
        exact = max(
            float(np.linalg.norm(blk[i] - Q[j])),
            float(cdP[lo + i]),
            float(cdQ[j]),
        )
        if exact < best[2]:
            best = (lo + i, j, exact)
    return best


def bccp(tree: KDTree, a: int, b: int) -> tuple[int, int, float]:
    """BCCP between tree nodes a and b, in original point ids."""
    alo, ahi = int(tree.lo[a]), int(tree.hi[a])
    blo, bhi = int(tree.lo[b]), int(tree.hi[b])
    i, j, d = bccp_kernel(tree.pts[alo:ahi], tree.pts[blo:bhi])
    return int(tree.perm[alo + i]), int(tree.perm[blo + j]), d


def bccp_star(tree: KDTree, a: int, b: int) -> tuple[int, int, float]:
    """BCCP* between tree nodes a and b, in original point ids.
    Requires ``attach_core_distances``."""
    assert tree.cd is not None
    alo, ahi = int(tree.lo[a]), int(tree.hi[a])
    blo, bhi = int(tree.lo[b]), int(tree.hi[b])
    i, j, d = bccp_star_kernel(
        tree.pts[alo:ahi],
        tree.pts[blo:bhi],
        tree.cd[alo:ahi],
        tree.cd[blo:bhi],
    )
    return int(tree.perm[alo + i]), int(tree.perm[blo + j]), d


def star_lower_bound(tree: KDTree, a: int, b: int) -> float:
    """Lower bound on BCCP*(A, B): max{d(A,B), cd_min(A), cd_min(B)}."""
    assert tree.cd_min is not None
    return max(
        tree.node_dist(a, b), float(tree.cd_min[a]), float(tree.cd_min[b])
    )


def star_upper_bound(tree: KDTree, a: int, b: int) -> float:
    """Upper bound on BCCP*(A, B): max{d_max(A,B), cd_max(A), cd_max(B)}
    (every cross pair's d_m is at most this, so the minimum is too)."""
    assert tree.cd_max is not None
    return max(
        tree.node_dist_max(a, b), float(tree.cd_max[a]), float(tree.cd_max[b])
    )
