"""BCCP / BCCP* kernels against brute force, and the bounding-sphere
bounds MemoGFK prunes with (Figure 3a: lb <= BCCP <= ub)."""
import numpy as np
import pytest

from repro.core.bccp import (
    bccp,
    bccp_kernel,
    bccp_star,
    bccp_star_kernel,
    star_lower_bound,
    star_upper_bound,
)
from repro.geometry import kdtree as kdt


def _tree(n=150, d=3, seed=0, with_cd=True):
    rng = np.random.default_rng(seed)
    pts = rng.random((n, d)) * 10
    t = kdt.build(pts, leaf_size=1)
    if with_cd:
        kdt.attach_core_distances(t, rng.random(n) * 4)
    return t


@pytest.mark.parametrize("a,b", [(1, 1), (1, 7), (6, 6), (40, 3), (33, 33)])
@pytest.mark.parametrize("d", [1, 2, 5])
def test_bccp_kernel_vs_bruteforce(a, b, d):
    rng = np.random.default_rng(a * 100 + b + d)
    P = rng.random((a, d))
    Q = rng.random((b, d)) + 0.5
    i, j, w = bccp_kernel(P, Q)
    dmat = np.linalg.norm(P[:, None] - Q[None], axis=2)
    assert np.isclose(w, dmat.min())
    assert np.isclose(np.linalg.norm(P[i] - Q[j]), w)


@pytest.mark.parametrize("a,b", [(1, 1), (5, 9), (30, 30)])
def test_bccp_star_kernel_vs_bruteforce(a, b):
    rng = np.random.default_rng(a + b)
    P = rng.random((a, 3))
    Q = rng.random((b, 3)) + 0.2
    cdP = rng.random(a)
    cdQ = rng.random(b)
    i, j, w = bccp_star_kernel(P, Q, cdP, cdQ)
    dmat = np.linalg.norm(P[:, None] - Q[None], axis=2)
    dm = np.maximum(dmat, np.maximum(cdP[:, None], cdQ[None]))
    assert np.isclose(w, dm.min())
    assert np.isclose(
        max(np.linalg.norm(P[i] - Q[j]), cdP[i], cdQ[j]), w
    )


def test_bccp_kernel_chunking():
    """Force the row-chunked path (cells > _CHUNK_CELLS)."""
    from repro.core import bccp as m

    old = m._CHUNK_CELLS
    m._CHUNK_CELLS = 50
    try:
        rng = np.random.default_rng(3)
        P, Q = rng.random((40, 2)), rng.random((37, 2))
        i, j, w = bccp_kernel(P, Q)
        assert np.isclose(
            w, np.linalg.norm(P[:, None] - Q[None], axis=2).min()
        )
    finally:
        m._CHUNK_CELLS = old


def test_bccp_exact_for_coincident_points():
    """The expanded-form cancellation must not leak into the result."""
    P = np.array([[1.23456789, 9.87654321]])
    i, j, w = bccp_kernel(P, P.copy())
    assert w == 0.0


def test_tree_bccp_returns_original_ids():
    t = _tree(with_cd=False)
    internal = np.flatnonzero(t.left >= 0)
    for v in internal[:30]:
        a, b = int(t.left[v]), int(t.right[v])
        u, w_, dist = bccp(t, a, b)
        # u, w_ are ids into the *original* point order.
        assert u in t.points_of(a) and w_ in t.points_of(b)


def test_star_bounds_bracket_bccp_star():
    t = _tree(seed=5)
    rng = np.random.default_rng(1)
    for _ in range(200):
        a, b = rng.integers(0, t.n_nodes, 2)
        a, b = int(a), int(b)
        _, _, w = bccp_star(t, a, b)
        assert star_lower_bound(t, a, b) <= w + 1e-9
        assert star_upper_bound(t, a, b) >= w - 1e-9
