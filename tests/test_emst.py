"""EMST correctness: every implementation against the O(n^2) Prim
oracle, across dimensions, sizes and distributions (the MST edge-weight
multiset of a graph is unique, so sorted weights must match exactly)."""
import numpy as np
import pytest

from repro import synth_data as sd
from repro.core.emst import emst_delaunay, emst_gfk, emst_memogfk, emst_naive
from repro.graph.boruvka import emst_boruvka
from repro.graph.prim import mst_bruteforce

METHODS = {
    "naive": lambda pts: emst_naive(pts)[0],
    "gfk": lambda pts: emst_gfk(pts)[0],
    "memogfk": lambda pts: emst_memogfk(pts)[0],
    "boruvka": emst_boruvka,
}


def _dataset(dist, n, d, seed):
    if dist == "uniform":
        return sd.uniform_fill(n, d, seed=seed)
    return sd.ss_varden(n, d, seed=seed)


CASES = [
    (dist, n, d)
    for dist in ("uniform", "varden")
    for (n, d) in [(40, 2), (200, 2), (600, 2), (40, 3), (200, 3), (600, 3), (150, 5), (80, 7)]
]


@pytest.mark.parametrize("method", list(METHODS))
@pytest.mark.parametrize("dist,n,d", CASES)
def test_emst_matches_prim(method, dist, n, d):
    pts = _dataset(dist, n, d, seed=n + d)
    ref = np.sort(mst_bruteforce(pts)[:, 2])
    edges = METHODS[method](pts)
    assert edges.shape == (n - 1, 3)
    assert np.allclose(np.sort(edges[:, 2]), ref)
    # Edges reference real points and are self-loop-free.
    assert edges[:, :2].min() >= 0 and edges[:, :2].max() < n
    assert (edges[:, 0] != edges[:, 1]).all()


@pytest.mark.parametrize("dist", ["uniform", "varden"])
@pytest.mark.parametrize("n", [50, 300, 800])
def test_emst_delaunay_matches_prim_2d(dist, n):
    pts = _dataset(dist, n, 2, seed=n)
    ref = np.sort(mst_bruteforce(pts)[:, 2])
    edges, _ = emst_delaunay(pts)
    assert edges.shape == (n - 1, 3)
    assert np.allclose(np.sort(edges[:, 2]), ref)


def test_emst_methods_agree_midsize():
    pts = sd.uniform_fill(2500, 3, seed=77)
    w = None
    for name in ("naive", "gfk", "memogfk"):
        edges = METHODS[name](pts)
        tw = float(edges[:, 2].sum())
        if w is None:
            w = tw
        assert np.isclose(tw, w), name


def test_memogfk_materializes_fewer_pairs():
    """The paper's memory claim: MemoGFK's peak materialized pairs are a
    small fraction of the full WSPD that Naive/GFK must hold."""
    pts = sd.uniform_fill(3000, 3, seed=5)
    _, s_naive = emst_naive(pts)
    _, s_memo = emst_memogfk(pts)
    assert s_memo.pairs_materialized < s_naive.pairs_materialized / 2


def test_gfk_computes_fewer_bccps_than_naive():
    """GFK's connectivity filter must prune BCCP computations."""
    pts = sd.uniform_fill(3000, 3, seed=6)
    _, s_naive = emst_naive(pts)
    _, s_gfk = emst_gfk(pts)
    assert s_gfk.bccp_computed < s_naive.bccp_computed


def test_emst_tiny_inputs():
    for n in (2, 3):
        pts = np.random.default_rng(n).random((n, 2))
        for name in ("naive", "gfk", "memogfk"):
            edges = METHODS[name](pts)
            assert edges.shape == (n - 1, 3)


def test_emst_collinear_points():
    pts = np.column_stack([np.arange(30.0), np.zeros(30)])
    for name in ("naive", "gfk", "memogfk", "boruvka"):
        edges = METHODS[name](pts)
        assert np.allclose(edges[:, 2], 1.0)


def test_emst_with_duplicates():
    rng = np.random.default_rng(3)
    base = rng.random((40, 3))
    pts = np.vstack([base, base[:10]])
    ref = np.sort(mst_bruteforce(pts)[:, 2])
    for name in ("naive", "gfk", "memogfk"):
        edges = METHODS[name](pts)
        assert np.allclose(np.sort(edges[:, 2]), ref), name


def test_delaunay_rejects_non_2d():
    with pytest.raises(ValueError):
        emst_delaunay(np.zeros((10, 3)))
