"""Internals of Algorithms 2 and 3: the connectivity summaries and the
per-round traversal invariants that GFK/MemoGFK correctness rests on."""
import numpy as np
import pytest

from repro.core.bccp import bccp, bccp_star
from repro.core.gfk import GfkStats, mono_labels
from repro.core.memogfk import get_pairs, get_rho
from repro.core.wspd import wspd
from repro.geometry import kdtree as kdt
from repro.graph.unionfind import UnionFind


def _tree(n=300, d=2, seed=0):
    pts = np.random.default_rng(seed).random((n, d)) * 10
    return kdt.build(pts, leaf_size=1)


def _random_uf(n, merges, seed=0):
    uf = UnionFind(n)
    rng = np.random.default_rng(seed)
    for _ in range(merges):
        uf.union(int(rng.integers(n)), int(rng.integers(n)))
    return uf


@pytest.mark.parametrize("merges", [0, 10, 150, 299])
def test_mono_labels_matches_naive(merges):
    t = _tree()
    uf = _random_uf(t.n, merges, seed=merges)
    mono = mono_labels(t, uf)
    lab = uf.labels()[t.perm]
    for v in range(t.n_nodes):
        seg = lab[t.lo[v] : t.hi[v]]
        expect = seg[0] if np.all(seg == seg[0]) else -1
        assert mono[v] == expect


@pytest.mark.parametrize("beta", [2, 8, 64, 10_000])
def test_get_rho_lower_bounds_big_pair_bccps(beta):
    """rho_hi must never exceed the BCCP of any not-yet-connected
    well-separated pair with cardinality > beta (that is exactly what
    makes the [rho_lo, rho_hi) batch safe for Kruskal)."""
    t = _tree(seed=2)
    uf = _random_uf(t.n, 120, seed=3)
    mono = mono_labels(t, uf)
    rho = get_rho(t, beta, mono, "s2", star=False)
    sz = t.hi - t.lo
    for a, b in wspd(t, "s2"):
        a, b = int(a), int(b)
        if sz[a] + sz[b] <= beta:
            continue
        if mono[a] != -1 and mono[a] == mono[b]:
            continue
        assert bccp(t, a, b)[2] >= rho - 1e-9


@pytest.mark.parametrize("lo_q,hi_q", [(0.0, 0.3), (0.3, 0.8), (0.8, 1.01)])
def test_get_pairs_returns_exactly_in_range_edges(lo_q, hi_q):
    """get_pairs must return precisely the WSPD BCCP edges (over
    unconnected pairs) with weight in [rho_lo, rho_hi)."""
    t = _tree(seed=4, n=200)
    uf = _random_uf(t.n, 60, seed=5)
    mono = mono_labels(t, uf)
    pairs = wspd(t, "s2")
    all_w = np.array([bccp(t, int(a), int(b))[2] for a, b in pairs])
    keep = np.array(
        [
            not (mono[a] != -1 and mono[a] == mono[b])
            for a, b in pairs
        ]
    )
    rho_lo = float(np.quantile(all_w, lo_q)) if lo_q > 0 else 0.0
    rho_hi = float(np.quantile(all_w, min(hi_q, 1.0))) if hi_q <= 1 else np.inf
    expect = np.sort(all_w[keep & (all_w >= rho_lo) & (all_w < rho_hi)])
    got = get_pairs(
        t, rho_lo, rho_hi, mono, "s2", False, {}, GfkStats(), None
    )
    assert np.allclose(np.sort(got[:, 2]), expect)


def test_get_rho_infinite_when_no_big_pairs():
    t = _tree(n=50, seed=7)
    uf = UnionFind(t.n)
    mono = mono_labels(t, uf)
    assert get_rho(t, 10_000, mono, "s2", star=False) == np.inf


def test_get_rho_star_uses_core_distance_floor():
    """With the star metric, rho_hi must respect cd_min floors: it can
    only be >= the smallest core distance among unconnected points."""
    t = _tree(n=120, seed=8)
    cd = np.random.default_rng(9).random(t.n) * 3 + 1.0
    kdt.attach_core_distances(t, cd)
    uf = UnionFind(t.n)
    mono = mono_labels(t, uf)
    rho = get_rho(t, 2, mono, "s2", star=True)
    for a, b in wspd(t, "s2"):
        a, b = int(a), int(b)
        if t.size(a) + t.size(b) <= 2:
            continue
        assert bccp_star(t, a, b)[2] >= rho - 1e-9


def test_gfk_stats_fields():
    from repro.core.emst import emst_gfk

    pts = np.random.default_rng(1).random((400, 2)) * 10
    _, s = emst_gfk(pts)
    assert s.rounds >= 1
    assert s.bccp_computed <= s.pairs_materialized
    assert s.bccp_work_cells >= s.bccp_computed
