"""Approximate OPTICS (Appendix C): approximation bounds and the
structural edge-generation cases."""
import numpy as np
import pytest

from repro import synth_data as sd
from repro.core.optics import optics_approx_mst
from repro.geometry.knn import core_distances
from repro.graph.prim import mst_bruteforce_mutual


@pytest.mark.parametrize("rho", [0.125, 0.5])
@pytest.mark.parametrize("n,d,mp", [(200, 2, 10), (400, 2, 5), (300, 3, 10)])
def test_weight_within_approximation_factor(rho, n, d, mp):
    """Every approximate edge weight is within [d_m/(1+rho), d_m], so
    the approximate MST weight W' satisfies W/(1+rho) <= W' <= W."""
    pts = sd.uniform_fill(n, d, seed=n + int(rho * 8))
    cd = core_distances(pts, mp)
    exact = mst_bruteforce_mutual(pts, cd)[:, 2].sum()
    edges, _, _ = optics_approx_mst(pts, mp, rho=rho)
    approx = edges[:, 2].sum()
    assert edges.shape[0] == n - 1
    assert approx <= exact * (1 + 1e-9)
    assert approx >= exact / (1 + rho) - 1e-9


def test_spanning_and_deterministic():
    pts = sd.ss_varden(300, 2, seed=1)
    e1, cd1, s1 = optics_approx_mst(pts, 10, seed=42)
    e2, cd2, s2 = optics_approx_mst(pts, 10, seed=42)
    assert np.array_equal(e1, e2)
    assert s1.pairs_materialized == s2.pairs_materialized


def test_min_pts_1_all_pairs_become_rep_edges():
    """With minPts=1 every node has |A| >= minPts: one edge per pair,
    so the edge count equals the pair count."""
    pts = sd.uniform_fill(150, 2, seed=3)
    edges, cd, stats = optics_approx_mst(pts, 1, rho=0.125)
    assert np.allclose(cd, 0.0)
    assert stats.bccp_work_cells == stats.pairs_materialized


def test_small_nodes_fully_connected():
    """With minPts > n every pair is in the all-cross-edges case: the
    base graph is the complete graph, so the 'approximate' MST weight
    equals the exact one up to the 1/(1+rho) scaling of the d-legs."""
    n = 40
    pts = sd.uniform_fill(n, 2, seed=4)
    mp = n  # forces |A| < minPts and |B| < minPts everywhere
    cd = core_distances(pts, mp)
    edges, _, stats = optics_approx_mst(pts, mp, rho=0.125)
    # cd is the max pairwise distance scale here; all d_m = max cd terms
    ref = mst_bruteforce_mutual(pts, cd)[:, 2].sum()
    assert np.isclose(edges[:, 2].sum(), ref)


def test_larger_s_means_more_pairs_than_exact():
    """rho=0.125 -> s=8 must produce far more WSPD pairs than s=2 (the
    paper's explanation for the approximate method being *slower*)."""
    from repro.core.hdbscan import build_hdbscan_tree
    from repro.core.wspd import wspd

    pts = sd.uniform_fill(400, 2, seed=5)
    cd = core_distances(pts, 10)
    tree = build_hdbscan_tree(pts, cd)
    assert wspd(tree, 8.0).shape[0] > 3 * wspd(tree, "s2").shape[0]
