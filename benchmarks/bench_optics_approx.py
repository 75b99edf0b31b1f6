"""Appendix C benchmark: approximate OPTICS (rho=0.125, s=8) vs the two
exact HDBSCAN* methods on two data sets.

Paper finding (Figure 10 discussion): the approximate method is
*slower* than HDBSCAN*-GanTao by 1.00-1.96x and than HDBSCAN*-MemoGFK
by 1.72-7.48x, because s=8 explodes the WSPD size.
"""
import pytest

from repro.core.hdbscan import hdbscan_mst
from repro.core.optics import optics_approx_mst
from repro.experiments import datasets

NAMES = ["2D-UniformFill", "2D-SS-varden"]


@pytest.mark.parametrize("name", NAMES)
@pytest.mark.parametrize(
    "method", ["optics-approx", "hdbscan-gantao", "hdbscan-memogfk"]
)
def test_optics_vs_exact(benchmark, name, method):
    pts = datasets.load(name)

    def run():
        if method == "optics-approx":
            return optics_approx_mst(pts, 10, rho=0.125)
        return hdbscan_mst(pts, 10, method=method.split("-")[1])

    edges, _, stats = benchmark.pedantic(
        run, rounds=1, iterations=1, warmup_rounds=0
    )
    assert edges.shape[0] == pts.shape[0] - 1
    benchmark.extra_info["pairs_materialized"] = stats.pairs_materialized
