"""Table 5 benchmark: HDBSCAN* (minPts=10) per (data set, method, mode).

As in the paper, a measurement covers the MST of the mutual
reachability graph *plus* the ordered dendrogram.
"""
import pytest

from repro.core.dendrogram import dendrogram_topdown
from repro.core.hdbscan import hdbscan_mst
from repro.experiments import datasets

MIN_PTS = 10


@pytest.mark.parametrize("mode", ["seq", "par"])
@pytest.mark.parametrize("method", ["memogfk", "gantao"])
@pytest.mark.parametrize("name", datasets.ALL_DATASETS)
def test_table5_hdbscan(benchmark, spark, name, method, mode):
    pts = datasets.load(name)
    session = spark if mode == "par" else None

    def run():
        edges, cd, stats = hdbscan_mst(pts, MIN_PTS, method=method, spark=session)
        dend = dendrogram_topdown(edges, 0, spark=session)
        return edges, stats, dend

    edges, stats, dend = benchmark.pedantic(
        run, rounds=1, iterations=1, warmup_rounds=0
    )
    assert edges.shape[0] == pts.shape[0] - 1
    assert dend.n == pts.shape[0]
    benchmark.extra_info["n"] = pts.shape[0]
    benchmark.extra_info["pairs_materialized"] = stats.pairs_materialized
    benchmark.extra_info["mst_weight"] = float(edges[:, 2].sum())
