"""Table 3 benchmark: sequential dual-tree Boruvka EMST (the mlpack
baseline stand-in) on all 12 data sets.

Paper reference (mlpack, 1 thread, 10M-25M points): 14.85-4777.29 s.
Our rows are at reproduction scale (see DESIGN.md §6); EXPERIMENTS.md
records paper vs measured side by side.
"""
import pytest

from repro.experiments import datasets
from repro.graph.boruvka import emst_boruvka


@pytest.mark.parametrize("name", datasets.ALL_DATASETS)
def test_table3_boruvka(benchmark, name):
    pts = datasets.load(name)
    edges = benchmark.pedantic(
        emst_boruvka, args=(pts,), rounds=1, iterations=1, warmup_rounds=0
    )
    assert edges.shape[0] == pts.shape[0] - 1
    benchmark.extra_info["n"] = pts.shape[0]
    benchmark.extra_info["mst_weight"] = float(edges[:, 2].sum())
