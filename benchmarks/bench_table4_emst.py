"""Table 4 benchmark: EMST running times per (data set, method, mode).

mode 'seq' = sequential NumPy ("1 thread" column); mode 'par' = Spark
fan-out of the BCCP loops ("48 cores" column, local[*] here). Cells the
paper marks '-' (Delaunay beyond 2D; WSPD pair budget exceeded — the
out-of-memory analogue) are skipped.
"""
import pytest

from repro.core.wspd import PairBudgetExceeded
from repro.experiments import datasets, tables


@pytest.mark.parametrize("mode", ["seq", "par"])
@pytest.mark.parametrize("method", tables.EMST_METHODS)
@pytest.mark.parametrize("name", datasets.ALL_DATASETS)
def test_table4_emst(benchmark, spark, name, method, mode):
    pts = datasets.load(name)
    if method == "Delaunay" and pts.shape[1] != 2:
        pytest.skip("Delaunay is 2D only (paper's '-')")
    session = spark if mode == "par" else None

    def run():
        return tables._run_emst(method, pts, session)

    try:
        edges, stats = benchmark.pedantic(
            run, rounds=1, iterations=1, warmup_rounds=0
        )
    except PairBudgetExceeded:
        pytest.skip(f"pair budget {tables.MAX_PAIRS} (paper's '-' cell)")
    assert edges.shape[0] == pts.shape[0] - 1
    benchmark.extra_info["n"] = pts.shape[0]
    benchmark.extra_info["pairs_materialized"] = stats.pairs_materialized
    benchmark.extra_info["bccp_computed"] = stats.bccp_computed
    benchmark.extra_info["mst_weight"] = float(edges[:, 2].sum())
