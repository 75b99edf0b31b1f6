"""Table 2 benchmark: the speedup-summary derivation.

Table 2 in the paper is *derived* from the Table 4/5 measurements
(speedup over the best sequential method + self-relative speedup); this
benchmark times the full derivation pipeline over two representative
data sets and prints the resulting summary rows. The full-scale
summary over all 12 data sets is produced by ``jobs/table2.py`` and
recorded in EXPERIMENTS.md.
"""
import pytest

from repro.experiments import tables

NAMES = ["2D-UniformFill", "2D-SS-varden"]


def test_table2_speedup_summary(benchmark, spark):
    def run():
        t4 = tables.table4(spark, NAMES)
        t5 = tables.table5(spark, NAMES)
        return tables.table2(t4, t5)

    summary = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    assert summary, "no methods produced parallel timings"
    print()
    print(tables.format_table2(summary))
    for method, r in summary.items():
        benchmark.extra_info[method] = round(r["self_avg"], 3)
