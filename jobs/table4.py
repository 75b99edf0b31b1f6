"""Reproduce Table 4: EMST running times (sequential vs Spark-parallel)
for EMST-Naive / EMST-GFK / EMST-MemoGFK / Delaunay(2D). Usage:

    spark-submit jobs/table4.py [--datasets ...]
"""
from _common import dataset_parser, get_spark


def main() -> None:
    args = dataset_parser(__doc__).parse_args()
    spark = get_spark("table4")
    from repro.experiments import tables

    rows = tables.table4(spark, args.datasets)
    print(tables.format_table4(rows))
    for name, row in rows.items():
        for m, c in row.items():
            if c.stats:
                print(
                    f"  [{name} / {m}] pairs={c.stats.get('pairs')} "
                    f"bccp={c.stats.get('bccp')} rounds={c.stats.get('rounds')}"
                )
    spark.stop()


if __name__ == "__main__":
    main()
