"""Reproduce Table 2: per-method speedups over the best sequential time
and self-relative speedups, derived from fresh Table 4 + Table 5 runs.
Usage:

    spark-submit jobs/table2.py [--datasets ...]
"""
from _common import dataset_parser, get_spark


def main() -> None:
    args = dataset_parser(__doc__).parse_args()
    spark = get_spark("table2")
    from repro.experiments import tables

    t4 = tables.table4(spark, args.datasets)
    t5 = tables.table5(spark, args.datasets)
    print(tables.format_table4(t4))
    print(tables.format_table5(t5))
    print(tables.format_table2(tables.table2(t4, t5)))
    spark.stop()


if __name__ == "__main__":
    main()
