"""Reproduce Table 3: sequential dual-tree Boruvka EMST times
(the mlpack baseline stand-in). Usage:

    spark-submit jobs/table3.py [--datasets 2D-UniformFill ...]
"""
from _common import dataset_parser


def main() -> None:
    args = dataset_parser(__doc__).parse_args()
    from repro.experiments import tables

    rows = tables.table3(args.datasets)
    print(tables.format_table3(rows))


if __name__ == "__main__":
    main()
