"""Reproduce Table 5: HDBSCAN* (minPts=10) running times — MST of the
mutual reachability graph + ordered dendrogram — for the new-definition
MemoGFK method vs the exact GanTao baseline. Usage:

    spark-submit jobs/table5.py [--datasets ...] [--minpts 10]
"""
from _common import dataset_parser, get_spark


def main() -> None:
    parser = dataset_parser(__doc__)
    parser.add_argument("--minpts", type=int, default=10)
    args = parser.parse_args()
    spark = get_spark("table5")
    from repro.experiments import tables

    rows = tables.table5(spark, args.datasets, min_pts=args.minpts)
    print(tables.format_table5(rows))
    for name, row in rows.items():
        pm = row["HDBSCAN*-MemoGFK"].stats.get("pairs")
        pg = row["HDBSCAN*-GanTao"].stats.get("pairs")
        if pm and pg:
            print(f"  [{name}] pair ratio GanTao/MemoGFK = {pg / pm:.2f}x")
    spark.stop()


if __name__ == "__main__":
    main()
