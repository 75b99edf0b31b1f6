"""Build the ordered dendrogram (single-linkage via EMST, or HDBSCAN*)
for a named data set and print reachability-plot summary stats. Usage:

    spark-submit jobs/dendrogram.py --kind emst --dataset 2D-SS-varden
"""
import argparse

from _common import get_spark


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--kind", default="emst", choices=["emst", "hdbscan"])
    p.add_argument("--minpts", type=int, default=10)
    p.add_argument("--dataset", default="2D-SS-varden")
    args = p.parse_args()

    from repro.core.dendrogram import dendrogram_topdown
    from repro.core.emst import emst_memogfk
    from repro.core.hdbscan import hdbscan_mst
    from repro.experiments import datasets

    spark = get_spark("dendrogram")
    pts = datasets.load(args.dataset)
    if args.kind == "emst":
        edges, _ = emst_memogfk(pts, spark=spark)
    else:
        edges, _, _ = hdbscan_mst(pts, args.minpts, spark=spark)
    dend = dendrogram_topdown(edges, 0, spark=spark)
    order, bars = dend.reachability()
    print(
        f"{args.dataset} ({args.kind}): n={pts.shape[0]} "
        f"dendrogram height={dend.weight.max():.4f} "
        f"first 10 of reachability order: {order[:10].tolist()}"
    )
    spark.stop()


if __name__ == "__main__":
    main()
