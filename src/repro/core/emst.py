"""EMST entry points — the four implementations of Table 4.

* ``emst_naive``   — materialize the s=2 WSPD, compute every pair's
  BCCP, run Kruskal once over all edges (Section 3.1.2's strawman).
* ``emst_gfk``     — Algorithm 2 over the materialized WSPD.
* ``emst_memogfk`` — Algorithm 3 (no WSPD materialization).
* ``emst_delaunay``— 2D only (Appendix A.1): MST over Delaunay edges.

Each takes an optional SparkSession; when given, the heavy inner loops
(all-pairs BCCP for naive, per-round BCCP batches for GFK/MemoGFK) run
as Spark jobs — the "48 cores" configuration. The returned edges are
(n-1, 3) [u, v, w] rows; ties aside, every implementation returns the
same MST weight multiset (tests enforce this against a Prim oracle).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from ..geometry import kdtree as kdt
from ..geometry.delaunay import delaunay_edges
from ..graph import kruskal
from .gfk import GfkStats, gfk_mst
from .memogfk import memogfk_mst
from .wspd import wspd


def _spark_ctx(spark: SparkSession | None, tree):
    if spark is None:
        return None
    from ..engine.distribute import SparkBccp

    return SparkBccp(spark, tree)


def emst_naive(
    points: np.ndarray,
    spark: SparkSession | None = None,
    max_pairs: int | None = None,
) -> tuple[np.ndarray, GfkStats]:
    """EMST-Naive: BCCP edge for every WSPD pair, then one Kruskal."""
    tree = kdt.build(points, leaf_size=1)
    pairs = wspd(tree, "s2", max_pairs=max_pairs)
    stats = GfkStats(rounds=1, pairs_materialized=int(pairs.shape[0]))
    stats.bccp_computed = int(pairs.shape[0])
    sz = tree.hi - tree.lo
    stats.bccp_work_cells = int((sz[pairs[:, 0]] * sz[pairs[:, 1]]).sum())
    ctx = _spark_ctx(spark, tree)
    if ctx is not None:
        results = ctx.bccp_many([(int(a), int(b)) for a, b in pairs], star=False)
        edges = np.asarray([e for _, e in results], dtype=np.float64)
        ctx.unpersist()
    else:
        from . import bccp as bccp_mod

        edges = np.asarray(
            [bccp_mod.bccp(tree, int(a), int(b)) for a, b in pairs],
            dtype=np.float64,
        ).reshape(-1, 3)
    mst = kruskal.mst(
        tree.n,
        edges[:, 0].astype(np.int64),
        edges[:, 1].astype(np.int64),
        edges[:, 2],
    )
    return mst, stats


def emst_gfk(
    points: np.ndarray,
    spark: SparkSession | None = None,
    max_pairs: int | None = None,
) -> tuple[np.ndarray, GfkStats]:
    """EMST-GFK: Algorithm 2 on the materialized WSPD."""
    tree = kdt.build(points, leaf_size=1)
    pairs = wspd(tree, "s2", max_pairs=max_pairs)
    ctx = _spark_ctx(spark, tree)
    edges, stats = gfk_mst(tree, pairs, star=False, spark_ctx=ctx)
    if ctx is not None:
        ctx.unpersist()
    return edges, stats


def emst_memogfk(
    points: np.ndarray, spark: SparkSession | None = None
) -> tuple[np.ndarray, GfkStats]:
    """EMST-MemoGFK: Algorithm 3 (the paper's fastest method)."""
    tree = kdt.build(points, leaf_size=1)
    ctx = _spark_ctx(spark, tree)
    edges, stats = memogfk_mst(tree, star=False, separation="s2", spark_ctx=ctx)
    if ctx is not None:
        ctx.unpersist()
    return edges, stats


def emst_delaunay(
    points: np.ndarray, spark: SparkSession | None = None
) -> tuple[np.ndarray, GfkStats]:
    """EMST-Delaunay (2D only): Kruskal over Delaunay edges.

    The triangulation itself is the driver-side Bowyer–Watson substrate
    (DESIGN.md documents this substitution for PBBS's parallel
    Delaunay); when a SparkSession is given, the O(n) edge-weighting is
    done as a DataFrame job so the parallel path is still exercised.
    """
    pts = np.asarray(points, dtype=np.float64)
    if pts.shape[1] != 2:
        raise ValueError("EMST-Delaunay is 2D only")
    de = delaunay_edges(pts)
    stats = GfkStats(rounds=1, pairs_materialized=int(de.shape[0]))
    if spark is not None:
        import pandas as pd
        from pyspark.sql import functions as F

        edf = spark.createDataFrame(
            pd.DataFrame({"u": de[:, 0], "v": de[:, 1]})
        )
        pdf_pts = spark.createDataFrame(
            pd.DataFrame(
                {"id": np.arange(pts.shape[0]), "x": pts[:, 0], "y": pts[:, 1]}
            )
        )
        pu = pdf_pts.select(
            F.col("id").alias("u"), F.col("x").alias("ux"), F.col("y").alias("uy")
        )
        pv = pdf_pts.select(
            F.col("id").alias("v"), F.col("x").alias("vx"), F.col("y").alias("vy")
        )
        joined = (
            edf.join(pu, "u")
            .join(pv, "v")
            .select(
                "u",
                "v",
                F.sqrt(
                    (F.col("ux") - F.col("vx")) ** 2
                    + (F.col("uy") - F.col("vy")) ** 2
                ).alias("w"),
            )
        )
        res = joined.toPandas()
        us, vs, ws = (
            res["u"].to_numpy(),
            res["v"].to_numpy(),
            res["w"].to_numpy(),
        )
    else:
        diff = pts[de[:, 0]] - pts[de[:, 1]]
        ws = np.sqrt(np.einsum("ij,ij->i", diff, diff))
        us, vs = de[:, 0], de[:, 1]
    mst = kruskal.mst(pts.shape[0], us, vs, ws)
    return mst, stats
