"""Spark fan-out of the paper's shared-memory parallel loops.

The paper runs on a 48-core Cilk machine; every parallel-for over
independent heavy kernels (BCCP batches, k-NN queries, light-edge
dendrogram subproblems) maps here onto one Spark DataFrame job:

* driver broadcasts the reordered point array / core distances / kd-tree
  arrays once per run;
* the work list (node-id pairs, query-id chunks, pickled subproblems)
  becomes a DataFrame, explicitly spread over ``defaultParallelism``
  partitions by a balanced partition key;
* ``mapInPandas`` runs the identical NumPy kernels used by the
  sequential path inside executors;
* results return to the driver (Kruskal's union-find, like the paper's,
  is a serial fraction that Figure 8 shows is negligible).

Tiny batches are executed on the driver instead — shipping four
integers to a cluster to compare two points is pure overhead; the paper
makes the same granularity argument for its parallel loops.
"""
from __future__ import annotations

import pickle

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.bccp import bccp_kernel, bccp_star_kernel
from ..geometry.kdtree import KDTree

# Below this many distance-matrix cells a fan-out costs more than it
# saves; the batch runs on the driver.
_MIN_PARALLEL_CELLS = 100_000


class SparkBccp:
    """Distributes BCCP / BCCP* batches for GFK and MemoGFK rounds.

    Construct once per MST run (one broadcast of the tree state), then
    ``bccp_many`` is called every round with that round's missing pairs.
    """

    def __init__(self, spark: SparkSession, tree: KDTree, n_parts: int | None = None):
        self.spark = spark
        self.tree = tree
        self.n_parts = n_parts or spark.sparkContext.defaultParallelism
        self._bc = spark.sparkContext.broadcast(
            {
                "pts": tree.pts,
                "perm": tree.perm,
                "lo": tree.lo,
                "hi": tree.hi,
                "cd": tree.cd,
            }
        )

    def unpersist(self) -> None:
        self._bc.unpersist()

    def _local(self, pairs: list[tuple[int, int]], star: bool):
        from ..core import bccp as bccp_mod

        fn = bccp_mod.bccp_star if star else bccp_mod.bccp
        return [((a, b), fn(self.tree, a, b)) for a, b in pairs]

    def bccp_many(
        self, pairs: list[tuple[int, int]], star: bool = False
    ) -> list[tuple[tuple[int, int], tuple[int, int, float]]]:
        """Compute BCCP (or BCCP*) for each (node_a, node_b) pair.

        Returns [((a, b), (u, v, w)), ...] with u, v in original ids.
        """
        if not pairs:
            return []
        t = self.tree
        sz = t.hi - t.lo
        cells = np.array([int(sz[a]) * int(sz[b]) for a, b in pairs], dtype=np.int64)
        if int(cells.sum()) < _MIN_PARALLEL_CELLS:
            return self._local(pairs, star)

        # Balance: largest pairs first, round-robin over partitions.
        order = np.argsort(-cells, kind="stable")
        pdf = pd.DataFrame(
            {
                "a": [pairs[i][0] for i in order],
                "b": [pairs[i][1] for i in order],
                "part": np.arange(order.size, dtype=np.int64) % self.n_parts,
            }
        )
        bc = self._bc
        use_star = bool(star)

        def compute(batches):
            data = bc.value
            pts, perm, los, his = data["pts"], data["perm"], data["lo"], data["hi"]
            cd = data["cd"]
            for b_pdf in batches:
                out = {"a": [], "b": [], "u": [], "v": [], "w": []}
                for a, b in zip(b_pdf["a"].to_numpy(), b_pdf["b"].to_numpy()):
                    alo, ahi = int(los[a]), int(his[a])
                    blo, bhi = int(los[b]), int(his[b])
                    if use_star:
                        i, j, w = bccp_star_kernel(
                            pts[alo:ahi], pts[blo:bhi], cd[alo:ahi], cd[blo:bhi]
                        )
                    else:
                        i, j, w = bccp_kernel(pts[alo:ahi], pts[blo:bhi])
                    out["a"].append(int(a))
                    out["b"].append(int(b))
                    out["u"].append(int(perm[alo + i]))
                    out["v"].append(int(perm[blo + j]))
                    out["w"].append(float(w))
                yield pd.DataFrame(out)

        df = self.spark.createDataFrame(pdf)
        res = (
            df.repartition(self.n_parts, "part")
            .mapInPandas(compute, schema="a long, b long, u long, v long, w double")
            .toPandas()
        )
        return [
            ((int(r.a), int(r.b)), (int(r.u), int(r.v), float(r.w)))
            for r in res.itertuples()
        ]


def core_distances_spark(
    spark: SparkSession,
    points: np.ndarray,
    min_pts: int,
    leaf_size: int = 16,
    n_chunks: int | None = None,
) -> np.ndarray:
    """Parallel core distances: build the k-NN tree on the driver,
    broadcast it, and fan the queries out in contiguous chunks.

    Mirrors the paper's parallel k-NN step (Section 3.2.1); returns
    cd[i] for every original point id i.
    """
    from ..geometry import kdtree as kdt
    from ..geometry.knn import kth_distances

    pts = np.ascontiguousarray(np.asarray(points, dtype=np.float64))
    n = pts.shape[0]
    if min_pts > n:
        raise ValueError("minPts larger than the point set")
    tree = kdt.build(pts.copy(), leaf_size=leaf_size)
    par = n_chunks or 4 * spark.sparkContext.defaultParallelism
    if n < 4096:
        return kth_distances(tree, pts, min_pts)
    bc = spark.sparkContext.broadcast({"tree": tree, "queries": pts})
    bounds = np.linspace(0, n, par + 1, dtype=np.int64)
    pdf = pd.DataFrame(
        {"lo": bounds[:-1], "hi": bounds[1:], "part": np.arange(par) % par}
    )
    k = int(min_pts)

    def compute(batches):
        data = bc.value
        t, q = data["tree"], data["queries"]
        for b_pdf in batches:
            for lo, hi in zip(b_pdf["lo"].to_numpy(), b_pdf["hi"].to_numpy()):
                cds = kth_distances(t, q[lo:hi], k)
                yield pd.DataFrame(
                    {"id": np.arange(lo, hi, dtype=np.int64), "cd": cds}
                )

    res = (
        spark.createDataFrame(pdf)
        .repartition(min(par, 64), "part")
        .mapInPandas(compute, schema="id long, cd double")
        .toPandas()
    )
    bc.unpersist()
    out = np.empty(n)
    out[res["id"].to_numpy()] = res["cd"].to_numpy()
    return out


def run_payloads_spark(
    spark: SparkSession, payloads: list[bytes], fn_name: str
) -> list[tuple[int, bytes]]:
    """Generic pickled-payload fan-out, used for dendrogram light-edge
    subproblems: each payload is solved in an executor by the named
    kernel from ``repro.core.dendrogram`` and pickled back.
    """
    if not payloads:
        return []
    n_parts = min(len(payloads), spark.sparkContext.defaultParallelism)
    sizes = np.array([len(p) for p in payloads], dtype=np.int64)
    order = np.argsort(-sizes, kind="stable")
    pdf = pd.DataFrame(
        {
            "sub_id": [int(i) for i in order],
            "blob": [payloads[i] for i in order],
            "part": np.arange(order.size, dtype=np.int64) % n_parts,
        }
    )
    kernel_name = fn_name

    def compute(batches):
        from ..core import dendrogram as dmod

        kernel = getattr(dmod, kernel_name)
        for b_pdf in batches:
            out = {"sub_id": [], "blob": []}
            for sid, blob in zip(b_pdf["sub_id"], b_pdf["blob"]):
                result = kernel(*pickle.loads(bytes(blob)))
                out["sub_id"].append(int(sid))
                out["blob"].append(pickle.dumps(result))
            yield pd.DataFrame(out)

    res = (
        spark.createDataFrame(pdf)
        .repartition(n_parts, "part")
        .mapInPandas(compute, schema="sub_id long, blob binary")
        .toPandas()
    )
    return [(int(r.sub_id), bytes(r.blob)) for r in res.itertuples()]
