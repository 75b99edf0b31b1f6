"""Ordered dendrogram and reachability plot (Section 4).

Given a weighted spanning tree (the EMST for single-linkage clustering,
or the HDBSCAN* mutual-reachability MST), build the *ordered
dendrogram* of a starting vertex s: the binary tree whose internal
nodes are the tree edges (split heights = edge weights) and whose
in-order leaf traversal is exactly Prim's visit order from s — i.e. the
reachability plot (Theorem 4.2).

Two constructions, which must agree (tests enforce it):

* ``dendrogram_sequential`` — the classic bottom-up agglomerative
  algorithm (sort edges, merge with union-find), ordering each internal
  node's children by the vertex distances of the edge endpoints.
* ``dendrogram_topdown`` — the paper's novel divide-and-conquer: take
  the heaviest ~n/10 edges ("heavy"), solve each light-edge component
  and the contracted heavy problem recursively, and graft light roots
  into the heavy dendrogram's leaves. With a SparkSession, the
  top-level light subproblems are solved in one Spark fan-out (the
  paper's implementation note: parallelism across subproblems).

Node encoding: the dendrogram over n leaves has n-1 internal nodes in
flat arrays ``left``/``right``/``weight``. A child reference r is a
leaf vertex v when r < 0 (encoded -(v+1)) and an internal node index
otherwise.
"""
from __future__ import annotations

import pickle
from dataclasses import dataclass

import numpy as np
from pyspark.sql import SparkSession

from ..graph.unionfind import UnionFind

# Subproblems at or below this edge count are solved bottom-up.
_SEQ_CUTOFF = 256
_HEAVY_FRAC = 0.1  # the paper's n/10 heavy edges


def leaf_ref(v: int) -> int:
    return -(v + 1)


def is_leaf(ref: int) -> bool:
    return ref < 0


def leaf_vertex(ref: int) -> int:
    return -ref - 1


@dataclass
class Dendrogram:
    """Ordered dendrogram over n leaves (see module docstring)."""

    n: int
    left: np.ndarray    # (n-1,) child refs
    right: np.ndarray   # (n-1,)
    weight: np.ndarray  # (n-1,) split heights
    root: int           # ref of the root

    def inorder_leaves(self) -> np.ndarray:
        """Leaves in in-order — Prim's visit order (Theorem 4.2)."""
        out = np.empty(self.n, dtype=np.int64)
        k = 0
        stack: list[int] = []
        cur = self.root
        while stack or not is_leaf(cur) or True:
            while not is_leaf(cur):
                stack.append(cur)
                cur = int(self.left[cur])
            out[k] = leaf_vertex(cur)
            k += 1
            if not stack:
                break
            cur = int(self.right[stack.pop()])
        assert k == self.n
        return out

    def reachability(self) -> tuple[np.ndarray, np.ndarray]:
        """(order, bars): the reachability plot. bars[0] = inf; for
        i > 0, bars[i] is the weight of the internal node between
        leaves i-1 and i in the in-order traversal (their LCA), which
        equals min_{j<i} d_m(p_i, p_j) for an ordered dendrogram."""
        order = np.empty(self.n, dtype=np.int64)
        bars = np.empty(self.n)
        k = 0
        last_internal = np.inf
        stack: list[int] = []
        cur = self.root
        while True:
            while not is_leaf(cur):
                stack.append(cur)
                cur = int(self.left[cur])
            order[k] = leaf_vertex(cur)
            bars[k] = last_internal
            k += 1
            if not stack:
                break
            node = stack.pop()
            last_internal = float(self.weight[node])
            cur = int(self.right[node])
        assert k == self.n
        return order, bars


def vertex_distances(n: int, edges: np.ndarray, s: int = 0) -> np.ndarray:
    """Unweighted hop distance from s in the tree (BFS) — the paper's
    'vertex distances', computed once and reused at every recursion
    level (their Euler-tour list-ranking step)."""
    heads = np.concatenate([edges[:, 0], edges[:, 1]]).astype(np.int64)
    tails = np.concatenate([edges[:, 1], edges[:, 0]]).astype(np.int64)
    order = np.argsort(heads, kind="stable")
    heads, tails = heads[order], tails[order]
    starts = np.searchsorted(heads, np.arange(n + 1))
    dist = np.full(n, -1, dtype=np.int64)
    dist[s] = 0
    frontier = [s]
    while frontier:
        nxt = []
        for u in frontier:
            for v in tails[starts[u] : starts[u + 1]]:
                if dist[v] < 0:
                    dist[v] = dist[u] + 1
                    nxt.append(int(v))
        frontier = nxt
    if np.any(dist < 0):
        raise ValueError("edges do not form a spanning tree")
    return dist


class _Builder:
    """Accumulates global internal-node arrays across recursion."""

    def __init__(self, n: int):
        self.left = np.empty(n - 1, dtype=np.int64)
        self.right = np.empty(n - 1, dtype=np.int64)
        self.weight = np.empty(n - 1)
        self.next_id = 0

    def add(self, left: int, right: int, w: float) -> int:
        i = self.next_id
        self.left[i] = left
        self.right[i] = right
        self.weight[i] = w
        self.next_id += 1
        return i


def _bottom_up(
    edges: np.ndarray, refs: np.ndarray, builder: _Builder
) -> int:
    """Classic agglomerative construction on one subproblem.

    ``edges`` is (m, 5): [u, v, w, vdist_u, vdist_v] with u, v local
    vertex ids in [0, m]; ``refs[i]`` is the global child ref standing
    for local vertex i (a true leaf, or the root of an already-solved
    lighter subproblem — that is how the top-down recursion grafts
    light dendrograms into heavy leaves). Returns the root ref.
    """
    m = edges.shape[0]
    k = m + 1
    uf = UnionFind(k)
    comp_root = {i: int(refs[i]) for i in range(k)}
    order = np.argsort(edges[:, 2], kind="stable")
    root = int(refs[0])
    for idx in order:
        u, v, w, vdu, vdv = edges[idx]
        u, v = int(u), int(v)
        ru, rv = uf.find(u), uf.find(v)
        cu, cv = comp_root[ru], comp_root[rv]
        # Ordering rule (Theorem 4.2): the side holding the endpoint
        # with the smaller vertex distance goes left.
        if vdu <= vdv:
            node = builder.add(cu, cv, float(w))
        else:
            node = builder.add(cv, cu, float(w))
        uf.union(u, v)
        comp_root[uf.find(u)] = node
        root = node
    return root


def _split_subproblems(
    edges: np.ndarray,
) -> tuple[np.ndarray, list[tuple[np.ndarray, np.ndarray]], np.ndarray]:
    """One level of the top-down recursion.

    Splits ``edges`` (local ids 0..k-1) into the heavy subproblem and
    the light components. Returns (heavy_edges_localized, lights,
    comp_of_vertex) where ``lights`` is a list of (light_edges_localized,
    member_local_vertices); heavy edge endpoints are component ids and
    the per-edge endpoint vdists are preserved for the ordering rule.
    """
    m = edges.shape[0]
    k = m + 1
    h = max(1, int(np.ceil(m * _HEAVY_FRAC)))
    # h heaviest edges are heavy (paper: n/10). Ties broken stably.
    order = np.argsort(-edges[:, 2], kind="stable")
    heavy_idx = order[:h]
    light_idx = order[h:]
    uf = UnionFind(k)
    for u, v, *_ in edges[light_idx]:
        uf.union(int(u), int(v))
    labels = uf.labels()
    comp_ids, comp_of_vertex = np.unique(labels, return_inverse=True)

    # Light components -> localized subproblems (group light edges by
    # component with one sort; localize endpoints with searchsorted).
    lights: list[tuple[np.ndarray, np.ndarray]] = []
    if light_idx.size:
        le = edges[light_idx]
        comp_of_edge = comp_of_vertex[le[:, 0].astype(np.int64)]
        grp = np.argsort(comp_of_edge, kind="stable")
        le = le[grp]
        comp_sorted = comp_of_edge[grp]
        cuts = np.flatnonzero(np.diff(comp_sorted)) + 1
        for sub in np.split(le, cuts):
            members = np.unique(
                np.concatenate([sub[:, 0], sub[:, 1]]).astype(np.int64)
            )
            sub_local = sub.copy()
            sub_local[:, 0] = np.searchsorted(members, sub[:, 0].astype(np.int64))
            sub_local[:, 1] = np.searchsorted(members, sub[:, 1].astype(np.int64))
            lights.append((sub_local, members))

    he = edges[heavy_idx].copy()
    he[:, 0] = comp_of_vertex[he[:, 0].astype(np.int64)]
    he[:, 1] = comp_of_vertex[he[:, 1].astype(np.int64)]
    return he, lights, comp_of_vertex


def _solve(edges: np.ndarray, refs: np.ndarray, builder: _Builder) -> int:
    """Recursive top-down solve; returns the root ref."""
    m = edges.shape[0]
    if m == 0:
        return int(refs[0])
    if m <= _SEQ_CUTOFF:
        return _bottom_up(edges, refs, builder)
    he, lights, comp_of_vertex = _split_subproblems(edges)
    n_comp = int(comp_of_vertex.max()) + 1
    comp_refs = np.empty(n_comp, dtype=np.int64)
    # Singleton components keep their original refs (vectorized).
    counts = np.bincount(comp_of_vertex, minlength=n_comp)
    singles = np.flatnonzero(counts[comp_of_vertex] == 1)
    comp_refs[comp_of_vertex[singles]] = refs[singles]
    # Light subproblems first (their roots become heavy leaves).
    for sub_local, members in lights:
        sub_refs = refs[members]
        root = _solve(sub_local, sub_refs, builder)
        comp_refs[comp_of_vertex[members[0]]] = root
    return _solve(he, comp_refs, builder)


def solve_subproblem_kernel(edges: np.ndarray, n_local: int):
    """Executor-side kernel for Spark-dispatched light subproblems.

    Solves one subproblem entirely locally (local leaf refs), returning
    (left, right, weight, root) with *local* encoding: leaves are
    -(local_vertex+1); internal nodes are local indices. The driver
    remaps both into the global builder.
    """
    builder = _Builder(n_local)
    refs = np.array([leaf_ref(i) for i in range(n_local)], dtype=np.int64)
    root = _solve(edges, refs, builder)
    nn = builder.next_id
    return builder.left[:nn], builder.right[:nn], builder.weight[:nn], root


def dendrogram_sequential(
    edges: np.ndarray, s: int = 0
) -> Dendrogram:
    """Bottom-up ordered dendrogram over a spanning tree's (n-1, 3)
    [u, v, w] edges — the sequential baseline of Section 4."""
    n = edges.shape[0] + 1
    vd = vertex_distances(n, edges, s)
    e5 = np.column_stack(
        [edges[:, 0], edges[:, 1], edges[:, 2], vd[edges[:, 0].astype(np.int64)], vd[edges[:, 1].astype(np.int64)]]
    )
    builder = _Builder(n)
    refs = np.array([leaf_ref(i) for i in range(n)], dtype=np.int64)
    root = _bottom_up(e5, refs, builder)
    return Dendrogram(n, builder.left, builder.right, builder.weight, root)


def dendrogram_topdown(
    edges: np.ndarray, s: int = 0, spark: SparkSession | None = None
) -> Dendrogram:
    """The paper's top-down divide-and-conquer ordered dendrogram.

    With ``spark``, the top level's light-edge subproblems are solved in
    one Spark fan-out (each by the same kernel, in an executor) and
    grafted into the heavy-edge dendrogram computed on the driver.
    """
    n = edges.shape[0] + 1
    if n == 1:
        return Dendrogram(1, *(np.empty(0),) * 3, leaf_ref(0))
    vd = vertex_distances(n, edges, s)
    e5 = np.column_stack(
        [edges[:, 0], edges[:, 1], edges[:, 2], vd[edges[:, 0].astype(np.int64)], vd[edges[:, 1].astype(np.int64)]]
    )
    builder = _Builder(n)
    refs = np.array([leaf_ref(i) for i in range(n)], dtype=np.int64)
    if spark is None or edges.shape[0] <= _SEQ_CUTOFF:
        root = _solve(e5, refs, builder)
        return Dendrogram(n, builder.left, builder.right, builder.weight, root)

    # Spark path: one level of subproblem finding on the driver, light
    # subproblems in executors, heavy subproblem recursively on driver.
    from ..engine.distribute import run_payloads_spark

    he, lights, comp_of_vertex = _split_subproblems(e5)
    n_comp = int(comp_of_vertex.max()) + 1
    comp_refs = np.empty(n_comp, dtype=np.int64)
    counts = np.bincount(comp_of_vertex, minlength=n_comp)
    singles = np.flatnonzero(counts[comp_of_vertex] == 1)
    comp_refs[comp_of_vertex[singles]] = refs[singles]

    payloads = [
        pickle.dumps((sub_local, int(members.size)))
        for sub_local, members in lights
    ]
    results = run_payloads_spark(spark, payloads, "solve_subproblem_kernel")
    for sub_id, blob in results:
        sub_local, members = lights[sub_id]
        l_left, l_right, l_weight, l_root = pickle.loads(blob)
        base = builder.next_id
        # Remap local refs: leaves -> global refs of members; internal
        # -> builder index + base.
        def remap(r: int) -> int:
            return int(refs[members[leaf_vertex(r)]]) if is_leaf(r) else int(r) + base

        for i in range(l_left.shape[0]):
            builder.add(remap(int(l_left[i])), remap(int(l_right[i])), float(l_weight[i]))
        comp_refs[comp_of_vertex[members[0]]] = remap(int(l_root))
    root = _solve(he, comp_refs, builder)
    return Dendrogram(n, builder.left, builder.right, builder.weight, root)


def single_linkage_labels(
    emst_edges: np.ndarray, n: int, eps: float
) -> np.ndarray:
    """Flat single-linkage clustering: components under EMST edges with
    weight <= eps (the horizontal dendrogram cut at eps)."""
    uf = UnionFind(n)
    for u, v, w in emst_edges:
        if w <= eps:
            uf.union(int(u), int(v))
    roots = uf.labels()
    _, labels = np.unique(roots, return_inverse=True)
    return labels
