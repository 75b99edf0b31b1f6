"""Sequential kd-tree Boruvka EMST — the mlpack baseline of Table 3.

The paper's Table 3 benchmarks mlpack's Dual-Tree Boruvka [March et
al. 2010] as the external sequential EMST baseline. mlpack is not
available offline, so this module implements the same algorithmic
family from scratch: Boruvka rounds where every component finds its
minimum-weight outgoing edge through pruned kd-tree traversals
(per-point nearest-other-component queries with component-pruned
subtrees), then all component edges are merged at once.

This is the stand-in whose times populate our Table 3 (DESIGN.md §4
documents the substitution); correctness is enforced against the same
Prim oracle as the paper's own methods.
"""
from __future__ import annotations

import numpy as np

from ..core.gfk import mono_labels
from ..geometry import kdtree as kdt
from .unionfind import UnionFind


def _nearest_other(
    tree: kdt.KDTree,
    q: np.ndarray,
    my_label: int,
    labels_reordered: np.ndarray,
    mono: np.ndarray,
    bound: float,
) -> tuple[float, int]:
    """Nearest point to q whose component label differs from my_label.

    Returns (distance, reordered_index) or (inf, -1). ``bound`` is an
    upper bound (e.g. the component's current best edge) used to prune
    from the start — the dual-tree flavor of March et al.
    """
    best_d2 = bound * bound
    best_i = -1
    stack = [(0.0, 0)]
    bb_min, bb_max = tree.bb_min, tree.bb_max
    left, right, lo, hi = tree.left, tree.right, tree.lo, tree.hi
    while stack:
        d2, node = stack.pop()
        if d2 >= best_d2 or mono[node] == my_label:
            continue
        if left[node] < 0:
            seg = tree.pts[lo[node] : hi[node]]
            diff = seg - q
            dd = np.einsum("ij,ij->i", diff, diff)
            dd[labels_reordered[lo[node] : hi[node]] == my_label] = np.inf
            j = int(np.argmin(dd))
            if dd[j] < best_d2:
                best_d2 = float(dd[j])
                best_i = int(lo[node]) + j
        else:
            children = []
            for c in (int(left[node]), int(right[node])):
                delta = np.maximum(bb_min[c] - q, 0.0) + np.maximum(
                    q - bb_max[c], 0.0
                )
                children.append((float(delta @ delta), c))
            # Visit the nearer child first (it is pushed last).
            children.sort(key=lambda t: -t[0])
            for cd2, c in children:
                if cd2 < best_d2 and mono[c] != my_label:
                    stack.append((cd2, c))
    return (np.sqrt(best_d2) if best_i >= 0 else np.inf), best_i


def emst_boruvka(points: np.ndarray, leaf_size: int = 32) -> np.ndarray:
    """EMST via Boruvka rounds with kd-tree component-pruned nearest-
    neighbor queries. Returns (n-1, 3) [u, v, w] rows."""
    pts = np.ascontiguousarray(np.asarray(points, dtype=np.float64))
    n = pts.shape[0]
    tree = kdt.build(pts.copy(), leaf_size=leaf_size)
    uf = UnionFind(n)
    out: list[tuple[int, int, float]] = []
    while uf.n_components > 1:
        labels = uf.labels()
        lab_re = labels[tree.perm]
        mono = mono_labels(tree, uf)
        best_w: dict[int, float] = {}
        best_edge: dict[int, tuple[int, int]] = {}
        # Iterate in reordered order so queries reuse spatial locality.
        for pos in range(n):
            orig = int(tree.perm[pos])
            ml = int(lab_re[pos])
            bound = best_w.get(ml, np.inf)
            d, j = _nearest_other(tree, tree.pts[pos], ml, lab_re, mono, bound)
            if j >= 0 and d < best_w.get(ml, np.inf):
                best_w[ml] = d
                best_edge[ml] = (orig, int(tree.perm[j]))
        progressed = False
        for ml, (u, v) in best_edge.items():
            if uf.union(u, v):
                out.append((u, v, best_w[ml]))
                progressed = True
        if not progressed:
            raise RuntimeError("Boruvka made no progress (bug)")
    return np.asarray(out, dtype=np.float64).reshape(-1, 3)
