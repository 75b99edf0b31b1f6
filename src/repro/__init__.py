"""Reproduction of "Fast Parallel Algorithms for Euclidean Minimum
Spanning Tree and Hierarchical Spatial Clustering" (SIGMOD 2021).

Subpackages: ``geometry`` (kd-tree, k-NN, Delaunay substrates),
``graph`` (union-find, Kruskal, Prim, Boruvka), ``core`` (WSPD, BCCP,
GFK/MemoGFK, HDBSCAN*, OPTICS, dendrogram — the paper's algorithms),
``engine`` (Spark fan-out of the parallel loops), ``experiments``
(the Table 2-5 harnesses). See DESIGN.md at the repo root.
"""
