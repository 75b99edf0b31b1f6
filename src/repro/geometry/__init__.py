"""Geometric substrates: array kd-tree, k-NN queries, 2D Delaunay."""
