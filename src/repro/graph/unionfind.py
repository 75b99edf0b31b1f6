"""Union-find (disjoint set union) with path compression + union by size.

Shared across every Kruskal invocation of a GFK/MemoGFK run, exactly as
in Algorithms 2 and 3 where ``UF`` persists between rounds.
"""
from __future__ import annotations

import numpy as np


class UnionFind:
    """Classic DSU over ``n`` elements.

    ``labels()`` returns a fully-compressed root array — the driver
    broadcasts it each GFK round so executors / vectorized filters can
    test connectivity without the structure itself.
    """

    def __init__(self, n: int):
        self.parent = np.arange(n, dtype=np.int64)
        self.size = np.ones(n, dtype=np.int64)
        self.n_components = n

    def find(self, x: int) -> int:
        root = x
        p = self.parent
        while p[root] != root:
            root = p[root]
        # Path compression.
        while p[x] != root:
            p[x], x = root, p[x]
        return int(root)

    def union(self, a: int, b: int) -> bool:
        """Join the components of a and b; True iff they were distinct."""
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return False
        if self.size[ra] < self.size[rb]:
            ra, rb = rb, ra
        self.parent[rb] = ra
        self.size[ra] += self.size[rb]
        self.n_components -= 1
        return True

    def connected(self, a: int, b: int) -> bool:
        return self.find(a) == self.find(b)

    def labels(self) -> np.ndarray:
        """Root id for every element (fully compressed, vectorized)."""
        p = self.parent
        # Pointer-jump until fixpoint; O(n alpha) total in practice.
        while True:
            pp = p[p]
            if np.array_equal(pp, p):
                break
            p = pp
        self.parent = p.copy()
        return p
