"""Union-find and Kruskal substrates."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graph.kruskal import kruskal_batch, mst
from repro.graph.prim import mst_bruteforce
from repro.graph.unionfind import UnionFind


def test_unionfind_basic():
    uf = UnionFind(5)
    assert uf.n_components == 5
    assert uf.union(0, 1)
    assert not uf.union(1, 0)
    assert uf.connected(0, 1)
    assert not uf.connected(0, 2)
    assert uf.n_components == 4


def test_unionfind_labels_consistent():
    uf = UnionFind(100)
    rng = np.random.default_rng(0)
    for _ in range(80):
        uf.union(int(rng.integers(100)), int(rng.integers(100)))
    lab = uf.labels()
    for i in range(100):
        assert lab[i] == uf.find(i)
    assert len(np.unique(lab)) == uf.n_components


@settings(max_examples=30, deadline=None)
@given(
    ops=st.lists(
        st.tuples(st.integers(0, 29), st.integers(0, 29)), max_size=60
    )
)
def test_unionfind_matches_naive(ops):
    uf = UnionFind(30)
    naive = list(range(30))

    def naive_root(x):
        while naive[x] != x:
            x = naive[x]
        return x

    for a, b in ops:
        ra, rb = naive_root(a), naive_root(b)
        if ra != rb:
            naive[ra] = rb
        uf.union(a, b)
    for a in range(30):
        for b in range(30):
            assert uf.connected(a, b) == (naive_root(a) == naive_root(b))


@pytest.mark.parametrize("n", [2, 5, 30, 120])
def test_kruskal_matches_prim_on_complete_graph(n):
    pts = np.random.default_rng(n).random((n, 3))
    iu, ju = np.triu_indices(n, k=1)
    ws = np.linalg.norm(pts[iu] - pts[ju], axis=1)
    got = mst(n, iu, ju, ws)
    ref = mst_bruteforce(pts)
    assert got.shape == ref.shape
    assert np.allclose(np.sort(got[:, 2]), np.sort(ref[:, 2]))


def test_kruskal_batched_equals_oneshot():
    """Feeding weight-ordered batches with a shared UF (the GFK calling
    convention) must equal one-shot Kruskal."""
    n = 80
    pts = np.random.default_rng(1).random((n, 2))
    iu, ju = np.triu_indices(n, k=1)
    ws = np.linalg.norm(pts[iu] - pts[ju], axis=1)
    order = np.argsort(ws)
    iu, ju, ws = iu[order], ju[order], ws[order]
    uf = UnionFind(n)
    out = []
    for lo in range(0, ws.size, 500):
        kruskal_batch(iu[lo : lo + 500], ju[lo : lo + 500], ws[lo : lo + 500], uf, out)
    got = np.asarray(out)
    ref = mst(n, iu, ju, ws)
    assert np.allclose(np.sort(got[:, 2]), np.sort(ref[:, 2]))


def test_kruskal_disconnected_graph():
    got = mst(4, np.array([0, 2]), np.array([1, 3]), np.array([1.0, 2.0]))
    assert got.shape[0] == 2  # spanning forest, not tree
