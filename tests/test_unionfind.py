"""Union–find unit + property tests."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.util.unionfind import UnionFind


def test_initial_components():
    uf = UnionFind(5)
    assert uf.n_components == 5
    assert all(uf.find(i) == i for i in range(5))


def test_union_reduces_components():
    uf = UnionFind(4)
    assert uf.union(0, 1)
    assert uf.n_components == 3
    assert not uf.union(0, 1)
    assert uf.n_components == 3


def test_connected_transitive():
    uf = UnionFind(5)
    uf.union(0, 1)
    uf.union(1, 2)
    assert uf.connected(0, 2)
    assert not uf.connected(0, 3)


def test_component_labels_dense():
    uf = UnionFind(6)
    uf.union(0, 3)
    uf.union(4, 5)
    labels = uf.component_labels()
    assert labels[0] == labels[3]
    assert labels[4] == labels[5]
    assert len(set(labels)) == 4
    assert set(labels) == set(range(4))


def test_single_element():
    uf = UnionFind(1)
    assert uf.component_labels() == [0]


@settings(max_examples=50, deadline=None)
@given(
    n=st.integers(2, 40),
    edges=st.lists(st.tuples(st.integers(0, 39), st.integers(0, 39)), max_size=80),
)
def test_matches_reference_components(n, edges):
    """Union-find components equal a BFS reference on the same edge set."""
    edges = [(a % n, b % n) for a, b in edges]
    uf = UnionFind(n)
    for a, b in edges:
        uf.union(a, b)
    # BFS reference
    adj = {i: [] for i in range(n)}
    for a, b in edges:
        adj[a].append(b)
        adj[b].append(a)
    seen = [-1] * n
    comp = 0
    for s in range(n):
        if seen[s] >= 0:
            continue
        stack = [s]
        seen[s] = comp
        while stack:
            u = stack.pop()
            for v in adj[u]:
                if seen[v] < 0:
                    seen[v] = comp
                    stack.append(v)
        comp += 1
    assert uf.n_components == comp
    ours = uf.component_labels()
    # same partition (bijection between label sets)
    pairs = set(zip(ours, seen))
    assert len({a for a, _ in pairs}) == len(pairs) == len({b for _, b in pairs})


def test_union_by_size_keeps_valid_parents():
    uf = UnionFind(100)
    g = np.random.default_rng(0)
    for _ in range(200):
        uf.union(int(g.integers(0, 100)), int(g.integers(0, 100)))
    roots = {uf.find(i) for i in range(100)}
    assert len(roots) == uf.n_components
