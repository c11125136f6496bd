"""Cover tree: structural invariants + query correctness vs brute force."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.covertree.tree import CoverTree, _maxdist
from repro.metrics.space import EditDistanceMetric, EuclideanMetric

EUC = EuclideanMetric()


def _all_nodes(tree):
    out = []
    stack = [tree.root]
    while stack:
        n = stack.pop()
        out.append(n)
        stack.extend(n.children)
    return out


def test_empty_raises():
    with pytest.raises(ValueError):
        CoverTree(np.empty((0, 2)), EUC)


def test_single_point():
    t = CoverTree(np.array([[1.0, 2.0]]), EUC)
    d, i = t.nearest(np.array([1.0, 3.0]))
    assert d == pytest.approx(1.0) and i == 0


def test_duplicates_folded():
    X = np.array([[0.0, 0.0]] * 5 + [[1.0, 1.0]])
    t = CoverTree(X, EUC)
    assert t.size() == 6
    nodes = _all_nodes(t)
    assert len(nodes) == 2
    dup = next(n for n in nodes if len(n.ids) == 5)
    assert sorted(dup.ids) == [0, 1, 2, 3, 4]
    d, i = t.nearest(np.array([0.1, 0.0]))
    assert i in (0, 1, 2, 3, 4)


def test_covering_invariant():
    g = np.random.default_rng(0)
    X = g.normal(size=(200, 3)) * 10
    t = CoverTree(X, EUC)
    for node in _all_nodes(t):
        for c in node.children:
            d = float(EUC.pairwise(np.asarray([node.point]), np.asarray([c.point]))[0, 0])
            assert d <= 2.0 ** node.level + 1e-9
            assert c.level < node.level


def test_maxdist_bounds_descendants():
    g = np.random.default_rng(1)
    X = g.normal(size=(150, 2)) * 5
    t = CoverTree(X, EUC)

    def check(node):
        bound = _maxdist(node)
        stack = list(node.children)
        while stack:
            c = stack.pop()
            d = float(np.linalg.norm(np.asarray(node.point) - np.asarray(c.point)))
            assert d <= bound + 1e-9
            stack.extend(c.children)

    for n in _all_nodes(t):
        check(n)


@pytest.mark.parametrize("seed", range(4))
def test_nearest_matches_brute(seed):
    g = np.random.default_rng(seed)
    X = g.normal(size=(300, 4)) * np.array([10, 1, 5, 0.1])
    t = CoverTree(X, EUC)
    Q = g.normal(size=(40, 4)) * 3
    for q in Q:
        d, i = t.nearest(q)
        brute = np.linalg.norm(X - q, axis=1)
        assert d == pytest.approx(brute.min())
        assert brute[i] == pytest.approx(brute.min())


@settings(max_examples=30, deadline=None)
@given(st.integers(0, 10**6))
def test_nearest_property(seed):
    g = np.random.default_rng(seed)
    n = int(g.integers(2, 60))
    X = g.uniform(-100, 100, size=(n, 2))
    t = CoverTree(X, EUC)
    q = g.uniform(-150, 150, size=2)
    d, _ = t.nearest(q)
    assert d == pytest.approx(np.linalg.norm(X - q, axis=1).min())


def test_min_dist_leq_predicate():
    g = np.random.default_rng(2)
    A = g.normal(size=(80, 3))
    B = g.normal(loc=5.0, size=(60, 3))
    t = CoverTree(A, EUC)
    true_min = EUC.pairwise(A, B).min()
    assert t.min_dist_leq(B, true_min + 1e-9)
    assert not t.min_dist_leq(B, true_min - 1e-6)


def test_cover_tree_on_strings():
    m = EditDistanceMetric()
    words = np.array(["apple", "apply", "ample", "zebra", "zebro"], dtype=object)
    t = CoverTree(words, m)
    d, i = t.nearest("appla")
    assert d == 1.0 and words[i] in ("apple", "apply")
    assert t.min_dist_leq(np.array(["zebrq"], dtype=object), 1.0)
    assert not t.min_dist_leq(np.array(["qqqqqqqq"], dtype=object), 2.0)


def test_clustered_data_queries():
    g = np.random.default_rng(3)
    X = np.vstack([g.normal(c, 0.2, size=(50, 2)) for c in ([0, 0], [10, 10], [-7, 3])])
    t = CoverTree(X, EUC)
    for q in [np.array([0.1, 0.1]), np.array([9.5, 10.2]), np.array([50.0, 50.0])]:
        d, _ = t.nearest(q)
        assert d == pytest.approx(np.linalg.norm(X - q, axis=1).min())
