"""ARI / AMI: closed-form cases, invariances, and sanity bounds."""
import numpy as np
import pytest

from repro.metrics.quality import (
    adjusted_mutual_info,
    adjusted_rand_index,
    contingency,
    expected_mutual_information,
    mutual_information,
)


def test_contingency_basic():
    t, r, c = contingency([0, 0, 1, 1], [1, 1, 0, 0])
    assert t.tolist() == [[0, 2], [2, 0]]
    assert r.tolist() == [2, 2] and c.tolist() == [2, 2]


def test_contingency_shape_mismatch():
    with pytest.raises(ValueError):
        contingency([0, 1], [0, 1, 2])


def test_ari_identical_is_one():
    y = [0, 0, 1, 1, 2, 2]
    assert adjusted_rand_index(y, y) == pytest.approx(1.0)


def test_ari_permutation_invariant():
    a = [0, 0, 1, 1, 2, 2]
    b = [2, 2, 0, 0, 1, 1]
    assert adjusted_rand_index(a, b) == pytest.approx(1.0)


def test_ari_known_half():
    # classic textbook example
    a = [0, 0, 0, 1, 1, 1]
    b = [0, 0, 1, 1, 2, 2]
    got = adjusted_rand_index(a, b)
    assert got == pytest.approx(0.24242, abs=1e-4)


def test_ari_random_near_zero():
    g = np.random.default_rng(0)
    a = g.integers(0, 4, 5000)
    b = g.integers(0, 4, 5000)
    assert abs(adjusted_rand_index(a, b)) < 0.02


def test_ari_trivial_partitions():
    assert adjusted_rand_index([0, 0, 0], [0, 0, 0]) == 1.0
    assert adjusted_rand_index([0, 1, 2], [0, 1, 2]) == 1.0


def test_ari_negative_possible():
    a = [0, 1, 0, 1]
    b = [0, 0, 1, 1]
    assert adjusted_rand_index(a, b) < 0.5


def test_mi_independent_is_zero():
    a = [0, 0, 1, 1]
    b = [0, 1, 0, 1]
    assert mutual_information(a, b) == pytest.approx(0.0, abs=1e-12)


def test_mi_identical_is_entropy():
    a = [0, 0, 1, 1]
    assert mutual_information(a, a) == pytest.approx(np.log(2))


def test_emi_symmetry():
    r = np.array([3, 3])
    c = np.array([2, 4])
    assert expected_mutual_information(r, c) == pytest.approx(
        expected_mutual_information(c, r)
    )


def test_ami_identical_is_one():
    y = [0, 0, 1, 1, 2, 2, 2]
    assert adjusted_mutual_info(y, y) == pytest.approx(1.0)


def test_ami_permutation_invariant():
    a = [0, 0, 1, 1]
    b = [5, 5, 3, 3]
    assert adjusted_mutual_info(a, b) == pytest.approx(1.0)


def test_ami_random_near_zero():
    g = np.random.default_rng(1)
    a = g.integers(0, 3, 3000)
    b = g.integers(0, 3, 3000)
    assert abs(adjusted_mutual_info(a, b)) < 0.02


def test_ami_trivial_both_single():
    assert adjusted_mutual_info([0, 0, 0], [1, 1, 1]) == 1.0


def test_ami_le_one_and_symmetric():
    a = [0, 0, 1, 1, 2, 2]
    b = [0, 1, 1, 1, 2, 2]
    x = adjusted_mutual_info(a, b)
    assert x <= 1.0 + 1e-12
    assert x == pytest.approx(adjusted_mutual_info(b, a))


def test_scores_with_noise_label():
    # -1 (outlier) treated as its own class — the paper's convention
    a = [-1, -1, 0, 0, 1, 1]
    assert adjusted_rand_index(a, a) == 1.0
    assert adjusted_mutual_info(a, a) == 1.0


def _ari_pair_counting(a, b):
    """Independent ARI implementation via explicit pair counting."""
    import itertools

    n = len(a)
    ss = sd = ds = dd = 0
    for i, j in itertools.combinations(range(n), 2):
        same_a, same_b = a[i] == a[j], b[i] == b[j]
        ss += same_a and same_b
        sd += same_a and not same_b
        ds += same_b and not same_a
        dd += not same_a and not same_b
    tot = ss + sd + ds + dd
    expected = (ss + sd) * (ss + ds) / tot
    max_index = ((ss + sd) + (ss + ds)) / 2.0
    if max_index == expected:
        return 1.0
    return (ss - expected) / (max_index - expected)


@pytest.mark.parametrize("seed", range(5))
def test_ari_matches_pair_counting(seed):
    g = np.random.default_rng(seed)
    a = g.integers(0, 4, 30)
    b = g.integers(0, 3, 30)
    assert adjusted_rand_index(a, b) == pytest.approx(_ari_pair_counting(a, b))
