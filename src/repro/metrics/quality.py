"""Clustering quality scores: Adjusted Rand Index and Adjusted Mutual
Information.

The container has no scikit-learn, so these are implemented from the original
formulas — ARI per Hubert & Arabie (1985), AMI per Vinh, Epps & Bailey (2009)
with the exact hypergeometric expected-MI and the arithmetic-mean normalizer
(matching sklearn's default ``average_method="arithmetic"``). Both are
validated against closed-form cases in ``tests/test_quality.py``.
"""
from __future__ import annotations

import math

import numpy as np


def contingency(labels_a, labels_b) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Contingency table of two labelings + the row/column marginals.

    Noise markers (e.g. -1) are treated as ordinary labels, the convention the
    paper's ARI/AMI tables use.
    """
    a = np.asarray(labels_a)
    b = np.asarray(labels_b)
    if a.shape != b.shape:
        raise ValueError(f"label shapes differ: {a.shape} vs {b.shape}")
    _, ai = np.unique(a, return_inverse=True)
    _, bi = np.unique(b, return_inverse=True)
    n_a, n_b = ai.max() + 1, bi.max() + 1
    table = np.zeros((n_a, n_b), dtype=np.int64)
    np.add.at(table, (ai, bi), 1)
    return table, table.sum(axis=1), table.sum(axis=0)


def _comb2(x: np.ndarray) -> np.ndarray:
    return x * (x - 1) / 2.0


def adjusted_rand_index(labels_a, labels_b) -> float:
    """Hubert–Arabie adjusted Rand index in [-1, 1]; 1 = identical partitions."""
    table, rows, cols = contingency(labels_a, labels_b)
    n = rows.sum()
    index = _comb2(table).sum()
    sum_rows = _comb2(rows).sum()
    sum_cols = _comb2(cols).sum()
    expected = sum_rows * sum_cols / _comb2(np.int64(n))
    max_index = (sum_rows + sum_cols) / 2.0
    if max_index == expected:  # both partitions trivial (all-one-cluster etc.)
        return 1.0
    return float((index - expected) / (max_index - expected))


def _entropy(marginal: np.ndarray, n: int) -> float:
    p = marginal[marginal > 0] / n
    return float(-(p * np.log(p)).sum())


def mutual_information(labels_a, labels_b) -> float:
    """MI (nats) of the two labelings' empirical joint distribution."""
    table, rows, cols = contingency(labels_a, labels_b)
    n = rows.sum()
    nz = table > 0
    nij = table[nz].astype(np.float64)
    outer = (rows[:, None] * cols[None, :])[nz].astype(np.float64)
    return float((nij / n * (np.log(nij * n) - np.log(outer))).sum())


def expected_mutual_information(rows: np.ndarray, cols: np.ndarray) -> float:
    """Exact E[MI] under the permutation (hypergeometric) model."""
    n = int(rows.sum())
    lg = math.lgamma
    log_n_fact = lg(n + 1)
    emi = 0.0
    for ai in rows.tolist():
        for bj in cols.tolist():
            lo = max(1, ai + bj - n)
            hi = min(ai, bj)
            # constant part of the hypergeometric log-probability
            base = (
                lg(ai + 1)
                + lg(bj + 1)
                + lg(n - ai + 1)
                + lg(n - bj + 1)
                - log_n_fact
            )
            for nij in range(lo, hi + 1):
                log_p = base - (
                    lg(nij + 1)
                    + lg(ai - nij + 1)
                    + lg(bj - nij + 1)
                    + lg(n - ai - bj + nij + 1)
                )
                emi += (
                    nij / n * (math.log(n * nij) - math.log(ai * bj))
                ) * math.exp(log_p)
    return emi


def adjusted_mutual_info(labels_a, labels_b) -> float:
    """AMI with arithmetic-mean normalization; 1 = identical partitions."""
    table, rows, cols = contingency(labels_a, labels_b)
    n = int(rows.sum())
    h_a = _entropy(rows, n)
    h_b = _entropy(cols, n)
    if h_a == 0.0 and h_b == 0.0:
        return 1.0
    mi = mutual_information(labels_a, labels_b)
    emi = expected_mutual_information(rows, cols)
    denom = 0.5 * (h_a + h_b) - emi
    if abs(denom) < 1e-15:
        return 0.0
    return float((mi - emi) / denom)
