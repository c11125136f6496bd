"""GT_Exact / GT_Approx — Gan & Tao, "DBSCAN Revisited" (SIGMOD 2015).

Grid-based (ρ-approximate) DBSCAN for low-dimensional **Euclidean** space:

- partition R^d into cells of side ``ε/√d`` (cell diameter ≤ ε, so a cell
  with ≥ MinPts points is all-core);
- a point's ε-neighbors lie in cells within ``⌈√d⌉`` steps per axis;
- **exact** merging connects two core cells iff their core-point BCP is ≤ ε;
- **approximate** merging may also connect at distance ≤ (1+ρ)ε — realised
  here by accepting the first pair found at ≤ (1+ρ)ε (the allowed ρ-approx
  relaxation that makes merging O(1) distance tests per cell pair in
  practice).

The number of neighbor cells grows as ``O((√d)^d)`` — the reason the paper's
Figure 3 has no GT curves on high-dimensional data. ``max_neighbor_cells``
guards against that blow-up; exceeding it raises, mirroring "did not finish".
"""
from __future__ import annotations

import itertools

import numpy as np

from repro.core.exact import DBSCANResult
from repro.util.unionfind import UnionFind


class GridBlowupError(RuntimeError):
    """Raised when the d-dimensional neighbor-cell enumeration is infeasible."""


def _grid(X: np.ndarray, side: float) -> dict[tuple, np.ndarray]:
    keys = np.floor(X / side).astype(np.int64)
    cells: dict[tuple, list[int]] = {}
    for i, k in enumerate(map(tuple, keys)):
        cells.setdefault(k, []).append(i)
    return {k: np.asarray(v, dtype=np.int64) for k, v in cells.items()}


def gan_tao_dbscan(
    X: np.ndarray,
    eps: float,
    minpts: int,
    *,
    rho: float = 0.0,
    max_neighbor_cells: int = 100_000,
) -> DBSCANResult:
    """``rho=0`` → GT_Exact; ``rho>0`` → GT_Approx."""
    X = np.asarray(X, dtype=np.float64)
    n, d = X.shape
    side = eps / np.sqrt(d)
    reach = int(np.ceil(np.sqrt(d)))
    if (2 * reach + 1) ** d > max_neighbor_cells:
        raise GridBlowupError(
            f"(2·⌈√d⌉+1)^d = {(2 * reach + 1) ** d} neighbor cells at d={d}"
        )
    offsets = list(itertools.product(range(-reach, reach + 1), repeat=d))
    cells = _grid(X, side)

    def nbr_points(key: tuple) -> np.ndarray:
        found = [
            cells[k2]
            for off in offsets
            if (k2 := tuple(a + b for a, b in zip(key, off))) in cells
        ]
        return np.concatenate(found)

    # --- core labeling ---------------------------------------------------
    is_core = np.zeros(n, dtype=bool)
    for key, members in cells.items():
        if len(members) >= minpts:  # cell diameter ≤ ε
            is_core[members] = True
            continue
        cand = nbr_points(key)
        dd = np.linalg.norm(X[members][:, None, :] - X[cand][None, :, :], axis=2)
        is_core[members[(dd <= eps).sum(axis=1) >= minpts]] = True

    # --- merge core cells ------------------------------------------------
    keys = list(cells.keys())
    key_pos = {k: i for i, k in enumerate(keys)}
    core_members = {k: m[is_core[m]] for k, m in cells.items()}
    uf = UnionFind(len(keys))
    link_thr = (1.0 + rho) * eps
    for key, a in core_members.items():
        if len(a) == 0:
            continue
        for off in offsets:
            k2 = tuple(x + y for x, y in zip(key, off))
            if k2 <= key or k2 not in cells:
                continue
            b = core_members[k2]
            if len(b) == 0 or uf.connected(key_pos[key], key_pos[k2]):
                continue
            dd = np.linalg.norm(X[a][:, None, :] - X[b][None, :, :], axis=2)
            if rho > 0.0:
                linked = bool((dd <= link_thr).any())
            else:
                linked = bool((dd <= eps).any())
            if linked:
                uf.union(key_pos[key], key_pos[k2])
    labels = np.full(n, -1, dtype=np.int64)
    remap: dict[int, int] = {}
    for key, m in core_members.items():
        if len(m) == 0:
            continue
        r = uf.find(key_pos[key])
        if r not in remap:
            remap[r] = len(remap)
        labels[m] = remap[r]

    # --- borders ---------------------------------------------------------
    for key, members in cells.items():
        pend = members[~is_core[members]]
        if len(pend) == 0:
            continue
        cand = nbr_points(key)
        cand = cand[is_core[cand]]
        if len(cand) == 0:
            continue
        dd = np.linalg.norm(X[pend][:, None, :] - X[cand][None, :, :], axis=2)
        j = dd.argmin(axis=1)
        hit = dd[np.arange(len(pend)), j] <= eps
        labels[pend[hit]] = labels[cand[j[hit]]]
    return DBSCANResult(labels=labels, is_core=is_core, n_clusters=len(remap))
