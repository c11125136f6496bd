"""Union–find (disjoint set) with path compression + union by size.

Used to merge ε/2-net cells (exact DBSCAN Step 2), summary points
(Algorithm 2 line 9), and by several baselines.
"""
from __future__ import annotations


class UnionFind:
    """Disjoint-set forest over the integers ``0..n-1``."""

    def __init__(self, n: int):
        self.parent = list(range(n))
        self.size = [1] * n
        self.n_components = n

    def find(self, x: int) -> int:
        """Return the canonical representative of ``x``'s set."""
        root = x
        while self.parent[root] != root:
            root = self.parent[root]
        while self.parent[x] != root:  # path compression
            self.parent[x], x = root, self.parent[x]
        return root

    def union(self, a: int, b: int) -> bool:
        """Merge the sets of ``a`` and ``b``; return True if they were
        distinct."""
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

    def component_labels(self) -> list[int]:
        """Dense labels ``0..k-1``, one per component, stable in root order."""
        roots: dict[int, int] = {}
        out = []
        for x in range(len(self.parent)):
            r = self.find(x)
            if r not in roots:
                roots[r] = len(roots)
            out.append(roots[r])
        return out
