"""Sequential connectivity oracle: union-find over the edge list."""
from __future__ import annotations

import numpy as np


class UnionFind:
    """Union-find with path halving + union by size (driver-side).

    Also used as the finishing structure of LDD-UF-JTB (the paper uses
    the concurrent Jayanti-Tarjan-Boix structure; on the driver the
    sequential equivalent is exact)."""

    def __init__(self, n: int):
        self.parent = np.arange(n, dtype=np.int64)
        self.size = np.ones(n, dtype=np.int64)

    def find(self, x: int) -> int:
        p = self.parent
        while p[x] != x:
            p[x] = p[p[x]]
            x = int(p[x])
        return x

    def union(self, a: int, b: int) -> bool:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return False
        if self.size[ra] < self.size[rb]:
            ra, rb = rb, ra
        self.parent[rb] = ra
        self.size[ra] += self.size[rb]
        return True


def seq_cc(n: int, src: np.ndarray, dst: np.ndarray) -> np.ndarray:
    """Component label per vertex (root id), sequential ground truth."""
    uf = UnionFind(n)
    for a, b in zip(src.tolist(), dst.tolist()):
        uf.union(int(a), int(b))
    return np.fromiter((uf.find(v) for v in range(n)), dtype=np.int64, count=n)
