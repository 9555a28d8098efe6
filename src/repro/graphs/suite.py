"""The benchmark graph suites (scaled-down analogues of paper Tab. 2/3).

``table2_suite`` returns the directed SCC suite; ``table3_suite`` the
symmetrized + road suite for connectivity; ``lelists_suite`` a smaller
undirected subset (LE-list output is O(n log n), and its multi-BFS pays
O(D) rounds per batch, so sizes are kept modest).

``scale`` < 1 shrinks every graph (used by tests); the default scale is
what `jobs/` and `benchmarks/` run.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs import generators as gen


@dataclass
class GraphSpec:
    name: str
    family: str
    n: int
    src: np.ndarray
    dst: np.ndarray

    @property
    def m(self) -> int:
        return len(self.src)


def _sym(n: int, src: np.ndarray, dst: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    s = np.concatenate([src, dst])
    d = np.concatenate([dst, src])
    keys = np.unique(s * n + d)
    return (keys // n).astype(np.int64), (keys % n).astype(np.int64)


def _scaled(x: int, scale: float, lo: int = 64) -> int:
    return max(lo, int(round(x * scale)))


def table2_suite(scale: float = 1.0, seed: int = 7) -> list[GraphSpec]:
    """Directed graphs for the SCC table, one row per paper analogue.

    Default sizes (n ~ 1-4 K) were chosen so that, with every round
    forced through a real Spark barrier (~0.25 s each), the plain-BFS
    baselines finish within the per-run budget on most graphs while the
    large-diameter structure (BFS depth 100+) is preserved.
    """
    lg = 11 if scale >= 1.0 else 8  # RMAT sizes are powers of two
    lg_big = lg + 1
    specs: list[GraphSpec] = []

    def add(name, family, n, sd):
        specs.append(GraphSpec(name, family, n, sd[0], sd[1]))

    add("SOC-LJ'", "social", 1 << lg, gen.rmat(lg, 8, seed=seed + 1))
    add("SOC-TW'", "social", 1 << lg, gen.rmat(lg, 16, seed=seed + 2))
    add("WEB-SD'", "web", 1 << lg, gen.web(lg, 8, seed=seed + 3))
    add("WEB-CW'", "web", 1 << lg_big, gen.web(lg_big, 8, seed=seed + 4))
    n_knn = _scaled(2048, scale)
    n_ch = _scaled(1024, scale)
    add("KNN-HH5'", "knn", n_knn, gen.knn_gmm(n_knn, 5, seed=seed + 5))
    add("KNN-CH5'", "knn", n_ch, gen.knn_curve(n_ch, 5, seed=seed + 6))
    add("KNN-GL2'", "knn", n_knn, gen.knn_trajectory(n_knn, 2, seed=seed + 7))
    add("KNN-GL5'", "knn", n_knn, gen.knn_trajectory(n_knn, 5, seed=seed + 8))
    r = _scaled(48, np.sqrt(scale), lo=8)
    rc = _scaled(192, np.sqrt(scale), lo=32)
    rr = _scaled(12, np.sqrt(scale), lo=4)
    add("LAT-SQR'", "lattice", r * r, gen.lattice_oriented(r, r, seed=seed + 9))
    add("LAT-REC'", "lattice", rr * rc, gen.lattice_oriented(rr, rc, seed=seed + 10))
    add("LAT-SQRp'", "lattice", r * r, gen.lattice_sparse(r, r, seed=seed + 11))
    add("LAT-RECp'", "lattice", rr * rc, gen.lattice_sparse(rr, rc, seed=seed + 12))
    return specs


def table3_suite(scale: float = 1.0, seed: int = 7) -> list[GraphSpec]:
    """Undirected graphs for connectivity: symmetrized Table-2 analogues
    plus two road networks."""
    base = {g.name: g for g in table2_suite(scale, seed)}
    picks = ["SOC-LJ'", "WEB-SD'", "KNN-HH5'", "KNN-GL5'", "LAT-SQR'", "LAT-SQRp'"]
    specs = []
    for name in picks:
        g = base[name]
        s, d = _sym(g.n, g.src, g.dst)
        specs.append(GraphSpec(name + "-sym", g.family, g.n, s, d))
    r = _scaled(64, np.sqrt(scale), lo=8)
    specs.append(
        GraphSpec("ROAD-GE'", "road", r * r, *gen.road(r, r, seed=seed + 20))
    )
    specs.append(
        GraphSpec("ROAD-USA'", "road", r * 2 * r, *gen.road(r, 2 * r, seed=seed + 21))
    )
    return specs


def lelists_suite(scale: float = 1.0, seed: int = 7) -> list[GraphSpec]:
    """Smaller undirected subset for LE-lists (paper Tab. 3 right half)."""
    suite = {g.name: g for g in table3_suite(scale * 0.5, seed)}
    picks = ["SOC-LJ'-sym", "KNN-HH5'-sym", "KNN-GL5'-sym", "LAT-SQR'-sym", "ROAD-GE'"]
    return [suite[p] for p in picks]
