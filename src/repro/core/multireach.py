"""Multi-reachability search (paper Sec. 2, 4.3, 4.5).

Runs a batch of sources simultaneously, maintaining (vertex, source)
reachability pairs in a :class:`~repro.core.pairtable.PairTable` — the
phase-concurrent hash table of the paper.  Cross edges (endpoints with
different labels) and finished vertices are skipped inside the kernel, as
in BGSS's MultiReach.

Two sizing policies (Sec. 4.5):

- ``"heuristic"`` (ours): pre-reserve ``max(0.3 b, 1.5 a)`` slots, where
  ``a`` = pairs produced by the previous batch and ``b`` = unfinished
  vertices; overflow-resizes are then rare.
- ``"exact"`` (GBBS-style): start tiny and grow on demand, paying the
  repeated rehashing the paper's Fig. 9 green bars show.

Dense mode is deliberately absent: it is unsound for multi-reachability
(finding one frontier in-neighbor says nothing about the other sources).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.engine import Engine, pair_pdf
from repro.core.pairtable import PairTable, heuristic_capacity


@dataclass
class MultiReachResult:
    pairs_v: np.ndarray
    pairs_s: np.ndarray
    rounds: int


def multi_reach(
    engine: Engine,
    sources: np.ndarray,
    labels: np.ndarray,
    finished: np.ndarray,
    *,
    direction: str = "fwd",
    tau: int = 1,
    two_pass: bool = False,
    sizing: str = "heuristic",
    prev_pairs_hint: int = 0,
) -> MultiReachResult:
    n = engine.n
    sources = np.asarray(sources, dtype=np.int64)
    sources = sources[~finished[sources]]
    table = PairTable(n, capacity=64)
    if sizing == "heuristic":
        unfinished = int(n - finished.sum())
        table.reserve(heuristic_capacity(prev_pairs_hint, unfinished))

    for s in sources.tolist():
        table.insert(s, s)
    f_v = sources.copy()
    f_s = sources.copy()
    rounds = 0
    while len(f_v) > 0:
        out = engine.round(
            "multi_reach",
            pair_pdf(f_v, f_s),
            {
                "direction": direction,
                "tau": tau,
                "two_pass": two_pass,
                "labels": labels,
                "finished": finished,
                "table_keys": table.snapshot(),
                "n": n,
            },
        )
        rounds += 1
        if len(out) == 0:
            break
        grp = out.groupby(["v", "s"])["explored"].max().reset_index()
        nf_v: list[int] = []
        nf_s: list[int] = []
        for v, s, explored in zip(
            grp["v"].tolist(), grp["s"].tolist(), grp["explored"].tolist()
        ):
            if table.insert(int(v), int(s)):
                engine.counters.pair_inserts += 1
            if not explored:
                nf_v.append(int(v))
                nf_s.append(int(s))
        f_v = np.asarray(nf_v, dtype=np.int64)
        f_s = np.asarray(nf_s, dtype=np.int64)

    engine.counters.table_rehash_cost += table.rehash_cost
    pv, ps = table.pairs()
    return MultiReachResult(pairs_v=pv, pairs_s=ps, rounds=rounds)
