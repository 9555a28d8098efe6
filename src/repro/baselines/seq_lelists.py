"""Cohen's sequential LE-lists algorithm (Cohen 1997) — the oracle.

Process vertices in the given random priority order; BFS from each,
pruned to vertices whose tentative distance would strictly improve.
Total work O(m log n) in expectation.  Returns, per vertex ``u``, the
list of (source, distance) pairs in priority order — by construction the
distances are strictly decreasing, matching the LE-list definition.
"""
from __future__ import annotations

from collections import deque

import numpy as np

from repro.core.csr import CSR


def seq_le_lists(csr: CSR, order: np.ndarray) -> list[list[tuple[int, int]]]:
    n = csr.n
    indptr, indices = csr.indptr, csr.indices
    INF = np.iinfo(np.int64).max
    delta = np.full(n, INF, dtype=np.int64)
    lists: list[list[tuple[int, int]]] = [[] for _ in range(n)]
    for s in np.asarray(order, dtype=np.int64).tolist():
        if delta[s] == 0:
            continue
        dist = {s: 0}
        q = deque([s])
        if 0 < delta[s]:
            delta[s] = 0
            lists[s].append((s, 0))
        while q:
            v = q.popleft()
            dv = dist[v]
            for u in indices[indptr[v] : indptr[v + 1]].tolist():
                if u in dist:
                    continue
                du = dv + 1
                if du < delta[u]:
                    dist[u] = du
                    delta[u] = du
                    lists[u].append((s, du))
                    q.append(u)
    return lists
