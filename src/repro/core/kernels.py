"""Expansion kernels: the per-round work of every traversal in this repo.

Each kernel is a pure function ``kernel(pdf_in, graph_arrays, params) ->
pdf_out`` over numpy/pandas data.  The same function runs in two places:

- driver-side, for tiny inputs (granularity cutoff), and
- inside Spark executors via ``mapInPandas`` (see ``engine.Engine``),
  where ``graph_arrays`` comes from a broadcast CSR and ``params`` rides
  in the task closure.  One executor task == one "processor" of the
  paper; one engine round == one global barrier.

The central kernel is :func:`k_sparse_reach`, implementing the paper's
tau-bounded *local search* (Sec. 3.1-3.2, Fig. 4):

- a frontier vertex with out-degree > tau processes all its neighbors the
  standard (one-hop) way — there is already enough work;
- otherwise it runs a sequential BFS from itself in a local queue,
  counting every neighbor visit (successful or not) and stopping at tau;
  fully-expanded vertices are *not* re-queued, while the unexpanded
  remainder of the local queue is handed back as next-round frontier.

``tau=1`` degenerates to plain one-hop BFS (the paper's "plain"/GBBS
setting); ``two_pass=True`` re-scans the frontier's edges a second time,
reproducing the Ligra/GBBS *edge-revisit* scheme that the parallel hash
bag removes.  Discovered vertices are collected through a real
:class:`~repro.core.hashbag.HashBag` instance, so the bag sits on the hot
path exactly where the paper puts it.

Output convention: candidate rows plus one sentinel row with ``v == -1``
whose ``visits`` column carries the task's edge-visit count (all other
rows have ``visits == 0``).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.hashbag import HashBag
from repro.core.pairtable import contains_static

SENTINEL = -1


def _emit(bag: HashBag, explored: set, visits: int, extra: dict | None = None) -> pd.DataFrame:
    vs = bag.extract_all()
    flags = np.fromiter((v in explored for v in vs), dtype=bool, count=len(vs))
    out = pd.DataFrame({"v": vs.astype(np.int64), "explored": flags})
    if extra:
        for k, arr in extra.items():
            out[k] = arr
    sent = {"v": [SENTINEL], "explored": [False], "visits": [visits]}
    if extra:
        for k in extra:
            sent[k] = [0]
    out["visits"] = np.zeros(len(out), dtype=np.int64)
    return pd.concat([out, pd.DataFrame(sent)], ignore_index=True)


def k_sparse_reach(pdf: pd.DataFrame, g, p) -> pd.DataFrame:
    """Single-reachability sparse round with VGC local search.

    params: direction ('fwd'|'bwd'), visited (bool[n] snapshot), tau,
    two_pass, finished (bool[n] or None), restrict (int[n] or None —
    traverse edge (x,u) only if restrict[x] == restrict[u]).
    """
    indptr, indices, indptr_t, indices_t = g
    ip, ix = (indptr, indices) if p["direction"] == "fwd" else (indptr_t, indices_t)
    visited = p["visited"]
    finished = p.get("finished")
    restrict = p.get("restrict")
    tau = int(p["tau"])
    n = len(visited)
    sources = pdf["v"].to_numpy(dtype=np.int64)
    bag = HashBag(max(1, n), seed=0)
    seen: set[int] = set()  # task-local "my writes" view of visit[]
    explored: set[int] = set()
    requeue: list[int] = []  # partially-expanded, already-visited vertices
    visits = 0

    def blocked(x: int, u: int) -> bool:
        if finished is not None and finished[u]:
            return True
        if restrict is not None and restrict[u] != restrict[x]:
            return True
        return False

    for v in sources.tolist():
        deg = int(ip[v + 1] - ip[v])
        if deg > tau:
            # Standard one-hop processing: enough work already (Sec. 3.2).
            for u in ix[ip[v] : ip[v + 1]].tolist():
                visits += 1
                if not blocked(v, u) and not visited[u] and u not in seen:
                    seen.add(u)
                    bag.insert(u)
            explored.add(v)
            continue
        # Local search: sequential BFS from v, budget tau neighbor visits.
        queue: list[int] = [v]
        qi = 0
        t = 0
        while qi < len(queue):
            x = queue[qi]
            lo, hi = int(ip[x]), int(ip[x + 1])
            cut = False
            for j, u in enumerate(ix[lo:hi].tolist()):
                t += 1
                visits += 1
                if not blocked(x, u) and not visited[u] and u not in seen:
                    seen.add(u)
                    bag.insert(u)
                    queue.append(u)
                if t >= tau and j != hi - lo - 1:
                    cut = True  # x only partially expanded
                    break
            if not cut:
                qi += 1
                explored.add(x)
            if t >= tau:
                break
        # queue[qi:] holds unexpanded vertices -> next frontier.  Vertices
        # that were already visited before this round (x partially
        # expanded, incl. possibly v itself) must be re-queued explicitly
        # because they are not in the bag.
        for x in queue[qi:]:
            if visited[x]:
                requeue.append(x)
        explored -= set(queue[qi:])

    out = _emit(bag, explored, visits)
    if requeue:
        rq = pd.DataFrame(
            {
                "v": np.asarray(requeue, dtype=np.int64),
                "explored": np.zeros(len(requeue), dtype=bool),
                "visits": np.zeros(len(requeue), dtype=np.int64),
            }
        )
        out = pd.concat([out, rq], ignore_index=True)
    if p.get("two_pass"):
        # Edge-revisit second pass: re-scan every edge incident to the
        # frontier (the "output" pass of Ligra/GBBS).  Work only.
        second = 0
        for v in sources.tolist():
            second += int(ip[v + 1] - ip[v])
        out.loc[out["v"] == SENTINEL, "visits"] += second
    return out


def k_dense_reach(pdf: pd.DataFrame, g, p) -> pd.DataFrame:
    """Ligra-style dense round (Sec. 4.2): each *unvisited* vertex scans
    its in-neighbors (w.r.t. the search direction) and joins the visited
    set on the first neighbor found in the current frontier.

    params: direction, in_frontier (bool[n]), finished, restrict.
    Input rows: the unvisited candidate vertices.
    """
    indptr, indices, indptr_t, indices_t = g
    # For a forward search, "who can reach me" = in-neighbors = transpose.
    ip, ix = (indptr_t, indices_t) if p["direction"] == "fwd" else (indptr, indices)
    in_frontier = p["in_frontier"]
    finished = p.get("finished")
    restrict = p.get("restrict")
    cand = pdf["v"].to_numpy(dtype=np.int64)
    n = len(in_frontier)
    bag = HashBag(max(1, n), seed=0)
    visits = 0
    for u in cand.tolist():
        if finished is not None and finished[u]:
            continue
        for w in ix[ip[u] : ip[u + 1]].tolist():
            visits += 1
            if restrict is not None and restrict[w] != restrict[u]:
                continue
            if in_frontier[w]:
                bag.insert(u)
                break  # early exit: skip the rest of u's edges
    return _emit(bag, set(), visits)


def k_multi_reach(pdf: pd.DataFrame, g, p) -> pd.DataFrame:
    """Multi-reachability sparse round over (v, s) pairs (Sec. 4.3).

    params: direction, tau, two_pass, labels (int[n]), finished
    (bool[n]), table_keys (PairTable snapshot), n.
    A pair (v, s) local-searches from v, skipping cross edges
    (labels differ) and finished vertices; a reached vertex u yields the
    candidate pair (u, s) unless the snapshot table already has it.
    """
    indptr, indices, indptr_t, indices_t = g
    ip, ix = (indptr, indices) if p["direction"] == "fwd" else (indptr_t, indices_t)
    labels = p["labels"]
    finished = p["finished"]
    keys = p["table_keys"]
    n = int(p["n"])
    tau = int(p["tau"])
    vs = pdf["v"].to_numpy(dtype=np.int64)
    ss = pdf["s"].to_numpy(dtype=np.int64)
    seen: set[tuple[int, int]] = set()
    out_v: list[int] = []
    out_s: list[int] = []
    out_e: list[bool] = []
    visits = 0

    for v, s in zip(vs.tolist(), ss.tolist()):
        deg = int(ip[v + 1] - ip[v])

        def try_visit(x: int, u: int) -> bool:
            if finished[u] or labels[u] != labels[x]:
                return False
            if (u, s) in seen or contains_static(keys, u, s, n):
                return False
            seen.add((u, s))
            return True

        if deg > tau:
            for u in ix[ip[v] : ip[v + 1]].tolist():
                visits += 1
                if try_visit(v, u):
                    out_v.append(u)
                    out_s.append(s)
                    out_e.append(False)
            continue
        queue = [v]
        qi = 0
        t = 0
        explored_here: set[int] = set()
        while qi < len(queue):
            x = queue[qi]
            lo, hi = int(ip[x]), int(ip[x + 1])
            cut = False
            for j, u in enumerate(ix[lo:hi].tolist()):
                t += 1
                visits += 1
                if try_visit(x, u):
                    queue.append(u)
                if t >= tau and j != hi - lo - 1:
                    cut = True
                    break
            if not cut:
                explored_here.add(x)
                qi += 1
            if t >= tau:
                break
        for u in queue[1:]:
            out_v.append(u)
            out_s.append(s)
            out_e.append(u in explored_here)
        # Partially-expanded pair (v, s) itself must continue next round.
        if v not in explored_here:
            out_v.append(v)
            out_s.append(s)
            out_e.append(False)
    if p.get("two_pass"):
        for v in vs.tolist():
            visits += int(ip[v + 1] - ip[v])
    out = pd.DataFrame(
        {
            "v": np.asarray(out_v, dtype=np.int64),
            "s": np.asarray(out_s, dtype=np.int64),
            "explored": np.asarray(out_e, dtype=bool),
            "visits": np.zeros(len(out_v), dtype=np.int64),
        }
    )
    sent = pd.DataFrame({"v": [SENTINEL], "s": [0], "explored": [False], "visits": [visits]})
    return pd.concat([out, sent], ignore_index=True)


def k_ldd_reach(pdf: pd.DataFrame, g, p) -> pd.DataFrame:
    """LDD round (Alg. 4 lines 12-16) with optional local search.

    Input rows (v, lab): frontier vertex carrying its cluster label.
    params: visited (bool[n] snapshot), tau, two_pass.
    Candidates (u, lab, explored); the driver resolves label races by
    minimum source priority (deterministic stand-in for first-CAS-wins).
    """
    indptr, indices, _, _ = g
    ip, ix = indptr, indices
    visited = p["visited"]
    tau = int(p["tau"])
    vs = pdf["v"].to_numpy(dtype=np.int64)
    labs = pdf["lab"].to_numpy(dtype=np.int64)
    seen: dict[int, int] = {}
    explored: set[int] = set()
    requeue: list[tuple[int, int]] = []
    visits = 0
    for v, lab in zip(vs.tolist(), labs.tolist()):
        deg = int(ip[v + 1] - ip[v])
        if deg > tau:
            for u in ix[ip[v] : ip[v + 1]].tolist():
                visits += 1
                if not visited[u] and u not in seen:
                    seen[u] = lab
            explored.add(v)
            continue
        queue = [v]
        qi = 0
        t = 0
        while qi < len(queue):
            x = queue[qi]
            lo, hi = int(ip[x]), int(ip[x + 1])
            cut = False
            for j, u in enumerate(ix[lo:hi].tolist()):
                t += 1
                visits += 1
                if not visited[u] and u not in seen:
                    seen[u] = lab
                    queue.append(u)
                if t >= tau and j != hi - lo - 1:
                    cut = True
                    break
            if not cut:
                qi += 1
                explored.add(x)
            if t >= tau:
                break
        for x in queue[qi:]:
            if visited[x]:
                requeue.append((x, lab))
        explored -= set(queue[qi:])
    if p.get("two_pass"):
        for v in vs.tolist():
            visits += int(ip[v + 1] - ip[v])
    rows_v = list(seen.keys()) + [x for x, _ in requeue]
    rows_l = [seen[u] for u in seen] + [l for _, l in requeue]
    rows_e = [u in explored for u in seen] + [False] * len(requeue)
    out = pd.DataFrame(
        {
            "v": np.asarray(rows_v, dtype=np.int64),
            "lab": np.asarray(rows_l, dtype=np.int64),
            "explored": np.asarray(rows_e, dtype=bool),
            "visits": np.zeros(len(rows_v), dtype=np.int64),
        }
    )
    sent = pd.DataFrame({"v": [SENTINEL], "lab": [0], "explored": [False], "visits": [visits]})
    return pd.concat([out, sent], ignore_index=True)


def k_lelists_round(pdf: pd.DataFrame, g, p) -> pd.DataFrame:
    """One distance level of the batched multi-BFS for LE-lists (Alg. 5).

    VGC is *not* applicable (BFS order must be preserved — paper Sec. 5.2);
    rounds advance exactly one hop.  params: delta (float[n], previous-
    batch tentative distances), d (current distance), table_keys, n,
    two_pass.  A pair (u, s) is a candidate iff d+1 < delta[u] and (u, s)
    is not already in the pair table.
    """
    indptr, indices, _, _ = g
    ip, ix = indptr, indices
    delta = p["delta"]
    d1 = int(p["d"]) + 1
    keys = p["table_keys"]
    n = int(p["n"])
    vs = pdf["v"].to_numpy(dtype=np.int64)
    ss = pdf["s"].to_numpy(dtype=np.int64)
    seen: set[tuple[int, int]] = set()
    out_v: list[int] = []
    out_s: list[int] = []
    visits = 0
    for v, s in zip(vs.tolist(), ss.tolist()):
        for u in ix[ip[v] : ip[v + 1]].tolist():
            visits += 1
            if d1 >= delta[u]:
                continue
            if (u, s) in seen or contains_static(keys, u, s, n):
                continue
            seen.add((u, s))
            out_v.append(u)
            out_s.append(s)
    if p.get("two_pass"):
        for v in vs.tolist():
            visits += int(ip[v + 1] - ip[v])
    out = pd.DataFrame(
        {
            "v": np.asarray(out_v, dtype=np.int64),
            "s": np.asarray(out_s, dtype=np.int64),
            "visits": np.zeros(len(out_v), dtype=np.int64),
        }
    )
    sent = pd.DataFrame({"v": [SENTINEL], "s": [0], "visits": [visits]})
    return pd.concat([out, sent], ignore_index=True)


def k_color_max(pdf: pd.DataFrame, g, p) -> pd.DataFrame:
    """Multi-step coloring round: propagate max color along out-edges.

    params: colors (int[n]), active (bool[n]).  Input rows: vertices whose
    color changed last round.  Output rows (v, lab): proposed new colors;
    the driver keeps the max per vertex.
    """
    indptr, indices, _, _ = g
    colors = p["colors"]
    active = p["active"]
    vs = pdf["v"].to_numpy(dtype=np.int64)
    best: dict[int, int] = {}
    visits = 0
    for v in vs.tolist():
        cv = int(colors[v])
        for u in indices[indptr[v] : indptr[v + 1]].tolist():
            visits += 1
            if active[u] and colors[u] < cv and best.get(u, -1) < cv:
                best[u] = cv
    out = pd.DataFrame(
        {
            "v": np.fromiter(best.keys(), dtype=np.int64, count=len(best)),
            "lab": np.fromiter(best.values(), dtype=np.int64, count=len(best)),
            "visits": np.zeros(len(best), dtype=np.int64),
        }
    )
    sent = pd.DataFrame({"v": [SENTINEL], "lab": [0], "visits": [visits]})
    return pd.concat([out, sent], ignore_index=True)


KERNELS = {
    "sparse_reach": k_sparse_reach,
    "dense_reach": k_dense_reach,
    "multi_reach": k_multi_reach,
    "ldd_reach": k_ldd_reach,
    "lelists_round": k_lelists_round,
    "color_max": k_color_max,
}
