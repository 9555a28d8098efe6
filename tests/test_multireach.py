"""Multi-reachability tests vs brute-force transitive closure."""
import numpy as np
import pytest

from repro.core import csr as csrmod
from repro.core.counters import Counters
from repro.core.engine import Engine
from repro.core.multireach import multi_reach
from tests.graph_zoo import ZOO_NAMES, random_digraph, zoo


def closure_pairs(c, sources, labels, finished, direction="fwd"):
    """Reference: all pairs (v, s) with s ~> v obeying label pruning and
    finished-skipping, via python BFS per source."""
    g = c if direction == "fwd" else c.transpose()
    out = set()
    for s in sources.tolist():
        if finished[s]:
            continue
        out.add((s, s))
        stack = [s]
        seen = {s}
        while stack:
            v = stack.pop()
            for u in g.neighbors(v).tolist():
                if finished[u] or labels[u] != labels[v] or u in seen:
                    continue
                seen.add(u)
                out.add((u, s))
                stack.append(u)
    return out


def run(c, sources, labels=None, finished=None, **kw):
    labels = labels if labels is not None else np.zeros(c.n, dtype=np.int64)
    finished = finished if finished is not None else np.zeros(c.n, dtype=bool)
    eng = Engine(None, c, Counters())
    r = multi_reach(eng, sources, labels, finished, **kw)
    return set(zip(r.pairs_v.tolist(), r.pairs_s.tolist())), r, eng


@pytest.mark.parametrize("name", ZOO_NAMES)
@pytest.mark.parametrize("tau", [1, 512])
def test_pairs_match_closure(name, tau):
    c = zoo()[name]
    if c.n < 2:
        return
    sources = np.array([0, c.n - 1])
    labels = np.zeros(c.n, dtype=np.int64)
    finished = np.zeros(c.n, dtype=bool)
    got, _, _ = run(c, sources, tau=tau)
    assert got == closure_pairs(c, sources, labels, finished)


@pytest.mark.parametrize("direction", ["fwd", "bwd"])
def test_directions(direction):
    c = zoo()["dag"]
    sources = np.array([0, 3])
    labels = np.zeros(c.n, dtype=np.int64)
    finished = np.zeros(c.n, dtype=bool)
    got, _, _ = run(c, sources, direction=direction, tau=4)
    assert got == closure_pairs(c, sources, labels, finished, direction)


def test_label_pruning():
    c = zoo()["path"]  # 0->1->2->3->4->5
    labels = np.array([1, 1, 1, 2, 2, 2], dtype=np.int64)
    finished = np.zeros(6, dtype=bool)
    got, _, _ = run(c, np.array([0]), labels=labels, tau=512)
    assert got == {(0, 0), (1, 0), (2, 0)}


def test_finished_pruning():
    c = zoo()["path"]
    finished = np.zeros(6, dtype=bool)
    finished[2] = True
    got, _, _ = run(c, np.array([0]), finished=finished, tau=512)
    assert got == {(0, 0), (1, 0)}


def test_finished_source_dropped():
    c = zoo()["path"]
    finished = np.zeros(6, dtype=bool)
    finished[0] = True
    got, _, _ = run(c, np.array([0]), finished=finished)
    assert got == set()


@pytest.mark.parametrize("sizing", ["heuristic", "exact"])
def test_sizing_policies_same_result(sizing):
    c = random_digraph(50, 200, 21)
    sources = np.array([0, 1, 2, 3])
    got, _, _ = run(c, sources, sizing=sizing, tau=1)
    labels = np.zeros(c.n, dtype=np.int64)
    finished = np.zeros(c.n, dtype=bool)
    assert got == closure_pairs(c, sources, labels, finished)


def test_exact_sizing_costs_more_rehash():
    c = random_digraph(60, 400, 22)
    sources = np.arange(8)
    _, _, e_heur = run(c, sources, sizing="heuristic", prev_pairs_hint=500, tau=1)
    _, _, e_exact = run(c, sources, sizing="exact", tau=1)
    assert e_exact.counters.table_rehash_cost >= e_heur.counters.table_rehash_cost


def test_two_pass_costs_more_visits():
    c = random_digraph(50, 300, 23)
    sources = np.array([0, 1])
    _, _, e1 = run(c, sources, two_pass=False, tau=1)
    _, _, e2 = run(c, sources, two_pass=True, tau=1)
    assert e2.counters.edge_visits > e1.counters.edge_visits


def test_vgc_reduces_rounds():
    c = zoo()["lattice"]
    sources = np.array([0, 70])
    _, r1, _ = run(c, sources, tau=1)
    _, r512, _ = run(c, sources, tau=512)
    assert r512.rounds < r1.rounds


def test_pair_inserts_counted():
    c = zoo()["cycle"]
    got, r, eng = run(c, np.array([0]), tau=1)
    # every vertex reachable: pairs (v, 0) for all 8; (0,0) inserted at init
    assert len(got) == 8
    assert eng.counters.pair_inserts == 7
