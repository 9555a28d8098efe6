"""Engine tests: driver path vs forced-Spark path produce identical
results; rounds and visit counters are accounted on both paths."""
import numpy as np
import pytest

from repro.core.counters import Counters
from repro.core.engine import Engine, frontier_pdf, pair_pdf
from repro.core.pairtable import PairTable
from repro.core.reach import single_reach
from tests.graph_zoo import zoo


def test_frontier_pdf_types():
    pdf = frontier_pdf(np.array([1, 2, 3]))
    assert pdf["v"].dtype == np.int64


def test_pair_pdf_types():
    pdf = pair_pdf(np.array([1]), np.array([2]))
    assert set(pdf.columns) == {"v", "s"}


def test_rounds_increment_on_driver_path():
    c = zoo()["path"]
    eng = Engine(None, c, Counters())
    eng.round(
        "sparse_reach",
        frontier_pdf(np.array([0])),
        {
            "direction": "fwd",
            "visited": np.array([True] + [False] * 5),
            "tau": 1,
            "two_pass": False,
        },
    )
    assert eng.counters.rounds == 1
    assert eng.counters.edge_visits == 1


def test_visits_stripped_from_output():
    c = zoo()["path"]
    eng = Engine(None, c, Counters())
    out = eng.round(
        "sparse_reach",
        frontier_pdf(np.array([0])),
        {
            "direction": "fwd",
            "visited": np.array([True] + [False] * 5),
            "tau": 1,
            "two_pass": False,
        },
    )
    assert "visits" not in out.columns
    assert (out["v"] >= 0).all()


def test_time_budget_zero_raises():
    c = zoo()["path"]
    eng = Engine(None, c, Counters(), time_budget_s=0.0)
    with pytest.raises(TimeoutError):
        eng.round(
            "sparse_reach",
            frontier_pdf(np.array([0])),
            {"direction": "fwd", "visited": np.zeros(6, bool), "tau": 1, "two_pass": False},
        )


@pytest.mark.spark
def test_spark_equals_driver_dense_round(spark):
    """A dense round treats every candidate row independently, so one
    driver call and partitioned tasks must emit exactly the same set."""
    c = zoo()["lattice"]
    visited = np.zeros(c.n, dtype=bool)
    visited[[0, 1, 2]] = True
    pdf = frontier_pdf(np.flatnonzero(~visited))
    params = {"direction": "fwd", "in_frontier": visited.copy()}
    e1 = Engine(None, c, Counters())
    a = e1.round("dense_reach", pdf, params)
    e2 = Engine(spark, c, Counters(), force_spark=True, spark_threshold=0)
    b = e2.round("dense_reach", pdf, params)
    assert sorted(a["v"].unique().tolist()) == sorted(b["v"].unique().tolist())
    assert e1.counters.edge_visits == e2.counters.edge_visits
    e2.close()


@pytest.mark.spark
def test_spark_sparse_round_fixpoint_invariant(spark):
    """A *single* sparse round may discover different (overlapping) sets
    depending on how sources share tau budgets across tasks — only the
    search fixpoint is path-invariant.  Check both properties: the round
    output is a subset of the true reachable set, and the fixpoint
    matches the driver path exactly."""
    from repro.core.reach import single_reach

    c = zoo()["lattice"]
    srcs = np.array([0, 1, 2])
    e1 = Engine(None, c, Counters())
    truth = single_reach(e1, srcs, tau=4, dense=False).visited
    e2 = Engine(spark, c, Counters(), force_spark=True, spark_threshold=0)
    got = single_reach(e2, srcs, tau=4, dense=False).visited
    assert np.array_equal(truth, got)
    e2.close()


@pytest.mark.spark
def test_spark_equals_driver_multi(spark):
    c = zoo()["web"]
    table = PairTable(c.n)
    params = {
        "direction": "fwd",
        "tau": 8,
        "two_pass": False,
        "labels": np.zeros(c.n, dtype=np.int64),
        "finished": np.zeros(c.n, dtype=bool),
        "table_keys": table.snapshot(),
        "n": c.n,
    }
    pdf = pair_pdf(np.array([0, 3, 9]), np.array([0, 3, 9]))
    e1 = Engine(None, c, Counters())
    a = e1.round("multi_reach", pdf, params)
    e2 = Engine(spark, c, Counters(), force_spark=True, spark_threshold=0)
    b = e2.round("multi_reach", pdf, params)
    assert set(map(tuple, a[["v", "s"]].to_numpy())) == set(
        map(tuple, b[["v", "s"]].to_numpy())
    )
    e2.close()


@pytest.mark.spark
def test_spark_threshold_routes_small_frontiers_to_driver(spark):
    """Below the threshold no Spark job should run; behaviour identical."""
    c = zoo()["path"]
    eng = Engine(spark, c, Counters(), force_spark=False, spark_threshold=10_000)
    r = single_reach(eng, np.array([0]), tau=512)
    assert r.visited.all()
    eng.close()


@pytest.mark.spark
def test_reach_spark_full_graph(spark):
    c = zoo()["knn"]
    e1 = Engine(None, c, Counters())
    a = single_reach(e1, np.array([0]), tau=16)
    e2 = Engine(spark, c, Counters(), force_spark=True, spark_threshold=0)
    b = single_reach(e2, np.array([0]), tau=16)
    assert np.array_equal(a.visited, b.visited)
    e2.close()
