"""BGSS labeling tests: pandas engine path, Catalyst path, DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.core.labeling import label_batch, label_batch_df
from repro.oracle import assert_equivalent
from tests.graph_zoo import same_partition


def _pairs(*pairs):
    v = np.asarray([p[0] for p in pairs], dtype=np.int64)
    s = np.asarray([p[1] for p in pairs], dtype=np.int64)
    return v, s


def test_intersection_finishes_with_max_source():
    # vertices 0,1 strongly connected to sources 3 and 5
    pin = _pairs((0, 3), (0, 5), (1, 3), (2, 3))
    pout = _pairs((0, 3), (0, 5), (1, 3), (1, 5))
    labels = np.full(6, -1, dtype=np.int64)
    finished = np.zeros(6, dtype=bool)
    n_new = label_batch(pin, pout, labels, finished)
    assert n_new == 2
    assert finished[0] and finished[1]
    assert labels[0] == 5 and labels[1] == 3  # max source in intersection
    assert not finished[2]


def test_one_sided_vertices_get_signature_split():
    # 2 reached only backward, 3 reached only forward, 4 untouched:
    # afterwards 2, 3, 4 must all have different labels.
    pin = _pairs((2, 9),)
    pout = _pairs((3, 9),)
    labels = np.full(10, -1, dtype=np.int64)
    finished = np.zeros(10, dtype=bool)
    label_batch(pin, pout, labels, finished)
    assert labels[2] != labels[3] != labels[4] and labels[2] != labels[4]
    assert labels[4] == -1  # untouched keeps old label
    assert labels[2] < 0 and labels[3] < 0  # signatures never collide with ids


def test_same_signature_keeps_same_label():
    pin = _pairs((2, 9), (3, 9))
    pout = _pairs((2, 9), (3, 9))
    labels = np.full(10, -1, dtype=np.int64)
    finished = np.zeros(10, dtype=bool)
    label_batch(pin, pout, labels, finished)
    # 2 and 3 are both strongly connected to 9 -> finished, same label
    assert finished[2] and finished[3] and labels[2] == labels[3] == 9


def test_refinement_only_splits():
    """Vertices with different old labels never merge."""
    pin = _pairs((0, 9), (1, 9))
    pout = _pairs((0, 9), (1, 9))
    labels = np.array([-1, -2, -1, -2], dtype=np.int64)
    finished = np.zeros(4, dtype=bool)
    # 0 and 1 become finished (same SCC as 9? both in in&out) -> merged is
    # fine for finished; test unfinished case instead:
    pin2 = _pairs((2, 8),)
    pout2 = _pairs((3, 8),)
    labels2 = np.array([-1, -2, -5, -6], dtype=np.int64)
    finished2 = np.zeros(4, dtype=bool)
    label_batch(pin2, pout2, labels2, finished2)
    assert labels2[2] != labels2[3]


def test_empty_batch_is_noop():
    labels = np.array([-1, -1], dtype=np.int64)
    finished = np.zeros(2, dtype=bool)
    n = label_batch(_pairs(), _pairs(), labels, finished)
    assert n == 0 and labels.tolist() == [-1, -1]


@pytest.mark.spark
def test_df_path_partition_equivalent(spark):
    g = np.random.default_rng(5)
    n = 40
    pin = (g.integers(0, n, 60), g.integers(0, 8, 60))
    pout = (g.integers(0, n, 60), g.integers(0, 8, 60))
    labels_a = np.full(n, -1, dtype=np.int64)
    finished_a = np.zeros(n, dtype=bool)
    label_batch(pin, pout, labels_a, finished_a)
    labels_b, finished_b = label_batch_df(
        spark, pin, pout, np.full(n, -1, dtype=np.int64), np.zeros(n, dtype=bool)
    )
    assert np.array_equal(finished_a, finished_b)
    assert same_partition(labels_a, labels_b)


@pytest.mark.spark
def test_scc_detection_oracle(spark):
    """The in-AND-out intersection (who finishes, with which max source)
    cross-checked against DuckDB SQL."""
    from pyspark.sql import functions as F

    g = np.random.default_rng(6)
    pin = pd.DataFrame({"v": g.integers(0, 30, 50), "s": g.integers(0, 5, 50)})
    pout = pd.DataFrame({"v": g.integers(0, 30, 50), "s": g.integers(0, 5, 50)})
    div, dov = spark.createDataFrame(pin), spark.createDataFrame(pout)
    got = (
        div.join(dov, ["v", "s"]).groupBy("v").agg(F.max("s").alias("newlab"))
    )
    assert_equivalent(
        got,
        """
        SELECT i.v AS v, max(i.s) AS newlab
        FROM (SELECT DISTINCT * FROM pin) i
        JOIN (SELECT DISTINCT * FROM pout) o ON i.v = o.v AND i.s = o.s
        GROUP BY i.v
        """,
        pin=pin,
        pout=pout,
    )
