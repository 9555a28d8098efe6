"""Trimming tests: numpy path, Catalyst path, DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.core import csr as csrmod
from repro.core.trim import trim_df, trim_numpy
from repro.oracle import assert_equivalent
from tests.graph_zoo import ZOO_NAMES, zoo


@pytest.mark.parametrize("name", ZOO_NAMES)
def test_trim_numpy_matches_definition(name):
    c = zoo()[name]
    ct = c.transpose()
    mask = trim_numpy(c, ct)
    outdeg = np.diff(c.indptr)
    indeg = np.diff(ct.indptr)
    assert np.array_equal(mask, (outdeg == 0) | (indeg == 0))


def test_trim_path_endpoints():
    c = zoo()["path"]
    mask = trim_numpy(c, c.transpose())
    assert mask[0] and mask[5]          # source and sink trimmed
    assert not mask[1:5].any()          # interior kept (one trim pass only)


def test_trim_cycle_nothing():
    c = zoo()["cycle"]
    assert not trim_numpy(c, c.transpose()).any()


def test_self_loop_not_trimmed():
    c = zoo()["self_loop"]  # 0->0, 1->2
    mask = trim_numpy(c, c.transpose())
    assert not mask[0]
    assert mask[1] and mask[2]


@pytest.mark.spark
def test_trim_df_matches_numpy(spark):
    c = zoo()["web"]
    edges = csrmod.to_edges_df(spark, c)
    assert np.array_equal(trim_df(spark, edges, c.n), trim_numpy(c, c.transpose()))


@pytest.mark.spark
def test_trim_df_oracle(spark):
    """Zero-in-or-out vertices via Catalyst vs DuckDB SQL."""
    g = np.random.default_rng(9)
    n = 40
    pdf = pd.DataFrame({"src": g.integers(0, n, 80), "dst": g.integers(0, n, 80)})
    edges = spark.createDataFrame(pdf)
    mask = trim_df(spark, edges, n)
    got = spark.createDataFrame(
        pd.DataFrame({"v": np.flatnonzero(mask).astype(np.int64)})
    )
    assert_equivalent(
        got,
        """
        WITH ids AS (SELECT * FROM range(0, 40) t(v))
        SELECT v FROM ids
        WHERE v NOT IN (SELECT src FROM edges)
           OR v NOT IN (SELECT dst FROM edges)
        """,
        edges=pdf,
    )
