"""Self-tests of the provided DuckDB oracle + TPC-H-lite generators, and
oracle checks of the graph DataFrame ops (repro.graphs.ops)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core import csr as csrmod
from repro.graphs import ops
from repro.oracle import assert_equivalent
from tests.graph_zoo import zoo

pytestmark = pytest.mark.spark


def test_oracle_accepts_matching_aggregate(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    out = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"), F.count("*").alias("cnt")
    )
    assert_equivalent(
        out,
        "SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS cnt "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_oracle_join(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    out = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        out,
        "SELECT o_orderpriority, count(*) AS cnt FROM lineitem l "
        "JOIN orders o ON l.l_orderkey = o.o_orderkey GROUP BY o_orderpriority",
        lineitem=li,
        orders=o,
    )


def test_oracle_catches_wrong_result(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("cnt"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_synth_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001).toPandas()
    b = synth_data.orders(spark, sf=0.001).toPandas()
    pd.testing.assert_frame_equal(a, b)


# -- graph ops vs DuckDB --------------------------------------------------
def _edges_pdf(c):
    src = np.repeat(np.arange(c.n, dtype=np.int64), np.diff(c.indptr))
    return pd.DataFrame({"src": src, "dst": c.indices})


def test_degrees_oracle(spark):
    c = zoo()["rmat"]
    pdf = _edges_pdf(c)
    out = ops.degrees(spark, spark.createDataFrame(pdf), c.n)
    assert_equivalent(
        out,
        """
        WITH ids AS (SELECT * FROM range(0, 256) t(v))
        SELECT v,
               coalesce((SELECT count(*) FROM edges WHERE src = v), 0) AS out_deg,
               coalesce((SELECT count(*) FROM edges WHERE dst = v), 0) AS in_deg
        FROM ids
        """,
        edges=pdf,
    )


def test_symmetrize_oracle(spark):
    c = zoo()["web"]
    pdf = _edges_pdf(c)
    out = ops.symmetrize(spark.createDataFrame(pdf))
    assert_equivalent(
        out,
        """
        SELECT DISTINCT src, dst FROM (
            SELECT src, dst FROM edges UNION ALL SELECT dst, src FROM edges
        ) WHERE src <> dst
        """,
        edges=pdf,
    )


def test_transpose_oracle(spark):
    c = zoo()["dag"]
    pdf = _edges_pdf(c)
    out = ops.transpose(spark.createDataFrame(pdf))
    assert_equivalent(
        out, "SELECT dst AS src, src AS dst FROM edges", edges=pdf
    )


def test_dedupe_oracle(spark):
    pdf = pd.DataFrame({"src": [0, 0, 1, 2, 2], "dst": [1, 1, 1, 2, 0]})
    out = ops.dedupe(spark.createDataFrame(pdf))
    assert_equivalent(
        out,
        "SELECT DISTINCT src, dst FROM edges WHERE src <> dst",
        edges=pdf,
    )


def test_scc_histogram_oracle(spark):
    from repro.baselines.tarjan import tarjan_scc

    c = zoo()["web"]
    labels, _ = tarjan_scc(c)
    out = ops.scc_size_histogram(spark, labels)
    assert_equivalent(
        out,
        """
        SELECT scc_size, count(*) AS num_sccs FROM (
            SELECT lab, count(*) AS scc_size FROM labs GROUP BY lab
        ) GROUP BY scc_size
        """,
        labs=pd.DataFrame({"v": np.arange(c.n), "lab": labels}),
    )
