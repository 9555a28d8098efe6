"""BGSS per-batch labeling (Alg. 1 lines 8-13, paper Sec. 4.4).

After a batch's forward/backward multi-reachability searches produce pair
sets L_out (s reaches v) and L_in (v reaches s):

- a vertex with some source in *both* sets is strongly connected to that
  source: it is **finished** and labeled with the largest such source id
  (all members of the SCC share that max, so the label is consistent);
- any other vertex touched by the searches gets a new **signature** label
  hashing (old label, sorted R_in, sorted R_out), so vertices with
  different reachability information — which cannot share an SCC — end up
  with different labels, and later searches skip the cross edges between
  them.

Two implementations produce the same partition refinement:

- :func:`label_batch` — pandas, driver-side, used by the SCC engine
  (signature = blake2b, forced negative so it can never collide with a
  finished label, which is a vertex id >= 0);
- :func:`label_batch_df` — Spark DataFrame/Catalyst (joins + collect_set +
  xxhash64), oracle-tested against DuckDB SQL and asserted
  partition-equivalent to the pandas path in tests.
"""
from __future__ import annotations

import hashlib

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F


def _sig_hash(old_label: int, r_in: tuple, r_out: tuple) -> int:
    h = hashlib.blake2b(repr((int(old_label), r_in, r_out)).encode(), digest_size=8)
    return -(int.from_bytes(h.digest(), "big") >> 1) - 1  # always negative


def label_batch(
    pairs_in: tuple[np.ndarray, np.ndarray],
    pairs_out: tuple[np.ndarray, np.ndarray],
    labels: np.ndarray,
    finished: np.ndarray,
) -> int:
    """Apply one batch's labeling in place; returns #newly finished."""
    div = pd.DataFrame({"v": pairs_in[0], "s": pairs_in[1]})
    dov = pd.DataFrame({"v": pairs_out[0], "s": pairs_out[1]})
    both = div.merge(dov, on=["v", "s"])
    n_new = 0
    if len(both):
        scc_lab = both.groupby("v")["s"].max()
        idx = scc_lab.index.to_numpy(dtype=np.int64)
        labels[idx] = scc_lab.to_numpy(dtype=np.int64)
        n_new = int((~finished[idx]).sum())
        finished[idx] = True
    touched = np.union1d(div["v"].unique(), dov["v"].unique()).astype(np.int64)
    touched = touched[~finished[touched]]
    if len(touched):
        sig_in = div.groupby("v")["s"].apply(lambda s: tuple(sorted(s)))
        sig_out = dov.groupby("v")["s"].apply(lambda s: tuple(sorted(s)))
        for v in touched.tolist():
            labels[v] = _sig_hash(
                labels[v], sig_in.get(v, ()), sig_out.get(v, ())
            )
    return n_new


def label_batch_df(
    spark: SparkSession,
    pairs_in: tuple[np.ndarray, np.ndarray],
    pairs_out: tuple[np.ndarray, np.ndarray],
    labels: np.ndarray,
    finished: np.ndarray,
) -> tuple[np.ndarray, np.ndarray]:
    """Catalyst implementation; returns updated (labels, finished) copies.

    Signature labels use ``xxhash64`` over (old label, sorted R_in,
    sorted R_out); finished labels are ``max`` source ids.  Labels differ
    numerically from :func:`label_batch` but induce the same partition.
    """
    labels = labels.copy()
    finished = finished.copy()
    div = spark.createDataFrame(
        pd.DataFrame({"v": pairs_in[0].astype(np.int64), "s": pairs_in[1].astype(np.int64)})
    )
    dov = spark.createDataFrame(
        pd.DataFrame({"v": pairs_out[0].astype(np.int64), "s": pairs_out[1].astype(np.int64)})
    )
    lab_df = spark.createDataFrame(
        pd.DataFrame({"v": np.arange(len(labels), dtype=np.int64), "old": labels})
    )
    both = div.join(dov, ["v", "s"]).groupBy("v").agg(F.max("s").alias("newlab"))
    fin = both.toPandas()
    if len(fin):
        idx = fin["v"].to_numpy(dtype=np.int64)
        labels[idx] = fin["newlab"].to_numpy(dtype=np.int64)
        finished[idx] = True
    sin = div.groupBy("v").agg(F.sort_array(F.collect_set("s")).alias("rin"))
    sout = dov.groupBy("v").agg(F.sort_array(F.collect_set("s")).alias("rout"))
    sig = (
        sin.join(sout, "v", "full_outer")
        .join(lab_df, "v")
        .select(
            "v",
            (
                -F.abs(
                    F.xxhash64(
                        F.col("old"),
                        F.concat_ws(",", F.col("rin").cast("array<string>")),
                        F.concat_ws(",", F.col("rout").cast("array<string>")),
                    )
                )
                - F.lit(1)
            ).alias("newlab"),
        )
        .toPandas()
    )
    if len(sig):
        idx = sig["v"].to_numpy(dtype=np.int64)
        keep = ~finished[idx]
        labels[idx[keep]] = sig["newlab"].to_numpy(dtype=np.int64)[keep]
    return labels, finished
