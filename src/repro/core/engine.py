"""Round engine: one call == one frontier round == one global barrier.

The engine takes a frontier as a pandas DataFrame, runs a kernel from
``repro.core.kernels`` over it, and returns the candidate rows.  Two
execution paths produce *identical* results:

- **Spark path** — the frontier becomes a DataFrame, is repartitioned
  across executors, and the kernel runs inside ``mapInPandas`` with the
  graph read from a broadcast variable.  Launching this job is the
  analogue of the paper's fork-join round: a real global synchronization
  whose fixed overhead is what VGC amortizes.
- **Driver path** — the kernel is called directly.  This is ordinary
  horizontal granularity control (don't distribute tiny work) and is used
  by unit tests; **benchmarks force the Spark path for every algorithm**
  (``spark_threshold=0``) so all competitors pay the same barrier cost.

``Counters.rounds`` is incremented per call on either path.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import types as T

from repro.core.counters import Counters
from repro.core.csr import CSR, GraphBroadcast
from repro.core.kernels import KERNELS, SENTINEL

_LONG = T.LongType()
_BOOL = T.BooleanType()

SCHEMAS = {
    "sparse_reach": T.StructType(
        [
            T.StructField("v", _LONG),
            T.StructField("explored", _BOOL),
            T.StructField("visits", _LONG),
        ]
    ),
    "dense_reach": T.StructType(
        [
            T.StructField("v", _LONG),
            T.StructField("explored", _BOOL),
            T.StructField("visits", _LONG),
        ]
    ),
    "multi_reach": T.StructType(
        [
            T.StructField("v", _LONG),
            T.StructField("s", _LONG),
            T.StructField("explored", _BOOL),
            T.StructField("visits", _LONG),
        ]
    ),
    "ldd_reach": T.StructType(
        [
            T.StructField("v", _LONG),
            T.StructField("lab", _LONG),
            T.StructField("explored", _BOOL),
            T.StructField("visits", _LONG),
        ]
    ),
    "lelists_round": T.StructType(
        [
            T.StructField("v", _LONG),
            T.StructField("s", _LONG),
            T.StructField("visits", _LONG),
        ]
    ),
    "color_max": T.StructType(
        [
            T.StructField("v", _LONG),
            T.StructField("lab", _LONG),
            T.StructField("visits", _LONG),
        ]
    ),
}

IN_SCHEMAS = {
    "sparse_reach": T.StructType([T.StructField("v", _LONG)]),
    "dense_reach": T.StructType([T.StructField("v", _LONG)]),
    "multi_reach": T.StructType([T.StructField("v", _LONG), T.StructField("s", _LONG)]),
    "ldd_reach": T.StructType([T.StructField("v", _LONG), T.StructField("lab", _LONG)]),
    "lelists_round": T.StructType([T.StructField("v", _LONG), T.StructField("s", _LONG)]),
    "color_max": T.StructType([T.StructField("v", _LONG)]),
}


def _make_mapper(bc_handle, kernel, params):
    """Closure shipped to executors; reads the graph from the broadcast."""

    def mapper(batches):
        g = bc_handle.value
        got_any = False
        for pdf in batches:
            if len(pdf) == 0:
                continue
            got_any = True
            yield kernel(pdf, g, params)
        if not got_any:
            return

    return mapper


class Engine:
    """Runs kernels over frontiers for one graph."""

    def __init__(
        self,
        spark: SparkSession | None,
        csr: CSR,
        counters: Counters,
        *,
        csr_t: CSR | None = None,
        force_spark: bool = False,
        spark_threshold: int = 1 << 30,
        npartitions: int = 8,
        time_budget_s: float | None = None,
    ):
        self.spark = spark
        self.counters = counters
        self.force_spark = force_spark
        self.spark_threshold = spark_threshold
        self.npartitions = npartitions
        self.time_budget_s = time_budget_s
        self._deadline = None
        if time_budget_s is not None:
            import time

            self._deadline = time.monotonic() + time_budget_s
        self.gb = None
        self._local_g = None
        if spark is not None:
            self.gb = GraphBroadcast(spark, csr, csr_t)
            self._local_g = self.gb.local_value()
        else:
            csr_t = csr_t if csr_t is not None else csr.transpose()
            self._local_g = (csr.indptr, csr.indices, csr_t.indptr, csr_t.indices)
        self.n = csr.n

    def check_budget(self) -> None:
        if self._deadline is not None:
            import time

            if time.monotonic() > self._deadline:
                raise TimeoutError("engine time budget exceeded")

    def round(self, kernel_name: str, pdf_in: pd.DataFrame, params: dict) -> pd.DataFrame:
        """Run one frontier round; returns candidate rows (sentinels
        stripped, their visit counts folded into the counters)."""
        self.check_budget()
        kernel = KERNELS[kernel_name]
        self.counters.rounds += 1
        use_spark = self.spark is not None and (
            self.force_spark or len(pdf_in) >= self.spark_threshold
        )
        if use_spark:
            df = self.spark.createDataFrame(pdf_in, schema=IN_SCHEMAS[kernel_name])
            out = (
                df.repartition(min(self.npartitions, max(1, len(pdf_in))))
                .mapInPandas(
                    _make_mapper(self.gb.handle, kernel, params),
                    schema=SCHEMAS[kernel_name],
                )
                .toPandas()
            )
        else:
            out = kernel(pdf_in, self._local_g, params)
        sent = out["v"] == SENTINEL
        self.counters.edge_visits += int(out.loc[sent, "visits"].sum())
        out = out.loc[~sent].drop(columns=["visits"]).reset_index(drop=True)
        return out

    def close(self) -> None:
        if self.gb is not None:
            self.gb.destroy()


def frontier_pdf(vs: np.ndarray) -> pd.DataFrame:
    return pd.DataFrame({"v": np.asarray(vs, dtype=np.int64)})


def pair_pdf(vs: np.ndarray, ss: np.ndarray) -> pd.DataFrame:
    return pd.DataFrame(
        {"v": np.asarray(vs, dtype=np.int64), "s": np.asarray(ss, dtype=np.int64)}
    )
