"""Trimming (paper Sec. 4.1): vertices with zero in- or out-degree are
singleton SCCs and are finished before any search.

Two equivalent implementations: a Spark DataFrame/Catalyst one over the
edge table (oracle-tested against DuckDB SQL) and a numpy one over the
CSR (used when no SparkSession/edge DataFrame is at hand).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.csr import CSR


def trim_numpy(csr: CSR, csr_t: CSR) -> np.ndarray:
    """Bool mask of trimmed vertices (zero in- OR zero out-degree)."""
    return (np.diff(csr.indptr) == 0) | (np.diff(csr_t.indptr) == 0)


def trim_df(spark: SparkSession, edges: DataFrame, n: int) -> np.ndarray:
    """Same mask computed with Catalyst anti-joins on the edge table."""
    vertices = spark.createDataFrame(
        pd.DataFrame({"v": np.arange(n, dtype=np.int64)})
    )
    has_out = edges.select(edges.src.alias("v")).distinct()
    has_in = edges.select(edges.dst.alias("v")).distinct()
    trimmed = vertices.join(has_out, "v", "left_anti").union(
        vertices.join(has_in, "v", "left_anti")
    ).distinct()
    mask = np.zeros(n, dtype=bool)
    ids = trimmed.toPandas()["v"].to_numpy(dtype=np.int64)
    mask[ids] = True
    return mask
