"""Graph operations as Spark DataFrame/Catalyst computations.

These are the non-iterative pieces of the pipelines (degree tables,
symmetrization, transpose, dedup); each has a DuckDB-SQL oracle test.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def transpose(edges: DataFrame) -> DataFrame:
    return edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))


def symmetrize(edges: DataFrame) -> DataFrame:
    """Undirected version: edges plus their reverses, deduplicated, no
    self loops."""
    return (
        edges.union(transpose(edges))
        .where(F.col("src") != F.col("dst"))
        .distinct()
    )


def dedupe(edges: DataFrame) -> DataFrame:
    return edges.where(F.col("src") != F.col("dst")).distinct()


def degrees(spark: SparkSession, edges: DataFrame, n: int) -> DataFrame:
    """(v, out_deg, in_deg) for all v in [0, n) — zero-degree rows kept."""
    vertices = spark.createDataFrame(pd.DataFrame({"v": np.arange(n, dtype=np.int64)}))
    outd = edges.groupBy(F.col("src").alias("v")).agg(F.count("*").alias("out_deg"))
    ind = edges.groupBy(F.col("dst").alias("v")).agg(F.count("*").alias("in_deg"))
    return (
        vertices.join(outd, "v", "left")
        .join(ind, "v", "left")
        .fillna(0, subset=["out_deg", "in_deg"])
    )


def scc_size_histogram(spark: SparkSession, labels: np.ndarray) -> DataFrame:
    """(scc_size, num_sccs) from a label array — Catalyst aggregation,
    used to compare #SCC and |SCC_1| against Tarjan via the oracle."""
    lab_df = spark.createDataFrame(
        pd.DataFrame({"v": np.arange(len(labels), dtype=np.int64), "lab": labels})
    )
    sizes = lab_df.groupBy("lab").agg(F.count("*").alias("scc_size"))
    return sizes.groupBy("scc_size").agg(F.count("*").alias("num_sccs"))
