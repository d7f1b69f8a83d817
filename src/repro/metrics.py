"""Partitioning-quality metrics: replication factor and load balance.

RF (Eq. 1) = Σ_v |P(v)| / |V| where P(v) is the set of partitions that
hold an edge incident to v. Load balance (Eq. 2) = k·max_i |p_i| / |E|.

Spark DataFrame implementations are the source of truth for experiments
(and are DuckDB-oracle-tested); the numpy twins exist for the inner
loops of jobs that evaluate hundreds of partitionings.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def replication_df(edges_df: DataFrame, assign_df: DataFrame) -> DataFrame:
    """Per-vertex replication counts ``(v, n_replicas)`` via Spark."""
    joined = edges_df.join(assign_df, "eid")
    ends = joined.select(F.col("src").alias("v"), "partition").unionAll(
        joined.select(F.col("dst").alias("v"), "partition")
    )
    return (
        ends.distinct()
        .groupBy("v")
        .agg(F.count("*").alias("n_replicas"))
    )


def replication_factor(edges_df: DataFrame, assign_df: DataFrame) -> float:
    """Replication factor of an assignment, computed in Spark."""
    row = (
        replication_df(edges_df, assign_df)
        .agg(F.sum("n_replicas").alias("s"), F.count("*").alias("n"))
        .collect()[0]
    )
    return float(row["s"]) / float(row["n"])


def load_balance(assign_df: DataFrame, k: int) -> float:
    """Relative load balance k·max|p_i|/|E| (lower is better, ≥ 1)."""
    sizes = assign_df.groupBy("partition").agg(F.count("*").alias("sz"))
    row = sizes.agg(F.max("sz").alias("mx"), F.sum("sz").alias("tot")).collect()[0]
    return float(k * row["mx"]) / float(row["tot"])


def replication_factor_np(edges: np.ndarray, part: np.ndarray, k: int) -> float:
    """Fast numpy RF: distinct (vertex, partition) pairs over |V|."""
    v = np.concatenate([edges[:, 0], edges[:, 1]])
    p = np.concatenate([part, part]).astype(np.int64)
    pairs = v.astype(np.int64) * np.int64(k) + p
    n_pairs = len(np.unique(pairs))
    n_v = len(np.unique(v))
    return n_pairs / n_v


def load_balance_np(part: np.ndarray, k: int) -> float:
    """Numpy twin of :func:`load_balance`."""
    sizes = np.bincount(part, minlength=k)
    return float(k * sizes.max()) / float(len(part))


def partition_sizes_np(part: np.ndarray, k: int) -> np.ndarray:
    """Edge count per partition."""
    return np.bincount(part, minlength=k).astype(np.int64)
