"""One synchronous Stackelberg best-response round in the DataFrame API.

The paper accelerates the game with thread-pool batch parallelism
(Section 4.4): best responses inside a batch are computed against a
frozen snapshot. Mapped onto Spark, the natural batch is *all players at
once* — one Catalyst-planned job per round:

    adjacency(c, nbr, w) ⋈ strategies(nbr → p)  → per-(c, p) cut mass
    clusters × partitions                        → Eq. (6) cost surface
    min-struct aggregation per cluster           → best responses

Semantics are identical to :func:`repro.core.game.synchronous_round`
(property-tested), so jobs use the fast numpy loop while this module
demonstrates — and validates — the distributed formulation.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from .game import ClusterGraph


def spark_synchronous_round(
    spark: SparkSession,
    g: ClusterGraph,
    c2p: np.ndarray,
    k: int,
    delta: float,
) -> np.ndarray:
    """Compute one synchronous best-response round with DataFrames."""
    n = g.n
    clusters = spark.createDataFrame(
        pd.DataFrame(
            {
                "c": np.arange(n, dtype=np.int64),
                "size": g.sizes.astype(np.float64),
                "cur_p": c2p.astype(np.int64),
                "w_total": g.W.astype(np.float64),
            }
        )
    )
    adj = spark.createDataFrame(
        pd.DataFrame(
            {
                "c": g._src.astype(np.int64),
                "nbr": g._nbr.astype(np.int64),
                "w": g._wt.astype(np.float64),
            }
        )
    )
    strategies = clusters.select(F.col("c").alias("nbr"), F.col("cur_p").alias("nbr_p"))
    parts = spark.range(k).select(F.col("id").cast("long").alias("p"))

    # Per-(cluster, partition) neighbor mass already inside that partition.
    w_in = (
        adj.join(strategies, "nbr")
        .groupBy("c", F.col("nbr_p").alias("p"))
        .agg(F.sum("w").alias("w_in"))
    )
    # Snapshot partition loads.
    loads = (
        clusters.groupBy(F.col("cur_p").alias("p"))
        .agg(F.sum("size").alias("load"))
    )

    cost = (
        clusters.crossJoin(parts)
        .join(w_in, ["c", "p"], "left")
        .join(loads, "p", "left")
        .fillna(0.0, subset=["w_in", "load"])
        .withColumn(
            "load_wo",
            F.col("load") - F.when(F.col("p") == F.col("cur_p"), F.col("size")).otherwise(0.0),
        )
        .withColumn(
            "cost",
            F.lit(delta / k) * F.col("size") * (F.col("load_wo") + F.col("size"))
            + (F.col("w_total") - F.col("w_in")) / F.lit(float(k))
            # strict-improvement tie-break, as in the numpy round
            - F.when(F.col("p") == F.col("cur_p"), F.lit(1e-9)).otherwise(0.0),
        )
    )
    best = (
        cost.groupBy("c")
        .agg(F.min(F.struct(F.col("cost"), F.col("p"))).alias("m"))
        .select("c", F.col("m.p").alias("p"))
        .toPandas()
        .sort_values("c")
    )
    out = c2p.copy()
    out[best["c"].to_numpy()] = best["p"].to_numpy()
    return out
