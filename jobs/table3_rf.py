"""Table 3: replication factor of the top-4 streaming partitioners.

CLUGP / 2PS-L / HDRF / S5P on the 11 real-graph stand-ins at
k ∈ {64, 128, 256}, all under the τ=1.0 balance constraint. RF and
balance are computed in Spark from the assignment DataFrames.

Run: ``spark-submit jobs/table3_rf.py [--preset full] [--ks 64,128,256]``
"""
from __future__ import annotations

import argparse
import sys

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.api import run_partitioner_spark
from repro.core.stream import edges_to_df
from repro.graphgen.catalog import ALL_REAL, standin_edges
from repro.metrics import load_balance, replication_factor

#: The paper's Table 3 values, for the EXPERIMENTS.md diff.
PAPER_TABLE3 = {
    # graph: {k: (CLUGP, 2PS-L, HDRF, S5P)}
    "OK": {64: (14.288, 15.112, 17.860, 11.614), 128: (17.522, 18.915, 22.617, 15.391), 256: (20.636, 23.200, 27.023, 19.055)},
    "TW": {64: (8.808, 10.642, 9.520, 7.583), 128: (10.817, 13.074, 11.789, 9.068), 256: (11.861, 15.577, 14.408, 10.526)},
    "FR": {64: (10.311, 11.241, 11.324, 7.870), 128: (13.432, 14.359, 14.757, 11.244), 256: (17.011, 17.457, 18.122, 14.995)},
    "LJ": {64: (4.913, 5.036, 6.778, 4.549), 128: (5.471, 5.593, 7.763, 5.112), 256: (5.945, 6.045, 8.545, 5.636)},
    "IT": {64: (1.908, 3.680, 12.538, 1.273), 128: (1.973, 4.110, 14.500, 1.232), 256: (2.041, 4.420, 16.469, 1.210)},
    "UK7": {64: (1.754, 3.338, 14.190, 1.265), 128: (1.876, 3.760, 16.700, 1.213), 256: (1.839, 4.077, 19.181, 1.196)},
    "IN": {64: (1.415, 1.895, 6.884, 1.229), 128: (1.542, 2.241, 8.028, 1.207), 256: (1.621, 2.887, 8.890, 1.225)},
    "SK": {64: (2.299, 4.001, 16.561, 1.337), 128: (2.584, 5.466, 19.413, 1.310), 256: (2.566, 7.029, 21.766, 1.293)},
    "UK2": {64: (1.561, 2.644, 9.414, 1.371), 128: (1.698, 2.752, 10.673, 1.227), 256: (1.692, 2.921, 11.791, 1.238)},
    "AR": {64: (2.015, 3.409, 12.599, 1.131), 128: (1.929, 3.803, 14.768, 1.213), 256: (2.005, 4.119, 16.762, 1.233)},
    "WB": {64: (1.446, 1.829, 5.951, 1.296), 128: (1.493, 1.836, 6.646, 1.178), 256: (1.485, 1.822, 7.283, 1.188)},
}
METHODS = ["CLUGP", "2PS-L", "HDRF", "S5P"]


def table3(
    spark: SparkSession,
    names: list[str] | None = None,
    ks: list[int] | None = None,
    preset: str = "full",
) -> pd.DataFrame:
    """RF/balance sweep; one row per (graph, k, partitioner)."""
    names = names or ALL_REAL
    ks = ks or [64, 128, 256]
    rows = []
    for name in names:
        edges_df = edges_to_df(spark, standin_edges(name, preset))
        edges_df.cache().count()
        for k in ks:
            for meth in METHODS:
                assign, stats = run_partitioner_spark(spark, edges_df, meth, k)
                assign.cache().count()
                paper = PAPER_TABLE3.get(name, {}).get(k)
                rows.append(
                    {
                        "graph": name,
                        "k": k,
                        "partitioner": meth,
                        "rf": round(replication_factor(edges_df, assign), 3),
                        "balance": round(load_balance(assign, k), 3),
                        "time_s": round(stats.wall_s, 2),
                        "paper_rf": paper[METHODS.index(meth)] if paper else None,
                    }
                )
                assign.unpersist()
                print(rows[-1], file=sys.stderr, flush=True)
        edges_df.unpersist()
    return pd.DataFrame(rows)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--preset", default="full", choices=["test", "bench", "full"])
    ap.add_argument("--ks", default="64,128,256")
    ap.add_argument("--names", default=",".join(ALL_REAL))
    ap.add_argument("--out", default=None, help="optional CSV path")
    args = ap.parse_args()
    spark = SparkSession.builder.appName("table3").getOrCreate()
    t = table3(
        spark,
        names=args.names.split(","),
        ks=[int(x) for x in args.ks.split(",")],
        preset=args.preset,
    )
    print(t.to_string(index=False))
    if args.out:
        t.to_csv(args.out, index=False)


if __name__ == "__main__":
    main()
