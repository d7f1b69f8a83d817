"""Table 4: game-based methods — RF, time and memory at k=32.

RMGP / MDSGP / CVSP / CLUGP / S5P on the OK, TW, FR, LJ, WB and G6
stand-ins. Wall time and tracemalloc peak stand in for the paper's
time/memory columns; a per-method time budget (and RMGP's O(|V|²)
memory refusal) stands in for the paper's ">24h" entries and is
reported as NaN.

Run: ``spark-submit jobs/table4_games.py [--preset full]``
"""
from __future__ import annotations

import argparse
import sys

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.api import run_partitioner_spark
from repro.baselines.gamebased import BudgetExceeded
from repro.core.stream import edges_to_df
from repro.graphgen.catalog import standin_edges
from repro.metrics import load_balance, replication_factor

#: Paper Table 4 (k=32): method -> graph -> (RF, time_s, mem_GB);
#: None = did not finish (">24h").
PAPER_TABLE4 = {
    "RMGP": {"OK": (16.7, 535, 4.01), "TW": None, "FR": (10.9, 4553, 70.2), "LJ": (5.4, 65, 2.08), "WB": (4.2, 1871, 61.1), "G6": None},
    "MDSGP": {"OK": (9.9, 324, 8.95), "TW": (6.8, 5189, 99.08), "FR": (7.6, 4934, 144.96), "LJ": (4.5, 184, 3.83), "WB": (6.2, 6320, 119.45), "G6": (4.9, 11915, 231.87)},
    "CVSP": {"OK": (17.4, 141, 2.25), "TW": None, "FR": (11.2, 2078, 80.69), "LJ": (5.7, 32, 2.25), "WB": (4.8, 822, 79.46), "G6": None},
    "CLUGP": {"OK": (10.7, 91, 1.02), "TW": (7.6, 1333, 11.65), "FR": (7.2, 3045, 14.12), "LJ": (4.2, 111, 1.11), "WB": (1.5, 1101, 25.11), "G6": (4.8, 4847, 18.01)},
    "S5P": {"OK": (8.5, 60, 0.38), "TW": (6.0, 808, 4.64), "FR": (7.0, 1466, 7.22), "LJ": (3.9, 28, 0.48), "WB": (1.1, 696, 12.9), "G6": (4.4, 2620, 8.06)},
}
METHODS = ["RMGP", "MDSGP", "CVSP", "CLUGP", "S5P"]
GRAPHS = ["OK", "TW", "FR", "LJ", "WB", "G6"]


def table4(
    spark: SparkSession,
    names: list[str] | None = None,
    k: int = 32,
    preset: str = "full",
    time_budget_s: float = 600.0,
) -> pd.DataFrame:
    """One row per (graph, method); NaN RF = budget exceeded."""
    names = names or GRAPHS
    rows = []
    for name in names:
        edges_df = edges_to_df(spark, standin_edges(name, preset))
        edges_df.cache().count()
        for meth in METHODS:
            kwargs = (
                {"time_budget_s": time_budget_s}
                if meth in ("RMGP", "MDSGP", "CVSP")
                else {}
            )
            paper = PAPER_TABLE4[meth].get(name)
            try:
                assign, stats = run_partitioner_spark(
                    spark, edges_df, meth, k, **kwargs
                )
                rows.append(
                    {
                        "graph": name,
                        "method": meth,
                        "rf": round(replication_factor(edges_df, assign), 3),
                        # RMGP/CVSP do not honor τ; balance exposes that
                        "balance": round(load_balance(assign, k), 2),
                        "time_s": round(stats.wall_s, 2),
                        "mem_mb": round(stats.peak_mem_mb, 2),
                        "paper_rf": paper[0] if paper else None,
                        "paper_time_s": paper[1] if paper else None,
                        "paper_mem_gb": paper[2] if paper else None,
                    }
                )
            except BudgetExceeded as exc:
                rows.append(
                    {
                        "graph": name,
                        "method": meth,
                        "rf": np.nan,
                        "balance": np.nan,
                        "time_s": np.nan,
                        "mem_mb": np.nan,
                        "paper_rf": paper[0] if paper else None,
                        "paper_time_s": paper[1] if paper else None,
                        "paper_mem_gb": paper[2] if paper else None,
                    }
                )
                print(f"{name}/{meth}: {exc}", file=sys.stderr)
            print(rows[-1], file=sys.stderr, flush=True)
        edges_df.unpersist()
    return pd.DataFrame(rows)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--preset", default="full", choices=["test", "bench", "full"])
    ap.add_argument("--k", type=int, default=32)
    ap.add_argument("--time-budget", type=float, default=600.0)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    spark = SparkSession.builder.appName("table4").getOrCreate()
    t = table4(spark, k=args.k, preset=args.preset, time_budget_s=args.time_budget)
    print(t.to_string(index=False))
    if args.out:
        t.to_csv(args.out, index=False)


if __name__ == "__main__":
    main()
