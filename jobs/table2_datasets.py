"""Table 2: dataset statistics (|V|, |E|, type, skewness ρ, ρ1, ρ2, ρ3).

Computes the Section-2.3 skewness metrics over every synthetic stand-in
(the degree pipeline runs in Spark). The paper's published values for
the real graphs are printed alongside for the EXPERIMENTS.md diff.

Run: ``spark-submit jobs/table2_datasets.py [--preset full]``
"""
from __future__ import annotations

import argparse

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.stream import edges_to_df
from repro.graphgen.catalog import ALL_REAL, ALL_SYNTH, PAPER_GRAPHS, standin_edges
from repro.skew.metrics import skewness_metrics


def dataset_stats(
    spark: SparkSession, names: list[str] | None = None, preset: str = "full"
) -> pd.DataFrame:
    """Stats table for the given catalog graphs (default: all 17)."""
    names = names or (ALL_REAL + ALL_SYNTH)
    rows = []
    for name in names:
        edges = standin_edges(name, preset)
        m = skewness_metrics(edges_to_df(spark, edges))
        spec = PAPER_GRAPHS.get(name, {})
        rows.append(
            {
                "graph": name,
                "type": spec.get("type", "synthetic"),
                "n_vertices": m["n_vertices"],
                "n_edges": m["n_edges"],
                "rho": round(m["rho"], 2),
                "rho1": round(m["rho1"], 2),
                "rho2": round(m["rho2"], 2),
                "rho3": m["rho3"],
                "paper_rho": spec.get("rho"),
                "paper_rho1": spec.get("rho1"),
                "paper_rho2": spec.get("rho2"),
            }
        )
    return pd.DataFrame(rows)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--preset", default="full", choices=["test", "bench", "full"])
    args = ap.parse_args()
    spark = SparkSession.builder.appName("table2").getOrCreate()
    print(dataset_stats(spark, preset=args.preset).to_string(index=False))


if __name__ == "__main__":
    main()
