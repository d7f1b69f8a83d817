"""Assemble the measured sections of EXPERIMENTS.md from job outputs.

Reads the ``results_table3_*.csv`` shards and ``results_table4.csv``
and prints markdown tables with paper-vs-measured columns, used to
refresh EXPERIMENTS.md after re-running the jobs.
"""
from __future__ import annotations

import glob

import pandas as pd


def table3_markdown() -> str:
    files = sorted(glob.glob("results_table3_*.csv")) or ["results_table3.csv"]
    df = pd.concat([pd.read_csv(f) for f in files], ignore_index=True)
    lines = [
        "| Graph | k | CLUGP paper/ours | 2PS-L paper/ours | HDRF paper/ours | S5P paper/ours | S5P rank (paper/ours) |",
        "|---|---|---|---|---|---|---|",
    ]
    order = ["OK", "TW", "FR", "LJ", "IT", "UK7", "IN", "SK", "UK2", "AR", "WB"]
    for g in order:
        for k in (64, 128, 256):
            sub = df[(df.graph == g) & (df.k == k)]
            if len(sub) != 4:
                continue
            cells, ours, papers = [], {}, {}
            for meth in ("CLUGP", "2PS-L", "HDRF", "S5P"):
                r = sub[sub.partitioner == meth].iloc[0]
                cells.append(f"{r.paper_rf:.2f} / {r.rf:.2f}")
                ours[meth] = r.rf
                papers[meth] = r.paper_rf
            rank_p = sorted(papers, key=papers.get).index("S5P") + 1
            rank_o = sorted(ours, key=ours.get).index("S5P") + 1
            lines.append(
                f"| {g} | {k} | " + " | ".join(cells) + f" | {rank_p} / {rank_o} |"
            )
    return "\n".join(lines)


def table4_markdown() -> str:
    df = pd.read_csv("results_table4.csv")
    lines = [
        "| Graph | Method | RF paper/ours | Time s paper/ours | Mem paper(GB)/ours(MB) | balance |",
        "|---|---|---|---|---|---|",
    ]
    for _, r in df.iterrows():
        rf = "DNF" if pd.isna(r.rf) else f"{r.rf:.2f}"
        t = "DNF" if pd.isna(r.time_s) else f"{r.time_s:.1f}"
        m = "DNF" if pd.isna(r.mem_mb) else f"{r.mem_mb:.1f}"
        bal = "-" if pd.isna(r.get("balance", float("nan"))) else f"{r.balance:.2f}"
        prf = "DNF" if pd.isna(r.paper_rf) else f"{r.paper_rf:.1f}"
        pt = "DNF" if pd.isna(r.paper_time_s) else f"{r.paper_time_s:.0f}"
        pm = "DNF" if pd.isna(r.paper_mem_gb) else f"{r.paper_mem_gb:.1f}"
        lines.append(
            f"| {r.graph} | {r.method} | {prf} / {rf} | {pt} / {t} | {pm} / {m} | {bal} |"
        )
    return "\n".join(lines)


if __name__ == "__main__":
    print("## Table 3\n")
    print(table3_markdown())
    print("\n## Table 4\n")
    print(table4_markdown())
