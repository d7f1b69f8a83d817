"""Benchmark: Table 5 workload — exact optimum by branch-and-bound.

Times the enumeration on the three tiny R-MAT graphs (the dominant cost
of regenerating Table 5).
"""
import pytest

from repro.core.optimal import optimal_partition
from repro.graphgen.tiny import optimality_graphs


@pytest.mark.parametrize("gname", ["G_alpha", "G_beta", "G_gamma"])
def test_bench_table5_optimal(benchmark, gname):
    edges = optimality_graphs()[gname]
    rf, _ = benchmark.pedantic(
        optimal_partition, args=(edges, 4), rounds=1, iterations=1
    )
    assert rf >= 1.0
