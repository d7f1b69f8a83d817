"""Benchmark: Table 1 workload — the streaming clustering algorithms.

Times one pass of each clustering algorithm over the same bench-scale
stream (the Table 1 comparison is qualitative; the benchmark pins the
relative cost of local / global / skewness-aware migration accounting,
which backs the paper's claim that skew-awareness is not more
expensive).
"""
import pytest

from repro.baselines.clugp import clugp_cluster
from repro.baselines.twops import twops_cluster
from repro.core.clustering import cluster_capacity, skewness_aware_clustering
from repro.core.stream import degrees_np
from repro.graphgen.catalog import standin_edges

K = 64


@pytest.fixture(scope="module")
def edges():
    return standin_edges("LJ", "bench")


def test_bench_s5p_clustering(benchmark, edges):
    benchmark.pedantic(
        skewness_aware_clustering, args=(edges, K), rounds=1, iterations=1
    )


def test_bench_clugp_clustering(benchmark, edges):
    kappa = cluster_capacity(len(edges), K)
    benchmark.pedantic(clugp_cluster, args=(edges, kappa), rounds=1, iterations=1)


def test_bench_twops_clustering(benchmark, edges):
    kappa = cluster_capacity(len(edges), K)
    deg = degrees_np(edges)
    benchmark.pedantic(
        twops_cluster, args=(edges, kappa, deg), rounds=1, iterations=1
    )
