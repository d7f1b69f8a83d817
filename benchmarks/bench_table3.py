"""Benchmark: Table 3 workload — partitioner runtime on a web + a social
stand-in at bench scale (pytest-benchmark).

The RF numbers for the actual table come from ``jobs/table3_rf.py``;
these benchmarks track the *runtime* of each partitioner on the same
workload shape so regressions in the sequential passes show up.
"""
import pytest

from repro.baselines.api import run_partitioner
from repro.graphgen.catalog import standin_edges

K = 64


@pytest.fixture(scope="module")
def web_edges():
    return standin_edges("IN", "bench")


@pytest.fixture(scope="module")
def social_edges():
    return standin_edges("LJ", "bench")


@pytest.mark.parametrize("method", ["S5P", "CLUGP", "2PS-L", "HDRF"])
def test_bench_table3_web(benchmark, web_edges, method):
    benchmark.pedantic(
        run_partitioner, args=(web_edges, method, K), rounds=1, iterations=1
    )


@pytest.mark.parametrize("method", ["S5P", "2PS-L"])
def test_bench_table3_social(benchmark, social_edges, method):
    benchmark.pedantic(
        run_partitioner, args=(social_edges, method, K), rounds=1, iterations=1
    )
