"""Benchmark: Table 4 workload — game-based methods at k=32, test scale.

RMGP/MDSGP/CVSP are orders of magnitude slower than S5P (the Table 4
point); benchmarking them at bench scale would dominate the suite, so
the game-based competitors run on the test preset while CLUGP/S5P run
the same instance for the direct comparison. The full-scale numbers
come from ``jobs/table4_games.py``.
"""
import pytest

from repro.baselines.api import run_partitioner
from repro.graphgen.catalog import standin_edges

K = 32


@pytest.fixture(scope="module")
def edges():
    return standin_edges("LJ", "test")


@pytest.mark.parametrize("method", ["RMGP", "MDSGP", "CVSP", "CLUGP", "S5P"])
def test_bench_table4_games(benchmark, edges, method):
    kwargs = {"time_budget_s": 300.0} if method in ("RMGP", "MDSGP", "CVSP") else {}
    benchmark.pedantic(
        run_partitioner, args=(edges, method, K), kwargs=kwargs, rounds=1, iterations=1
    )
