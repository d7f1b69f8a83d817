"""Benchmark: Table 2 workload — skewness metrics over the catalog.

Times the Spark degree pipeline + metric computation for one web and
one social stand-in at bench scale.
"""
import pytest

from repro.core.stream import edges_to_df
from repro.graphgen.catalog import standin_edges
from repro.skew.metrics import skewness_metrics


@pytest.mark.parametrize("name", ["IN", "OK"])
def test_bench_table2_metrics(benchmark, spark, name):
    edges_df = edges_to_df(spark, standin_edges(name, "bench"))
    edges_df.cache().count()
    result = benchmark.pedantic(
        skewness_metrics, args=(edges_df,), rounds=1, iterations=1
    )
    edges_df.unpersist()
    assert result["rho"] > 0
