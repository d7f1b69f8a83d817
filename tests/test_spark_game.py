"""The Spark DataFrame game round must match the numpy reference round."""
import numpy as np
import pytest

from repro.core.clustering import skewness_aware_clustering
from repro.core.game import (
    ClusterGraph,
    delta_max,
    initial_assignment,
    synchronous_round,
)
from repro.core.spark_game import spark_synchronous_round
from repro.core.theta import ExactTheta
from repro.graphgen.catalog import standin_edges


def _game(name, k):
    e = standin_edges(name, "test")
    cl = skewness_aware_clustering(e, k)
    th = ExactTheta()
    cu, cv = cl.cut_pairs
    th.add_pairs(cu, cv)
    g = ClusterGraph(cl.n_clusters, cl.cluster_sizes, th.pairs())
    return g, delta_max(g, k)


@pytest.mark.parametrize("name,k", [("LJ", 4), ("IN", 8)])
def test_spark_round_matches_numpy(spark, name, k):
    g, delta = _game(name, k)
    c2p = initial_assignment(g.sizes, k)
    ref = synchronous_round(g, c2p, k, delta)
    got = spark_synchronous_round(spark, g, c2p, k, delta)
    # identical cost surfaces; allow float-tie divergence on < 0.5% of players
    assert (ref != got).mean() < 0.005


def test_spark_round_idempotent_at_equilibrium(spark):
    from repro.core.game import stackelberg_game
    from repro.core.clustering import skewness_aware_clustering
    from repro.core.theta import ExactTheta
    from repro.graphgen.catalog import standin_edges

    k = 4
    e = standin_edges("LJ", "test")
    cl = skewness_aware_clustering(e, k)
    th = ExactTheta()
    cu, cv = cl.cut_pairs
    th.add_pairs(cu, cv)
    r = stackelberg_game(
        cl.n_clusters, cl.cluster_sizes, cl.cluster_is_head, th.pairs(), k
    )
    g = ClusterGraph(cl.n_clusters, cl.cluster_sizes, th.pairs())
    after = spark_synchronous_round(spark, g, r.c2p, k, r.delta)
    assert (after != r.c2p).mean() < 0.005
