"""Greedy streaming vertex-cut partitioner (PowerGraph, OSDI'12).

The classic replica-aware greedy rules, per edge (u, v):

1. both endpoints share partitions → least-loaded shared partition;
2. both have replicas but disjoint → least-loaded among the replicas of
   the endpoint with the higher partial degree (its remaining edges are
   the ones worth co-locating);
3. exactly one endpoint has replicas → least-loaded of those;
4. neither placed yet → least-loaded partition overall.

Runs under the same load cap as every other competitor.
"""
from __future__ import annotations

import numpy as np

from repro.core.postprocess import max_load


def greedy_partition(edges: np.ndarray, k: int, *, tau: float = 1.0) -> np.ndarray:
    """Run PowerGraph Greedy over the stream."""
    n_v = int(edges.max()) + 1 if len(edges) else 0
    n_e = len(edges)
    cap = max_load(n_e, k, tau)
    replicas = np.zeros((n_v, k), dtype=bool)
    pdeg = np.zeros(n_v, dtype=np.int64)
    loads = np.zeros(k, dtype=np.int64)
    out = np.empty(n_e, dtype=np.int64)
    src, dst = edges[:, 0], edges[:, 1]

    def pick_least_loaded(mask: np.ndarray) -> int:
        cand = np.flatnonzero(mask & (loads < cap))
        if len(cand) == 0:
            cand = np.flatnonzero(loads < cap)
        if len(cand) == 0:  # cap saturated (τ rounding): spill to min load
            return int(np.argmin(loads))
        return int(cand[np.argmin(loads[cand])])

    for i in range(n_e):
        u = int(src[i]); v = int(dst[i])
        pdeg[u] += 1; pdeg[v] += 1
        ru, rv = replicas[u], replicas[v]
        both = ru & rv
        if both.any():
            p = pick_least_loaded(both)
        elif ru.any() and rv.any():
            keep = u if pdeg[u] >= pdeg[v] else v
            p = pick_least_loaded(replicas[keep])
        elif ru.any() or rv.any():
            p = pick_least_loaded(ru | rv)
        else:
            p = pick_least_loaded(np.ones(k, dtype=bool))
        out[i] = p
        replicas[u, p] = True
        replicas[v, p] = True
        loads[p] += 1
    return out
