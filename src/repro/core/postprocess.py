"""Postprocessing: cluster-level → edge-level assignment (Algorithm 3).

A final sequential pass over the stream. Each edge looks up the
partitions of its endpoints' clusters (head table for head edges, tail
table otherwise) and goes to the less-loaded of the two; if both are
over the cap L = ⌈τ|E|/k⌉, head edges scan partitions first→last and
tail edges last→first for free space (the skew-aware overflow rule that
concentrates head and tail overflow at opposite ends).
"""
from __future__ import annotations

import math

import numpy as np


def max_load(n_edges: int, k: int, tau: float = 1.0) -> int:
    """L = ⌈τ·|E|/k⌉ (Theorem 1: relative balance is then ≤ kL/|E|)."""
    return math.ceil(tau * n_edges / k)


def assign_edges(
    edge_cu: np.ndarray,
    edge_cv: np.ndarray,
    edge_is_head: np.ndarray,
    c2p: np.ndarray,
    k: int,
    *,
    tau: float = 1.0,
    cap: int | None = None,
) -> np.ndarray:
    """Run Algorithm 3; returns the per-edge partition array.

    Inputs are per-edge endpoint-cluster ids (in arrival order), the
    head/tail flag per edge, and the game's cluster→partition map.
    ``tau=inf`` disables the load cap (the S5P-B variant removes
    maxLoad).
    """
    n_e = len(edge_cu)
    if cap is None:
        cap = max_load(n_e, k, tau) if math.isfinite(tau) else n_e + 1
    pu = c2p[edge_cu]
    pv = c2p[edge_cv]
    is_head = edge_is_head
    loads = np.zeros(k, dtype=np.int64)
    out = np.empty(n_e, dtype=np.int64)
    for i in range(n_e):
        a = pu[i]; b = pv[i]
        if loads[a] >= cap and loads[b] >= cap:
            # overflow: skew-aware scan for any partition with space
            rng = range(k) if is_head[i] else range(k - 1, -1, -1)
            for p in rng:
                if loads[p] < cap:
                    break
            else:  # cap can momentarily bind if τ·|E|/k < |E|/k; spill anyway
                p = int(np.argmin(loads))
        elif loads[a] > loads[b]:
            p = b
        else:
            p = a
        out[i] = p
        loads[p] += 1
    return out
