"""Exact optimal vertex-cut partitioning by enumeration (Table 5).

The paper computes the optimum of tiny graphs by enumerating the k^|E|
assignments. We implement the same search as branch-and-bound over the
edge sequence with three sound prunings that do not change the optimum:

* partition-symmetry breaking (restricted growth: edge i may open at
  most one new partition);
* the load cap L = ⌈τ|E|/k⌉ (the same constraint the streaming
  partitioners run under);
* incumbent pruning on a lower bound: current replica count plus one
  replica for every vertex not yet placed.

Only feasible for the Table-5-scale graphs (|E| ≤ ~16, k = 4).
"""
from __future__ import annotations

import math

import numpy as np


def optimal_partition(
    edges: np.ndarray, k: int, tau: float = 1.0
) -> tuple[float, np.ndarray]:
    """(optimal RF, an optimal per-edge assignment) for a tiny graph."""
    n_e = len(edges)
    cap = math.ceil(tau * n_e / k)
    verts = np.unique(edges)
    n_v = len(verts)
    remap = {int(v): i for i, v in enumerate(verts)}
    eu = np.array([remap[int(u)] for u in edges[:, 0]], dtype=np.int64)
    ev = np.array([remap[int(v)] for v in edges[:, 1]], dtype=np.int64)

    # first-seen position of each vertex, for the unseen-vertex lower bound
    seen: set[int] = set()
    unseen_after = np.zeros(n_e + 1, dtype=np.int64)
    firsts = []
    for i in range(n_e):
        fresh = {int(eu[i]), int(ev[i])} - seen
        firsts.append(len(fresh))
        seen |= fresh
    unseen_after[n_e] = 0
    for i in range(n_e - 1, -1, -1):
        unseen_after[i] = unseen_after[i + 1] + firsts[i]

    masks = np.zeros(n_v, dtype=np.int64)  # bitmask of partitions per vertex
    loads = np.zeros(k, dtype=np.int64)
    assign = np.zeros(n_e, dtype=np.int64)
    best = {"replicas": n_v * k + 1, "assign": None}

    def dfs(i: int, replicas: int, used: int) -> None:
        if replicas + unseen_after[i] >= best["replicas"]:
            return
        if i == n_e:
            best["replicas"] = replicas
            best["assign"] = assign.copy()
            return
        u, v = int(eu[i]), int(ev[i])
        limit = min(k, used + 1)  # restricted growth breaks symmetry
        for p in range(limit):
            if loads[p] >= cap:
                continue
            bit = 1 << p
            # int() casts matter: np.bool_ + np.bool_ saturates to True
            add = int(masks[u] & bit == 0) + int(masks[v] & bit == 0)
            old_u, old_v = masks[u], masks[v]
            masks[u] |= bit
            masks[v] |= bit
            loads[p] += 1
            assign[i] = p
            dfs(i + 1, replicas + add, max(used, p + 1))
            masks[u], masks[v] = old_u, old_v
            loads[p] -= 1

    dfs(0, 0, 0)
    if best["assign"] is None:
        raise RuntimeError("no feasible assignment under the load cap")
    return best["replicas"] / n_v, best["assign"]
