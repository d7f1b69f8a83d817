"""Hash-based streaming partitioners: Random, DBH and Grid.

These are the cheap, quality-poor end of the baseline spectrum
(Section 3: "methods like DBH and Grid, which solely rely on hash-based
partitioning, often exhibit poor partitioning quality").

* Random — uniform hash of the edge id.
* DBH (Xie et al., NeurIPS'14) — hash the endpoint with the *smaller*
  degree, so hubs are cut (replicated) preferentially, which is the
  right direction on power-law graphs.
* Grid (GraphBuilder) — each vertex hashes to a cell of a √k×√k grid;
  the edge goes to the (row(u), col(v)) intersection, bounding each
  vertex's replicas by 2√k−1.

All are stateless and fully vectorized.
"""
from __future__ import annotations

import numpy as np

from repro.core.stream import degrees_np


def _mix(x: np.ndarray, seed: int) -> np.ndarray:
    """Deterministic 64-bit integer mix (splitmix64 finalizer).

    uint64 wrap-around is the intended hashing behaviour.
    """
    with np.errstate(over="ignore"):
        z = x.astype(np.uint64) + np.uint64(0x9E3779B97F4A7C15) * np.uint64(seed + 1)
        z = (z ^ (z >> np.uint64(30))) * np.uint64(0xBF58476D1CE4E5B9)
        z = (z ^ (z >> np.uint64(27))) * np.uint64(0x94D049BB133111EB)
        return z ^ (z >> np.uint64(31))


def random_partition(edges: np.ndarray, k: int, seed: int = 0) -> np.ndarray:
    """Uniform random (hash of arrival index)."""
    eid = np.arange(len(edges), dtype=np.int64)
    return (_mix(eid, seed) % np.uint64(k)).astype(np.int64)


def dbh_partition(edges: np.ndarray, k: int, seed: int = 0) -> np.ndarray:
    """Degree-Based Hashing: hash the lower-degree endpoint."""
    deg = degrees_np(edges)
    u, v = edges[:, 0], edges[:, 1]
    pick = np.where(deg[u] <= deg[v], u, v)
    return (_mix(pick, seed) % np.uint64(k)).astype(np.int64)


def grid_partition(edges: np.ndarray, k: int, seed: int = 0) -> np.ndarray:
    """Grid partitioning over the largest square grid fitting in k."""
    s = max(1, int(np.floor(np.sqrt(k))))
    r = _mix(edges[:, 0], seed) % np.uint64(s)
    c = _mix(edges[:, 1], seed + 1) % np.uint64(s)
    return (r * np.uint64(s) + c).astype(np.int64)
