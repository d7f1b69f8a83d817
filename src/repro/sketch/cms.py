"""Count-Min Sketch (Cormode & Muthukrishnan) for inter-cluster counts.

Parameterized exactly as the paper (Section 4.4): w = ceil(e/ε) columns,
d = ceil(ln(1/ν)) rows; a point query overestimates the true count by at
most ε·N with probability ≥ 1-ν, where N is the total inserted mass.
With the paper's ε=0.1, ν=0.01: w=28 (the paper rounds to 27), d=5.

Keys are int64 (cluster-pair codes). Hashing is 2-universal
multiply-shift with per-row odd multipliers drawn from a seeded RNG, and
both single-key and vectorized batch operations are provided (Alg. 1/2
insert per edge; the game queries in batches).
"""
from __future__ import annotations

import math

import numpy as np

_PRIME = np.uint64((1 << 61) - 1)


class CountMinSketch:
    """CMS over int64 keys with conservative point queries (min over rows)."""

    def __init__(self, eps: float = 0.1, nu: float = 0.01, seed: int = 7):
        if not (0 < eps < 1 and 0 < nu < 1):
            raise ValueError("eps and nu must be in (0, 1)")
        self.eps = eps
        self.nu = nu
        self.width = math.ceil(math.e / eps)
        self.depth = math.ceil(math.log(1 / nu))
        g = np.random.default_rng(seed)
        # Odd multipliers for multiply-shift hashing, one per row.
        self._a = (g.integers(1, 1 << 61, self.depth, dtype=np.uint64) * 2 + 1) % _PRIME
        self._b = g.integers(0, 1 << 61, self.depth, dtype=np.uint64) % _PRIME
        self.table = np.zeros((self.depth, self.width), dtype=np.int64)
        self.total = 0

    def _rows_cols(self, keys: np.ndarray) -> np.ndarray:
        """(depth, n) column indices for an array of int64 keys."""
        k = keys.astype(np.uint64)[None, :]
        with np.errstate(over="ignore"):
            h = (self._a[:, None] * k + self._b[:, None]) % _PRIME
        return (h % np.uint64(self.width)).astype(np.int64)

    def add(self, key: int, count: int = 1) -> None:
        """Insert ``count`` occurrences of ``key``."""
        cols = self._rows_cols(np.array([key], dtype=np.int64))[:, 0]
        self.table[np.arange(self.depth), cols] += count
        self.total += count

    def add_batch(self, keys: np.ndarray, counts: np.ndarray | None = None) -> None:
        """Vectorized insert of many keys (with optional per-key counts)."""
        if len(keys) == 0:
            return
        if counts is None:
            counts = np.ones(len(keys), dtype=np.int64)
        cols = self._rows_cols(keys)
        for r in range(self.depth):
            np.add.at(self.table[r], cols[r], counts)
        self.total += int(counts.sum())

    def query(self, key: int) -> int:
        """Point estimate: never underestimates the true count."""
        cols = self._rows_cols(np.array([key], dtype=np.int64))[:, 0]
        return int(self.table[np.arange(self.depth), cols].min())

    def query_batch(self, keys: np.ndarray) -> np.ndarray:
        """Vectorized point estimates for an array of keys."""
        if len(keys) == 0:
            return np.zeros(0, dtype=np.int64)
        cols = self._rows_cols(keys)
        ests = self.table[np.arange(self.depth)[:, None], cols]
        return ests.min(axis=0)

    @property
    def nbytes(self) -> int:
        """Memory footprint of the count table (the paper's w×d units)."""
        return self.table.nbytes
