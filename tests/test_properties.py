"""Property-based tests (hypothesis) for the metric and core kernels."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.optimal import optimal_partition
from repro.core.postprocess import assign_edges, max_load
from repro.core.theta import decode_pairs, pair_codes
from repro.metrics import load_balance_np, replication_factor_np


def _rf_bruteforce(edges: np.ndarray, part: np.ndarray) -> float:
    reps = {}
    for (u, v), p in zip(edges, part):
        reps.setdefault(int(u), set()).add(int(p))
        reps.setdefault(int(v), set()).add(int(p))
    return sum(len(s) for s in reps.values()) / len(reps)


edges_strategy = st.lists(
    st.tuples(st.integers(0, 30), st.integers(0, 30)).filter(lambda t: t[0] != t[1]),
    min_size=1,
    max_size=60,
)


class TestReplicationFactorProperty:
    @given(edges_strategy, st.integers(2, 8), st.integers(0, 1000))
    @settings(max_examples=60, deadline=None)
    def test_matches_bruteforce(self, raw, k, seed):
        edges = np.array(raw, dtype=np.int64)
        part = np.random.default_rng(seed).integers(0, k, len(edges))
        assert replication_factor_np(edges, part, k) == _rf_bruteforce(edges, part)

    @given(edges_strategy, st.integers(2, 8))
    @settings(max_examples=30, deadline=None)
    def test_rf_bounds(self, raw, k):
        edges = np.array(raw, dtype=np.int64)
        part = np.zeros(len(edges), dtype=np.int64)
        assert replication_factor_np(edges, part, k) == 1.0


class TestPairCodesProperty:
    @given(st.integers(0, 2**31 - 1), st.integers(0, 2**31 - 1))
    @settings(max_examples=100, deadline=None)
    def test_roundtrip_and_symmetry(self, a, b):
        ca = pair_codes(np.array([a]), np.array([b]))
        cb = pair_codes(np.array([b]), np.array([a]))
        assert ca[0] == cb[0]
        lo, hi = decode_pairs(ca)
        assert lo[0] == min(a, b) and hi[0] == max(a, b)


class TestPostprocessProperty:
    @given(
        st.integers(2, 8),
        st.lists(st.integers(0, 5), min_size=2, max_size=40),
        st.lists(st.integers(0, 5), min_size=2, max_size=40),
    )
    @settings(max_examples=50, deadline=None)
    def test_cap_always_respected(self, k, cus, cvs):
        n = min(len(cus), len(cvs))
        cu = np.array(cus[:n], dtype=np.int64)
        cv = np.array(cvs[:n], dtype=np.int64)
        head = np.zeros(n, dtype=bool)
        c2p = np.arange(6, dtype=np.int64) % k
        part = assign_edges(cu, cv, head, c2p, k)
        assert np.bincount(part, minlength=k).max() <= max_load(n, k)
        assert part.min() >= 0 and part.max() < k

    @given(st.integers(2, 6))
    @settings(max_examples=20, deadline=None)
    def test_balance_formula(self, k):
        part = np.arange(4 * k, dtype=np.int64) % k
        assert load_balance_np(part, k) == 1.0


class TestOptimalProperty:
    @given(
        st.lists(
            st.tuples(st.integers(0, 5), st.integers(0, 5)).filter(
                lambda t: t[0] != t[1]
            ),
            min_size=2,
            max_size=7,
        )
    )
    @settings(max_examples=25, deadline=None)
    def test_optimum_never_above_any_heuristic(self, raw):
        edges = np.array(raw, dtype=np.int64)
        k = 2
        rf_opt, assign = optimal_partition(edges, k, tau=2.0)
        assert replication_factor_np(edges, assign, k) == rf_opt
        # any feasible single assignment is ≥ the optimum
        cap = max_load(len(edges), k, 2.0)
        alt = np.zeros(len(edges), dtype=np.int64)
        if np.bincount(alt, minlength=k).max() <= cap:
            assert replication_factor_np(edges, alt, k) >= rf_opt - 1e-12
