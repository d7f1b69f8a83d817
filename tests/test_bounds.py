"""Tests for the Section-5 theoretical bounds (Theorems 1, 2, 3, 5, 6)."""
import numpy as np
import pytest

from repro.core.bounds import (
    head_fraction,
    poa_bound,
    rf_bound,
    rounds_bound,
    tau_bound,
)
from repro.core.s5p import s5p_partition_np
from repro.core.stream import degrees_np
from repro.graphgen.powerlaw import chung_lu
from repro.metrics import replication_factor_np
from repro.skew.metrics import regression_rho


class TestTheorem1:
    def test_tau_bound_formula(self):
        assert tau_bound(8, 125, 1000) == pytest.approx(1.0)
        assert tau_bound(8, 150, 1000) == pytest.approx(1.2)


class TestHeadFraction:
    def test_fraction_in_unit_interval(self):
        f = head_fraction(10.0, 2.2, 500)
        assert 0.0 <= f <= 1.0

    def test_higher_threshold_fewer_heads(self):
        assert head_fraction(20.0, 2.2, 500) <= head_fraction(5.0, 2.2, 500)

    def test_skewed_graph_fewer_heads(self):
        # larger ρ → faster decay → less mass above ξ
        assert head_fraction(10.0, 3.0, 500) <= head_fraction(10.0, 2.0, 500)


class TestTheorem2:
    @pytest.mark.parametrize("k", [16, 64])
    def test_rf_bound_dominates_measured(self, k):
        # S5P-B's measured RF must sit below the Theorem-2 bound
        e = chung_lu(3000, 30000, rho=2.3, seed=1)
        part, st = s5p_partition_np(e, k, bounded=True)
        rf = replication_factor_np(e, part, k)
        deg = degrees_np(e)
        deg = deg[deg > 0]
        bound = rf_bound(
            n_vertices=len(deg),
            k=k,
            rho=regression_rho(deg),
            d_min=int(deg.min()),
            xi=st.xi,
            d_max=int(deg.max()),
        )
        assert rf <= bound

    def test_bound_above_one(self):
        assert rf_bound(10000, 32, 2.5, 1, 10.0, 300) >= 1.0


class TestTheorem3:
    def test_bound_decreases_with_rho_decrease(self):
        # "The bound of RF will decrease as the decrease of ρ"
        bounds = [
            rf_bound(10000, 32, rho, 1, 10.0, 300) for rho in (1.5, 2.0, 2.5, 3.0)
        ]
        assert bounds == sorted(bounds)


class TestTheorem5:
    @pytest.mark.parametrize("k", [2, 16, 256])
    def test_poa_is_k_plus_one(self, k):
        assert poa_bound(k) == k + 1


class TestTheorem6:
    def test_rounds_bound_positive(self):
        assert rounds_bound(10000, 32, 2.2, 1, 300, 10.0) > 0

    def test_measured_rounds_below_bound(self):
        e = chung_lu(2000, 20000, rho=2.3, seed=2)
        part, st = s5p_partition_np(e, 16)
        deg = degrees_np(e)
        deg = deg[deg > 0]
        bound = rounds_bound(
            len(deg), 16, regression_rho(deg), int(deg.min()), int(deg.max()), st.xi
        )
        assert st.game_rounds <= bound

    def test_tighter_for_more_skew(self):
        # both parts decrease as ρ decreases (more skew)
        b_skewed = rounds_bound(10000, 32, 1.5, 1, 300, 10.0)
        b_flat = rounds_bound(10000, 32, 3.0, 1, 300, 10.0)
        assert b_skewed <= b_flat
