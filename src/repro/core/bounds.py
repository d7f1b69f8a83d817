"""Closed-form theoretical bounds of Section 5, as executable functions.

These are used by tests to check (a) that measured quantities respect
the bounds and (b) the monotonicity claims (Theorems 3 and 6).
"""
from __future__ import annotations

import numpy as np


def tau_bound(k: int, max_load: int, n_edges: int) -> float:
    """Theorem 1: relative load balance τ ≤ k·L/|E|."""
    return k * max_load / n_edges


def head_fraction(xi: float, rho: float, d_max: int, n_vertices: int | None = None) -> float:
    """χ_H as the paper writes it: 1 − (Σ_{j≤ξ} j^-ρ)/|V|.

    The paper's expression is unnormalized power-law mass divided by
    |V| (Theorem 2's proof), which is what makes Theorem 3's
    monotonicity ("the bound decreases as ρ decreases") hold: smaller ρ
    → larger Σ j^-ρ → larger χ_T → smaller χ_H. When ``n_vertices`` is
    omitted we fall back to normalized tail mass over [1, d_max].
    """
    if n_vertices is not None:
        j = np.arange(1, max(int(xi), 1) + 1, dtype=np.float64)
        chi_t = min(1.0, float((j**-rho).sum()) / n_vertices)
        return 1.0 - chi_t
    d = np.arange(1, max(int(d_max), 2) + 1, dtype=np.float64)
    mass = d**-rho
    mass /= mass.sum()
    return float(mass[d > xi].sum())


def rf_bound(
    n_vertices: int,
    k: int,
    rho: float,
    d_min: int,
    xi: float,
    d_max: int,
) -> float:
    """Theorem 2: RF bound of S5P-B = head part + tail part + 1.

    head part: χ_H·k (head vertices replicated everywhere in the worst
    case). tail part: mean over tail vertices i of
    d_m·((k-1)/d_m)^(1-ρ) + (i-1)/|V|)^(-1).
    """
    chi_h = head_fraction(xi, rho, d_max, n_vertices)
    chi_t = 1.0 - chi_h
    n_tail = max(1, int(chi_t * n_vertices))
    i = np.arange(1, n_tail + 1, dtype=np.float64)
    base = ((k - 1) / d_min) ** (1.0 - rho)
    tail_terms = d_min * (base + (i - 1) / n_vertices) ** -1.0
    return chi_h * k + float(tail_terms.mean()) + 1.0


def poa_bound(k: int) -> float:
    """Theorem 5: price of anarchy of the Stackelberg game ≤ k+1."""
    return k + 1.0


def rounds_bound(
    n_vertices: int,
    k: int,
    rho: float,
    d_min: int,
    d_max: int,
    xi: float,
) -> float:
    """Theorem 6: bound on best-response rounds until equilibrium.

    RD ≤ 2·(Σ_{i≤τ'} d_m·(((k-1)/d_m)^{1-ρ} + (i-1)/|V|)^{-1}
           + |V|·(1 - Σ_{i≤ξ} i^{-ρ})·d_M + |V|)
    with τ' = |V| - |V|(d_M - ξ)·d_M^{-ρ} the tail-count bound.
    """
    tau_prime = max(1, int(n_vertices - n_vertices * (d_max - xi) * d_max**-rho))
    i = np.arange(1, tau_prime + 1, dtype=np.float64)
    base = ((k - 1) / d_min) ** (1.0 - rho)
    tail = float((d_min * (base + (i - 1) / n_vertices) ** -1.0).sum())
    head_count = n_vertices * max(
        0.0, 1.0 - float((np.arange(1, max(int(xi), 1) + 1) ** -rho).sum())
    )
    return 2.0 * (tail + head_count * d_max + n_vertices)
