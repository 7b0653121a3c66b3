"""Sensitivity theory of the paper (Theorems 5.1–5.4, Appendices A/B).

Closed forms for the DP calibration constants:

* ``delta_r``          — Δ_R = 1 − (1 − 1/S)^|D^Q|          (Eq 12)
* ``delta_avg_r``      — Δ_Avg(R̂) = max(Δ_R/N^min, 1/(N^min+1))  (Thm 5.1)
* ``delta_p``          — Δp = 1/(N^min (N^min+1))            (Thm 5.2)
* smooth local sensitivity of the Hansen–Hurwitz per-cluster estimator
  𝔼(C) = Q(C)/p (Thm 5.3 shows GS is unbounded; Thm 5.4 + App B.2 give the
  dominant neighbouring scenario; Eq 10 + App B.3 give the smooth max and
  its terminating k bound).
"""
from __future__ import annotations

import math


def delta_r(S: int, n_query_dims: int) -> float:
    """Δ_R (Eq 12): worst-case change of a cluster proportion for ±1 row."""
    if S <= 0 or n_query_dims < 1:
        raise ValueError("S must be positive and |D^Q| >= 1")
    return 1.0 - (1.0 - 1.0 / S) ** n_query_dims


def delta_avg_r(S: int, n_query_dims: int, n_min: int) -> float:
    """Δ_Avg(R̂) (Theorem 5.1). Uses only public constants S, |D^Q|, N^min."""
    if n_min < 1:
        raise ValueError("N^min must be >= 1")
    return max(delta_r(S, n_query_dims) / n_min, 1.0 / (n_min + 1))


def delta_p(n_min: int) -> float:
    """Δp (Theorem 5.2): sensitivity of any cluster's sampling probability."""
    if n_min < 1:
        raise ValueError("N^min must be >= 1")
    return 1.0 / (n_min * (n_min + 1))


def smooth_beta(eps: float, delta: float) -> float:
    """β = ε / (2 ln(2/δ)) of the smooth sensitivity framework (Eq 10)."""
    if eps <= 0 or not (0 < delta < 1):
        raise ValueError("need eps > 0 and 0 < delta < 1")
    return eps / (2.0 * math.log(2.0 / delta))


def k_max(beta: float) -> int:
    """App B.3 bound: e^{-βk}·LS^k stops growing once k > 1/(1−e^{−β})."""
    if beta <= 0:
        raise ValueError("beta must be positive")
    return int(math.floor(1.0 / (1.0 - math.exp(-beta)))) + 1


def scenario1_dominates(q_c: float, sum_r: float, d_r: float) -> bool:
    """Theorem 5.4: scenario 1 (another cluster gained a row) beats
    scenario 4 (this cluster's measure grew) iff Q(C) > ΣR / Δ_R."""
    return q_c > sum_r / d_r


def ls_slope(*, q_c: float, r: float, p: float, sum_r: float, d_r: float) -> float:
    """Per-k slope ``a`` of the dominant LS^k = k·a (App B.2, Eq 26).

    Scenario 1: a = Q(C)·Δ_R / R ; scenario 4: a = 1/p.
    """
    if r <= 0 or p <= 0:
        raise ValueError("R and p must be positive")
    if scenario1_dominates(q_c, sum_r, d_r):
        return q_c * d_r / r
    return 1.0 / p


def smooth_local_sensitivity(
    *,
    q_c: float,
    r: float,
    p: float,
    sum_r: float,
    S: int,
    n_query_dims: int,
    eps: float,
    delta: float,
) -> float:
    """S_LS_𝔼 for one sampled cluster (Eq 10).

    ``LS^k = k·a`` is linear in k, so ``e^{-βk}·k·a`` is unimodal with its
    continuous maximum at k = 1/β; the integer maximum is at ⌊1/β⌋ or
    ⌈1/β⌉, clamped into [0, k_max] (App B.3's terminating bound). Closed
    form instead of iterating — for the §6.6 attack budgets β ~ 1e-5 and
    k_max ~ 1e5, a loop per sampled cluster is prohibitive.
    """
    beta = smooth_beta(eps, delta)
    a = ls_slope(q_c=q_c, r=r, p=p, sum_r=sum_r, d_r=delta_r(S, n_query_dims))
    km = k_max(beta)
    k_star = 1.0 / beta
    candidates = {0, 1, min(int(math.floor(k_star)), km), min(int(math.ceil(k_star)), km), km}
    return max(math.exp(-beta * k) * k * a for k in candidates if k >= 0)
