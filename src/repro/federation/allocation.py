"""Aggregator allocation phase (§5.3.1, Eq 6).

Maximize Σ_i Avg_i·s_i subject to Σ_i s_i = sr·Σ_i Ñ_i^Q and 1 ≤ s_i ≤ Ñ_i^Q.
This is a continuous knapsack whose optimum is greedy: give every provider
its floor of 1, then saturate providers in decreasing order of Ãvg(R̂).
The paper solves it with OR-Tools; the greedy form is exactly optimal for
this LP (exchange argument: moving mass from a lower-Avg to a higher-Avg
provider never decreases the objective), so no external solver is needed.

Inputs are the *noisy* summaries (Laplace-perturbed by each provider), so
they are sanitized first: Ñ^Q is clamped to >= 1 and rounded, Ãvg to [0, 1].
Outputs are integer allocations (largest-remainder rounding preserves the
total sample budget).
"""
from __future__ import annotations

import numpy as np


def solve_allocation(
    avg_r: np.ndarray, n_q: np.ndarray, sampling_rate: float
) -> np.ndarray:
    """Integer sample sizes s_i per provider (Eq 6 optimum).

    Args:
        avg_r: noisy Ãvg(R̂) per provider.
        n_q: noisy Ñ^Q per provider.
        sampling_rate: sr ∈ (0, 1).
    """
    if not (0.0 < sampling_rate < 1.0):
        raise ValueError("sampling rate must be in (0, 1)")
    avg = np.clip(np.asarray(avg_r, dtype="float64"), 0.0, 1.0)
    caps = np.maximum(np.rint(np.asarray(n_q, dtype="float64")), 1.0)
    k = len(avg)
    if k == 0 or len(caps) != k:
        raise ValueError("avg_r and n_q must be aligned and non-empty")

    # Eq 6 bounds s_i to ]1, Ñ_i^Q[ — strictly above 1 — so every provider
    # is floored at 2 samples (or its cap when Ñ < 2).
    floors = np.minimum(2.0, caps)
    budget = sampling_rate * caps.sum()
    budget = float(np.clip(budget, floors.sum(), caps.sum()))

    s = floors.copy()
    remaining = budget - floors.sum()
    for i in np.argsort(-avg, kind="stable"):
        if remaining <= 0:
            break
        take = min(caps[i] - s[i], remaining)
        s[i] += take
        remaining -= take

    # Largest-remainder integerization keeping Σ s_i and the caps intact.
    floors = np.floor(s)
    deficit = int(round(budget)) - int(floors.sum())
    if deficit > 0:
        order = np.argsort(-(s - floors), kind="stable")
        for i in order:
            if deficit == 0:
                break
            if floors[i] < caps[i]:
                floors[i] += 1
                deficit -= 1
    return floors.astype("int64")
