"""Differential-privacy primitives: Laplace and Exponential mechanisms.

All randomness flows through an explicit ``numpy.random.Generator`` so every
experiment is reproducible; no global RNG state is touched.
"""
from __future__ import annotations

import numpy as np


def laplace_noise(sensitivity: float, eps: float, rng: np.random.Generator) -> float:
    """One draw of Lap(sensitivity/eps) — the Laplace Mechanism's noise term."""
    if sensitivity < 0:
        raise ValueError("sensitivity must be non-negative")
    if eps <= 0:
        raise ValueError("eps must be positive")
    if sensitivity == 0:
        return 0.0
    return float(rng.laplace(0.0, sensitivity / eps))


def laplace_mechanism(
    value: float, sensitivity: float, eps: float, rng: np.random.Generator
) -> float:
    """Definition 3.4: value + Lap(GS_f / eps)."""
    return float(value) + laplace_noise(sensitivity, eps, rng)


def exponential_mechanism_probabilities(
    scores: np.ndarray, sensitivity: float, eps: float
) -> np.ndarray:
    """Selection distribution ∝ exp(eps·L(e) / (2·Δ_L)) (Definition 3.5).

    Computed with a max-shifted softmax so huge exponents (Δ_L is tiny in
    Algorithm 2: Δp = 1/(N^min(N^min+1))) cannot overflow.
    """
    if sensitivity <= 0:
        raise ValueError("score sensitivity must be positive")
    if eps <= 0:
        raise ValueError("eps must be positive")
    s = np.asarray(scores, dtype="float64")
    logits = (eps * s) / (2.0 * sensitivity)
    logits -= logits.max()
    w = np.exp(logits)
    return w / w.sum()


def exponential_mechanism_sample(
    items: np.ndarray,
    scores: np.ndarray,
    sensitivity: float,
    eps_total: float,
    size: int,
    rng: np.random.Generator,
) -> np.ndarray:
    """Algorithm 2 (EM_sampling): ``size`` independent draws, each charged
    ``eps_total/size`` (sequential composition inside the sampling phase).

    Draws are with replacement — the regime the Hansen–Hurwitz estimator
    assumes — and return selected items (indices into ``items``' order are
    not exposed; equal scores get equal odds).
    """
    items = np.asarray(items)
    if size < 1:
        raise ValueError("sample size must be >= 1")
    if len(items) != len(scores):
        raise ValueError("items and scores must be aligned")
    eps_each = eps_total / size
    probs = exponential_mechanism_probabilities(np.asarray(scores), sensitivity, eps_each)
    idx = rng.choice(len(items), size=size, replace=True, p=probs)
    return items[idx]
