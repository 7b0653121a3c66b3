"""Privacy budget accounting (§5.4 and §6.6).

The end user holds a total budget (ξ, ψ); each answered query consumes a
per-query (ε, δ). Within a query, ε is split by hyperparameters
(hp1, hp2, hp3) into ε^O (allocation summaries), ε^S (EM sampling) and
ε^E (result release); across providers the cost composes in parallel
(disjoint data), across queries sequentially.

Also provides the per-query budgets used by the §6.6 attack analysis:
sequential ε = ξ/nQ, advanced ε = ξ / (2·sqrt(2·nQ·ln(1/δ))) (the paper's
form of [22]), and coalition (parallel: each attacker spends the full ξ on
one query).
"""
from __future__ import annotations

import math
from dataclasses import dataclass


@dataclass(frozen=True)
class BudgetSplit:
    """Per-query ε split across the three protocol phases."""

    eps_allocation: float  # ε^O
    eps_sampling: float  # ε^S
    eps_estimate: float  # ε^E

    @property
    def total(self) -> float:
        return self.eps_allocation + self.eps_sampling + self.eps_estimate


def split_budget(eps: float, hp: tuple[float, float, float] = (0.1, 0.1, 0.8)) -> BudgetSplit:
    """Split a per-query ε by the hyperparameters of §5.4 (must sum to 1)."""
    if eps <= 0:
        raise ValueError("eps must be positive")
    if any(h < 0 for h in hp) or not math.isclose(sum(hp), 1.0, rel_tol=1e-9):
        raise ValueError(f"hyperparameters must be non-negative and sum to 1, got {hp}")
    return BudgetSplit(hp[0] * eps, hp[1] * eps, hp[2] * eps)


class BudgetExhausted(RuntimeError):
    """Raised when a query would exceed the total budget (ξ, ψ)."""


class PrivacyAccountant:
    """Tracks (ξ, ψ) consumption under sequential composition (Thm 3.1)."""

    def __init__(self, xi: float, psi: float) -> None:
        if xi <= 0 or psi < 0:
            raise ValueError("need xi > 0 and psi >= 0")
        self.xi = float(xi)
        self.psi = float(psi)
        self.spent_eps = 0.0
        self.spent_delta = 0.0
        self.queries = 0

    @property
    def remaining_eps(self) -> float:
        return self.xi - self.spent_eps

    @property
    def remaining_delta(self) -> float:
        return self.psi - self.spent_delta

    def can_charge(self, eps: float, delta: float) -> bool:
        tol = 1e-9
        return (
            self.spent_eps + eps <= self.xi + tol
            and self.spent_delta + delta <= self.psi + tol
        )

    def charge(self, eps: float, delta: float) -> None:
        """Consume (ε, δ) for one query; raises once the budget is gone."""
        if eps <= 0 or delta < 0:
            raise ValueError("need eps > 0 and delta >= 0")
        if not self.can_charge(eps, delta):
            raise BudgetExhausted(
                f"query cost ({eps}, {delta}) exceeds remaining "
                f"({self.remaining_eps}, {self.remaining_delta})"
            )
        self.spent_eps += eps
        self.spent_delta += delta
        self.queries += 1


def sequential_eps(xi: float, n_queries: int) -> float:
    """§6.6: equal split under sequential composition, ε = ξ / nQ."""
    if n_queries < 1:
        raise ValueError("n_queries must be >= 1")
    return xi / n_queries


def advanced_eps(xi: float, n_queries: int, delta: float) -> float:
    """§6.6 advanced composition: ε = ξ / (2·sqrt(2·nQ·ln(1/δ)))."""
    if n_queries < 1 or not (0 < delta < 1):
        raise ValueError("need n_queries >= 1 and 0 < delta < 1")
    return xi / (2.0 * math.sqrt(2.0 * n_queries * math.log(1.0 / delta)))


def coalition_eps(xi: float) -> float:
    """§6.6 coalition: each colluding analyst spends the full ξ on 1 query."""
    return xi
