"""Tests for privacy budget accounting (§5.4, §6.6)."""
from __future__ import annotations

import math

import pytest

from repro.dp.accountant import (
    BudgetExhausted,
    PrivacyAccountant,
    advanced_eps,
    coalition_eps,
    sequential_eps,
    split_budget,
)


class TestSplitBudget:
    def test_default_hyperparameters(self):
        b = split_budget(1.0)
        assert b.eps_allocation == pytest.approx(0.1)
        assert b.eps_sampling == pytest.approx(0.1)
        assert b.eps_estimate == pytest.approx(0.8)

    def test_total_is_eps(self):
        b = split_budget(2.5, (0.2, 0.3, 0.5))
        assert b.total == pytest.approx(2.5)

    def test_bad_hp_sum_rejected(self):
        with pytest.raises(ValueError, match="sum to 1"):
            split_budget(1.0, (0.5, 0.5, 0.5))

    def test_negative_hp_rejected(self):
        with pytest.raises(ValueError):
            split_budget(1.0, (-0.1, 0.3, 0.8))

    def test_zero_eps_rejected(self):
        with pytest.raises(ValueError):
            split_budget(0.0)


class TestAccountant:
    def test_charges_accumulate(self):
        acc = PrivacyAccountant(10.0, 1e-3)
        acc.charge(1.0, 1e-4)
        acc.charge(2.0, 1e-4)
        assert acc.spent_eps == pytest.approx(3.0)
        assert acc.spent_delta == pytest.approx(2e-4)
        assert acc.queries == 2

    def test_exhaustion_raises(self):
        acc = PrivacyAccountant(1.0, 1e-3)
        acc.charge(0.9, 0)
        with pytest.raises(BudgetExhausted):
            acc.charge(0.2, 0)

    def test_delta_exhaustion_raises(self):
        acc = PrivacyAccountant(100.0, 1e-6)
        with pytest.raises(BudgetExhausted):
            acc.charge(1.0, 1e-5)

    def test_failed_charge_spends_nothing(self):
        acc = PrivacyAccountant(1.0, 1e-3)
        with pytest.raises(BudgetExhausted):
            acc.charge(2.0, 0)
        assert acc.spent_eps == 0.0

    def test_exact_budget_allowed(self):
        acc = PrivacyAccountant(1.0, 1e-3)
        for _ in range(10):
            acc.charge(0.1, 1e-4)
        assert acc.remaining_eps == pytest.approx(0.0, abs=1e-9)

    def test_invalid_construction(self):
        with pytest.raises(ValueError):
            PrivacyAccountant(0, 0)

    def test_invalid_charge(self):
        acc = PrivacyAccountant(1.0, 1e-3)
        with pytest.raises(ValueError):
            acc.charge(-1.0, 0)


class TestCompositionBudgets:
    def test_sequential(self):
        assert sequential_eps(100.0, 1000) == pytest.approx(0.1)

    def test_advanced_formula(self):
        xi, n, d = 100.0, 3201, 1e-9
        expect = xi / (2 * math.sqrt(2 * n * math.log(1 / d)))
        assert advanced_eps(xi, n, d) == pytest.approx(expect)

    def test_advanced_beats_sequential_for_many_queries(self):
        """§6.6: advanced composition gives each query more budget."""
        xi, n, d = 50.0, 5000, 1e-9
        assert advanced_eps(xi, n, d) > sequential_eps(xi, n)

    def test_coalition_spends_full_budget(self):
        assert coalition_eps(42.0) == 42.0

    def test_invalid(self):
        with pytest.raises(ValueError):
            sequential_eps(1.0, 0)
        with pytest.raises(ValueError):
            advanced_eps(1.0, 10, 1.5)
