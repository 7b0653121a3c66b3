"""Tests for the paper's sensitivity theory (Thms 5.1–5.4, Appendices A/B)."""
from __future__ import annotations

import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import sensitivity as s


class TestDeltaR:
    @pytest.mark.parametrize("S,d", [(10, 1), (100, 3), (1000, 6), (50, 2)])
    def test_closed_form(self, S, d):
        assert s.delta_r(S, d) == pytest.approx(1 - (1 - 1 / S) ** d)

    def test_single_dim_is_one_over_S(self):
        assert s.delta_r(100, 1) == pytest.approx(1 / 100)

    @given(st.integers(2, 10_000), st.integers(1, 20))
    @settings(max_examples=200, deadline=None)
    def test_bounds(self, S, d):
        dr = s.delta_r(S, d)
        assert 0 < dr < 1

    @given(st.integers(2, 10_000), st.integers(1, 20))
    @settings(max_examples=200, deadline=None)
    def test_appendix_a_inequality(self, S, d):
        """App A.1 (Eq 14): Δ_R >= 1/S^|D^Q| — the floor case never exceeds
        the additional-row case."""
        assert s.delta_r(S, d) >= (1.0 / S) ** d - 1e-15

    def test_monotone_in_dims(self):
        assert s.delta_r(100, 5) > s.delta_r(100, 2)

    def test_monotone_decreasing_in_S(self):
        assert s.delta_r(1000, 3) < s.delta_r(10, 3)

    def test_invalid_inputs(self):
        with pytest.raises(ValueError):
            s.delta_r(0, 1)
        with pytest.raises(ValueError):
            s.delta_r(10, 0)


class TestDeltaAvgR:
    @pytest.mark.parametrize("S,d,nmin", [(100, 3, 10), (50, 2, 5), (1000, 6, 20)])
    def test_theorem_5_1(self, S, d, nmin):
        expect = max(s.delta_r(S, d) / nmin, 1 / (nmin + 1))
        assert s.delta_avg_r(S, d, nmin) == pytest.approx(expect)

    def test_large_nmin_shrinks_sensitivity(self):
        assert s.delta_avg_r(100, 3, 100) < s.delta_avg_r(100, 3, 5)

    def test_invalid_nmin(self):
        with pytest.raises(ValueError):
            s.delta_avg_r(100, 3, 0)

    @given(st.integers(2, 1000), st.integers(1, 10), st.integers(1, 100))
    @settings(max_examples=200, deadline=None)
    def test_positive(self, S, d, nmin):
        assert s.delta_avg_r(S, d, nmin) > 0


class TestDeltaP:
    @pytest.mark.parametrize("nmin,expect", [(1, 1 / 2), (10, 1 / 110), (100, 1 / 10100)])
    def test_theorem_5_2(self, nmin, expect):
        assert s.delta_p(nmin) == pytest.approx(expect)

    def test_worst_case_construction(self):
        """Δp bounds |1/N - 1/(N+1)| for every N >= N^min (Eq 7)."""
        nmin = 7
        bound = s.delta_p(nmin)
        for n in range(nmin, 200):
            assert abs(1 / n - 1 / (n + 1)) <= bound + 1e-15

    def test_invalid(self):
        with pytest.raises(ValueError):
            s.delta_p(0)


class TestSmoothBetaAndK:
    def test_beta_formula(self):
        assert s.smooth_beta(0.8, 1e-3) == pytest.approx(0.8 / (2 * math.log(2000)))

    @given(st.floats(0.01, 10.0), st.floats(1e-9, 0.5))
    @settings(max_examples=200, deadline=None)
    def test_beta_positive(self, eps, delta):
        assert s.smooth_beta(eps, delta) > 0

    def test_k_max_formula(self):
        beta = 0.05
        assert s.k_max(beta) == int(math.floor(1 / (1 - math.exp(-beta)))) + 1

    @given(st.floats(1e-3, 5.0))
    @settings(max_examples=100, deadline=None)
    def test_k_max_is_past_the_argmax(self, beta):
        """e^{-βk}·k peaks at k ≈ 1/β; the App B.3 bound must lie at or past
        the last k where the product still grows."""
        km = s.k_max(beta)
        f = lambda k: math.exp(-beta * k) * k
        assert f(km + 1) <= f(km) or f(km) >= max(f(k) for k in range(km))

    def test_invalid(self):
        with pytest.raises(ValueError):
            s.smooth_beta(0, 1e-3)
        with pytest.raises(ValueError):
            s.smooth_beta(1.0, 2.0)
        with pytest.raises(ValueError):
            s.k_max(0)


class TestDominantScenario:
    def test_theorem_5_4_threshold(self):
        assert s.scenario1_dominates(q_c=101, sum_r=10, d_r=0.1)  # 101 > 100
        assert not s.scenario1_dominates(q_c=99, sum_r=10, d_r=0.1)

    def test_slope_scenario1(self):
        a = s.ls_slope(q_c=200, r=0.5, p=0.1, sum_r=10, d_r=0.1)
        assert a == pytest.approx(200 * 0.1 / 0.5)  # Q(C)·Δ_R/R

    def test_slope_scenario4(self):
        a = s.ls_slope(q_c=1, r=0.5, p=0.1, sum_r=10, d_r=0.1)
        assert a == pytest.approx(1 / 0.1)  # 1/p

    def test_slope_is_max_of_both_at_threshold(self):
        """The dominant scenario must yield the larger of the two slopes
        exactly at the Theorem 5.4 boundary behaviour."""
        sum_r, d_r, r, p = 10.0, 0.1, 0.4, 0.25
        for q_c in [1.0, 50.0, 99.9, 100.1, 1000.0]:
            a = s.ls_slope(q_c=q_c, r=r, p=p, sum_r=sum_r, d_r=d_r)
            s1, s4 = q_c * d_r / r, 1 / p
            assert a in (pytest.approx(s1), pytest.approx(s4))

    def test_invalid_inputs(self):
        with pytest.raises(ValueError):
            s.ls_slope(q_c=1, r=0, p=0.1, sum_r=1, d_r=0.1)
        with pytest.raises(ValueError):
            s.ls_slope(q_c=1, r=0.1, p=0, sum_r=1, d_r=0.1)


class TestSmoothLocalSensitivity:
    KW = dict(r=0.3, p=0.1, sum_r=3.0, S=100, n_query_dims=3, eps=0.8, delta=1e-3)

    def test_positive(self):
        assert s.smooth_local_sensitivity(q_c=50, **self.KW) > 0

    def test_equals_manual_max(self):
        beta = s.smooth_beta(0.8, 1e-3)
        a = s.ls_slope(
            q_c=50, r=0.3, p=0.1, sum_r=3.0, d_r=s.delta_r(100, 3)
        )
        manual = max(
            math.exp(-beta * k) * k * a for k in range(s.k_max(beta) + 1)
        )
        assert s.smooth_local_sensitivity(q_c=50, **self.KW) == pytest.approx(manual)

    def test_at_least_ls_at_k1(self):
        """S_LS >= e^{-β}·LS^1: smoothing never undercuts distance 1."""
        beta = s.smooth_beta(0.8, 1e-3)
        a = s.ls_slope(q_c=50, r=0.3, p=0.1, sum_r=3.0, d_r=s.delta_r(100, 3))
        assert s.smooth_local_sensitivity(q_c=50, **self.KW) >= math.exp(-beta) * a

    def test_grows_with_tighter_eps(self):
        """Smaller ε ⇒ smaller β ⇒ larger smooth bound (more smoothing)."""
        lo = s.smooth_local_sensitivity(q_c=50, r=0.3, p=0.1, sum_r=3.0, S=100,
                                        n_query_dims=3, eps=0.1, delta=1e-3)
        hi = s.smooth_local_sensitivity(q_c=50, r=0.3, p=0.1, sum_r=3.0, S=100,
                                        n_query_dims=3, eps=2.0, delta=1e-3)
        assert lo > hi

    def test_scenario4_dominated_small_counts(self):
        """For tiny Q(C) the 1/p slope drives the bound."""
        v1 = s.smooth_local_sensitivity(q_c=0.0, **self.KW)
        v2 = s.smooth_local_sensitivity(q_c=1.0, **self.KW)
        assert v1 == pytest.approx(v2)  # both scenario 4, independent of Q(C)

    def test_scenario1_scales_with_q(self):
        big1 = s.smooth_local_sensitivity(q_c=10_000, **self.KW)
        big2 = s.smooth_local_sensitivity(q_c=20_000, **self.KW)
        assert big2 == pytest.approx(2 * big1)


class TestGlobalSensitivityUnbounded:
    def test_theorem_5_3_lower_bound_grows(self):
        """(N−1)·S^D/2 − 1 grows without bound — the reason the paper
        abandons global sensitivity for the estimator."""
        lb = lambda n, S, d: (n - 1) * S**d / 2 - 1
        assert lb(10, 100, 3) < lb(100, 100, 3) < lb(100, 1000, 3)
