"""Fig 8: SMC vs per-provider DP for sharing final results.

Paper setting: Adult on 4 providers, 5 random two-dimensional COUNT
queries, each repeated 5 times with and without SMC; reports the range of
Laplace noise and the speed-up. SMC should (i) add no significant runtime
overhead and (ii) produce a narrower noise range (one max-sensitivity
noise instead of the sum of four).
"""
from __future__ import annotations

from statistics import mean

from repro.experiments import smc_comparison
from repro.reporting import format_table, save_results
from repro.synth_data import ADULT_DIMS

COLS = ["query", "mode", "noise_lo", "noise_hi", "noise_spread", "speedup"]


def test_fig8_smc_vs_dp(benchmark, adult_fed_bench):
    def run():
        return smc_comparison(
            adult_fed_bench, ADULT_DIMS, n_queries=5, reps=5, sr=0.1, seed=80
        )

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    save_results("fig8_smc_vs_dp", format_table(rows, COLS))

    smc = [r for r in rows if r["mode"] == "SMC"]
    dp = [r for r in rows if r["mode"] == "DP"]
    # SMC result-sharing must not produce significant overhead (Fig 8 / Fig 1)
    assert mean(r["speedup"] for r in smc) > 0.5 * mean(r["speedup"] for r in dp)
