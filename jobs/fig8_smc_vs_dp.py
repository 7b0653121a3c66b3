"""spark-submit entrypoint for the Fig 8 experiment (SMC vs per-provider DP).

Example:
    spark-submit jobs/fig8_smc_vs_dp.py --sf 0.1
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from jobs.run_query import build
from repro.experiments import smc_comparison
from repro.reporting import format_table, save_results
from repro.synth_data import ADULT_DIMS


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()

    spark = SparkSession.builder.appName("repro-fig8").getOrCreate()
    fed = build(spark, "adult", args.sf, 4, 10)
    rows = smc_comparison(fed, ADULT_DIMS, n_queries=5, reps=5, sr=0.1, seed=80)
    save_results(
        "fig8_smc_vs_dp_job",
        format_table(rows, ["query", "mode", "noise_lo", "noise_hi", "noise_spread", "speedup"]),
    )
    spark.stop()


if __name__ == "__main__":
    main()
