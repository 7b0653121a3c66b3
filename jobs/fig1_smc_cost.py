"""spark-submit entrypoint for the Fig 1 simulation (SMC row vs result cost).

Example:
    spark-submit jobs/fig1_smc_cost.py --sf 0.1
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from jobs.run_query import build
from repro.experiments import smc_cost_simulation
from repro.reporting import format_table, save_results
from repro.synth_data import ADULT_DIMS


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()

    spark = SparkSession.builder.appName("repro-fig1").getOrCreate()
    fed = build(spark, "adult", args.sf, 4, 10)
    rows = smc_cost_simulation(fed, ADULT_DIMS, n_queries=5, seed=10)
    save_results(
        "fig1_smc_cost_job",
        format_table(rows, ["query", "rows_shared", "smc_rows_s", "smc_results_s", "ratio"]),
    )
    spark.stop()


if __name__ == "__main__":
    main()
