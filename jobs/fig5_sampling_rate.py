"""spark-submit entrypoint for the Fig 5 experiment (error vs sampling rate).

Example:
    spark-submit jobs/fig5_sampling_rate.py --sf 0.1 --m 6
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from jobs.run_query import build
from repro.experiments import sampling_rate_sweep
from repro.reporting import format_table, save_results
from repro.synth_data import ADULT_DIMS, AMAZON_DIMS


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--m", type=int, default=6)
    args = ap.parse_args()

    spark = SparkSession.builder.appName("repro-fig5").getOrCreate()
    rows = []
    for name, dims in (("adult", ADULT_DIMS), ("amazon", AMAZON_DIMS)):
        fed = build(spark, name, args.sf, 4, 10)
        for r in sampling_rate_sweep(
            fed, dims, rates=[0.05, 0.10, 0.15, 0.20], m=args.m, n_dims=4, seed=50
        ):
            rows.append({"dataset": f"{name}-lite", **r})
    save_results(
        "fig5_sampling_rate_job",
        format_table(rows, ["dataset", "sr", "agg", "rel_err", "speedup"]),
    )
    spark.stop()


if __name__ == "__main__":
    main()
