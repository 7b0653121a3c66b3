"""spark-submit entrypoint for the Fig 6 experiment (error vs ε).

Example:
    spark-submit jobs/fig6_epsilon.py --sf 0.1 --m 6
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from jobs.run_query import build
from repro.experiments import epsilon_sweep
from repro.reporting import format_table, save_results
from repro.synth_data import ADULT_DIMS, AMAZON_DIMS


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--m", type=int, default=6)
    args = ap.parse_args()

    spark = SparkSession.builder.appName("repro-fig6").getOrCreate()
    rows = []
    for name, dims, sr in (("adult", ADULT_DIMS, 0.10), ("amazon", AMAZON_DIMS, 0.05)):
        fed = build(spark, name, args.sf, 4, 10)
        for r in epsilon_sweep(
            fed, dims, eps_list=[0.1, 0.4, 0.7, 1.0, 1.3], m=args.m, sr=sr, seed=60
        ):
            rows.append({"dataset": f"{name}-lite", **r})
    save_results(
        "fig6_epsilon_job",
        format_table(rows, ["dataset", "eps", "agg", "rel_err", "speedup"]),
    )
    spark.stop()


if __name__ == "__main__":
    main()
