"""spark-submit entrypoint for the Fig 4 experiment (error vs #dimensions).

Example:
    spark-submit jobs/fig4_dimensions.py --sf 0.1 --m 6
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from jobs.run_query import build
from repro.experiments import dimension_sweep
from repro.reporting import format_table, save_results
from repro.synth_data import ADULT_DIMS, AMAZON_DIMS


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--m", type=int, default=6)
    args = ap.parse_args()

    spark = SparkSession.builder.appName("repro-fig4").getOrCreate()
    rows = []
    adult = build(spark, "adult", args.sf, 4, 10)
    for r in dimension_sweep(
        adult, ADULT_DIMS, n_dims_list=[2, 3, 4, 5, 6, 7], m=args.m, sr=0.20, seed=40
    ):
        rows.append({"dataset": "adult-lite", **r})
    amazon = build(spark, "amazon", args.sf, 4, 10)
    for r in dimension_sweep(
        amazon, AMAZON_DIMS, n_dims_list=[2, 3, 4, 5], m=args.m, sr=0.05, seed=41
    ):
        rows.append({"dataset": "amazon-lite", **r})
    save_results(
        "fig4_dimensions_job",
        format_table(rows, ["dataset", "n_dims", "agg", "rel_err", "speedup"]),
    )
    spark.stop()


if __name__ == "__main__":
    main()
