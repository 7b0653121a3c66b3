"""spark-submit entrypoint for the Fig 7 experiment (speed-up vs dims / ε).

Builds a store-backed amazon-lite federation (cluster-pruned parquet I/O).

Example:
    spark-submit jobs/fig7_speedup.py --sf 0.5 --m 4
"""
from __future__ import annotations

import argparse
import tempfile

from pyspark.sql import SparkSession

from repro.experiments import dimension_sweep, epsilon_sweep
from repro.federation.builder import build_federation
from repro.reporting import format_table, save_results
from repro.synth_data import AMAZON_DIMS, amazon_tensor


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=0.5)
    ap.add_argument("--m", type=int, default=4)
    args = ap.parse_args()

    spark = SparkSession.builder.appName("repro-fig7").getOrCreate()
    fed = build_federation(
        spark,
        amazon_tensor(sf=args.sf, seed=11),
        dims=list(AMAZON_DIMS),
        n_providers=4,
        cluster_frac=0.005,
        n_min=10,
        store_root=tempfile.mkdtemp(prefix="fig7_store_"),
        seed=1,
    )
    rows = [
        {"axis": "dims", **r}
        for r in dimension_sweep(
            fed, AMAZON_DIMS, n_dims_list=[2, 3, 4, 5], m=args.m, sr=0.05, seed=70
        )
    ] + [
        {"axis": "eps", **r}
        for r in epsilon_sweep(
            fed, AMAZON_DIMS, eps_list=[0.1, 0.7, 1.3], m=args.m, sr=0.05, seed=71
        )
    ]
    save_results(
        "fig7_speedup_job",
        format_table(rows, ["axis", "n_dims", "eps", "agg", "rel_err", "speedup"]),
    )
    spark.stop()


if __name__ == "__main__":
    main()
