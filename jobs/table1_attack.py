"""spark-submit entrypoint for the Table 1 experiment (NBC attack).

Example:
    spark-submit jobs/table1_attack.py --sf 0.01
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from jobs.run_query import build
from repro.attack.nbc import AttackSpec
from repro.experiments import attack_table
from repro.reporting import format_table, save_results
from repro.synth_data import ADULT_DIMS


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=0.01)
    ap.add_argument("--sa", choices=["fnlwgt", "capgain"], default="fnlwgt")
    args = ap.parse_args()

    spark = SparkSession.builder.appName("repro-table1").getOrCreate()
    fed = build(spark, "adult", args.sf, 4, 10).with_pandas_evaluators()
    qi = ("education", "workclass", "relationship")
    spec = AttackSpec(
        sa_dim=args.sa,
        qi_dims=qi,
        domains={args.sa: ADULT_DIMS[args.sa], **{d: ADULT_DIMS[d] for d in qi}},
    )
    xi = [1.0, 20.0, 50.0, 100.0]
    rows = attack_table(fed, spec, xi_list=xi, psi=1e-6, sr=0.1, seed=90)
    save_results(
        "table1_attack_job",
        format_table(rows, ["mode", "agg"] + [f"xi={x:g}" for x in xi]),
    )
    spark.stop()


if __name__ == "__main__":
    main()
