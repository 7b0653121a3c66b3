"""Offline cluster metadata construction (Algorithm 1) as a Spark job.

For each cluster ``C`` and dimension ``d`` the data-level metadata stores the
step function ``R^{d>=}(v) = |rows of C with d >= v| / S`` at every distinct
value ``v`` of ``d`` in ``C``; the global metadata stores per-cluster
``(v_min^d, v_max^d)`` for pruning (Eq 2). Built with a single Spark pass per
dimension (groupBy + descending window cumulative sum), then collected to the
driver — the paper stores this as small per-cluster meta files (~tens of KB
per cluster), so driver-side pandas/numpy lookup is the faithful analogue.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


@dataclass
class ProviderMetadata:
    """In-memory metadata for one data provider.

    Attributes:
        S: agreed maximum cluster size (denominator of every R^{d>=}).
        dims: dimensions covered by the metadata.
        minmax: dim -> DataFrame indexed by cluster_id with vmin/vmax cols.
        rgeq: (cluster_id, dim) -> (values ascending, r_geq aligned) arrays.
        n_rows: cluster_id -> actual row count of the cluster.
    """

    S: int
    dims: list[str]
    minmax: dict[str, pd.DataFrame]
    rgeq: dict[tuple[int, str], tuple[np.ndarray, np.ndarray]]
    n_rows: dict[int, int]

    @property
    def cluster_ids(self) -> np.ndarray:
        return np.array(sorted(self.n_rows), dtype="int64")

    @property
    def n_clusters(self) -> int:
        return len(self.n_rows)

    def r_geq(self, cluster_id: int, dim: str, x: float) -> float:
        """R^{d>=}(x): proportion of the cluster's rows with dim value >= x.

        The stored step function has a point at each distinct value; for an
        arbitrary x, R^{d>=}(x) equals the stored value at the smallest
        distinct value >= x (0 beyond the maximum).
        """
        values, r = self.rgeq[(int(cluster_id), dim)]
        idx = int(np.searchsorted(values, x, side="left"))
        return 0.0 if idx >= len(values) else float(r[idx])

    def size_bytes(self) -> int:
        """Approximate serialized metadata footprint (paper §6.1 reports it)."""
        total = 0
        for values, r in self.rgeq.values():
            total += values.nbytes + r.nbytes
        for mm in self.minmax.values():
            total += mm.memory_usage(index=True).sum()
        return int(total)


def build_metadata(df: DataFrame, *, dims: list[str], S: int) -> ProviderMetadata:
    """Run Algorithm 1 over a provider table (must carry ``cluster_id``).

    One Spark aggregation computes distinct-value counts per (cluster, dim);
    a descending window cumulative sum turns them into ``R^{d>=}`` without a
    second scan. All dimension passes are unioned into a single job.
    """
    if S <= 0:
        raise ValueError("cluster size S must be positive")
    stacked = None
    for d in dims:
        part = (
            df.groupBy("cluster_id", F.col(d).alias("value"))
            .agg(F.count(F.lit(1)).alias("cnt"))
            .withColumn("dim", F.lit(d))
        )
        stacked = part if stacked is None else stacked.unionByName(part)
    w = (
        Window.partitionBy("cluster_id", "dim")
        .orderBy(F.desc("value"))
        .rowsBetween(Window.unboundedPreceding, Window.currentRow)
    )
    vals = (
        stacked.withColumn("cnt_geq", F.sum("cnt").over(w))
        .withColumn("r_geq", F.col("cnt_geq") / F.lit(float(S)))
        .select("cluster_id", "dim", "value", "r_geq")
        .toPandas()
    )

    agg_exprs = [F.count(F.lit(1)).alias("n_rows")]
    for d in dims:
        agg_exprs += [F.min(d).alias(f"{d}__min"), F.max(d).alias(f"{d}__max")]
    glob = df.groupBy("cluster_id").agg(*agg_exprs).toPandas()
    glob = glob.set_index("cluster_id").sort_index()

    rgeq: dict[tuple[int, str], tuple[np.ndarray, np.ndarray]] = {}
    for (cid, dim), grp in vals.groupby(["cluster_id", "dim"], sort=False):
        grp = grp.sort_values("value")
        rgeq[(int(cid), str(dim))] = (
            grp["value"].to_numpy(dtype="float64"),
            grp["r_geq"].to_numpy(dtype="float64"),
        )

    minmax = {
        d: glob[[f"{d}__min", f"{d}__max"]].rename(
            columns={f"{d}__min": "vmin", f"{d}__max": "vmax"}
        )
        for d in dims
    }
    n_rows = {int(c): int(n) for c, n in glob["n_rows"].items()}
    return ProviderMetadata(S=int(S), dims=list(dims), minmax=minmax, rgeq=rgeq, n_rows=n_rows)
