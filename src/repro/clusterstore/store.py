"""Cluster-granular storage over the local filesystem.

The paper assumes tables are stored as fixed-size clusters (pages/HDFS
blocks) and that sampling s of N clusters reads only s clusters' worth of
I/O. We reproduce that with parquet partitioned by ``cluster_id``: a filter
on ``cluster_id`` is satisfied by Catalyst partition-directory pruning, so
an approximate query physically touches only the sampled clusters while the
exact baseline scans every directory.
"""
from __future__ import annotations

import os
from collections.abc import Iterable

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


class ClusterStore:
    """A provider table persisted as one parquet directory per cluster."""

    def __init__(self, path: str) -> None:
        if not os.path.isdir(path):
            raise FileNotFoundError(f"no cluster store at {path}")
        self.path = path
        self._df: DataFrame | None = None  # memoized scan plan (file index)

    @classmethod
    def write(cls, df: DataFrame, path: str) -> "ClusterStore":
        """Persist a provider table (must carry ``cluster_id``)."""
        (
            df.repartition("cluster_id")
            .write.mode("overwrite")
            .partitionBy("cluster_id")
            .parquet(path)
        )
        return cls(path)

    def read_all(self, spark: SparkSession) -> DataFrame:
        """Full-table scan — the plain-text (exact) baseline's access path.

        The DataFrame (and with it the parquet file index + schema) is
        memoized so per-query cost is the scan itself, not re-listing the
        store; the data is NOT cached — every query pays real I/O.
        """
        if self._df is None:
            self._df = spark.read.parquet(self.path)
        return self._df

    def read_clusters(self, spark: SparkSession, cluster_ids: Iterable[int]) -> DataFrame:
        """Scan only the given clusters (partition pruning does the skip)."""
        ids = [int(c) for c in cluster_ids]
        return self.read_all(spark).filter(F.col("cluster_id").isin(ids))

    def n_clusters(self) -> int:
        """Number of cluster directories on disk."""
        return sum(
            1 for e in os.listdir(self.path) if e.startswith("cluster_id=")
        )
