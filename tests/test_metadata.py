"""Tests for Algorithm 1 (offline cluster metadata) against brute force."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.metadata import build_metadata
from repro.synth_data import adult_tensor, assign_clusters

DIMS = ["age", "education", "hours"]


@pytest.fixture(scope="module")
def clustered(spark):
    pdf = assign_clusters(
        adult_tensor(sf=0.001, seed=3), cluster_size=80, sort_dim="age", seed=0
    )
    return pdf, spark.createDataFrame(pdf)


@pytest.fixture(scope="module")
def meta(clustered):
    _, sdf = clustered
    return build_metadata(sdf, dims=DIMS, S=80)


class TestStructure:
    def test_all_clusters_present(self, clustered, meta):
        pdf, _ = clustered
        assert meta.n_clusters == pdf["cluster_id"].nunique()

    def test_n_rows_match(self, clustered, meta):
        pdf, _ = clustered
        sizes = pdf.groupby("cluster_id").size()
        for cid, n in sizes.items():
            assert meta.n_rows[int(cid)] == int(n)

    def test_dims_covered(self, meta):
        assert meta.dims == DIMS
        for d in DIMS:
            assert d in meta.minmax

    def test_rgeq_entries_for_every_cluster_dim(self, clustered, meta):
        pdf, _ = clustered
        for cid in pdf["cluster_id"].unique():
            for d in DIMS:
                assert (int(cid), d) in meta.rgeq

    def test_invalid_S_rejected(self, clustered):
        _, sdf = clustered
        with pytest.raises(ValueError, match="S must be positive"):
            build_metadata(sdf, dims=DIMS, S=0)


class TestRgeqValues:
    @pytest.mark.parametrize("dim", DIMS)
    def test_stored_values_match_brute_force(self, clustered, meta, dim):
        """R^{d>=}(v) = |rows >= v| / S at every stored distinct value."""
        pdf, _ = clustered
        for cid in list(pdf["cluster_id"].unique())[:5]:
            cluster = pdf[pdf["cluster_id"] == cid]
            values, r = meta.rgeq[(int(cid), dim)]
            for v, got in zip(values, r):
                expect = (cluster[dim] >= v).sum() / 80.0
                assert got == pytest.approx(expect), (cid, dim, v)

    @pytest.mark.parametrize("dim", DIMS)
    def test_rgeq_monotone_decreasing(self, meta, dim):
        for (cid, d), (values, r) in meta.rgeq.items():
            if d != dim:
                continue
            assert (np.diff(values) > 0).all()
            assert (np.diff(r) < 0).all(), "R^{d>=} must strictly decrease in v"

    def test_lookup_between_stored_values(self, clustered, meta):
        """Step-function semantics for arbitrary x."""
        pdf, _ = clustered
        cid = int(pdf["cluster_id"].iloc[0])
        cluster = pdf[pdf["cluster_id"] == cid]
        for x in [-5, 0, 17.5, 33, 200]:
            expect = (cluster["age"] >= x).sum() / 80.0
            assert meta.r_geq(cid, "age", x) == pytest.approx(expect), x

    def test_lookup_beyond_max_is_zero(self, clustered, meta):
        pdf, _ = clustered
        cid = int(pdf["cluster_id"].iloc[0])
        assert meta.r_geq(cid, "age", 10_000) == 0.0

    def test_lookup_at_or_below_min_is_full(self, clustered, meta):
        pdf, _ = clustered
        cid = int(pdf["cluster_id"].iloc[0])
        n = meta.n_rows[cid]
        assert meta.r_geq(cid, "age", -(10**9)) == pytest.approx(n / 80.0)


class TestMinMax:
    @pytest.mark.parametrize("dim", DIMS)
    def test_minmax_match_brute_force(self, clustered, meta, dim):
        pdf, _ = clustered
        mm = meta.minmax[dim]
        brute = pdf.groupby("cluster_id")[dim].agg(["min", "max"])
        for cid in brute.index:
            assert mm.loc[cid, "vmin"] == brute.loc[cid, "min"]
            assert mm.loc[cid, "vmax"] == brute.loc[cid, "max"]


class TestFootprint:
    def test_size_bytes_positive_and_small(self, clustered, meta):
        """Metadata must be a tiny fraction of the table (paper: KB/cluster)."""
        pdf, _ = clustered
        table_bytes = pdf.memory_usage(index=False).sum()
        assert 0 < meta.size_bytes() < table_bytes

    def test_cluster_ids_sorted(self, meta):
        ids = meta.cluster_ids
        assert (np.diff(ids) > 0).all()
