"""Tests for the paper-specific synthetic data generators."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.synth_data import (
    ADULT_DIMS,
    AMAZON_DIMS,
    adult_tensor,
    amazon_tensor,
    assign_clusters,
    partition_providers,
)


@pytest.mark.parametrize("gen,dims", [(adult_tensor, ADULT_DIMS), (amazon_tensor, AMAZON_DIMS)])
class TestTensorGenerators:
    def test_columns(self, gen, dims):
        pdf = gen(sf=0.001)
        assert list(pdf.columns) == list(dims) + ["measure"]

    def test_domains_respected(self, gen, dims):
        pdf = gen(sf=0.002)
        for d, dom in dims.items():
            assert pdf[d].min() >= 0
            assert pdf[d].max() < dom, f"{d} exceeds domain {dom}"

    def test_measure_positive(self, gen, dims):
        pdf = gen(sf=0.002)
        assert (pdf["measure"] >= 1).all()

    def test_deterministic_in_seed(self, gen, dims):
        a = gen(sf=0.001, seed=3)
        b = gen(sf=0.001, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_data(self, gen, dims):
        a = gen(sf=0.001, seed=3)
        b = gen(sf=0.001, seed=4)
        assert not a.equals(b)

    def test_scale_factor_scales_rows(self, gen, dims):
        small = gen(sf=0.0005)
        large = gen(sf=0.001)
        assert len(large) == 2 * len(small)

    def test_integer_dtypes(self, gen, dims):
        pdf = gen(sf=0.001)
        for d in dims:
            assert np.issubdtype(pdf[d].dtype, np.integer), d


class TestAdultSpecifics:
    def test_sa_dimension_domain_100(self):
        assert ADULT_DIMS["capgain"] == 100

    def test_sa_correlates_with_education(self):
        """The attack sanity ceiling needs QI->SA signal."""
        pdf = adult_tensor(sf=0.01)
        corr = pdf[["education", "capgain"]].corr().iloc[0, 1]
        assert corr > 0.3

    def test_nine_dimensions(self):
        assert len(ADULT_DIMS) == 9  # supports n in [2, 7] workloads + SA dims

    def test_fnlwgt_uniform_and_independent(self):
        """The paper-regime SA dim: near-uniform marginal, no QI signal."""
        pdf = adult_tensor(sf=0.01)
        freq = pdf["fnlwgt"].value_counts(normalize=True)
        assert freq.max() < 0.03  # mode share ~1%: random-guessing floor
        corr = pdf[["education", "fnlwgt"]].corr().iloc[0, 1]
        assert abs(corr) < 0.05


class TestAmazonSpecifics:
    def test_six_dimensions(self):
        assert len(AMAZON_DIMS) == 6  # supports n in [2, 5] workloads

    def test_rating_skewed_to_five_stars(self):
        pdf = amazon_tensor(sf=0.005)
        assert (pdf["rating"] == 4).mean() > 0.5

    def test_bigger_than_adult_per_sf(self):
        assert len(amazon_tensor(sf=0.001)) > len(adult_tensor(sf=0.001))


class TestAssignClusters:
    def test_cluster_sizes(self):
        pdf = adult_tensor(sf=0.001)
        out = assign_clusters(pdf, cluster_size=50, sort_dim="age", seed=0)
        sizes = out.groupby("cluster_id").size()
        assert (sizes <= 50).all()
        assert (sizes.iloc[:-1] == 50).all()  # only the tail may be short

    def test_preserves_rows(self):
        pdf = adult_tensor(sf=0.001)
        out = assign_clusters(pdf, cluster_size=64, sort_dim="age", seed=0)
        assert len(out) == len(pdf)
        assert out["measure"].sum() == pdf["measure"].sum()

    def test_value_locality(self):
        """Sorted-with-jitter assignment must yield skewed per-cluster age
        ranges (the property PPS sampling exploits)."""
        pdf = adult_tensor(sf=0.002)
        out = assign_clusters(pdf, cluster_size=100, sort_dim="age", seed=0)
        spans = out.groupby("cluster_id")["age"].agg(lambda s: s.max() - s.min())
        full_span = pdf["age"].max() - pdf["age"].min()
        assert spans.median() < 0.7 * full_span

    def test_deterministic(self):
        pdf = adult_tensor(sf=0.001)
        a = assign_clusters(pdf, cluster_size=32, sort_dim="age", seed=5)
        b = assign_clusters(pdf, cluster_size=32, sort_dim="age", seed=5)
        pd.testing.assert_frame_equal(a, b)

    def test_cluster_ids_contiguous(self):
        pdf = adult_tensor(sf=0.001)
        out = assign_clusters(pdf, cluster_size=100, sort_dim="hours", seed=1)
        ids = sorted(out["cluster_id"].unique())
        assert ids == list(range(len(ids)))


class TestPartitionProviders:
    @pytest.mark.parametrize("n", [2, 3, 4, 8])
    def test_partition_sizes(self, n):
        pdf = adult_tensor(sf=0.001)
        parts = partition_providers(pdf, n_providers=n)
        assert sum(len(p) for p in parts) == len(pdf)
        sizes = [len(p) for p in parts]
        assert max(sizes) - min(sizes) <= 1

    def test_partitions_disjoint_and_complete(self):
        pdf = adult_tensor(sf=0.001)
        parts = partition_providers(pdf, n_providers=4)
        total = pd.concat(parts)
        assert total["measure"].sum() == pdf["measure"].sum()
        assert len(total) == len(pdf)

    def test_contiguous_with_sort_dim_skews_providers(self):
        """Providers must hold different value ranges for allocation skew."""
        pdf = adult_tensor(sf=0.002)
        parts = partition_providers(pdf, n_providers=4, sort_dim="age", seed=0)
        means = [p["age"].mean() for p in parts]
        assert means == sorted(means)
        assert means[-1] - means[0] > 5

    def test_random_mode_homogeneous(self):
        pdf = adult_tensor(sf=0.002)
        parts = partition_providers(pdf, n_providers=4, mode="random", seed=0)
        means = [p["age"].mean() for p in parts]
        assert max(means) - min(means) < 3

    def test_unknown_mode_rejected(self):
        with pytest.raises(ValueError, match="unknown partition mode"):
            partition_providers(adult_tensor(sf=0.001), n_providers=2, mode="bogus")

    def test_deterministic(self):
        pdf = adult_tensor(sf=0.001)
        a = partition_providers(pdf, n_providers=4, sort_dim="age", seed=2)
        b = partition_providers(pdf, n_providers=4, sort_dim="age", seed=2)
        for x, y in zip(a, b):
            pd.testing.assert_frame_equal(x, y)
