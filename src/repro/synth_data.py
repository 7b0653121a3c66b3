"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# Paper-specific generators: count tensors for the EDBT'25 private-AQP
# reproduction (Laouir & Imine). A *count tensor* is a table whose rows are
# distinct-ish combinations of discrete ordered dimension values plus a
# ``measure`` column counting the aggregated individuals (Fig. 2 of the
# paper). All dimensions are integer-coded ordinal values in [0, dom).
# ---------------------------------------------------------------------------

#: Dimension -> domain size for the Adult-lite tensor. Two candidate
#: sensitive attributes for the Table-1 attack, both with domain 100:
#: ``fnlwgt`` (uniform, independent of the QI dims — the paper's regime,
#: where even a non-private attack is near random) and ``capgain``
#: (correlated with ``education``, giving a non-private attack real signal
#: to find — the supplementary "ceiling" experiment).
ADULT_DIMS: dict[str, int] = {
    "age": 74,
    "education": 16,
    "hours": 99,
    "capgain": 100,
    "fnlwgt": 100,
    "occupation": 15,
    "workclass": 9,
    "relationship": 6,
    "sex": 2,
}

#: Dimension -> domain size for the Amazon-Review-lite tensor: three skewed
#: "real" dimensions plus three uniform synthetic ones (the paper likewise
#: adds three randomly-populated dimensions).
AMAZON_DIMS: dict[str, int] = {
    "rating": 5,
    "helpful": 50,
    "month": 120,
    "r1": 20,
    "r2": 30,
    "r3": 10,
}

_N_ADULT_PER_SF = 4_000_000  # tensor rows at SF=1; SF=0.1 ~= paper's 4M individuals
_N_AMAZON_PER_SF = 16_000_000  # tensor rows at SF=1 (~100 MB at SF=0.1) — the "big" dataset


def adult_tensor(*, sf: float = 0.01, seed: int = 7) -> pd.DataFrame:
    """Adult-lite count tensor with skewed, partially correlated marginals."""
    n = max(10, int(_N_ADULT_PER_SF * sf))
    g = _rng(seed)
    education = np.minimum(g.geometric(0.18, n) - 1, 15)
    # SA dim: correlated with education (signal for the NBC attack sanity
    # check) plus wide noise so the correlation is moderate, not trivial.
    capgain = np.clip(
        education * 6 + g.normal(0, 18, n).astype(int) + 5, 0, 99
    ).astype(int)
    pdf = pd.DataFrame(
        {
            "age": np.clip(g.normal(36, 14, n), 0, 73).astype(int),
            "education": education.astype(int),
            "hours": np.clip(g.normal(40, 12, n), 0, 98).astype(int),
            "capgain": capgain,
            "fnlwgt": g.integers(0, 100, n),
            "occupation": np.minimum(g.geometric(0.25, n) - 1, 14).astype(int),
            "workclass": np.minimum(g.geometric(0.45, n) - 1, 8).astype(int),
            "relationship": g.integers(0, 6, n),
            "sex": g.integers(0, 2, n),
            "measure": 1 + g.poisson(9, n),
        }
    )
    return pdf


def amazon_tensor(*, sf: float = 0.01, seed: int = 11) -> pd.DataFrame:
    """Amazon-Review-lite count tensor (3 skewed + 3 uniform dimensions)."""
    n = max(10, int(_N_AMAZON_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "rating": g.choice(5, n, p=[0.06, 0.05, 0.09, 0.20, 0.60]),
            "helpful": np.minimum(g.geometric(0.12, n) - 1, 49).astype(int),
            "month": np.clip(
                119 - (g.exponential(30, n)).astype(int), 0, 119
            ),
            "r1": g.integers(0, 20, n),
            "r2": g.integers(0, 30, n),
            "r3": g.integers(0, 10, n),
            "measure": 1 + g.poisson(3, n),
        }
    )
    return pdf


def assign_clusters(
    pdf: pd.DataFrame,
    *,
    cluster_size: int,
    sort_dim: str,
    jitter: float = 0.15,
    seed: int = 0,
) -> pd.DataFrame:
    """Assign rows to fixed-size clusters with value locality.

    Real storage pages correlate with insertion order, which correlates
    with attribute values (e.g. time). We sort by ``sort_dim`` plus
    Gaussian jitter (fraction of the domain span) and chunk into clusters
    of ``cluster_size`` rows, yielding the skewed per-cluster proportions
    that make distribution-aware (PPS) sampling beat uniform sampling.
    """
    g = _rng(seed)
    span = max(1.0, float(pdf[sort_dim].max() - pdf[sort_dim].min()))
    key = pdf[sort_dim].to_numpy() + g.normal(0, jitter * span, len(pdf))
    order = np.argsort(key, kind="stable")
    out = pdf.iloc[order].reset_index(drop=True).copy()
    out["cluster_id"] = (np.arange(len(out)) // cluster_size).astype("int64")
    return out


def partition_providers(
    pdf: pd.DataFrame,
    *,
    n_providers: int,
    mode: str = "contiguous",
    seed: int = 0,
    sort_dim: str | None = None,
    jitter: float = 0.5,
) -> list[pd.DataFrame]:
    """Horizontally partition a tensor into equal-size provider tables.

    ``contiguous`` with a ``sort_dim`` orders rows by that dimension plus
    Gaussian jitter before chunking, so providers hold overlapping but
    distinct slices of the value space — the cross-provider skew the
    allocation phase (Eq 6) is designed to exploit. ``random`` shuffles
    rows first (providers become statistically identical).
    """
    if mode not in ("contiguous", "random"):
        raise ValueError(f"unknown partition mode: {mode}")
    if mode == "random":
        pdf = pdf.sample(frac=1.0, random_state=seed).reset_index(drop=True)
    elif sort_dim is not None:
        g = _rng(seed)
        span = max(1.0, float(pdf[sort_dim].max() - pdf[sort_dim].min()))
        key = pdf[sort_dim].to_numpy() + g.normal(0, jitter * span, len(pdf))
        pdf = pdf.iloc[np.argsort(key, kind="stable")].reset_index(drop=True)
    bounds = np.linspace(0, len(pdf), n_providers + 1).astype(int)
    return [
        pdf.iloc[bounds[i] : bounds[i + 1]].reset_index(drop=True)
        for i in range(n_providers)
    ]
