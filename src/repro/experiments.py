"""Evaluation-section experiment drivers (§6), shared by jobs/ and benchmarks/.

Each function reproduces one paper artifact's numbers and returns printable
rows; the caller decides scale (SF), workload size m, and where to persist.
Metrics follow §6.1: Relative error = |answer − estimation| / answer and
Speed-up = time(normal computation) / time(estimate computation).
"""
from __future__ import annotations

import time
from statistics import mean

import numpy as np

from repro.attack.nbc import AttackSpec, per_query_eps, train_nbc
from repro.baselines.exact import exact_federated
from repro.core.query import COUNT, SUM, RangeQuery
from repro.federation.builder import Federation
from repro.smc.protocol import SMCEnvironment
from repro.workloads import qualifying_workload


def _cell(
    fed: Federation,
    queries: list[RangeQuery],
    *,
    sr: float,
    eps: float,
    delta: float,
    seed: int,
    use_smc: bool = False,
) -> dict:
    """Mean relative error + speed-up of the private protocol over a
    workload, against the exact plain-text execution."""
    rng = np.random.default_rng(seed)
    rel_errs, speedups, noises = [], [], []
    for q in queries:
        ex = exact_federated(fed.aggregator, q)
        ans = fed.aggregator.answer(
            q, sampling_rate=sr, eps=eps, delta=delta, rng=rng, use_smc=use_smc
        )
        rel_errs.append(abs(ans.value - ex.value) / max(abs(ex.value), 1.0))
        speedups.append(ex.seconds / max(ans.seconds, 1e-9))
        noises.append(ans.noise)
    return {
        "rel_err": mean(rel_errs),
        "speedup": mean(speedups),
        "noise_lo": min(noises),
        "noise_hi": max(noises),
    }


def dimension_sweep(
    fed: Federation,
    dims: dict[str, int],
    *,
    n_dims_list: list[int],
    m: int,
    sr: float,
    eps: float = 1.0,
    delta: float = 1e-3,
    seed: int = 0,
    min_width_frac: float = 0.3,
) -> list[dict]:
    """Fig 4 (+ Fig 7 dims axis): error/speed-up vs #query dimensions.

    ``min_width_frac`` keeps random ranges wide enough that high-dimension
    answers stay above the noise floor — the regime the paper's reported
    error bands imply (its 4M/924M-row tables with ≤ 17% error at n=7
    require range products far above #clusters-scale noise).
    """
    rows = []
    for n in n_dims_list:
        for agg in (COUNT, SUM):
            ws = qualifying_workload(
                dims, fed.providers, m=m, n_dims=n, agg=agg, seed=seed + n,
                min_width_frac=min_width_frac,
            )
            cell = _cell(fed, ws, sr=sr, eps=eps, delta=delta, seed=seed + n)
            rows.append({"n_dims": n, "agg": agg, **cell})
    return rows


def sampling_rate_sweep(
    fed: Federation,
    dims: dict[str, int],
    *,
    rates: list[float],
    m: int,
    n_dims: int = 4,
    eps: float = 1.0,
    delta: float = 1e-3,
    seed: int = 0,
    min_width_frac: float = 0.3,
) -> list[dict]:
    """Fig 5: error/speed-up vs sampling rate (fixed n=4 dims)."""
    rows = []
    for agg in (COUNT, SUM):
        ws = qualifying_workload(
            dims, fed.providers, m=m, n_dims=n_dims, agg=agg, seed=seed,
            min_width_frac=min_width_frac,
        )
        for sr in rates:
            cell = _cell(fed, ws, sr=sr, eps=eps, delta=delta, seed=seed + int(sr * 100))
            rows.append({"sr": sr, "agg": agg, **cell})
    return rows


def epsilon_sweep(
    fed: Federation,
    dims: dict[str, int],
    *,
    eps_list: list[float],
    m: int,
    sr: float,
    n_dims: int = 4,
    delta: float = 1e-3,
    seed: int = 0,
    min_width_frac: float = 0.3,
) -> list[dict]:
    """Fig 6 (+ Fig 7 ε axis): error/speed-up vs privacy budget ε."""
    rows = []
    for agg in (COUNT, SUM):
        ws = qualifying_workload(
            dims, fed.providers, m=m, n_dims=n_dims, agg=agg, seed=seed,
            min_width_frac=min_width_frac,
        )
        for eps in eps_list:
            cell = _cell(fed, ws, sr=sr, eps=eps, delta=delta, seed=seed + int(eps * 10))
            rows.append({"eps": eps, "agg": agg, **cell})
    return rows


def smc_comparison(
    fed: Federation,
    dims: dict[str, int],
    *,
    n_queries: int = 5,
    reps: int = 5,
    sr: float = 0.1,
    eps: float = 1.0,
    delta: float = 1e-3,
    seed: int = 0,
) -> list[dict]:
    """Fig 8: per-query Laplace noise range and speed-up, with/without SMC
    result sharing (two-dimensional COUNT queries, as in the paper)."""
    ws = qualifying_workload(dims, fed.providers, m=n_queries, n_dims=2, agg=COUNT, seed=seed)
    rows = []
    for qi, q in enumerate(ws):
        for mode in ("DP", "SMC"):
            rng = np.random.default_rng(seed + qi)
            noises, speedups = [], []
            for _ in range(reps):
                ex = exact_federated(fed.aggregator, q)
                ans = fed.aggregator.answer(
                    q,
                    sampling_rate=sr,
                    eps=eps,
                    delta=delta,
                    rng=rng,
                    use_smc=(mode == "SMC"),
                )
                noises.append(ans.noise)
                # SMC wire time is simulated; add it to the measured time
                speedups.append(ex.seconds / max(ans.seconds + ans.smc_seconds, 1e-9))
            rows.append(
                {
                    "query": qi + 1,
                    "mode": mode,
                    "noise_lo": min(noises),
                    "noise_hi": max(noises),
                    "noise_spread": max(noises) - min(noises),
                    "speedup": mean(speedups),
                }
            )
    return rows


def smc_cost_simulation(
    fed: Federation,
    dims: dict[str, int],
    *,
    n_queries: int = 5,
    seed: int = 0,
) -> list[dict]:
    """Fig 1: simulated SMC cost of sharing matching rows vs sharing only
    local results, per random range query."""
    ws = qualifying_workload(dims, fed.providers, m=n_queries, n_dims=2, agg=COUNT, seed=seed)
    n_cols = len(dims) + 1  # dims + measure
    rows = []
    for qi, q in enumerate(ws):
        matching_rows = int(sum(p.exact(q) for p in fed.providers))
        env = SMCEnvironment(n_parties=len(fed.providers), rng=np.random.default_rng(seed))
        t_rows = env.share_rows_cost(matching_rows, n_cols)
        t_results = env.share_results_cost()
        rows.append(
            {
                "query": qi + 1,
                "rows_shared": matching_rows,
                "smc_rows_s": t_rows,
                "smc_results_s": t_results,
                "ratio": t_rows / t_results,
            }
        )
    return rows


def attack_table(
    fed_pandas: Federation,
    spec: AttackSpec,
    *,
    xi_list: list[float],
    psi: float = 1e-6,
    sr: float = 0.1,
    modes: tuple[str, ...] = ("sequential", "advanced", "coalition"),
    aggs: tuple[str, ...] = (COUNT, SUM),
    seed: int = 0,
    include_no_privacy_ceiling: bool = True,
) -> list[dict]:
    """Table 1: NBC inference accuracy per composition mode / agg / ξ.

    Answers are issued through the full protocol (pandas-evaluator
    federation — numerically identical, feasible for ~10^4 queries/cell).
    Optionally appends the non-private ceiling row (exact answers) showing
    the attack does work without DP.
    """
    rows = []
    nq = spec.n_queries
    t0 = time.perf_counter()
    for mode in modes:
        for agg in aggs:
            accs = {}
            for xi in xi_list:
                eps, delta = per_query_eps(mode, xi, nq, psi)
                rng = np.random.default_rng(seed)

                def answer(q: RangeQuery) -> float:
                    return fed_pandas.aggregator.answer(
                        q, sampling_rate=sr, eps=eps, delta=delta, rng=rng
                    ).value

                nbc = train_nbc(spec, answer, agg=agg)
                accs[f"xi={xi:g}"] = nbc.accuracy(fed_pandas.tensor)
            rows.append({"mode": mode, "agg": agg, **accs})
    if include_no_privacy_ceiling:
        from repro.attack.nbc import exact_answer_fn

        nbc = train_nbc(spec, exact_answer_fn(fed_pandas.tensor), agg=COUNT)
        acc = nbc.accuracy(fed_pandas.tensor)
        rows.append(
            {"mode": "no-privacy (ceiling)", "agg": COUNT}
            | {f"xi={xi:g}": acc for xi in xi_list}
        )
    rows.append({"mode": f"(total {time.perf_counter() - t0:.0f}s)", "agg": ""})
    return rows
