"""Row-level (Bernoulli) sampling baseline (§2/§4).

Uniform row sampling with the Horvitz–Thompson scale-up ``Q(sample)/sr``.
As the paper notes (citing [20]), Bernoulli sampling still requires a full
table scan, so it trades accuracy for *no* I/O saving — the timing contrast
with cluster sampling is part of the motivation.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from repro.core.query import RangeQuery
from repro.federation.aggregator import Aggregator
from repro.federation.evaluation import SparkEvaluator


@dataclass
class RowSampleAnswer:
    value: float
    seconds: float


def bernoulli_estimate(
    aggregator: Aggregator, query: RangeQuery, *, sampling_rate: float, seed: int = 0
) -> RowSampleAnswer:
    """Federated Bernoulli-sampled estimate (Spark ``DataFrame.sample``)."""
    if not (0.0 < sampling_rate < 1.0):
        raise ValueError("sampling rate must be in (0, 1)")
    t0 = time.perf_counter()
    total = 0.0
    for p in aggregator.providers:
        ev = p.evaluator
        if not isinstance(ev, SparkEvaluator):
            raise TypeError("bernoulli_estimate requires Spark-backed providers")
        frame = ev._frame(None).sample(fraction=sampling_rate, seed=seed)
        total += query.evaluate(frame) / sampling_rate
    return RowSampleAnswer(value=float(total), seconds=time.perf_counter() - t0)
