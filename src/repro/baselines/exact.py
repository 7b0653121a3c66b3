"""Plain-text (non-secure, non-approximate) federated execution baseline.

This is the paper's speed-up denominator: every provider scans its full
partition and the aggregator sums exact local answers, with no DP and no
sampling. Timed end-to-end for the Fig 5/7 speed-up metric
``speedup = time(normal computation) / time(estimate computation)``.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from repro.core.query import RangeQuery
from repro.federation.aggregator import Aggregator


@dataclass
class ExactAnswer:
    value: float
    seconds: float


def exact_federated(aggregator: Aggregator, query: RangeQuery) -> ExactAnswer:
    """Exact federated answer with wall-clock timing."""
    t0 = time.perf_counter()
    value = aggregator.exact(query)
    return ExactAnswer(value=value, seconds=time.perf_counter() - t0)
