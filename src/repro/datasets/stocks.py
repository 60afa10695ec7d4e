"""Synthetic NASDAQ-style stocks stream (S11).

The paper describes its stocks dataset as having "low skew in data
statistics ..., with the initial values nearly identical for all event
types. The changes were highly frequent, but mostly minor." This
generator reproduces that profile:

* 8 stock-identifier event types ``S0..S7`` with near-identical initial
  arrival rates;
* per-batch multiplicative random-walk drift of every rate (small
  steps, every batch) — frequent, minor changes that keep the rates
  near-uniform while continually swapping the order of near-equal types;
* one attribute ``diff`` (price change since the previous update) drawn
  from a per-type normal whose mean random-walks a little faster, so the
  ordering-predicate selectivities drift continuously — with uniform
  rates, the selectivities are what the evaluation order is actually
  optimised on, and their drift is what a well-tuned adaptation policy
  must track.

Patterns (:func:`stocks_pattern`) mirror the paper's: sequences of
distinct stock identifiers whose price differences are increasing
(``A.diff < B.diff < ...``).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.pattern import Pattern, chain_predicates

ATTRS = ("diff",)


@dataclass(frozen=True)
class StocksProfile:
    """Ground-truth generation parameters, exposed for tests and docs."""

    types: tuple[str, ...]
    window: float
    n_batches: int
    expected_rates: np.ndarray  # (n_batches, n_types)
    diff_mean: np.ndarray  # (n_batches, n_types)


def stocks_profile(
    n_types: int = 8,
    n_batches: int = 240,
    window: float = 10.0,
    scale: float = 1.0,
    rate_walk_sigma: float = 0.02,
    mean_walk_sigma: float = 0.1,
    seed: int = 11,
) -> StocksProfile:
    """Random-walk rate and attribute-mean trajectories (deterministic in
    ``seed``; the walk itself is part of the data-generating process, so
    it lives here and not in the event sampling noise)."""
    g = np.random.default_rng(seed)
    types = tuple(f"S{i}" for i in range(n_types))
    base = 12.0 * scale
    # Near-identical initial rates: within ±3% of each other.
    rates = np.empty((n_batches, n_types))
    rates[0] = base * (1.0 + g.uniform(-0.03, 0.03, n_types))
    for b in range(1, n_batches):
        rates[b] = np.clip(
            rates[b - 1] * np.exp(g.normal(0.0, rate_walk_sigma, n_types)),
            base * 0.25,
            base * 4.0,
        )
    means = np.empty((n_batches, n_types))
    means[0] = g.uniform(-0.2, 0.2, n_types)
    for b in range(1, n_batches):
        means[b] = np.clip(
            means[b - 1] + g.normal(0.0, mean_walk_sigma, n_types), -2.0, 2.0
        )
    return StocksProfile(types, window, n_batches, rates, means)


def stocks_events(
    spark: SparkSession,
    n_types: int = 8,
    n_batches: int = 240,
    window: float = 10.0,
    scale: float = 1.0,
    seed: int = 11,
) -> DataFrame:
    """Generate the stream as a Spark DataFrame with columns
    ``ts, type, diff, batch``."""
    prof = stocks_profile(n_types, n_batches, window, scale, seed=seed)
    g = np.random.default_rng(seed + 1)
    rows_ts, rows_type, rows_diff, rows_batch = [], [], [], []
    for b in range(n_batches):
        for i, t in enumerate(prof.types):
            n = int(g.poisson(prof.expected_rates[b, i]))
            if n == 0:
                continue
            ts = b * window + np.sort(g.random(n)) * window
            diff = g.normal(prof.diff_mean[b, i], 1.0, n)
            rows_ts.append(ts)
            rows_type.append(np.full(n, t, dtype=object))
            rows_diff.append(diff)
            rows_batch.append(np.full(n, b, dtype=np.int64))
    pdf = pd.DataFrame(
        {
            "ts": np.concatenate(rows_ts),
            "type": np.concatenate(rows_type),
            "diff": np.concatenate(rows_diff).round(4),
            "batch": np.concatenate(rows_batch),
        }
    ).sort_values("ts", kind="stable", ignore_index=True)
    return spark.createDataFrame(pdf)


def stocks_pattern(n: int = 8, window: float = 10.0) -> Pattern:
    """SEQ over the first ``n`` stock identifiers with the paper's price
    ordering constraint ``S0.diff < S1.diff < ...``. Rates are near
    uniform, so prefix subsets keep the event mass comparable and no
    symmetric selection (as in the traffic dataset) is needed."""
    types = tuple(f"S{i}" for i in range(n))
    return Pattern("SEQ", types, chain_predicates(types, "diff", "<"), window)


def stocks_stats_pattern(window: float = 10.0) -> Pattern:
    """Superpattern for statistics extraction — the size-8 pattern's
    predicate pairs cover every smaller prefix pattern."""
    return stocks_pattern(8, window)
