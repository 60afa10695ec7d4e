"""Synthetic Aarhus-style traffic sensor stream (S10).

The paper describes its traffic dataset as "highly skewed and stable,
with few on-the-fly changes; however, the changes that did occur were
mostly very extreme". This generator reproduces that profile:

* 8 observation-point event types ``T0..T7`` with Zipf-skewed arrival
  rates (factor ~1.8 between neighbours, >60x end to end);
* multiplicative log-normal per-batch noise;
* a small number of *regime shifts*, alternating between
  - **major**: the rate vector is reversed across observation points
    (every rate moves by a large absolute amount) and the selectivity
    landscape moves with it,
  - **selectivity**: only the "pruning pair" — the single chain pair
    with ~0.01 selectivity that every good plan joins first — relocates.
    The optimal plan changes drastically, yet rates do not move and
    selectivity deviations are bounded by 1, so no absolute threshold
    that ignores routine rate noise (necessarily t >= 1) can see it —
    the paper's "no single threshold" dilemma (§1, rates 100/15/10);
* attributes per event: ``cars`` (vehicle count) and ``speed``, whose
  per-type means encode the selectivity landscape (see
  :func:`traffic_profile`) and shift with the regime.

Patterns (:func:`traffic_pattern`) mirror the paper's: sequences of
observations with the vehicle count increasing and the average speed
decreasing along the sequence.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.pattern import Pattern, chain_predicates

ATTRS = ("cars", "speed")


@dataclass(frozen=True)
class TrafficProfile:
    """Ground-truth generation parameters, exposed for tests and docs."""

    types: tuple[str, ...]
    window: float
    n_batches: int
    expected_rates: np.ndarray  # (n_batches, n_types), pre-noise
    cars_mean: np.ndarray  # (n_batches, n_types)
    speed_base: np.ndarray  # (n_batches, n_types)
    change_points: tuple[int, ...]


def traffic_profile(
    n_types: int = 8,
    n_batches: int = 120,
    window: float = 10.0,
    scale: float = 1.0,
    change_points: tuple[int, ...] | None = None,
    transition: int = 10,
) -> TrafficProfile:
    """Deterministic regime schedule: Zipf-skewed base rates, with major
    (rate + attribute reversal) and selectivity-only shifts alternating
    at the change points."""
    types = tuple(f"T{i}" for i in range(n_types))
    if change_points is None:  # few changes: major, selectivity, major
        change_points = (n_batches // 4, n_batches // 2, (3 * n_batches) // 4)
    # Skewed rates (~8x end to end), assigned to chain positions in a
    # scrambled order. If the rates were monotone along the chain, the
    # greedy order would be a pure function of the rates (chain-adjacent
    # = rate-adjacent) and the selectivity landscape could never change
    # the plan; scrambling makes rate order and predicate structure
    # interact, as in real sensor deployments where a point's traffic
    # volume is unrelated to its position in a monitored route.
    base_rates = 100.0 * scale * (0.75 ** np.arange(n_types))
    _scramble8 = [2, 6, 0, 4, 7, 3, 5, 1]
    scramble = np.array(
        [v for v in _scramble8 if v < n_types]
        + [v for v in range(8, n_types)]
    )
    # Attribute regimes: vehicle-count means rise gently along the chain
    # (adjacent-pair selectivity ~0.3) except for one sharp drop after
    # the "pruning position" p, making that single chain pair highly
    # selective (~0.01). The position of the pruning pair is the
    # selectivity-skew axis of this workload: the optimal plan wants the
    # pruning pair joined first, so moving p forces a very different
    # plan while every monitored selectivity moves by less than 1 —
    # invisible to any absolute threshold that also has to ignore
    # arrival-rate noise (necessarily t >= 1 here).
    def attr_means(p: int) -> tuple[np.ndarray, np.ndarray]:
        idx = np.arange(n_types, dtype=float)
        cars_mu = 30.0 + 2.0 * idx - 22.0 * (idx > p)
        speed_mu = 60.0 - 1.5 * idx
        return cars_mu, speed_mu

    base_cars, base_speed = attr_means(1)

    # Two kinds of extreme shifts, alternating at the change points:
    # * major (even index): the arrival-rate vector is reversed across
    #   observation points AND the pruning position moves — every rate
    #   changes by a large absolute amount (visible to thresholds).
    # * selectivity (odd index): only the pruning position moves. The
    #   optimal plan changes drastically (the ~0.01-selectivity pair
    #   relocates), but every monitored deviation is < 1: rates do not
    #   move at all and selectivities are bounded by 1. An absolute
    #   threshold must choose t >= 1 to ignore routine arrival-rate
    #   noise, so it cannot see this shift — the paper's "no single
    #   threshold" dilemma (§1, rates 100/15/10, t ≷ 6) across the two
    #   statistic scales.
    rate_perm = scramble.copy()
    rates = np.tile(base_rates[rate_perm], (n_batches, 1))
    cars = np.tile(base_cars, (n_batches, 1))
    speed = np.tile(base_speed, (n_batches, 1))
    prune_cycle = (1, 5, 2, 6, 0, 4)  # deterministic pruning positions
    prune_at = 0
    for idx, cp in enumerate(sorted(change_points)):
        prev_rates = rates[cp - 1].copy()
        prev_cars = cars[cp - 1].copy()
        prev_speed = speed[cp - 1].copy()
        prune_at = (prune_at + 1) % len(prune_cycle)
        if idx % 2 == 0:  # major shift: reverse rates, move pruning pair
            rate_perm = rate_perm[::-1]
        new_cars, new_speed = attr_means(prune_cycle[prune_at])
        rates[cp:] = base_rates[rate_perm]
        cars[cp:] = new_cars
        speed[cp:] = new_speed
        # Extreme but not instantaneous: the new regime phases in linearly
        # over `transition` batches (a road does not empty in one window).
        # An instantaneous step would make every adaptive policy pay the
        # same single unavoidable transition batch, erasing the decision-
        # quality differences the experiment is designed to measure.
        for b in range(cp, min(cp + transition, n_batches)):
            w = (b - cp + 1) / transition
            rates[b] = (1 - w) * prev_rates + w * rates[b]
            cars[b] = (1 - w) * prev_cars + w * cars[b]
            speed[b] = (1 - w) * prev_speed + w * speed[b]
    return TrafficProfile(
        types, window, n_batches, rates, cars, speed, tuple(sorted(change_points))
    )


def traffic_events(
    spark: SparkSession,
    n_types: int = 8,
    n_batches: int = 120,
    window: float = 10.0,
    scale: float = 1.0,
    noise_sigma: float = 0.25,
    seed: int = 7,
    change_points: tuple[int, ...] | None = None,
    transition: int = 10,
) -> DataFrame:
    """Generate the stream as a Spark DataFrame with columns
    ``ts, type, cars, speed, batch`` (batch ``b`` spans
    ``[b*window, (b+1)*window)``)."""
    prof = traffic_profile(n_types, n_batches, window, scale, change_points, transition)
    g = np.random.default_rng(seed)
    rows_ts, rows_type, rows_cars, rows_speed, rows_batch = [], [], [], [], []
    for b in range(n_batches):
        for i, t in enumerate(prof.types):
            lam = prof.expected_rates[b, i] * g.lognormal(0.0, noise_sigma)
            n = int(g.poisson(lam))
            if n == 0:
                continue
            ts = b * window + np.sort(g.random(n)) * window
            cars = np.clip(g.normal(prof.cars_mean[b, i], 7.0, n), 0.0, None)
            speed = np.clip(
                g.normal(prof.speed_base[b, i], 7.0, n), 1.0, None
            )
            rows_ts.append(ts)
            rows_type.append(np.full(n, t, dtype=object))
            rows_cars.append(cars)
            rows_speed.append(speed)
            rows_batch.append(np.full(n, b, dtype=np.int64))
    pdf = pd.DataFrame(
        {
            "ts": np.concatenate(rows_ts),
            "type": np.concatenate(rows_type),
            "cars": np.concatenate(rows_cars).round(2),
            "speed": np.concatenate(rows_speed).round(2),
            "batch": np.concatenate(rows_batch),
        }
    ).sort_values("ts", kind="stable", ignore_index=True)
    return spark.createDataFrame(pdf)


#: Observation points per pattern size, chosen (nearly) symmetric under
#: the major regime shift's rate reversal (i <-> 7-i), so the pattern's
#: total event mass — and with it the intrinsic detection cost every
#: method must pay — stays comparable across regimes. Without this, the
#: throughput of a size-n prefix pattern would be dominated by whichever
#: regime happens to assign it the high-rate types, drowning the
#: adaptation effects the experiment measures.
PATTERN_TYPE_SETS: dict[int, tuple[int, ...]] = {
    3: (0, 3, 7),
    4: (0, 3, 4, 7),
    5: (0, 2, 3, 5, 7),
    6: (0, 1, 3, 4, 6, 7),
    7: (0, 1, 2, 3, 5, 6, 7),
    8: (0, 1, 2, 3, 4, 5, 6, 7),
}


def traffic_pattern(n: int = 8, window: float = 10.0) -> Pattern:
    """SEQ over ``n`` observation points (reversal-symmetric selection,
    see :data:`PATTERN_TYPE_SETS`) with the paper's driving-model
    predicates: vehicle count increasing and average speed decreasing
    along the sequence."""
    types = tuple(f"T{i}" for i in PATTERN_TYPE_SETS[n])
    preds = chain_predicates(types, "cars", "<") + chain_predicates(
        types, "speed", ">"
    )
    return Pattern("SEQ", types, preds, window)


def traffic_stats_pattern(window: float = 10.0) -> Pattern:
    """Superpattern for statistics extraction: all 8 types and the union
    of the chain predicates of every pattern size, so one Spark pass over
    the stream yields the selectivity history every experiment needs."""
    types = tuple(f"T{i}" for i in range(8))
    seen: dict[tuple[str, ...], None] = {}
    preds = []
    for n in sorted(PATTERN_TYPE_SETS):
        for p in traffic_pattern(n, window).predicates:
            key = (p.left_type, p.left_attr, p.op, p.right_type, p.right_attr)
            if key not in seen:
                seen[key] = None
                preds.append(p)
    return Pattern("SEQ", types, tuple(preds), window)
