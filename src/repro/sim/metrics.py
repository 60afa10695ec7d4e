"""Time accounting for the experiment sweeps (S12, DESIGN.md §2).

The big sweeps charge each batch its *expected* evaluation time:
``base + partial_matches(plan, true batch statistics) * sec_per_match``,
where the per-partial-match cost is **calibrated against the real Spark
executor** (:func:`calibrate`): we profile an order plan on an actual
generated batch, divide wall-clock by the observed partial-match count,
and use that rate. 𝒟/𝒜 costs are measured wall-clock of the real
implementations, and a plan replacement charges ``deploy_batches`` extra
old-plan evaluations (the §2.2 parallel-execution handover window).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import SparkSession

from ..core.executor import profile_order_plan
from ..core.greedy import greedy_plan
from ..core.stats import per_batch_statistics
from ..datasets.traffic import ATTRS as TRAFFIC_ATTRS
from ..datasets.traffic import traffic_events, traffic_pattern


@dataclass(frozen=True)
class CostModel:
    """Per-batch evaluation time account.

    ``sec_per_match`` — seconds per partial match created;
    ``batch_base_seconds`` — fixed per-batch cost (ingestion, scheduling);
    ``deploy_batches`` — extra old-plan batch evaluations charged per
    plan replacement (handover protocol, §2.2).
    """

    sec_per_match: float = 2.0e-5
    batch_base_seconds: float = 2.0e-4
    deploy_batches: float = 1.0

    def eval_seconds(self, partial_matches: float) -> float:
        return self.batch_base_seconds + partial_matches * self.sec_per_match


#: Deterministic default used by tests/benchmarks (one observed
#: calibration of the Spark executor on this container, rounded).
DEFAULT_COST_MODEL = CostModel()


def calibrate(spark: SparkSession, n_batches: int = 2, scale: float = 1.0) -> CostModel:
    """Measure ``sec_per_match`` of the real Spark executor.

    Profiles a deliberately *bad* order plan (the reverse of the greedy
    order) over real traffic batches so the partial-match count is large
    enough to dominate fixed per-action scheduling overhead; that
    overhead is measured separately with per-step trivial ``count()``
    actions and subtracted before dividing wall time by the partial
    matches produced.
    """
    pattern = traffic_pattern(5)
    events = traffic_events(
        spark, n_types=5, n_batches=n_batches, scale=scale, change_points=()
    ).cache()
    events.count()
    history = per_batch_statistics(events, pattern)
    total_secs, total_matches, n_actions = 0.0, 0, 0
    for bid, stats in history:
        plan = greedy_plan(pattern, stats.for_pattern(pattern))
        bad = type(plan)(tuple(reversed(plan.order)))
        batch = events.filter(events.batch == bid)
        t0 = time.perf_counter()
        prof = profile_order_plan(batch, pattern, bad, TRAFFIC_ATTRS)
        total_secs += time.perf_counter() - t0
        total_matches += prof.total_partial_matches
        n_actions += len(prof.partial_match_counts)
    # fixed per-action overhead of the harness on this machine
    t0 = time.perf_counter()
    for _ in range(n_actions):
        events.limit(1).count()
    overhead = time.perf_counter() - t0
    events.unpersist()
    sec_per_match = max(
        (total_secs - overhead) / max(1, total_matches), 1e-7
    )
    return CostModel(
        sec_per_match=sec_per_match,
        batch_base_seconds=DEFAULT_COST_MODEL.batch_base_seconds,
        deploy_batches=DEFAULT_COST_MODEL.deploy_batches,
    )
