"""Detection-adaptation loop (S7) — Algorithm 1 of the paper.

:class:`AdaptiveEngine` is the control plane shared by the simulation
harness and the Structured Streaming operator: per micro-batch it updates
the sliding-window statistics estimate, consults the decision function
𝒟, re-runs the plan generation algorithm 𝒜 when 𝒟 fires, and deploys
the new plan when it is better than the current one under the current
estimates. Timings of 𝒟 and 𝒜 are measured (they feed the paper's
"computational overhead" metric), and a deployment records the handover
protocol of §2.2 (old and new plan run in parallel for one window).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Callable, Sequence

from .greedy import greedy_plan_instrumented
from .invariants import Condition, DecisionFunction
from .pattern import Pattern
from .plans import Plan, order_plan_cost, tree_plan_cost
from .stats import SlidingWindowEstimator, Statistics
from .zstream import zstream_plan_instrumented

Instrumented = Callable[[Pattern, Statistics], tuple[Plan, list[list[Condition]]]]


@dataclass(frozen=True)
class PlanAlgorithm:
    """A plan generation algorithm 𝒜 with its cost model (used both for
    the "is the new plan better" check of Algorithm 1 and for the
    evaluation-cost accounting of the experiment harness)."""

    name: str
    build_instrumented: Instrumented
    cost: Callable[[Plan, Pattern, Statistics], float]


GREEDY = PlanAlgorithm("greedy", greedy_plan_instrumented, order_plan_cost)
ZSTREAM = PlanAlgorithm("zstream", zstream_plan_instrumented, tree_plan_cost)

ALGORITHMS: dict[str, PlanAlgorithm] = {a.name: a for a in (GREEDY, ZSTREAM)}


@dataclass(frozen=True)
class BatchReport:
    """What happened in one iteration of the detection-adaptation loop."""

    batch: int
    plan: Plan
    previous_plan: Plan
    estimate: Statistics
    decision_fired: bool
    replaced: bool
    decision_seconds: float
    generation_seconds: float


class AdaptiveEngine:
    """Algorithm 1 driven one micro-batch at a time."""

    def __init__(
        self,
        pattern: Pattern,
        algorithm: PlanAlgorithm,
        decision: DecisionFunction,
        initial_stats: Statistics,
        estimator_window: int = 3,
    ):
        self.pattern = pattern
        self.algorithm = algorithm
        self.decision = decision
        self.estimator = SlidingWindowEstimator(estimator_window)
        self.estimator.update(initial_stats)
        plan, dcs = algorithm.build_instrumented(pattern, initial_stats)
        decision.on_plan_deployed(initial_stats, dcs)
        self.plan: Plan = plan
        self.replacements = 0
        self.decision_fires = 0
        self._batch = 0

    def observe_batch(self, snapshot: Statistics) -> BatchReport:
        """One loop iteration: absorb the batch's statistics snapshot and
        adapt if 𝒟 fires and 𝒜 finds a better plan."""
        self._batch += 1
        previous = self.plan
        est = self.estimator.update(snapshot)

        t0 = time.perf_counter()
        fired = self.decision.should_reoptimize(est)
        d_secs = time.perf_counter() - t0

        g_secs = 0.0
        replaced = False
        if fired:
            self.decision_fires += 1
            t1 = time.perf_counter()
            new_plan, dcs = self.algorithm.build_instrumented(self.pattern, est)
            new_cost = self.algorithm.cost(new_plan, self.pattern, est)
            cur_cost = self.algorithm.cost(self.plan, self.pattern, est)
            g_secs = time.perf_counter() - t1
            if new_plan != self.plan and new_cost < cur_cost:
                self.plan = new_plan
                self.decision.on_plan_deployed(est, dcs)
                self.replacements += 1
                replaced = True
            elif self.decision.needs_instrumentation:
                # 𝒜 returned the same plan (possible only through the
                # frozen-constant approximation of tree invariants, §4.2):
                # refresh the invariants so the frozen values track the
                # current statistics and the spurious firing stops.
                self.decision.on_plan_deployed(est, dcs)
        return BatchReport(
            batch=self._batch,
            plan=self.plan,
            previous_plan=previous,
            estimate=est,
            decision_fired=fired,
            replaced=replaced,
            decision_seconds=d_secs,
            generation_seconds=g_secs,
        )
