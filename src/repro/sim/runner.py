"""Experiment runners (S12): one function per table of EXPERIMENTS.md.

``run_experiment`` replays a per-batch statistics history (extracted
from real generated data by Spark, ``repro.core.stats``) through the
full detection-adaptation loop with a chosen decision policy, and
accounts time with the calibrated :class:`~repro.sim.metrics.CostModel`.
On top of it:

* :func:`distance_sweep` — Table 1 (paper Fig. 5): invariant-method
  throughput vs pattern length and distance ``d``;
* :func:`compare_methods` — Tables 2-5 (paper Figs. 6-9): throughput,
  gain over the static plan, replacement counts and computational
  overhead for {static, unconditional, threshold(t_opt), invariant(d_opt)},
  with t_opt/d_opt found by grid search exactly as the paper tunes them.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import pandas as pd

from ..core.adaptive import AdaptiveEngine, PlanAlgorithm
from ..core.invariants import (
    DecisionFunction,
    InvariantDecision,
    StaticDecision,
    ThresholdDecision,
    UnconditionalDecision,
)
from ..core.pattern import Pattern
from ..core.stats import Statistics
from .metrics import DEFAULT_COST_MODEL, CostModel

#: grids used to find t_opt / d_opt, mirroring the paper's tuning runs.
#: The t grid spans sub-1 values (selectivity scale) through the rate
#: scale, so the threshold method gets its best possible single t.
DEFAULT_T_GRID = (0.05, 0.1, 0.2, 0.5, 1.0, 2.0, 5.0, 10.0, 20.0, 40.0, 80.0)
DEFAULT_D_GRID = (0.0, 0.05, 0.1, 0.2, 0.3, 0.5, 1.0)


@dataclass(frozen=True)
class RunResult:
    """Accounted outcome of one detection-adaptation run."""

    method: str
    pattern_size: int
    events: float
    eval_seconds: float
    decision_seconds: float
    generation_seconds: float
    deploy_seconds: float
    replacements: int
    decision_fires: int

    @property
    def total_seconds(self) -> float:
        return (
            self.eval_seconds
            + self.decision_seconds
            + self.generation_seconds
            + self.deploy_seconds
        )

    @property
    def throughput(self) -> float:
        """Events per accounted second — the paper's headline metric."""
        return self.events / self.total_seconds

    @property
    def overhead_pct(self) -> float:
        """Share of time spent in 𝒟 and 𝒜 (paper Figs. 6(d)-9(d))."""
        return 100.0 * (self.decision_seconds + self.generation_seconds) / self.total_seconds


def make_decision(
    method: str,
    t: float = 10.0,
    d: float = 0.0,
    k: int | None = 1,
    threshold_mode: str = "absolute",
) -> DecisionFunction:
    """Factory for the four compared policies."""
    if method == "static":
        return StaticDecision()
    if method == "unconditional":
        return UnconditionalDecision()
    if method == "threshold":
        return ThresholdDecision(t, threshold_mode)
    if method == "invariant":
        return InvariantDecision(k=k, d=d)
    raise ValueError(f"unknown adaptation method {method!r}")


def run_experiment(
    pattern: Pattern,
    algorithm: PlanAlgorithm,
    decision: DecisionFunction,
    history: list[Statistics],
    cost_model: CostModel = DEFAULT_COST_MODEL,
    estimator_window: int = 3,
    method_name: str = "?",
) -> RunResult:
    """Replay ``history`` (per-batch true statistics) through Algorithm 1.

    ``history[0]`` initialises the first plan (warm-up, not counted as a
    processed batch). Each subsequent batch is evaluated with the plan
    deployed *before* it, then its statistics tick the loop — decisions
    affect the next batch, and a replacement charges the handover cost on
    the following batch.
    """
    if len(history) < 2:
        raise ValueError("need at least an init snapshot and one batch")
    restricted = [s.for_pattern(pattern) for s in history]
    engine = AdaptiveEngine(
        pattern, algorithm, decision, restricted[0], estimator_window
    )
    events = eval_s = d_s = g_s = deploy_s = 0.0
    handover_plan = None
    for snap in restricted[1:]:
        events += sum(snap.rates.values())
        eval_s += cost_model.eval_seconds(
            algorithm.cost(engine.plan, pattern, snap)
        )
        if handover_plan is not None:
            deploy_s += (
                cost_model.deploy_batches
                * cost_model.sec_per_match
                * algorithm.cost(handover_plan, pattern, snap)
            )
            handover_plan = None
        rep = engine.observe_batch(snap)
        d_s += rep.decision_seconds
        g_s += rep.generation_seconds
        if rep.replaced:
            handover_plan = rep.previous_plan
    return RunResult(
        method=method_name,
        pattern_size=pattern.size,
        events=events,
        eval_seconds=eval_s,
        decision_seconds=d_s,
        generation_seconds=g_s,
        deploy_seconds=deploy_s,
        replacements=engine.replacements,
        decision_fires=engine.decision_fires,
    )


def distance_sweep(
    pattern_for_size: Callable[[int], Pattern],
    algorithm: PlanAlgorithm,
    history: list[Statistics],
    pattern_sizes: tuple[int, ...] = (3, 4, 5, 6, 7, 8),
    d_values: tuple[float, ...] = DEFAULT_D_GRID,
    k: int | None = 1,
    cost_model: CostModel = DEFAULT_COST_MODEL,
) -> pd.DataFrame:
    """Table 1 rows: throughput of the invariant method per (n, d)."""
    rows = []
    for n in pattern_sizes:
        pat = pattern_for_size(n)
        for d in d_values:
            res = run_experiment(
                pat,
                algorithm,
                make_decision("invariant", d=d, k=k),
                history,
                cost_model,
                method_name=f"invariant(d={d})",
            )
            rows.append(
                {
                    "pattern_size": n,
                    "d": d,
                    "throughput": res.throughput,
                    "replacements": res.replacements,
                    "overhead_pct": res.overhead_pct,
                }
            )
    return pd.DataFrame(rows)


def find_opt_parameter(
    pattern: Pattern,
    algorithm: PlanAlgorithm,
    history: list[Statistics],
    method: str,
    grid: tuple[float, ...],
    k: int | None = 1,
    cost_model: CostModel = DEFAULT_COST_MODEL,
) -> float:
    """Grid-search t_opt (threshold) or d_opt (invariant) by throughput,
    the paper's empirical tuning procedure (§5.2)."""
    best_v, best_tp = grid[0], -1.0
    for v in grid:
        decision = (
            make_decision("threshold", t=v)
            if method == "threshold"
            else make_decision("invariant", d=v, k=k)
        )
        tp = run_experiment(
            pattern, algorithm, decision, history, cost_model
        ).throughput
        if tp > best_tp:
            best_v, best_tp = v, tp
    return best_v


def compare_methods(
    pattern_for_size: Callable[[int], Pattern],
    algorithm: PlanAlgorithm,
    history: list[Statistics],
    pattern_sizes: tuple[int, ...] = (3, 4, 5, 6, 7, 8),
    t_grid: tuple[float, ...] = DEFAULT_T_GRID,
    d_grid: tuple[float, ...] = DEFAULT_D_GRID,
    k: int | None = 1,
    cost_model: CostModel = DEFAULT_COST_MODEL,
) -> pd.DataFrame:
    """Tables 2-5 rows: the four adaptation methods per pattern size."""
    rows = []
    for n in pattern_sizes:
        pat = pattern_for_size(n)
        t_opt = find_opt_parameter(pat, algorithm, history, "threshold", t_grid, k, cost_model)
        d_opt = find_opt_parameter(pat, algorithm, history, "invariant", d_grid, k, cost_model)
        runs = {
            "static": make_decision("static"),
            "unconditional": make_decision("unconditional"),
            "threshold": make_decision("threshold", t=t_opt),
            "invariant": make_decision("invariant", d=d_opt, k=k),
        }
        results = {
            m: run_experiment(pat, algorithm, dec, history, cost_model, method_name=m)
            for m, dec in runs.items()
        }
        static_tp = results["static"].throughput
        for m, res in results.items():
            rows.append(
                {
                    "pattern_size": n,
                    "method": m,
                    "param": {"threshold": t_opt, "invariant": d_opt}.get(m, float("nan")),
                    "throughput": res.throughput,
                    "gain_vs_static": res.throughput / static_tp,
                    "replacements": res.replacements,
                    "overhead_pct": res.overhead_pct,
                }
            )
    return pd.DataFrame(rows)


def format_table(df: pd.DataFrame, floatfmt: str = "{:.3g}") -> str:
    """Plain-text rendering used by the jobs and EXPERIMENTS.md."""
    show = df.copy()
    for c in show.columns:
        if show[c].dtype.kind == "f":
            show[c] = show[c].map(lambda v: floatfmt.format(v))
    return show.to_string(index=False)
