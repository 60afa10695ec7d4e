"""Invariants and reoptimizing decision functions 𝒟 (S6).

Implements the four decision policies compared in the paper's evaluation:

* :class:`StaticDecision` — never reoptimize (the "static plan" baseline);
* :class:`UnconditionalDecision` — always reoptimize (lazy-NFA [33]);
* :class:`ThresholdDecision` — the ZStream [38] policy: fire when any
  monitored value deviates from its value at the last plan deployment by
  more than a constant threshold ``t``. Deviation is *absolute*, matching
  the paper's running example (rates 100/15/10 and thresholds around 6);
  a relative mode is provided for completeness.
* :class:`InvariantDecision` — the paper's contribution (§3): verify, in
  building-block order, the K tightest deciding conditions per block with
  minimal distance ``d``; fire on the first violation.

A *condition* here is any object exposing ``lhs(stats)``, ``rhs(stats)``,
``margin(stats)`` and ``holds(stats, d)`` — satisfied by
:class:`~repro.core.greedy.GreedyCondition` and
:class:`~repro.core.zstream.TreeCondition`.
"""
from __future__ import annotations

from typing import Protocol, Sequence

from .stats import Statistics


class Condition(Protocol):
    """Deciding condition ``f(stat1) < g(stat2)`` (paper §3.1)."""

    def lhs(self, stats: Statistics) -> float: ...

    def rhs(self, stats: Statistics) -> float: ...

    def margin(self, stats: Statistics) -> float: ...

    def holds(self, stats: Statistics, d: float = 0.0) -> bool: ...


def select_invariants(
    dcs_list: Sequence[Sequence[Condition]], stats: Statistics, k: int = 1
) -> list[Condition]:
    """K-invariant selection (§3.3): from each building block's DCS keep
    the ``k`` *tightest* conditions (smallest ``margin`` under the
    statistics seen at plan creation), preserving block order — the order
    in which 𝒟 verifies them. ``k=None``/``k>=|DCS|`` keeps all
    conditions (the Theorem 2 regime)."""
    out: list[Condition] = []
    for dcs in dcs_list:
        ranked = sorted(dcs, key=lambda c: c.margin(stats))
        out.extend(ranked if k is None else ranked[:k])
    return out


class DecisionFunction:
    """Base 𝒟: maps current statistic estimates to a reoptimize verdict.

    ``on_plan_deployed`` is called by the adaptation loop whenever a plan
    (re)deployment happens, with the statistics it was built from and the
    instrumentation (DCS list) of the generating algorithm run.
    """

    #: whether this policy needs the instrumented 𝒜 run (DCS recording)
    needs_instrumentation: bool = False

    def should_reoptimize(self, stats: Statistics) -> bool:
        raise NotImplementedError

    def on_plan_deployed(
        self, stats: Statistics, dcs_list: Sequence[Sequence[Condition]] | None
    ) -> None:
        """Default: stateless."""


class StaticDecision(DecisionFunction):
    """Never adapt — the non-adaptive baseline of the evaluation."""

    def should_reoptimize(self, stats: Statistics) -> bool:
        return False


class UnconditionalDecision(DecisionFunction):
    """Always re-run 𝒜 — the policy of the tree-based lazy NFA [33]."""

    def should_reoptimize(self, stats: Statistics) -> bool:
        return True


class ThresholdDecision(DecisionFunction):
    """Constant-threshold policy of ZStream [38]: fire when any monitored
    value deviates by more than ``t`` from its value at the last plan
    deployment."""

    def __init__(self, t: float, mode: str = "absolute"):
        if mode not in ("absolute", "relative"):
            raise ValueError(f"unknown deviation mode {mode!r}")
        self.t = float(t)
        self.mode = mode
        self._baseline: dict[str, float] | None = None

    def on_plan_deployed(self, stats, dcs_list=None) -> None:
        self._baseline = stats.flat()

    def should_reoptimize(self, stats: Statistics) -> bool:
        if self._baseline is None:
            raise RuntimeError("no plan deployed yet")
        current = stats.flat()
        for name, base in self._baseline.items():
            val = current.get(name, base)
            dev = abs(val - base)
            if self.mode == "relative":
                dev = dev / abs(base) if base != 0 else (float("inf") if dev else 0.0)
            if dev > self.t:
                return True
        return False


class InvariantDecision(DecisionFunction):
    """The paper's invariant-based 𝒟 with the K-invariant (§3.3) and
    minimal-distance (§3.4) extensions. ``k=1, d=0`` is the basic method."""

    needs_instrumentation = True

    def __init__(self, k: int | None = 1, d: float = 0.0):
        if d < 0:
            raise ValueError("distance d must be non-negative")
        self.k = k
        self.d = float(d)
        self._invariants: list[Condition] | None = None

    @property
    def invariants(self) -> list[Condition]:
        if self._invariants is None:
            raise RuntimeError("no plan deployed yet")
        return self._invariants

    def on_plan_deployed(self, stats, dcs_list) -> None:
        if dcs_list is None:
            raise ValueError("InvariantDecision requires the instrumented 𝒜 output")
        self._invariants = select_invariants(dcs_list, stats, self.k)

    def should_reoptimize(self, stats: Statistics) -> bool:
        """Verify invariants in building-block order; fire on the first
        violation (the later invariants implicitly assume the earlier
        ones hold, §3.2)."""
        for inv in self.invariants:
            if not inv.holds(stats, self.d):
                return True
        return False
