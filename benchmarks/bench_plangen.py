"""Micro-benchmarks of the control-plane hot path: plan generation 𝒜
(instrumented, as the adaptation loop runs it) and decision functions 𝒟.
These are the costs behind the "computational overhead" columns of
Tables 2-5."""
import numpy as np
import pytest

from repro.core.greedy import greedy_plan_instrumented
from repro.core.invariants import InvariantDecision, ThresholdDecision
from repro.core.pattern import Pattern, chain_predicates
from repro.core.stats import Statistics
from repro.core.zstream import zstream_plan_instrumented

N = 8
TYPES = tuple(f"T{i}" for i in range(N))
PAT = Pattern("SEQ", TYPES, chain_predicates(TYPES, "v", "<"), 10.0)
RNG = np.random.default_rng(0)
STATS = Statistics(
    {t: float(r) for t, r in zip(TYPES, RNG.uniform(1, 100, N))},
    {(a, b): float(s) for (a, b), s in zip(zip(TYPES, TYPES[1:]), RNG.uniform(0.05, 0.9, N - 1))},
)
PERTURBED = Statistics(
    {t: r * 1.1 for t, r in STATS.rates.items()}, STATS.selectivities
)


def test_greedy_instrumented_n8(benchmark):
    plan, dcs = benchmark(greedy_plan_instrumented, PAT, STATS)
    assert plan.size == N and len(dcs) == N


def test_zstream_instrumented_n8(benchmark):
    plan, dcs = benchmark(zstream_plan_instrumented, PAT, STATS)
    assert plan.size == N


def test_invariant_decision_n8(benchmark):
    dec = InvariantDecision(k=3, d=0.1)
    dec.on_plan_deployed(STATS, greedy_plan_instrumented(PAT, STATS)[1])
    benchmark(dec.should_reoptimize, PERTURBED)


def test_threshold_decision_n8(benchmark):
    dec = ThresholdDecision(10.0)
    dec.on_plan_deployed(STATS, None)
    benchmark(dec.should_reoptimize, PERTURBED)
