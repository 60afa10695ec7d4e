"""Adaptive CEP as a Structured Streaming operator (S9).

This is the repro target named in the calibration hint: "adaptive CEP
plan-switching as a Structured Streaming operator with monitored
statistics triggering re-optimization of the match evaluation plan".

The operator is a ``foreachBatch`` sink over a file-source stream: each
trigger (one micro-batch = one pattern window)

1. evaluates the *currently deployed* plan as a Catalyst join pipeline
   over the batch (``repro.core.executor``) and appends the matches,
2. extracts the batch's monitored statistics with Spark aggregations
   (``repro.core.stats.single_batch_statistics``),
3. runs one tick of the detection-adaptation loop
   (``repro.core.adaptive.AdaptiveEngine``): the decision function 𝒟 is
   consulted and, when it fires, the plan generation algorithm 𝒜
   re-optimizes the evaluation plan used from the next trigger on.
"""
from __future__ import annotations

import tempfile
from dataclasses import dataclass, field
from typing import Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.adaptive import AdaptiveEngine, BatchReport, PlanAlgorithm
from ..core.executor import evaluate_plan
from ..core.invariants import DecisionFunction
from ..core.pattern import Pattern
from ..core.plans import Plan
from ..core.stats import Statistics, single_batch_statistics


@dataclass
class StreamingRunReport:
    """Outcome of one adaptive streaming run."""

    matches: pd.DataFrame
    triggers: int = 0
    replacements: int = 0
    decision_fires: int = 0
    plans: list[Plan] = field(default_factory=list)
    batch_reports: list[BatchReport] = field(default_factory=list)


def run_adaptive_stream(
    spark: SparkSession,
    input_path: str,
    schema_ddl: str,
    pattern: Pattern,
    algorithm: PlanAlgorithm,
    decision: DecisionFunction,
    attrs: Sequence[str],
    initial_stats: Statistics | None = None,
    estimator_window: int = 3,
    sample_per_type: int = 64,
) -> StreamingRunReport:
    """Run the adaptive operator over all parquet files in ``input_path``
    (one file per micro-batch, processed one per trigger, availableNow).

    ``initial_stats`` seeds the first plan; when omitted, the first
    trigger is used for bootstrapping only (statistics are gathered and
    the initial plan is built from them; matches of that batch are still
    produced, with the freshly built plan).
    """
    state: dict = {"engine": None}
    report = StreamingRunReport(matches=pd.DataFrame())
    collected: list[pd.DataFrame] = []

    if initial_stats is not None:
        state["engine"] = AdaptiveEngine(
            pattern, algorithm, decision, initial_stats, estimator_window
        )

    def handle_batch(batch_df: DataFrame, batch_id: int) -> None:
        if batch_df.isEmpty():
            return
        snap = single_batch_statistics(batch_df, pattern, sample_per_type)
        engine: AdaptiveEngine | None = state["engine"]
        if engine is None:
            engine = AdaptiveEngine(
                pattern, algorithm, decision, snap, estimator_window
            )
            state["engine"] = engine
        # Detect with the currently deployed plan, then tick Algorithm 1.
        matches = evaluate_plan(batch_df, pattern, engine.plan, attrs).toPandas()
        if len(matches):
            collected.append(matches)
        report.plans.append(engine.plan)
        report.batch_reports.append(engine.observe_batch(snap))
        report.triggers += 1

    stream = (
        spark.readStream.schema(schema_ddl)
        .option("maxFilesPerTrigger", 1)
        .parquet(input_path)
    )
    with tempfile.TemporaryDirectory(prefix="repro-ckpt-") as ckpt:
        query = (
            stream.writeStream.foreachBatch(handle_batch)
            .option("checkpointLocation", ckpt)
            .trigger(availableNow=True)
            .start()
        )
        query.awaitTermination()

    engine = state["engine"]
    if engine is not None:
        report.replacements = engine.replacements
        report.decision_fires = engine.decision_fires
    if collected:
        report.matches = pd.concat(collected, ignore_index=True)
    return report
