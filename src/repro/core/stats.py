"""Statistics monitor (S2): arrival rates and predicate selectivities.

The paper monitors, per event type, its arrival rate, and per predicate,
its selectivity, maintained over sliding windows with histogram sketches
[13, 26]. Substitution (DESIGN.md §4.3): Spark computes *exact* per-batch
statistics for the whole stream in one job — rates via ``groupBy`` counts
and selectivities via sampled type-pair self-joins — and a driver-side
:class:`SlidingWindowEstimator` provides the sliding-window smoothing/lag
semantics the sketches give a single-machine engine.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field
from typing import Mapping

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from .pattern import Pattern

PairKey = tuple[str, str]


def pair_key(a: str, b: str) -> PairKey:
    """Canonical unordered key for the selectivity of the type pair {a,b}."""
    return (a, b) if a <= b else (b, a)


@dataclass(frozen=True)
class Statistics:
    """One snapshot of the monitored statistics.

    ``rates`` maps event type -> expected arrivals per time window;
    ``selectivities`` maps a canonical type pair -> probability that a
    random event pair of those types satisfies all predicates between
    them (1.0 when no predicate is defined, per the paper).
    """

    rates: Mapping[str, float]
    selectivities: Mapping[PairKey, float] = field(default_factory=dict)

    def rate(self, event_type: str) -> float:
        return float(self.rates[event_type])

    def sel(self, a: str, b: str) -> float:
        """Selectivity of the pair {a,b}; ``sel(a,a)`` is the self-selectivity
        of single-type predicates (1.0 unless explicitly monitored)."""
        return float(self.selectivities.get(pair_key(a, b), 1.0))

    def flat(self) -> dict[str, float]:
        """Flat name -> value view, the form consumed by the
        constant-threshold decision function (it monitors 'all values')."""
        out = {f"rate:{t}": float(r) for t, r in self.rates.items()}
        for (a, b), s in self.selectivities.items():
            out[f"sel:{a}:{b}"] = float(s)
        return out

    def restricted(self, event_types: tuple[str, ...]) -> "Statistics":
        """Projection onto a subset of event types (for prefix subpatterns)."""
        keep = set(event_types)
        return Statistics(
            {t: r for t, r in self.rates.items() if t in keep},
            {k: s for k, s in self.selectivities.items() if k[0] in keep and k[1] in keep},
        )

    def for_pattern(self, pattern: Pattern) -> "Statistics":
        """Projection onto exactly what a pattern monitors: the rates of
        its event types and the selectivities of its predicate-carrying
        pairs. A statistics history may cover a superset of pairs (one
        extraction reused across pattern sizes); the cost model must only
        see the pairs the pattern actually constrains."""
        pairs = set(pattern.predicate_pairs()) | {(t, t) for t in pattern.event_types}
        return Statistics(
            {t: float(self.rates.get(t, 0.0)) for t in pattern.event_types},
            {k: s for k, s in self.selectivities.items() if k in pairs},
        )


class SlidingWindowEstimator:
    """Sliding-window mean over the last ``window`` per-batch snapshots.

    Models the estimation lag of the paper's sliding-window statistics
    maintenance: the engine reacts to the smoothed estimate, not to the
    instantaneous batch values.
    """

    def __init__(self, window: int = 3):
        if window < 1:
            raise ValueError("window must be >= 1")
        self.window = window
        self._hist: deque[Statistics] = deque(maxlen=window)

    def update(self, snapshot: Statistics) -> Statistics:
        """Absorb one per-batch snapshot; return the current estimate."""
        self._hist.append(snapshot)
        return self.current()

    def current(self) -> Statistics:
        if not self._hist:
            raise RuntimeError("estimator has seen no data")
        rates: dict[str, list[float]] = {}
        sels: dict[PairKey, list[float]] = {}
        for s in self._hist:
            for t, r in s.rates.items():
                rates.setdefault(t, []).append(float(r))
            for k, v in s.selectivities.items():
                sels.setdefault(k, []).append(float(v))
        return Statistics(
            {t: float(np.mean(v)) for t, v in rates.items()},
            {k: float(np.mean(v)) for k, v in sels.items()},
        )


def batch_rates(events: DataFrame, batch_col: str = "batch") -> DataFrame:
    """Per (batch, type) arrival counts — the rate per window since one
    micro-batch spans exactly one time window in our experiments."""
    return events.groupBy(batch_col, "type").agg(F.count("*").alias("rate"))


def batch_selectivities(
    events: DataFrame,
    pattern: Pattern,
    batch_col: str = "batch",
    sample_per_type: int = 64,
    seed: int = 0,
) -> DataFrame:
    """Per (batch, pair) predicate selectivities via sampled self-joins.

    For every type pair that carries predicates, sample up to
    ``sample_per_type`` events per (batch, type), pair them within each
    batch and return the satisfied fraction. One Spark plan per pair,
    unioned, so the whole stream's selectivity history is one action.
    Returns columns: batch, a, b (canonical pair), sel.
    """
    pairs = pattern.predicate_pairs()
    if not pairs:
        return events.sparkSession.createDataFrame(
            pd.DataFrame({"batch": [], "a": [], "b": [], "sel": []}),
            schema="batch long, a string, b string, sel double",
        )
    order = Window.partitionBy(batch_col, "type").orderBy(F.rand(seed))
    sampled = (
        events.withColumn("_rn", F.row_number().over(order))
        .filter(F.col("_rn") <= sample_per_type)
        .drop("_rn")
    )
    attr_cols = [c for c in events.columns if c not in (batch_col, "type", "ts")]
    per_pair = []
    for a, b in pairs:
        preds = pattern.predicates_between(a, b)
        left = sampled.filter(F.col("type") == a).select(
            F.col(batch_col).alias("batch"),
            *[F.col(c).alias(f"{a}__{c}") for c in attr_cols],
        )
        right = sampled.filter(F.col("type") == b).select(
            F.col(batch_col).alias("batch"),
            *[F.col(c).alias(f"{b}__{c}") for c in attr_cols],
        )
        joined = left.join(right, on="batch")
        cond = None
        for p in preds:
            c = p.spark_condition(lambda t, attr: f"{t}__{attr}")
            cond = c if cond is None else cond & c
        per_pair.append(
            joined.groupBy("batch")
            .agg(F.avg(F.when(cond, 1.0).otherwise(0.0)).alias("sel"))
            .select("batch", F.lit(a).alias("a"), F.lit(b).alias("b"), "sel")
        )
    out = per_pair[0]
    for df in per_pair[1:]:
        out = out.unionByName(df)
    return out


def single_batch_statistics(
    batch_df: DataFrame,
    pattern: Pattern,
    sample_per_type: int = 64,
    seed: int = 0,
) -> Statistics:
    """Statistics of one micro-batch (used by the Structured Streaming
    operator, which sees one batch per trigger). Types absent from the
    batch get rate 0; pairs with no co-occurring samples get
    selectivity 1.0."""
    tagged = batch_df.withColumn("__b", F.lit(0))
    rates_pdf = batch_rates(tagged, "__b").toPandas()
    rates = {t: 0.0 for t in pattern.event_types}
    for _, row in rates_pdf.iterrows():
        if row["type"] in rates:
            rates[row["type"]] = float(row["rate"])
    sels_pdf = batch_selectivities(tagged, pattern, "__b", sample_per_type, seed).toPandas()
    sels = {k: 1.0 for k in pattern.predicate_pairs()}
    for _, row in sels_pdf.iterrows():
        if not pd.isna(row["sel"]):
            sels[(row["a"], row["b"])] = float(row["sel"])
    return Statistics(rates, sels)


def per_batch_statistics(
    events: DataFrame,
    pattern: Pattern,
    batch_col: str = "batch",
    sample_per_type: int = 64,
    seed: int = 0,
) -> list[tuple[int, Statistics]]:
    """Collect the full per-batch statistics history of a batched event
    stream: ``[(batch_id, Statistics), ...]`` sorted by batch.

    Missing (batch, type) rates are 0; missing (batch, pair)
    selectivities are forward-filled from the previous batch (a pair with
    no co-occurring samples this batch keeps its last estimate), seeded
    with the pair's overall mean.
    """
    rates_pdf = batch_rates(events, batch_col).toPandas()
    sels_pdf = batch_selectivities(
        events, pattern, batch_col, sample_per_type, seed
    ).toPandas()

    batches = sorted(rates_pdf[batch_col].unique().tolist())
    types = list(pattern.event_types)
    rate_tab = (
        rates_pdf.pivot_table(index=batch_col, columns="type", values="rate", aggfunc="sum")
        .reindex(index=batches, columns=types)
        .fillna(0.0)
    )
    pairs = pattern.predicate_pairs()
    sel_tabs: dict[PairKey, pd.Series] = {}
    for a, b in pairs:
        s = (
            sels_pdf[(sels_pdf["a"] == a) & (sels_pdf["b"] == b)]
            .set_index("batch")["sel"]
            .reindex(batches)
        )
        fallback = s.mean() if s.notna().any() else 1.0
        sel_tabs[(a, b)] = s.ffill().fillna(fallback)

    out = []
    for bid in batches:
        out.append(
            (
                int(bid),
                Statistics(
                    {t: float(rate_tab.loc[bid, t]) for t in types},
                    {k: float(v.loc[bid]) for k, v in sel_tabs.items()},
                ),
            )
        )
    return out
