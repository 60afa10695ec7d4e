"""Micro-batch slicing (S9).

A stream is an event DataFrame with a ``ts`` column; one micro-batch
spans one pattern time window (tumbling), so the detection-adaptation
loop ticks once per window — the natural Structured Streaming
granularity (DESIGN.md §4.5). Matches are detected within a batch, which
keeps every compared method and plan on identical semantics.
"""
from __future__ import annotations

from typing import Iterator

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def with_batch_id(events: DataFrame, window: float, ts_col: str = "ts") -> DataFrame:
    """Assign tumbling-window batch ids: ``batch = floor(ts / window)``.
    If the frame already carries a ``batch`` column it is kept as-is
    (the synthetic generators emit it directly)."""
    if "batch" in events.columns:
        return events
    return events.withColumn(
        "batch", F.floor(F.col(ts_col) / F.lit(window)).cast("long")
    )


def batch_ids(events: DataFrame) -> list[int]:
    """Sorted distinct batch ids present in the stream."""
    rows = events.select("batch").distinct().collect()
    return sorted(int(r["batch"]) for r in rows)


def iter_batches(events: DataFrame) -> Iterator[tuple[int, DataFrame]]:
    """Yield ``(batch_id, batch DataFrame)`` in stream order. The parent
    frame is evaluated once per batch via a filter; callers processing
    many batches should cache ``events`` first."""
    for bid in batch_ids(events):
        yield bid, events.filter(F.col("batch") == bid)
