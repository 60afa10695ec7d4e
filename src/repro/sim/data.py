"""Shared data preparation for jobs and benchmarks (S12).

One Spark pass per dataset turns the generated event stream into the
per-batch statistics history the experiment harness replays. The result
is cached on disk (pickle next to a parquet copy of the events) keyed by
the generation parameters, so the five table jobs and the benchmark
suite do not regenerate statistics for every run.
"""
from __future__ import annotations

import os
import pickle
from dataclasses import dataclass

from pyspark.sql import SparkSession

from ..core.stats import Statistics, per_batch_statistics
from ..datasets.stocks import stocks_events, stocks_pattern, stocks_stats_pattern
from ..datasets.traffic import traffic_events, traffic_pattern, traffic_stats_pattern

DEFAULT_CACHE_DIR = os.environ.get("REPRO_DATA_DIR", "/tmp/repro-data")

#: experiment defaults (frozen; see DESIGN.md §3 and EXPERIMENTS.md)
TRAFFIC_BATCHES = 120
STOCKS_BATCHES = 240
SAMPLE_PER_TYPE = 64


@dataclass(frozen=True)
class DatasetBundle:
    """Everything an experiment needs about one dataset."""

    name: str
    pattern_for_size: object  # Callable[[int], Pattern]
    history: list[Statistics]
    n_events: int


def _build(spark: SparkSession, name: str) -> DatasetBundle:
    if name == "traffic":
        events = traffic_events(spark, n_types=8, n_batches=TRAFFIC_BATCHES).cache()
        stats_pattern, pattern_for_size = traffic_stats_pattern(), traffic_pattern
    elif name == "stocks":
        events = stocks_events(spark, n_types=8, n_batches=STOCKS_BATCHES).cache()
        stats_pattern, pattern_for_size = stocks_stats_pattern(), stocks_pattern
    else:
        raise ValueError(f"unknown dataset {name!r}")
    n_events = events.count()
    history = [
        s
        for _, s in per_batch_statistics(
            events, stats_pattern, sample_per_type=SAMPLE_PER_TYPE
        )
    ]
    events.unpersist()
    return DatasetBundle(name, pattern_for_size, history, n_events)


def load_dataset(
    spark: SparkSession, name: str, cache_dir: str = DEFAULT_CACHE_DIR
) -> DatasetBundle:
    """Build (or load from cache) the statistics history of a dataset.

    Only the history (a list of small dicts) is cached; the pattern
    factory is re-bound on load so cached files stay code-version
    independent."""
    os.makedirs(cache_dir, exist_ok=True)
    path = os.path.join(cache_dir, f"{name}-history.pkl")
    factory = traffic_pattern if name == "traffic" else stocks_pattern
    if os.path.exists(path):
        with open(path, "rb") as f:
            payload = pickle.load(f)
        return DatasetBundle(name, factory, payload["history"], payload["n_events"])
    bundle = _build(spark, name)
    with open(path, "wb") as f:
        pickle.dump({"history": bundle.history, "n_events": bundle.n_events}, f)
    return bundle


def algorithm_k(algorithm_name: str) -> int:
    """K used by the invariant method per algorithm in the experiments:
    1 for the greedy algorithm (its DCSs are small and well-ordered),
    3 for ZStream (the paper recommends the K-invariant method for the
    DP algorithm, §4.2)."""
    return 1 if algorithm_name == "greedy" else 3
