"""Shared plumbing for the table jobs (spark-submit entrypoints).

Each job regenerates one table of EXPERIMENTS.md:

    spark-submit jobs/table2_traffic_greedy.py [--sizes 3,4,5,6,7,8]

Jobs build their own SparkSession via ``getOrCreate`` (under
spark-submit the session is provided; standalone, a local one is
created), extract the cached per-batch statistics history with one
Spark pass, run the experiment harness, and print the table rows.
"""
from __future__ import annotations

import argparse
import os
import sys

# Allow running without an installed package (offline container).
sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

from pyspark.sql import SparkSession  # noqa: E402

from repro.core.adaptive import ALGORITHMS  # noqa: E402
from repro.sim.data import algorithm_k, load_dataset  # noqa: E402
from repro.sim.runner import compare_methods, distance_sweep, format_table  # noqa: E402


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def parse_sizes(default: str = "3,4,5,6,7,8") -> tuple[int, ...]:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sizes", default=default, help="comma-separated pattern sizes")
    args = ap.parse_args()
    return tuple(int(s) for s in args.sizes.split(","))


def run_methods_table(dataset: str, algorithm_name: str) -> None:
    """Tables 2-5: method comparison for one dataset-algorithm pair."""
    sizes = parse_sizes()
    spark = get_spark(f"repro-{dataset}-{algorithm_name}")
    spark.sparkContext.setLogLevel("ERROR")
    bundle = load_dataset(spark, dataset)
    algo = ALGORITHMS[algorithm_name]
    df = compare_methods(
        bundle.pattern_for_size,
        algo,
        bundle.history,
        pattern_sizes=sizes,
        k=algorithm_k(algorithm_name),
    )
    print(f"# {dataset} x {algorithm_name}: adaptation method comparison")
    print(f"# stream: {bundle.n_events} events, {len(bundle.history)} batches")
    print(format_table(df))
    spark.stop()


def run_distance_table(pairs: list[tuple[str, str]]) -> None:
    """Table 1: invariant-distance sweep over all dataset-algorithm pairs."""
    sizes = parse_sizes()
    spark = get_spark("repro-distance-sweep")
    spark.sparkContext.setLogLevel("ERROR")
    for dataset, algorithm_name in pairs:
        bundle = load_dataset(spark, dataset)
        algo = ALGORITHMS[algorithm_name]
        df = distance_sweep(
            bundle.pattern_for_size,
            algo,
            bundle.history,
            pattern_sizes=sizes,
            k=algorithm_k(algorithm_name),
        )
        print(f"# {dataset} x {algorithm_name}: invariant throughput by distance d")
        print(format_table(df))
        print()
    spark.stop()
