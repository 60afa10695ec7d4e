"""Benchmark for Table 2 (paper Fig. 6): traffic x greedy method
comparison."""
from benchmarks._tables import run_table


def test_table2_traffic_greedy(benchmark, traffic_bundle):
    run_table(benchmark, traffic_bundle, "greedy")
