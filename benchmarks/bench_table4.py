"""Benchmark for Table 4 (paper Fig. 8): stocks x greedy method
comparison."""
from benchmarks._tables import run_table


def test_table4_stocks_greedy(benchmark, stocks_bundle):
    run_table(benchmark, stocks_bundle, "greedy")
