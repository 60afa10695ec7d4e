"""Benchmark for Table 5 (paper Fig. 9): stocks x ZStream method
comparison."""
from benchmarks._tables import run_table


def test_table5_stocks_zstream(benchmark, stocks_bundle):
    run_table(benchmark, stocks_bundle, "zstream")
