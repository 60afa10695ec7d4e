"""Benchmark for Table 3 (paper Fig. 7): traffic x ZStream method
comparison."""
from benchmarks._tables import run_table


def test_table3_traffic_zstream(benchmark, traffic_bundle):
    run_table(benchmark, traffic_bundle, "zstream")
