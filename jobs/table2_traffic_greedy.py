"""Table 2 (paper Fig. 6): adaptation methods on the traffic dataset
with the greedy order-based algorithm — throughput, gain over static,
plan replacements, computational overhead."""
from _common import run_methods_table

if __name__ == "__main__":
    run_methods_table("traffic", "greedy")
