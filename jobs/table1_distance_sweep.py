"""Table 1 (paper Fig. 5): throughput of the invariant-based method as a
function of pattern length and invariant distance d, for all four
dataset-algorithm combinations."""
from _common import run_distance_table

if __name__ == "__main__":
    run_distance_table(
        [
            ("traffic", "greedy"),
            ("traffic", "zstream"),
            ("stocks", "greedy"),
            ("stocks", "zstream"),
        ]
    )
