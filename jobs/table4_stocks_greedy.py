"""Table 4 (paper Fig. 8): adaptation methods on the stocks dataset
with the greedy order-based algorithm."""
from _common import run_methods_table

if __name__ == "__main__":
    run_methods_table("stocks", "greedy")
