"""Table 5 (paper Fig. 9): adaptation methods on the stocks dataset
with the ZStream tree-based algorithm."""
from _common import run_methods_table

if __name__ == "__main__":
    run_methods_table("stocks", "zstream")
