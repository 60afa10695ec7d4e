"""Table 3 (paper Fig. 7): adaptation methods on the traffic dataset
with the ZStream tree-based algorithm."""
from _common import run_methods_table

if __name__ == "__main__":
    run_methods_table("traffic", "zstream")
