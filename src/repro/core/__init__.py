"""Core systems of the reproduction: pattern model, statistics, plan
generation algorithms (greedy order-based and ZStream DP tree-based),
the invariant-based reoptimizing decision functions, the
detection-adaptation loop, and the Spark match-evaluation executor."""
