"""Reproduction of Kolchinsky & Schuster, "Efficient Adaptive Detection
of Complex Event Patterns" (VLDB 2018): an adaptive CEP stack on PySpark
with invariant-based reoptimization decisions. See DESIGN.md."""

__all__ = ["core", "datasets", "sim", "streaming"]
