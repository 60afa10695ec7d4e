"""Pattern model (S1): SASE-style pattern specifications.

A :class:`Pattern` is an operator (``SEQ`` or ``AND``) over a tuple of
distinct event types, a set of inter-event :class:`Predicate` s, and a
time window. Predicates are restricted to attribute comparisons between
two events (``a.attr OP b.attr``), which covers both evaluation
workloads of the paper (traffic: ``cars`` increasing and ``speed``
decreasing along the sequence; stocks: ``diff`` increasing) while
giving every predicate three faithful renderings:

* a pandas/numpy mask (used for driver-side selectivity estimation and
  the simulation harness),
* a Spark ``Column`` (used by the match-evaluation executor), and
* a SQL fragment (used by the DuckDB correctness oracle).
"""
from __future__ import annotations

import operator
from dataclasses import dataclass
from typing import Callable, Iterable

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F

_OPS: dict[str, Callable] = {
    "<": operator.lt,
    "<=": operator.le,
    ">": operator.gt,
    ">=": operator.ge,
}


@dataclass(frozen=True)
class Predicate:
    """Inter-event predicate ``left_type.left_attr OP right_type.right_attr``."""

    left_type: str
    left_attr: str
    op: str
    right_type: str
    right_attr: str

    def __post_init__(self) -> None:
        if self.op not in _OPS:
            raise ValueError(f"unsupported predicate operator {self.op!r}")
        if self.left_type == self.right_type:
            raise ValueError("predicates must relate two distinct event types")

    @property
    def pair(self) -> tuple[str, str]:
        """Canonical (sorted) unordered type pair this predicate relates."""
        return tuple(sorted((self.left_type, self.right_type)))  # type: ignore[return-value]

    def numpy_mask(self, left_values: np.ndarray, right_values: np.ndarray) -> np.ndarray:
        """Vectorised evaluation over aligned arrays of attribute values."""
        return _OPS[self.op](left_values, right_values)

    def spark_condition(self, prefix: Callable[[str, str], str]) -> Column:
        """Spark condition; ``prefix(event_type, attr)`` names the column of
        ``attr`` for the event bound to ``event_type`` in the joined frame."""
        return _OPS[self.op](
            F.col(prefix(self.left_type, self.left_attr)),
            F.col(prefix(self.right_type, self.right_attr)),
        )

    def sql(self, alias: Callable[[str], str]) -> str:
        """SQL fragment; ``alias(event_type)`` is the table alias bound to it."""
        return (
            f"{alias(self.left_type)}.{self.left_attr} {self.op} "
            f"{alias(self.right_type)}.{self.right_attr}"
        )


@dataclass(frozen=True)
class Pattern:
    """A CEP pattern: operator, event types, predicates and time window.

    ``event_types`` are distinct; for ``SEQ`` their tuple order is the
    required temporal order of the match. ``window`` is in the same time
    unit as the event ``ts`` column.
    """

    operator: str
    event_types: tuple[str, ...]
    predicates: tuple[Predicate, ...]
    window: float

    def __post_init__(self) -> None:
        if self.operator not in ("SEQ", "AND"):
            raise ValueError(f"unsupported operator {self.operator!r}")
        if len(set(self.event_types)) != len(self.event_types):
            raise ValueError("event types must be distinct")
        if self.window <= 0:
            raise ValueError("window must be positive")
        for p in self.predicates:
            for t in (p.left_type, p.right_type):
                if t not in self.event_types:
                    raise ValueError(f"predicate references unknown type {t!r}")

    @property
    def size(self) -> int:
        return len(self.event_types)

    def position(self, event_type: str) -> int:
        """Index of ``event_type`` in the pattern's declaration order."""
        return self.event_types.index(event_type)

    def predicates_between(self, a: str, b: str) -> tuple[Predicate, ...]:
        """All predicates relating the unordered type pair ``{a, b}``."""
        key = tuple(sorted((a, b)))
        return tuple(p for p in self.predicates if p.pair == key)

    def predicate_pairs(self) -> tuple[tuple[str, str], ...]:
        """Distinct canonical type pairs that carry at least one predicate."""
        seen: dict[tuple[str, str], None] = {}
        for p in self.predicates:
            seen.setdefault(p.pair, None)
        return tuple(seen)

    def subpattern(self, n: int) -> "Pattern":
        """Prefix pattern over the first ``n`` event types (used to grow the
        experiment's pattern length 3..8 over one shared stream)."""
        types = self.event_types[:n]
        kept = tuple(
            p for p in self.predicates if p.left_type in types and p.right_type in types
        )
        return Pattern(self.operator, types, kept, self.window)


def chain_predicates(
    event_types: Iterable[str], attr: str, op: str
) -> tuple[Predicate, ...]:
    """Predicates ``t_i.attr OP t_{i+1}.attr`` between consecutive types —
    the shape used by both the traffic and the stocks workloads."""
    types = list(event_types)
    return tuple(
        Predicate(a, attr, op, b, attr) for a, b in zip(types, types[1:])
    )
