"""Synthetic substitutes for the paper's two real-world datasets (S10,
S11): an Aarhus-style vehicle-traffic stream (highly skewed, stable,
rare extreme regime shifts) and a NASDAQ-style stocks stream (near
uniform, frequent minor drift). See DESIGN.md §4 for the substitution
argument."""
from .stocks import stocks_events, stocks_pattern, stocks_profile, stocks_stats_pattern
from .traffic import (
    traffic_events,
    traffic_pattern,
    traffic_profile,
    traffic_stats_pattern,
)

__all__ = [
    "stocks_events",
    "stocks_pattern",
    "stocks_profile",
    "stocks_stats_pattern",
    "traffic_events",
    "traffic_pattern",
    "traffic_profile",
    "traffic_stats_pattern",
]
