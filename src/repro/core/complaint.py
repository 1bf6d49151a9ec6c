"""User complaints over aggregate view tuples (paper §3.1).

A complaint is a function ``f_comp : tuple → ℝ`` that Reptile minimises.
The formulation captures the common cases: the aggregate is *too high*
(minimise the value), *too low* (minimise the negated value), or *should be
v* (minimise ``|value − v|``).  The complained tuple is identified by a
predicate (attribute → value dict) over the current view.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, Optional

from .stats import SUPPORTED_AGGS, GroupStats

DIRECTIONS = ("too_high", "too_low", "target")


@dataclass(frozen=True)
class Complaint:
    """A complaint about one tuple of the current aggregation view.

    ``where``: equality predicate selecting the complained tuple t_c.
    ``agg``: which aggregate of t_c is wrong (count/mean/sum/std).
    ``direction``: 'too_high' | 'too_low' | 'target'.
    ``target``: required value when direction == 'target'.
    """

    where: Dict[str, object]
    agg: str
    direction: str
    target: Optional[float] = None

    def __post_init__(self) -> None:
        if self.agg not in SUPPORTED_AGGS:
            raise ValueError(f"agg must be one of {SUPPORTED_AGGS}, got {self.agg!r}")
        if self.direction not in DIRECTIONS:
            raise ValueError(
                f"direction must be one of {DIRECTIONS}, got {self.direction!r}"
            )
        if self.direction == "target" and self.target is None:
            raise ValueError("direction='target' requires a target value")

    def score(self, value: float) -> float:
        """f_comp(t): smaller is better (more resolved)."""
        if self.direction == "too_high":
            return value
        if self.direction == "too_low":
            return -value
        return abs(value - float(self.target))

    def score_stats(self, stats: GroupStats) -> float:
        """f_comp applied to the complained aggregate of combined statistics."""
        return self.score(stats.get(self.agg))

    @property
    def modeled_stats(self) -> tuple:
        """Which distributive statistics the repair model must predict.

        SUM decomposes into MEAN × COUNT (footnote 3); STD complaints are
        resolved by repairing child (count, mean) — the combiner then
        propagates the change into the parent's standard deviation.
        """
        if self.agg == "count":
            return ("count",)
        if self.agg == "mean":
            return ("mean",)
        return ("count", "mean")
