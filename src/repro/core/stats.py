"""Distributive aggregate statistics and their combiners (paper §3.1, App. A).

A *distributive set* of aggregation functions ``F = {count, mean, std}`` admits
a combiner ``G`` such that the statistics of a relation can be recomputed from
the statistics of any partition of it.  Reptile relies on this to re-derive a
complained parent aggregate after a single child group's statistics are
*repaired* (replaced by model-predicted values) — without touching raw rows.

``GroupStats`` is the per-group triple (count, mean, std); ``combine`` is the
Appendix-A ``G`` for {G_count, G_mean, G_std} (SUM derives as count·mean).
``group_stats`` computes the per-group triples as a Spark ``groupBy``/``agg``
job so the partition statistics themselves are produced by the dataflow engine.
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Iterable, Sequence

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: Aggregates a complaint can reference. SUM/STD are expressions over the
#: distributive triple (paper footnotes 3-4).
SUPPORTED_AGGS = ("count", "mean", "sum", "std")


@dataclass(frozen=True)
class GroupStats:
    """Distributive statistics of one group: (count, mean, std).

    ``std`` is the sample standard deviation (ddof=1); it is 0.0 for groups
    with fewer than two rows, matching Spark's ``stddev_samp`` coalesced to 0.
    """

    count: float
    mean: float
    std: float = 0.0

    @property
    def sum(self) -> float:
        return self.count * self.mean

    def get(self, agg: str) -> float:
        """Return the value of a supported aggregate name."""
        if agg == "count":
            return self.count
        if agg == "mean":
            return self.mean
        if agg == "sum":
            return self.sum
        if agg == "std":
            return self.std
        raise ValueError(f"unsupported aggregate {agg!r}; one of {SUPPORTED_AGGS}")

    def replace(self, **kwargs: float) -> "GroupStats":
        """A copy with some statistics repaired to new values."""
        return GroupStats(
            count=kwargs.get("count", self.count),
            mean=kwargs.get("mean", self.mean),
            std=kwargs.get("std", self.std),
        )


def combine(parts: Iterable[GroupStats]) -> GroupStats:
    """Appendix-A combiner ``G`` over a partition's statistics.

    G_count = Σ n_j ;  G_mean = Σ n_j·m_j / Σ n_j ;
    G_std   = sqrt([Σ (n_j−1)·s_j² + Σ n_j·(G_mean − m_j)²] / (G_count − 1)).

    Groups with count 0 contribute nothing (a repair may zero a group out).
    """
    parts = [p for p in parts if p.count > 0]
    n = sum(p.count for p in parts)
    if n <= 0:
        return GroupStats(count=0.0, mean=0.0, std=0.0)
    mean = sum(p.count * p.mean for p in parts) / n
    if n <= 1:
        return GroupStats(count=n, mean=mean, std=0.0)
    ss = sum((p.count - 1.0) * p.std**2 for p in parts)
    ss += sum(p.count * (mean - p.mean) ** 2 for p in parts)
    return GroupStats(count=n, mean=mean, std=math.sqrt(max(ss, 0.0) / (n - 1.0)))


def combine_with_repair(
    parts: Sequence[GroupStats], index: int, repaired: GroupStats
) -> GroupStats:
    """Combine a partition with one member's statistics replaced.

    This is equation (3) of Problem 1: ``t'_c = G(V'/{t} ∪ {f_repair(t)})``.
    """
    out = list(parts)
    out[index] = repaired
    return combine(out)


def group_stats(df: DataFrame, group_cols: Sequence[str], measure: str) -> DataFrame:
    """Per-group distributive statistics as a Spark aggregation job.

    Returns one row per group with columns ``group_cols + [count, mean, std]``.
    ``std`` is sample stddev, coalesced to 0.0 for singleton groups so that
    downstream combiners never see nulls.
    """
    return df.groupBy(*group_cols).agg(
        F.count(F.lit(1)).cast("double").alias("count"),
        F.avg(F.col(measure)).alias("mean"),
        F.coalesce(F.stddev_samp(F.col(measure)), F.lit(0.0)).alias("std"),
    )


def stats_from_rows(rows: Iterable) -> list[GroupStats]:
    """Convert collected Rows (with count/mean/std fields) to GroupStats."""
    return [
        GroupStats(count=float(r["count"]), mean=float(r["mean"]), std=float(r["std"]))
        for r in rows
    ]
