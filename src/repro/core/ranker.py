"""Group ranking: repair each drill-down group, re-combine, score (§4.5).

Given the drill-down result of the complained tuple (its sibling groups), a
repair replaces one group's modeled statistics with the model's predictions;
the parent aggregate is re-derived with the distributive combiner and the
complaint re-evaluated.  Groups are ranked by the repaired complaint score
(Problem 1's argmin).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Sequence

import numpy as np
import pandas as pd

from .complaint import Complaint
from .stats import GroupStats, combine, combine_with_repair


@dataclass
class RankedGroup:
    """One candidate drill-down group with its repair outcome."""

    hierarchy: str
    group: Dict[str, object]
    observed: GroupStats
    predicted: GroupStats
    score: float  #: f_comp after repairing this group (lower = better)
    improvement: float  #: baseline score − repaired score


def repaired_stats(observed: GroupStats, predictions: Dict[str, float]) -> GroupStats:
    """Apply model predictions to a group's modeled statistics.

    Counts are clipped at 0 (a model may extrapolate negative); the standard
    deviation is kept as observed — repairing (count, mean) is what propagates
    into a parent STD complaint through the combiner.
    """
    fixed = dict(predictions)
    if "count" in fixed:
        fixed["count"] = max(float(fixed["count"]), 0.0)
    return observed.replace(**fixed)


def rank_groups(
    *,
    hierarchy: str,
    group_keys: Sequence[Dict[str, object]],
    observed: Sequence[GroupStats],
    predictions: pd.DataFrame,
    complaint: Complaint,
) -> List[RankedGroup]:
    """Score every candidate group and return them sorted best-first.

    ``predictions`` holds one column per modeled statistic, aligned with
    ``observed`` / ``group_keys`` by position.
    """
    if not (len(group_keys) == len(observed) == len(predictions)):
        raise ValueError("group_keys, observed and predictions must align")
    baseline = complaint.score_stats(combine(observed))
    out: List[RankedGroup] = []
    for i, (key, obs) in enumerate(zip(group_keys, observed)):
        preds = {c: float(predictions.iloc[i][c]) for c in predictions.columns}
        rep = repaired_stats(obs, preds)
        combined = combine_with_repair(list(observed), i, rep)
        score = complaint.score_stats(combined)
        out.append(
            RankedGroup(
                hierarchy=hierarchy,
                group=dict(key),
                observed=obs,
                predicted=rep,
                score=score,
                improvement=baseline - score,
            )
        )
    out.sort(key=lambda r: (r.score, _stable_key(r.group)))
    return out


def _stable_key(group: Dict[str, object]) -> str:
    return "|".join(str(v) for v in group.values())
