"""Baseline explanation approaches (paper §5.2.1 'Approaches').

All baselines answer the same question as Reptile — which drill-down group
explains the complaint — with different machinery:

* **Sensitivity** (Scorpion-style [57]): deletion-based intervention; delete
  each group entirely, re-combine, pick the group whose deletion best
  resolves the complaint.
* **Support** (density-based pruning [1]): pick the group with the largest
  COUNT; ignores both the complaint direction and auxiliary data.
* **Raw** (record-level winsorization [29]): clip each group's raw measures
  to [mean−std, mean+std], recompute the group statistics, pick the group
  whose clipping best resolves the complaint.
* **Outlier** (complaint ablation, §5.2.2): use Reptile's model predictions
  but ignore the complaint — pick the group whose statistics deviate most
  from the prediction.

Each takes the candidate groups' observed statistics (and predictions /
raw rows where needed) and returns the index of the recommended group.
"""
from __future__ import annotations

from typing import Dict, List, Sequence

import numpy as np
import pandas as pd

from repro.core.complaint import Complaint
from repro.core.stats import GroupStats, combine_with_repair


def sensitivity(observed: Sequence[GroupStats], complaint: Complaint) -> int:
    """Deletion-based: argmin over groups of f_comp after deleting the group."""
    scores = [
        complaint.score_stats(
            combine_with_repair(list(observed), i, GroupStats(count=0.0, mean=0.0))
        )
        for i in range(len(observed))
    ]
    return int(np.argmin(scores))


def support(observed: Sequence[GroupStats], complaint: Complaint) -> int:
    """Density-based: the group with the largest COUNT."""
    return int(np.argmax([g.count for g in observed]))


def raw_winsorize(
    rows: pd.DataFrame,
    group_col: str | List[str],
    measure: str,
    group_keys: Sequence[Dict[str, object]],
    observed: Sequence[GroupStats],
    complaint: Complaint,
) -> int:
    """Record-level: winsorize each group's rows, re-aggregate, score.

    ``rows`` is the raw relation (pandas).  Clipping happens within the
    candidate group only; all sibling groups keep their observed statistics.
    """
    group_cols = [group_col] if isinstance(group_col, str) else list(group_col)
    scores = []
    for i, key in enumerate(group_keys):
        mask = pd.Series(True, index=rows.index)
        for c in group_cols:
            mask &= rows[c] == key[c]
        vals = rows.loc[mask, measure].to_numpy(dtype=np.float64)
        if len(vals) == 0:
            scores.append(np.inf)
            continue
        mu, sd = vals.mean(), vals.std(ddof=1) if len(vals) > 1 else 0.0
        clipped = np.clip(vals, mu - sd, mu + sd)
        rep = GroupStats(
            count=float(len(clipped)),
            mean=float(clipped.mean()),
            std=float(clipped.std(ddof=1)) if len(clipped) > 1 else 0.0,
        )
        scores.append(
            complaint.score_stats(combine_with_repair(list(observed), i, rep))
        )
    return int(np.argmin(scores))


def outlier(
    observed: Sequence[GroupStats],
    predictions: pd.DataFrame,
    complaint: Complaint,
) -> int:
    """Model residual magnitude, complaint-blind.

    The deviation is the summed absolute residual over the modeled
    statistics, each normalised by the statistic's cross-group spread so
    COUNT and MEAN residuals are comparable for SUM complaints.
    """
    dev = np.zeros(len(observed))
    for stat in predictions.columns:
        obs = np.array([g.get(stat) for g in observed], dtype=np.float64)
        pred = predictions[stat].to_numpy(dtype=np.float64)
        scale = obs.std(ddof=0) or 1.0
        dev += np.abs(obs - pred) / scale
    return int(np.argmax(dev))
