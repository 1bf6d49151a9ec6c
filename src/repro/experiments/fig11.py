"""Explanation-accuracy experiments (paper Figs. 11 & 12).

Each trial corrupts one or more groups of a 100-group dataset, submits the
implied complaint, and asks five approaches for the erroneous group:
Reptile, Raw, Sensitivity, Support (Fig. 11) and Outlier (Fig. 12).

The trial tables are 100 rows, so the harness drives the *same* suffstats →
EM → ranker code through its pandas fast path; ``tests/test_fig11_spark.py``
verifies that the Spark path produces identical recommendations on sampled
trials.  Reptile's model here is aux-feature-only (single dimension
attribute: a main effect would be the group's own label — see
``FeaturePlan.use_main_effects``).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Sequence

import numpy as np
import pandas as pd

from repro.baselines import explainers
from repro.core.em import fit_em
from repro.core.ranker import rank_groups
from repro.core.stats import GroupStats
from repro.core.suffstats import suffstats_from_pandas
from repro.synth.accuracy import (
    ERROR_TYPES,
    MULTI_ERROR_CONDITIONS,
    Trial,
    make_multi_trial,
    make_trial,
)

APPROACHES = ("reptile", "raw", "sensitivity", "support")


def observed_stats(rows: pd.DataFrame) -> pd.DataFrame:
    g = rows.groupby("g")["m"]
    out = g.agg(count="size", mean="mean", std="std").fillna({"std": 0.0})
    out["count"] = out["count"].astype(float)
    return out.reset_index()


def model_predictions(trial: Trial, stats_df: pd.DataFrame) -> pd.DataFrame:
    """Fit one model per modeled statistic on aux features; predict per group."""
    preds = {}
    for stat in trial.complaint.modeled_stats:
        aux = trial.aux[stat].rename(columns={"aux": "f_aux"})
        tab = stats_df.merge(aux, on="g", how="left")
        tab["f_aux"] = (tab["f_aux"] - tab["f_aux"].mean()) / (
            tab["f_aux"].std(ddof=1) or 1.0
        )
        tab["f_intercept"] = 1.0
        tab["y"] = tab[stat].astype(float)
        tab["cluster"] = "_all"
        feats = ["f_intercept", "f_aux"]
        model = fit_em(
            suffstats_from_pandas(tab, feats), z_cols=["f_intercept"], n_iter=20
        )
        preds[stat] = model.predict(tab)
    return pd.DataFrame(preds)


def run_trial(trial: Trial) -> Dict[str, bool]:
    """Top-1 hit/miss per approach for one trial."""
    stats_df = observed_stats(trial.rows)
    groups = list(stats_df["g"])
    observed = [
        GroupStats(count=r["count"], mean=r["mean"], std=r["std"])
        for _, r in stats_df.iterrows()
    ]
    predictions = model_predictions(trial, stats_df)
    truths = set(trial.true_groups)

    ranked = rank_groups(
        hierarchy="g",
        group_keys=[{"g": gname} for gname in groups],
        observed=observed,
        predictions=predictions,
        complaint=trial.complaint,
    )
    hits = {"reptile": ranked[0].group["g"] in truths}
    hits["outlier"] = (
        groups[explainers.outlier(observed, predictions, trial.complaint)] in truths
    )
    hits["sensitivity"] = (
        groups[explainers.sensitivity(observed, trial.complaint)] in truths
    )
    hits["support"] = groups[explainers.support(observed, trial.complaint)] in truths
    hits["raw"] = (
        groups[
            explainers.raw_winsorize(
                trial.rows,
                "g",
                "m",
                [{"g": gname} for gname in groups],
                observed,
                trial.complaint,
            )
        ]
        in truths
    )
    return hits


@dataclass
class AccuracyPoint:
    error: str
    rho: float
    accuracy: Dict[str, float]
    n_trials: int


def sweep_single_errors(
    *,
    rhos: Sequence[float] = (0.6, 0.7, 0.8, 0.9, 1.0),
    errors: Sequence[str] = ERROR_TYPES,
    n_trials: int = 60,
    n_groups: int = 100,
    seed0: int = 0,
) -> List[AccuracyPoint]:
    """Fig. 11 sweep: per (error class, aux correlation) accuracy."""
    out: List[AccuracyPoint] = []
    for error in errors:
        for rho in rhos:
            tally = {a: 0 for a in APPROACHES + ("outlier",)}
            for t in range(n_trials):
                trial = make_trial(seed0 + 7919 * t, error, rho, n_groups)
                hits = run_trial(trial)
                for a in tally:
                    tally[a] += int(hits[a])
            out.append(
                AccuracyPoint(
                    error=error,
                    rho=rho,
                    accuracy={a: tally[a] / n_trials for a in tally},
                    n_trials=n_trials,
                )
            )
    return out


def sweep_multi_errors(
    *,
    rhos: Sequence[float] = (0.6, 0.7, 0.8, 0.9, 1.0),
    conditions: Sequence[str] = tuple(MULTI_ERROR_CONDITIONS),
    n_trials: int = 60,
    n_groups: int = 100,
    seed0: int = 1,
) -> List[AccuracyPoint]:
    """Fig. 12 sweep: Reptile vs Outlier with decoy errors present."""
    out: List[AccuracyPoint] = []
    for cond in conditions:
        for rho in rhos:
            tally = {"reptile": 0, "outlier": 0}
            for t in range(n_trials):
                trial = make_multi_trial(seed0 + 104729 * t, cond, rho, n_groups)
                hits = run_trial(trial)
                for a in tally:
                    tally[a] += int(hits[a])
            out.append(
                AccuracyPoint(
                    error=cond,
                    rho=rho,
                    accuracy={a: tally[a] / n_trials for a in tally},
                    n_trials=n_trials,
                )
            )
    return out


def format_table(points: List[AccuracyPoint], approaches: Sequence[str]) -> str:
    lines = ["error".ljust(18) + "rho   " + "".join(a.ljust(12) for a in approaches)]
    for p in points:
        lines.append(
            p.error.ljust(18)
            + f"{p.rho:<6.1f}"
            + "".join(f"{p.accuracy[a]:<12.2f}" for a in approaches)
        )
    return "\n".join(lines)
