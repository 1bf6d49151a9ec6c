"""Model-quality comparison via ΔAIC (paper App. K, Fig. 16).

Four models on two datasets:

* Linear / Linear-f       — pooled OLS, without / with auxiliary features
* Multi-level / Multi-level-f — mixed-effects EM, without / with auxiliaries

Datasets: the FIST-like drought survey (aux = village-year rainfall,
clusters = district) and a Vote-like county panel (aux = previous-election
share, clusters = state).  A model is substantially better when its AIC is
lower by more than 10 [7]; the paper finds the multi-level(-f) models win.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List

import numpy as np
import pandas as pd

from repro.core.em import fit_em, fit_linear
from repro.core.suffstats import suffstats_from_pandas
from repro.synth.fist import base_survey

MODELS = ("linear", "linear_f", "multilevel", "multilevel_f")


def fist_table(seed: int = 0) -> pd.DataFrame:
    """Group-level FIST table: y = mean severity per (village, year)."""
    rows, rain = base_survey(seed)
    grp = (
        rows.groupby(["region", "district", "village", "year"])["severity"]
        .mean()
        .reset_index()
        .rename(columns={"severity": "y"})
        .merge(rain, on=["village", "year"], how="left")
    )
    # Clusters are the parent groups of a village-level drill-down: the
    # (region, year) cells, which carry the latent drought level — the
    # hierarchical variation the multi-level model is meant to absorb.
    grp["cluster"] = grp["region"] + "␟" + grp["year"].astype(str)
    grp["f_intercept"] = 1.0
    grp["f_year"] = grp.groupby("year")["y"].transform("median")
    grp["f_aux"] = (grp["rainfall"] - grp["rainfall"].mean()) / grp[
        "rainfall"
    ].std(ddof=1)
    return grp


def vote_table(seed: int = 1, n_states: int = 50, counties_per: int = 60) -> pd.DataFrame:
    """Vote-like table: 2020 share per county, 2016 share as auxiliary."""
    rng = np.random.default_rng(seed)
    rows = []
    for s in range(n_states):
        state_lean = rng.normal(0, 0.08)
        state_shift = rng.normal(0, 0.03)
        for c in range(counties_per):
            lean = 0.5 + state_lean + rng.normal(0, 0.12)
            share_2016 = np.clip(lean + rng.normal(0, 0.02), 0.02, 0.98)
            share_2020 = np.clip(
                lean + state_shift + rng.normal(0, 0.02), 0.02, 0.98
            )
            rows.append((f"s{s:02d}", f"s{s:02d}c{c:03d}", share_2020, share_2016))
    pdf = pd.DataFrame(rows, columns=["state", "county", "y", "share_2016"])
    pdf["cluster"] = pdf["state"]
    pdf["f_intercept"] = 1.0
    pdf["f_aux"] = (pdf["share_2016"] - pdf["share_2016"].mean()) / pdf[
        "share_2016"
    ].std(ddof=1)
    return pdf


@dataclass
class AicRow:
    dataset: str
    delta_aic: Dict[str, float]  #: AIC_model − AIC_min per model


def _aics(pdf: pd.DataFrame, base_feats: List[str]) -> Dict[str, float]:
    feats_f = base_feats + ["f_aux"]
    stats = suffstats_from_pandas(pdf, base_feats)
    stats_f = suffstats_from_pandas(pdf, feats_f)
    return {
        "linear": fit_linear(stats).aic,
        "linear_f": fit_linear(stats_f).aic,
        "multilevel": fit_em(stats, z_cols=["f_intercept"], n_iter=40).aic,
        "multilevel_f": fit_em(stats_f, z_cols=["f_intercept"], n_iter=40).aic,
    }


def run(seed: int = 0) -> List[AicRow]:
    out = []
    fist = fist_table(seed)
    aic = _aics(fist, ["f_intercept", "f_year"])
    mn = min(aic.values())
    out.append(AicRow("fist", {k: v - mn for k, v in aic.items()}))
    vote = vote_table(seed + 1)
    aic = _aics(vote, ["f_intercept"])
    mn = min(aic.values())
    out.append(AicRow("vote", {k: v - mn for k, v in aic.items()}))
    return out


def format_table(rows: List[AicRow]) -> str:
    lines = ["dataset  " + "".join(m.ljust(14) for m in MODELS) + " (ΔAIC, lower=better)"]
    for r in rows:
        lines.append(
            f"{r.dataset:<8} "
            + "".join(f"{r.delta_aic[m]:<14.1f}" for m in MODELS)
        )
    return "\n".join(lines)
