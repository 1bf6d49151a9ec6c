"""Synthetic JHU-style COVID-19 panels with the Tables 1–2 issues (§5.3).

The real study replays 30 resolved GitHub issues against the JHU data.  We
synthesize epidemic panels with the same structure (location hierarchy ×
day, measures confirmed/deaths/recovered) and inject one issue per case with
the same *class* and comparable relative magnitude:

* ``missing``   — a day's report drops to ~5% (missing data source that day)
* ``spike``     — backlog / definition change / over-report: a day multiplied
* ``prevalent`` — ★ issues: a small multiplicative drift over the *whole*
  period (missing source since the start) — undetectable from the corrupted
  panel alone, as the paper's error analysis explains
* ``subtle``    — a delta well inside the daily noise (typos, tiny backlogs)
* ``dayshift``  — a fraction of every day's count booked one day late

Locations and issue ids mirror Table 1 (US states) and Table 2 (countries;
province-level issues are attributed to their country).  Detectability is an
*emergent* property of magnitude vs noise, not hard-coded.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

import numpy as np
import pandas as pd

N_DAYS = 180
_BASE_DATE = pd.Timestamp("2020-08-01")

# Relative population weights. Issue locations are listed explicitly; the
# remainder fill out the panel.
US_STATES: Dict[str, float] = {
    "California": 39.5, "Texas": 29.1, "Florida": 21.5, "New York": 19.5,
    "Pennsylvania": 12.8, "Illinois": 12.7, "Ohio": 11.7, "Georgia": 10.6,
    "North Carolina": 10.4, "Michigan": 10.0, "New Jersey": 8.9,
    "Virginia": 8.5, "Washington": 7.6, "Arizona": 7.3, "Massachusetts": 6.9,
    "Tennessee": 6.8, "Indiana": 6.7, "Missouri": 6.1, "Maryland": 6.0,
    "Wisconsin": 5.8, "Colorado": 5.7, "Minnesota": 5.6, "South Carolina": 5.1,
    "Alabama": 4.9, "Louisiana": 4.6, "Kentucky": 4.5, "Oregon": 4.2,
    "Oklahoma": 4.0, "Connecticut": 3.6, "Utah": 3.2, "Iowa": 3.2,
    "Nevada": 3.1, "Arkansas": 3.0, "Mississippi": 3.0, "Kansas": 2.9,
    "New Mexico": 2.1, "Nebraska": 1.9, "Idaho": 1.8, "West Virginia": 1.8,
    "Hawaii": 1.4, "New Hampshire": 1.4, "Maine": 1.3, "Montana": 1.1,
    "Rhode Island": 1.1, "Delaware": 1.0, "South Dakota": 0.9,
    "North Dakota": 0.8, "Alaska": 0.7, "Vermont": 0.6, "Wyoming": 0.6,
}

COUNTRIES: Dict[str, float] = {
    "US": 331, "India": 1380, "Brazil": 212, "Russia": 146, "France": 67,
    "UK": 67, "Turkey": 84, "Italy": 60, "Spain": 47, "Germany": 83,
    "Argentina": 45, "Colombia": 51, "Mexico": 128, "Poland": 38,
    "Iran": 84, "Ukraine": 44, "South Africa": 59, "Peru": 33,
    "Netherlands": 17, "Indonesia": 273, "Czechia": 10, "Canada": 38,
    "Chile": 19, "Romania": 19, "Belgium": 11, "Iraq": 40, "Israel": 9,
    "Sweden": 10, "Portugal": 10, "Pakistan": 220, "Philippines": 109,
    "Switzerland": 8, "Bangladesh": 164, "Morocco": 37, "Austria": 9,
    "Japan": 126, "Saudi Arabia": 34, "Hungary": 10, "Jordan": 10,
    "Afghanistan": 39, "Thailand": 70, "Kazakhstan": 19,
}

MEASURES = ("confirmed", "deaths", "recovered")
#: infection-to-measure scale (daily new counts)
_MEASURE_SCALE = {"confirmed": 1.0, "deaths": 0.018, "recovered": 0.85}


def base_panel(
    locations: Dict[str, float], *, n_days: int = N_DAYS, seed: int = 0
) -> pd.DataFrame:
    """Daily new counts per (location, day) with waves, weekday effect, noise."""
    rng = np.random.default_rng(seed)
    t = np.arange(n_days)
    # two national waves
    national = 1.0 + 0.8 * np.exp(-((t - 45) ** 2) / (2 * 25**2)) + 1.6 * np.exp(
        -((t - 135) ** 2) / (2 * 30**2)
    )
    weekday = np.where(pd.Series(t % 7).isin([5, 6]), 0.82, 1.0)
    frames = []
    for loc, w in locations.items():
        phase = rng.normal(0, 10)
        local = 1.0 + 0.35 * np.sin(2 * np.pi * (t + phase) / 90.0 + rng.uniform(0, 6))
        # Day-to-day reporting noise is small (~1%): real case series are
        # strongly autocorrelated, which is what makes a missing report from
        # even a small state stand out against the largest states' residuals.
        lam = 120.0 * w * national * local * weekday
        noise = rng.lognormal(0.0, 0.012, n_days)
        confirmed = np.maximum((lam * noise).round(), 0)
        out = pd.DataFrame(
            {
                "location": loc,
                "day": [(_BASE_DATE + pd.Timedelta(days=int(d))).strftime("%Y-%m-%d") for d in t],
                "day_idx": t,
            }
        )
        for meas in MEASURES:
            mnoise = rng.lognormal(0.0, 0.012, n_days)
            out[meas] = np.maximum(
                (confirmed * _MEASURE_SCALE[meas] * mnoise).round(), 0
            )
        frames.append(out)
    return pd.concat(frames, ignore_index=True)


@dataclass(frozen=True)
class Issue:
    """One replayed data issue (id/name mirror Tables 1–2)."""

    issue_id: str
    name: str
    dataset: str  #: 'us' | 'global'
    location: str
    measure: str
    kind: str  #: missing | spike | prevalent | subtle | dayshift
    day_idx: int
    factor: float  #: multiplicative factor of the corruption
    prevalent: bool = False  #: ★ in the paper's tables
    paper_reptile_hit: bool = True  #: the paper's per-issue Reptile outcome


def corrupt(panel: pd.DataFrame, issue: Issue, seed: int = 0) -> pd.DataFrame:
    """Apply one issue to a copy of the panel."""
    out = panel.copy()
    loc = out["location"] == issue.location
    col = issue.measure
    if issue.kind in ("missing", "spike", "subtle"):
        mask = loc & (out["day_idx"] == issue.day_idx)
        out.loc[mask, col] = (out.loc[mask, col] * issue.factor).round()
    elif issue.kind == "prevalent":
        out.loc[loc, col] = (out.loc[loc, col] * issue.factor).round()
    elif issue.kind == "dayshift":
        vals = out.loc[loc].sort_values("day_idx")[col].to_numpy(dtype=np.float64)
        moved = np.floor(vals * (1.0 - issue.factor))
        shifted = vals - moved
        shifted[1:] += moved[:-1]
        out.loc[out.loc[loc].sort_values("day_idx").index, col] = shifted.round()
    else:
        raise ValueError(f"unknown issue kind {issue.kind!r}")
    return out


def complaint_direction(panel: pd.DataFrame, corrupted: pd.DataFrame, issue: Issue) -> str:
    """'too_low'/'too_high' for the national total on the complaint day."""
    day = issue.day_idx
    clean = panel[panel.day_idx == day][issue.measure].sum()
    dirty = corrupted[corrupted.day_idx == day][issue.measure].sum()
    return "too_low" if dirty < clean else "too_high"


US_ISSUES: List[Issue] = [
    Issue("3572", "Texas confirmed missing reports", "us", "Texas", "confirmed", "missing", 172, 0.05),
    Issue("3521", "Arizona death methodology altered", "us", "Arizona", "deaths", "spike", 157, 2.5),
    Issue("3482", "Washington missing reports", "us", "Washington", "confirmed", "missing", 150, 0.05),
    Issue("3476", "Utah missing source", "us", "Utah", "confirmed", "prevalent", 140, 0.93, prevalent=True, paper_reptile_hit=False),
    Issue("3468", "New York death missing reports", "us", "New York", "deaths", "missing", 146, 0.05),
    Issue("3466", "Montana missing reports", "us", "Montana", "confirmed", "missing", 144, 0.04),
    Issue("3456", "North Dakota confirmed backlog", "us", "North Dakota", "confirmed", "spike", 131, 2.8),
    Issue("3451", "Iowa death missing reports", "us", "Iowa", "deaths", "missing", 128, 0.05),
    Issue("3449", "Arizona test over reported", "us", "Arizona", "confirmed", "spike", 126, 1.9),
    Issue("3448", "Washington death wrongly reported", "us", "Washington", "deaths", "spike", 125, 2.2),
    Issue("3441", "Albany confirmed day shift", "us", "New York", "confirmed", "dayshift", 121, 0.7, prevalent=True, paper_reptile_hit=False),
    Issue("3438", "Ohio confirmed backlog", "us", "Ohio", "confirmed", "spike", 118, 2.2),
    Issue("3424", "Massachusetts confirmed backlog", "us", "Massachusetts", "confirmed", "subtle", 110, 1.05, paper_reptile_hit=False),
    Issue("3416", "Nevada death over reported", "us", "Nevada", "deaths", "spike", 104, 2.3),
    Issue("3414", "Eureka death over reported", "us", "Nevada", "deaths", "spike", 103, 2.0),
    Issue("3402", "Washington confirmed typo", "us", "Washington", "confirmed", "subtle", 96, 1.013, paper_reptile_hit=False),
]

GLOBAL_ISSUES: List[Issue] = [
    Issue("3623", "Germany recovered over reported", "global", "Germany", "recovered", "spike", 175, 2.1),
    Issue("3618", "Quebec death missing source", "global", "Canada", "deaths", "prevalent", 170, 0.92, prevalent=True, paper_reptile_hit=False),
    Issue("3578", "US recovery nullified", "global", "US", "recovered", "missing", 160, 0.0),
    Issue("3567", "India confirmed missing reports", "global", "India", "confirmed", "missing", 155, 0.05),
    Issue("3546", "Thailand confirmed missing source", "global", "Thailand", "confirmed", "prevalent", 148, 0.90, prevalent=True, paper_reptile_hit=False),
    Issue("3538a", "Mexico confirmed definition altered", "global", "Mexico", "confirmed", "spike", 143, 1.8),
    Issue("3538b", "Mexico confirmed missing reports", "global", "Mexico", "confirmed", "missing", 142, 0.05),
    Issue("3518", "Sweden death missing source", "global", "Sweden", "deaths", "prevalent", 135, 0.90, prevalent=True, paper_reptile_hit=False),
    Issue("3498", "Alberta missing source", "global", "Canada", "confirmed", "prevalent", 129, 0.95, prevalent=True, paper_reptile_hit=False),
    Issue("3494", "UK death missing reports", "global", "UK", "deaths", "missing", 127, 0.05),
    Issue("3471", "Turkey confirmed definition altered", "global", "Turkey", "confirmed", "spike", 120, 6.0),
    Issue("3423", "Afghanistan confirmed wrongly reported", "global", "Afghanistan", "confirmed", "subtle", 112, 0.994, paper_reptile_hit=False),
    Issue("3413", "France missing reports", "global", "France", "confirmed", "missing", 108, 0.05),
    Issue("3408", "Kazakhstan confirmed over reported", "global", "Kazakhstan", "confirmed", "spike", 100, 2.5),
]


def all_issues() -> List[Issue]:
    return US_ISSUES + GLOBAL_ISSUES


def panel_for(dataset: str, seed: int = 0) -> pd.DataFrame:
    if dataset == "us":
        return base_panel(US_STATES, seed=seed)
    if dataset == "global":
        return base_panel(COUNTRIES, seed=seed + 1)
    raise ValueError(f"dataset must be 'us' or 'global', got {dataset!r}")
