"""Synthetic FIST drought-survey data and the 22-complaint study (§5.4, App. M).

The real study had FIST members submit 22 complaints over their Ethiopian
farmer-reported drought data; Reptile resolved 20, failing on (a) one
inherently ambiguous complaint and (b) one STD complaint caused by *two*
districts jointly.  We synthesize a panel with the same hierarchy shape
(region / district / village × year, severity 1–10, rainfall auxiliary) and
plant 22 scenarios with exactly that structure: 20 single-cause group errors
of the classes the study surfaced (year confusion → mean shifts, missing /
duplicated surveys, over-severe reports) plus the two designed failure modes.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Optional, Tuple

import numpy as np
import pandas as pd

REGIONS = ["Tigray", "Amhara", "Oromia"]
N_DISTRICTS = 6
N_VILLAGES = 10
YEARS = list(range(1985, 2019))


def _district(region: str, i: int) -> str:
    return f"{region}-D{i}"


def _village(region: str, i: int, j: int) -> str:
    return f"{region}-D{i}-V{j:02d}"


def base_survey(seed: int = 0) -> Tuple[pd.DataFrame, pd.DataFrame]:
    """Clean survey rows + village-year rainfall auxiliary.

    Severity has region-year latent drought levels, district and village
    offsets, and per-response noise; rainfall is negatively correlated with
    the latent drought level (satellite sensing proxy).
    """
    rng = np.random.default_rng(seed)
    rows, rain = [], []
    for region in REGIONS:
        for year in YEARS:
            latent = float(np.clip(rng.normal(5.0, 1.5), 1.5, 9.0))
            for i in range(N_DISTRICTS):
                d_eff = rng.normal(0, 0.4)
                for j in range(N_VILLAGES):
                    v_eff = rng.normal(0, 0.3)
                    mu = latent + d_eff + v_eff
                    n = int(rng.poisson(7)) + 3
                    sev = np.clip(rng.normal(mu, 1.0, n), 1.0, 10.0)
                    for s in sev:
                        rows.append((region, _district(region, i), _village(region, i, j), year, float(s)))
                    rain.append(
                        (
                            _village(region, i, j),
                            year,
                            float(600.0 - 45.0 * mu + rng.normal(0, 25)),
                        )
                    )
    survey = pd.DataFrame(
        rows, columns=["region", "district", "village", "year", "severity"]
    )
    rainfall = pd.DataFrame(rain, columns=["village", "year", "rainfall"])
    return survey, rainfall


@dataclass(frozen=True)
class Scenario:
    """One scripted complaint: corruption + complaint + ground truth."""

    sid: int
    description: str
    #: (group filter dict, kind, magnitude) corruptions
    corruptions: tuple
    #: complaint tuple filter (the complained view tuple t_c)
    where: Dict[str, object]
    agg: str
    direction: str
    #: drill target level: 'district' or 'village'
    level: str
    #: expected top-1 values at that level; empty = designed failure
    truth: tuple
    failure_mode: Optional[str] = None  #: 'ambiguous' | 'multi-group'


def _shift(filt: Dict[str, object], delta: float):
    return (filt, "shift", delta)


def _missing(filt: Dict[str, object], frac: float):
    return (filt, "missing", frac)


def _dup(filt: Dict[str, object], frac: float):
    return (filt, "dup", frac)


def scenarios() -> List[Scenario]:
    """The 22 complaints. 20 single-cause + 2 designed failures (App. M)."""
    out: List[Scenario] = []
    sid = 0

    def add(description, corruptions, where, agg, direction, level, truth, failure=None):
        nonlocal sid
        sid += 1
        out.append(
            Scenario(
                sid=sid,
                description=description,
                corruptions=tuple(corruptions),
                where=dict(where),
                agg=agg,
                direction=direction,
                level=level,
                truth=tuple(truth),
                failure_mode=failure,
            )
        )

    # -- 12 district-level single-cause complaints over the three regions.
    specs = [
        ("Tigray", 1996, 0, +3.0, "mean", "too_high", "farmers report non-drought year as severe"),
        ("Tigray", 2009, 1, -3.0, "mean", "too_low", "planting/harvest year confusion"),
        ("Tigray", 2013, 2, -3.0, "std", "too_high", "one district misremembers the year"),
        ("Amhara", 1991, 3, +3.0, "mean", "too_high", "over-severe reporting"),
        ("Amhara", 2000, 4, -3.0, "mean", "too_low", "year confusion"),
        ("Amhara", 2016, 5, +3.0, "std", "too_high", "one district over-reports"),
        ("Oromia", 1989, 0, -3.0, "mean", "too_low", "misremembered events"),
        ("Oromia", 2004, 1, +3.0, "mean", "too_high", "over-severe reporting"),
        ("Oromia", 2011, 2, +3.0, "std", "too_high", "one district over-reports"),
        ("Tigray", 1987, 3, None, "count", "too_low", "missing surveys"),
        ("Amhara", 1994, 0, None, "count", "too_low", "missing surveys"),
        ("Oromia", 2017, 5, None, "count", "too_high", "duplicated surveys"),
    ]
    for region, year, di, delta, agg, direction, why in specs:
        district = _district(region, di)
        filt = {"district": district, "year": year}
        if agg == "count":
            corr = [_dup(filt, 0.8)] if direction == "too_high" else [_missing(filt, 0.6)]
        else:
            corr = [_shift(filt, delta)]
        add(
            f"{why}: {agg} in {region} {year} is {direction}",
            corr,
            {"region": region, "year": year},
            agg,
            direction,
            "district",
            [district],
        )

    # -- 8 village-level single-cause complaints.
    vspecs = [
        ("Tigray", 1990, 0, 2, +3.5, "mean", "too_high"),
        ("Tigray", 2002, 1, 7, -3.5, "mean", "too_low"),
        ("Amhara", 1988, 2, 4, -3.5, "std", "too_high"),
        ("Amhara", 2006, 3, 1, +3.5, "mean", "too_high"),
        ("Oromia", 1993, 4, 9, -3.5, "mean", "too_low"),
        ("Oromia", 2014, 5, 3, +3.5, "std", "too_high"),
        ("Tigray", 2018, 2, 5, None, "count", "too_low"),
        ("Amhara", 2010, 4, 8, None, "count", "too_high"),
    ]
    for region, year, di, vj, delta, agg, direction in vspecs:
        district = _district(region, di)
        village = _village(region, di, vj)
        filt = {"village": village, "year": year}
        if agg == "count":
            corr = [_dup(filt, 0.8)] if direction == "too_high" else [_missing(filt, 0.6)]
        else:
            corr = [_shift(filt, delta)]
        add(
            f"village error: {agg} in {district} {year} is {direction}",
            corr,
            {"region": region, "district": district, "year": year},
            agg,
            direction,
            "village",
            [village],
        )

    # -- 21: inherently ambiguous (every district shifted equally; members
    #        disagreed about the cause — no single ground-truth group).
    add(
        "ambiguous: all districts in Tigray 1998 equally low",
        [_shift({"district": _district("Tigray", i), "year": 1998}, -2.0) for i in range(N_DISTRICTS)],
        {"region": "Tigray", "year": 1998},
        "mean",
        "too_low",
        "district",
        [],
        failure="ambiguous",
    )
    # -- 22: STD complaint caused by two districts jointly; repairing either
    #        alone cannot restore the STD (App. M's parabola argument).
    add(
        "two-district STD: Amhara 2003 needs both fixes",
        [
            _shift({"district": _district("Amhara", 1), "year": 2003}, +3.0),
            _shift({"district": _district("Amhara", 4), "year": 2003}, -3.0),
        ],
        {"region": "Amhara", "year": 2003},
        "std",
        "too_high",
        "district",
        [_district("Amhara", 1), _district("Amhara", 4)],
        failure="multi-group",
    )
    return out


def apply_corruptions(survey: pd.DataFrame, scenario: Scenario, seed: int = 0) -> pd.DataFrame:
    rng = np.random.default_rng(seed + scenario.sid)
    out = survey.copy()
    for filt, kind, mag in scenario.corruptions:
        mask = pd.Series(True, index=out.index)
        for c, v in filt.items():
            mask &= out[c] == v
        idx = out.index[mask]
        if kind == "shift":
            out.loc[idx, "severity"] = np.clip(out.loc[idx, "severity"] + mag, 1.0, 10.0)
        elif kind == "missing":
            drop = rng.choice(idx, size=int(len(idx) * mag), replace=False)
            out = out.drop(index=drop)
        elif kind == "dup":
            dup = rng.choice(idx, size=int(len(idx) * mag), replace=False)
            out = pd.concat([out, out.loc[dup]], ignore_index=False)
        else:
            raise ValueError(kind)
    return out.reset_index(drop=True)
