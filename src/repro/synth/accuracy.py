"""Synthetic accuracy benchmark data (paper §5.2.1 setup).

One dimension attribute with 100 groups; rows per group ~ N(100, 20); each
measure value ~ N(100, 20).  Per aggregate statistic an auxiliary table is
generated whose measure has rank correlation ρ with the *clean* statistic
(Iman–Conover-style reordering [23]).  Errors corrupt one (or more) chosen
groups:

* ``missing`` — delete half the group's rows (COUNT too low)
* ``dup``     — duplicate half the rows (COUNT too high)
* ``inc`` / ``dec`` — shift every measure by ±5 (MEAN too high / low)
* ``missing+dec`` / ``dup+inc`` — the combinations (SUM complaints)
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Sequence, Tuple

import numpy as np
import pandas as pd

from repro.core.complaint import Complaint

N_GROUPS = 100
ERROR_TYPES = ("missing", "dup", "inc", "dec", "missing+dec", "dup+inc")

#: complaint (agg, direction) implied by each error class (§5.2.1)
COMPLAINT_FOR_ERROR = {
    "missing": ("count", "too_low"),
    "dup": ("count", "too_high"),
    "inc": ("mean", "too_high"),
    "dec": ("mean", "too_low"),
    "missing+dec": ("sum", "too_low"),
    "dup+inc": ("sum", "too_high"),
}


def correlated_series(
    values: np.ndarray, rho: float, rng: np.random.Generator
) -> np.ndarray:
    """A series with rank correlation ≈ ρ to ``values`` (Iman–Conover).

    Ranks are induced by mixing the standardized target with independent
    noise, then an independent normal sample is reordered to those ranks —
    the distribution-free rank-reordering trick of Iman & Conover [23].
    """
    z = (values - values.mean()) / (values.std(ddof=0) or 1.0)
    mixed = rho * z + np.sqrt(max(1 - rho**2, 0.0)) * rng.normal(size=len(values))
    sample = np.sort(rng.normal(size=len(values)))
    ranks = mixed.argsort().argsort()
    return sample[ranks]


def base_dataset(seed: int, n_groups: int = N_GROUPS) -> pd.DataFrame:
    """Clean rows: columns g (group) and m (measure)."""
    rng = np.random.default_rng(seed)
    counts = np.maximum(np.round(rng.normal(100, 20, n_groups)).astype(int), 20)
    g = np.repeat([f"g{i:03d}" for i in range(n_groups)], counts)
    m = rng.normal(100, 20, counts.sum())
    return pd.DataFrame({"g": g, "m": m})


def clean_group_stats(rows: pd.DataFrame) -> pd.DataFrame:
    return (
        rows.groupby("g")["m"]
        .agg(count="size", mean="mean")
        .assign(sum=lambda d: d["count"] * d["mean"])
        .reset_index()
    )


def aux_tables(
    rows: pd.DataFrame, rho: float, seed: int
) -> Dict[str, pd.DataFrame]:
    """Per-statistic auxiliary tables (g, aux) correlated with clean stats."""
    rng = np.random.default_rng(seed + 104729)
    stats = clean_group_stats(rows)
    out = {}
    for stat in ("count", "mean"):
        out[stat] = pd.DataFrame(
            {
                "g": stats["g"],
                "aux": correlated_series(
                    stats[stat].to_numpy(dtype=np.float64), rho, rng
                ),
            }
        )
    return out


def _apply_error(
    rows: pd.DataFrame, group: str, error: str, rng: np.random.Generator
) -> pd.DataFrame:
    mask = rows["g"] == group
    idx = rows.index[mask]
    if error == "missing":
        drop = rng.choice(idx, size=len(idx) // 2, replace=False)
        return rows.drop(index=drop).reset_index(drop=True)
    if error == "dup":
        dup = rng.choice(idx, size=len(idx) // 2, replace=False)
        return pd.concat([rows, rows.loc[dup]], ignore_index=True)
    if error == "inc":
        out = rows.copy()
        out.loc[mask, "m"] += 5.0
        return out
    if error == "dec":
        out = rows.copy()
        out.loc[mask, "m"] -= 5.0
        return out
    if "+" in error:
        out = rows
        for part in error.split("+"):
            out = _apply_error(out, group, part, rng)
        return out
    raise ValueError(f"unknown error type {error!r}")


@dataclass
class Trial:
    """One corrupted dataset with its ground truth."""

    rows: pd.DataFrame
    aux: Dict[str, pd.DataFrame]
    complaint: Complaint
    true_groups: List[str]  #: groups whose repair resolves the complaint
    decoys: List[str]  #: corrupted groups whose error opposes the complaint


def make_trial(
    seed: int, error: str, rho: float, n_groups: int = N_GROUPS
) -> Trial:
    """§5.2 single-error trial: one corrupted group, complaint implied."""
    if error not in ERROR_TYPES:
        raise ValueError(f"error must be one of {ERROR_TYPES}")
    rng = np.random.default_rng(seed)
    rows = base_dataset(seed, n_groups)
    aux = aux_tables(rows, rho, seed)
    target = f"g{rng.integers(0, n_groups):03d}"
    corrupted = _apply_error(rows, target, error, rng)
    agg, direction = COMPLAINT_FOR_ERROR[error]
    return Trial(
        rows=corrupted,
        aux=aux,
        complaint=Complaint({}, agg, direction),
        true_groups=[target],
        decoys=[],
    )


#: Fig. 12 conditions: (true-error spec, decoy spec, complaint agg+direction)
MULTI_ERROR_CONDITIONS = {
    "missing+duplication": (("missing", 2), ("dup", 1), "count", "too_low"),
    "dec+inc": (("dec", 2), ("inc", 1), "mean", "too_low"),
    "all": (("missing+dec", 2), ("dup+inc", 1), "sum", "too_low"),
}


def make_multi_trial(
    seed: int, condition: str, rho: float, n_groups: int = N_GROUPS
) -> Trial:
    """§5.2.2 multi-error trial: two true errors plus one false positive."""
    (true_err, n_true), (decoy_err, n_decoy), agg, direction = (
        MULTI_ERROR_CONDITIONS[condition]
    )
    rng = np.random.default_rng(seed)
    rows = base_dataset(seed, n_groups)
    aux = aux_tables(rows, rho, seed)
    picks = rng.choice(n_groups, size=n_true + n_decoy, replace=False)
    names = [f"g{i:03d}" for i in picks]
    corrupted = rows
    for gname in names[:n_true]:
        corrupted = _apply_error(corrupted, gname, true_err, rng)
    for gname in names[n_true:]:
        corrupted = _apply_error(corrupted, gname, decoy_err, rng)
    return Trial(
        rows=corrupted,
        aux=aux,
        complaint=Complaint({}, agg, direction),
        true_groups=names[:n_true],
        decoys=names[n_true:],
    )
