"""Synthetic hierarchical datasets (paper §5.1 default setup + Fig. 10 shapes).

``hier_dataset`` builds a relation with ``d`` independent hierarchies of ``t``
attributes each, ``w`` distinct leaf values per hierarchy, a measure column,
and the within-hierarchy functional dependencies A_n → A_m the paper assumes
(each leaf maps to one parent chain).  ``absentee_like`` / ``compas_like``
mirror the two real datasets' hierarchy shapes used in the end-to-end
runtime evaluation (§5.1.4).
"""
from __future__ import annotations

from typing import List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.hierarchy import Hierarchy, Schema


def _hierarchy_columns(
    prefix: str, t: int, w: int, fanout: int, rng: np.random.Generator
) -> pd.DataFrame:
    """One hierarchy's leaf table: w leaves, t attribute levels.

    Leaf j's ancestors are derived by integer division so the FDs hold by
    construction: level l (0 = least specific) has ~w / fanout^(t-1-l)
    distinct values.
    """
    leaves = np.arange(w)
    cols = {}
    for level in range(t):
        div = fanout ** (t - 1 - level)
        cols[f"{prefix}{level}"] = [f"{prefix}{level}_{v}" for v in leaves // div]
    return pd.DataFrame(cols)


def hier_schema(d: int, t: int) -> Schema:
    """Schema with hierarchies h0..h{d-1}, each with attrs hs0..hs{t-1}."""
    hiers = [
        Hierarchy(f"h{s}", [f"h{s}a{l}" for l in range(t)]) for s in range(d)
    ]
    return Schema(hiers, measure="m")


def hier_dataset(
    spark: SparkSession,
    *,
    d: int = 3,
    t: int = 3,
    w: int = 100,
    n_rows: int | None = None,
    fanout: int = 4,
    seed: int = 0,
) -> DataFrame:
    """Rows with one leaf value per hierarchy plus a numeric measure.

    ``n_rows`` defaults to 10·w so every leaf is observed in expectation.
    Columns follow ``hier_schema(d, t)`` naming.
    """
    rng = np.random.default_rng(seed)
    n = n_rows or 10 * w
    data = {}
    for s in range(d):
        leaf_tab = _hierarchy_columns(f"h{s}a", t, w, fanout, rng)
        pick = rng.integers(0, w, n)
        for c in leaf_tab.columns:
            data[c] = leaf_tab[c].to_numpy()[pick]
    data["m"] = rng.normal(100, 20, n)
    return spark.createDataFrame(pd.DataFrame(data))


# -- Fig. 10 dataset shapes --------------------------------------------------
def absentee_like(
    spark: SparkSession, *, n_rows: int = 179_000, seed: int = 0
) -> DataFrame:
    """NC-absentee-shaped data: county(100) / party(6) / week(53) / gender(3)."""
    rng = np.random.default_rng(seed)
    pdf = pd.DataFrame(
        {
            "county": [f"county_{i:03d}" for i in rng.integers(0, 100, n_rows)],
            "party": [f"party_{i}" for i in rng.integers(0, 6, n_rows)],
            "week": [f"week_{i:02d}" for i in rng.integers(0, 53, n_rows)],
            "gender": [f"g_{i}" for i in rng.integers(0, 3, n_rows)],
            "m": rng.normal(1.0, 0.1, n_rows),
        }
    )
    return spark.createDataFrame(pdf)


ABSENTEE_SCHEMA = Schema(
    [
        Hierarchy("county", ["county"]),
        Hierarchy("party", ["party"]),
        Hierarchy("week", ["week"]),
        Hierarchy("gender", ["gender"]),
    ],
    measure="m",
)


def compas_like(
    spark: SparkSession, *, n_rows: int = 60_843, seed: int = 0
) -> DataFrame:
    """COMPAS-shaped data: time(year/month/day, 704 days) + age(3)/race(6)/degree(3)."""
    rng = np.random.default_rng(seed)
    day_idx = rng.integers(0, 704, n_rows)
    dates = pd.to_datetime("2013-01-01") + pd.to_timedelta(day_idx, unit="D")
    pdf = pd.DataFrame(
        {
            "year": dates.year.astype(str),
            "month": dates.strftime("%Y-%m"),
            "day": dates.strftime("%Y-%m-%d"),
            "age": [f"age_{i}" for i in rng.integers(0, 3, n_rows)],
            "race": [f"race_{i}" for i in rng.integers(0, 6, n_rows)],
            "degree": [f"deg_{i}" for i in rng.integers(0, 3, n_rows)],
            "m": rng.normal(5.0, 2.0, n_rows),
        }
    )
    return spark.createDataFrame(pdf)


COMPAS_SCHEMA = Schema(
    [
        Hierarchy("time", ["year", "month", "day"]),
        Hierarchy("age", ["age"]),
        Hierarchy("race", ["race"]),
        Hierarchy("degree", ["degree"]),
    ],
    measure="m",
)


def single_attr_hierarchies(d: int, w: int) -> List[dict]:
    """Fig. 7 configuration descriptor: d hierarchies × 1 attribute × w values."""
    return [{"name": f"h{s}", "attrs": [f"h{s}a0"], "w": w} for s in range(d)]
