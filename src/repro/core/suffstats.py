"""Per-cluster sufficient statistics via Spark aggregation (§4.1–4.2 analog).

The EM updates of Appendix D touch the data only through the products
``X_iᵀX_i``, ``X_iᵀy_i``, ``y_iᵀy_i`` and ``n_i`` per cluster (plus their
global sums).  This module computes them with one distributed pass: a
``groupBy(cluster)`` job whose aggregation list is the upper triangle of the
``[X|y]ᵀ[X|y]`` moment matrix as ``sum(f_i·f_j)`` expressions — the
"factorised learning" aggregate, compiled by Catalyst with no per-group
Python.  After this one pass EM never needs the raw rows again: the paper's
reduction of matrix operations to batches of aggregation queries.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass
class ClusterStats:
    """Sufficient statistics of one cluster for the mixed-effects EM."""

    n: float
    xtx: np.ndarray  # (m, m)
    xty: np.ndarray  # (m,)
    yty: float


@dataclass
class SuffStats:
    """Per-cluster statistics plus their global aggregation."""

    clusters: Dict[str, ClusterStats]
    feature_cols: List[str]

    @property
    def n(self) -> float:
        return sum(c.n for c in self.clusters.values())

    @property
    def xtx(self) -> np.ndarray:
        return sum(c.xtx for c in self.clusters.values())

    @property
    def xty(self) -> np.ndarray:
        return sum(c.xty for c in self.clusters.values())

    @property
    def yty(self) -> float:
        return sum(c.yty for c in self.clusters.values())


def compute_suffstats(
    df: DataFrame, feature_cols: Sequence[str], y_col: str = "y",
    cluster_col: str = "cluster",
) -> SuffStats:
    """One Spark aggregation computing every cluster's moment matrix.

    The upper triangle of the ``[X | y]`` moment matrix becomes a batch of
    ``sum(f_i · f_j)`` aggregation expressions in one ``groupBy(cluster)``
    job — the paper's reduction of matrix operations to batches of
    aggregation queries, executed by Catalyst with no per-group Python.
    NaNs in features are treated as 0 so that a sparse auxiliary join cannot
    poison a whole cluster.
    """
    cols = list(feature_cols)
    m = len(cols)
    clean = [
        F.coalesce(F.col(c).cast("double"), F.lit(0.0)).alias(f"__v{i}")
        for i, c in enumerate(cols)
    ] + [F.coalesce(F.col(y_col).cast("double"), F.lit(0.0)).alias(f"__v{m}")]
    proj = df.select(F.col(cluster_col), *clean)
    aggs = [F.count(F.lit(1)).cast("double").alias("__n")]
    for i in range(m + 1):
        for j in range(i, m + 1):
            aggs.append(
                F.sum(F.col(f"__v{i}") * F.col(f"__v{j}")).alias(f"__m_{i}_{j}")
            )
    rows = proj.groupBy(cluster_col).agg(*aggs).collect()
    clusters: Dict[str, ClusterStats] = {}
    for r in rows:
        mom = np.empty((m + 1, m + 1), dtype=np.float64)
        for i in range(m + 1):
            for j in range(i, m + 1):
                mom[i, j] = mom[j, i] = float(r[f"__m_{i}_{j}"] or 0.0)
        clusters[str(r[cluster_col])] = ClusterStats(
            n=float(r["__n"]),
            xtx=mom[:m, :m],
            xty=mom[:m, m],
            yty=float(mom[m, m]),
        )
    return SuffStats(clusters=clusters, feature_cols=list(cols))


def suffstats_from_pandas(
    pdf: pd.DataFrame, feature_cols: Sequence[str], y_col: str = "y",
    cluster_col: str = "cluster",
) -> SuffStats:
    """Driver-side equivalent for small tables / tests (same math, no Spark)."""
    cols = list(feature_cols)
    clusters: Dict[str, ClusterStats] = {}
    for key, grp in pdf.groupby(cluster_col, sort=True):
        xy = np.column_stack(
            [np.nan_to_num(grp[c].to_numpy(dtype=np.float64)) for c in cols]
            + [np.nan_to_num(grp[y_col].to_numpy(dtype=np.float64))]
        )
        mom = xy.T @ xy
        m = len(cols)
        clusters[str(key)] = ClusterStats(
            n=float(len(grp)), xtx=mom[:m, :m], xty=mom[:m, m], yty=float(mom[m, m])
        )
    return SuffStats(clusters=clusters, feature_cols=cols)
