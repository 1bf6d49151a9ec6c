"""Feature matrix construction for the repair model (paper §3.3, App. B).

The training table is the drill-down result over *all parallel groups*: one
row per group, with the group's distributive statistics.  Features:

* **Default (main effects)** — every group-by attribute is categorical; its
  feature is the median of the target statistic over groups sharing the
  attribute value (§3.3.1), computed as a Spark ``groupBy().agg(median)``
  job joined back to the training table.
* **Auxiliary datasets** — joined on their key columns; their measure columns
  are centred and normalised (§3.3.2).
* **Custom features** — arbitrary ``DataFrame → DataFrame`` transforms that
  append numeric columns; :func:`add_lag_feature` (used in the COVID study)
  is the canonical example (§3.3.3).

The output keeps the group-by attributes, a ``cluster`` id column (the parent
groups = inter-cluster attributes), the target ``y``, and feature columns
``f_*`` with ``f_intercept`` first.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable, List, Optional, Sequence

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

FEATURE_PREFIX = "f_"
INTERCEPT = "f_intercept"
CLUSTER_COL = "cluster"


@dataclass(frozen=True)
class AuxDataset:
    """An auxiliary dataset to join into the feature matrix (§3.3.2).

    ``df``: the dataset; ``on``: join columns (must all be in the training
    table for the join to be *applicable*); ``measures``: numeric columns to
    add as features.
    """

    name: str
    df: DataFrame
    on: tuple
    measures: tuple

    def __init__(self, name: str, df: DataFrame, on: Sequence[str], measures: Sequence[str]):
        object.__setattr__(self, "name", name)
        object.__setattr__(self, "df", df)
        object.__setattr__(self, "on", tuple(on))
        object.__setattr__(self, "measures", tuple(measures))

    def applicable(self, group_cols: Sequence[str]) -> bool:
        return set(self.on) <= set(group_cols)


@dataclass
class FeaturePlan:
    """What goes into X: main effects + auxiliary joins + custom features."""

    aux: List[AuxDataset] = field(default_factory=list)
    #: transforms appending extra numeric feature columns named f_*
    custom: List[Callable[[DataFrame], DataFrame]] = field(default_factory=list)
    #: attribute subset for the random-effects matrix Z (None = all of X)
    z_features: Optional[List[str]] = None
    #: main-effect encodings of the group-by attributes (§3.3.1). Disable
    #: when a single group-by attribute would make the encoding the group's
    #: own label (the Fig. 11 single-dimension setup trains on aux only).
    use_main_effects: bool = True


def main_effect_features(
    grouped: DataFrame, group_cols: Sequence[str], y_col: str
) -> DataFrame:
    """Replace each categorical attribute with the median-Y main effect.

    One Spark aggregation per attribute; the encodings are tiny (one row per
    attribute value) so the join back is a broadcast-friendly equi-join.
    """
    out = grouped
    for attr in group_cols:
        enc = grouped.groupBy(attr).agg(
            F.expr(f"median({y_col})").alias(f"{FEATURE_PREFIX}{attr}")
        )
        out = out.join(enc, on=attr, how="left")
    return out


def normalize_columns(df: DataFrame, cols: Sequence[str]) -> DataFrame:
    """Centre and scale numeric feature columns ((x − mean) / std)."""
    if not cols:
        return df
    stats = df.select(
        *[F.avg(c).alias(f"mu_{c}") for c in cols],
        *[F.coalesce(F.stddev_samp(c), F.lit(1.0)).alias(f"sd_{c}") for c in cols],
    ).collect()[0]
    out = df
    for c in cols:
        sd = stats[f"sd_{c}"] or 1.0
        sd = sd if sd > 0 else 1.0
        out = out.withColumn(c, (F.col(c) - F.lit(stats[f"mu_{c}"])) / F.lit(sd))
    return out


def add_lag_feature(
    df: DataFrame,
    *,
    partition_cols: Sequence[str],
    order_col: str,
    value_col: str,
    lag: int,
    name: str | None = None,
) -> DataFrame:
    """Append a lagged value of ``value_col`` as a feature (COVID §App. L).

    Nulls at series starts are filled with the partition mean so every row
    stays usable for training.
    """
    name = name or f"{FEATURE_PREFIX}lag{lag}_{value_col}"
    w = Window.partitionBy(*partition_cols).orderBy(order_col)
    wp = Window.partitionBy(*partition_cols)
    lagged = F.lag(F.col(value_col), lag).over(w)
    return df.withColumn(name, F.coalesce(lagged, F.avg(value_col).over(wp)))


def build_feature_table(
    grouped: DataFrame,
    *,
    group_cols: Sequence[str],
    cluster_cols: Sequence[str],
    y_col: str,
    plan: FeaturePlan | None = None,
) -> tuple:
    """Assemble the training table for one target statistic.

    ``grouped`` is the parallel-group table (one row per drill-down group,
    with statistic columns).  Returns ``(df, feature_cols)`` where ``df`` has
    ``group_cols``, ``cluster`` (concatenated ``cluster_cols``; a constant
    when there are no parent groups), ``y`` and the ``f_*`` columns.
    """
    plan = plan or FeaturePlan()
    df = grouped.withColumn("y", F.col(y_col).cast("double"))
    df = df.withColumn(INTERCEPT, F.lit(1.0))
    if plan.use_main_effects:
        df = main_effect_features(df, group_cols, "y")

    aux_cols: List[str] = []
    for aux in plan.aux:
        if not aux.applicable(group_cols):
            continue
        proj = aux.df.select(
            *aux.on,
            *[
                F.col(mcol).cast("double").alias(f"{FEATURE_PREFIX}{aux.name}_{mcol}")
                for mcol in aux.measures
            ],
        )
        df = df.join(proj, on=list(aux.on), how="left")
        aux_cols += [f"{FEATURE_PREFIX}{aux.name}_{mcol}" for mcol in aux.measures]
    df = normalize_columns(df, aux_cols)
    for c in aux_cols:  # groups absent from the aux data get the (0) mean
        df = df.withColumn(c, F.coalesce(F.col(c), F.lit(0.0)))

    for fn in plan.custom:
        df = fn(df)

    if cluster_cols:
        df = df.withColumn(
            CLUSTER_COL, F.concat_ws("␟", *[F.col(c) for c in cluster_cols])
        )
    else:
        df = df.withColumn(CLUSTER_COL, F.lit("_all"))

    feature_cols = [INTERCEPT] + [
        c for c in df.columns if c.startswith(FEATURE_PREFIX) and c != INTERCEPT
    ]
    return df, feature_cols
