"""LMFAO-style serial aggregate computation (paper §5.1.2 comparison).

LMFAO executes each decomposed aggregate as its own query over the joined
relations, without Reptile's two optimizations: (a) sharing the per-hierarchy
path computation across aggregates and (b) exploiting independence between
hierarchies to keep cross-hierarchy COFs factorised.  ``compute_serial``
reproduces that plan shape in Spark: every COUNT/COF re-derives its
hierarchy's leaf table from the base relation, and cross-hierarchy COFs are
materialized with an actual ``crossJoin`` + ``groupBy``.  ``compute_shared``
is Reptile's plan (one path job per hierarchy, factorised cross COFs).
"""
from __future__ import annotations

import math
from typing import Dict, Optional, Tuple

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.hierarchy import Schema
from repro.factorized.aggregates import DecomposedAggregates
from repro.factorized.relations import collect_all


def _attrs(schema: Schema, depths: Optional[Dict[str, int]]):
    for h in schema.hierarchies:
        d = h.depth if depths is None else depths.get(h.name, h.depth)
        yield h, list(h.prefix(d))


def compute_serial(
    df: DataFrame, schema: Schema, depths: Optional[Dict[str, int]] = None
) -> Dict[str, object]:
    """Every aggregate as an independent Spark job (the LMFAO-style arm).

    Returns {'count': {attr: Series}, 'cof': {(a, b): Series}, 'total': int}
    with full-cross-product multiplicities, for equivalence testing against
    :class:`DecomposedAggregates`.
    """
    hier_attrs = list(_attrs(schema, depths))
    # leaf totals are re-derived per use, serially (no sharing)
    def leaf_df(h, attrs) -> DataFrame:
        return df.select(*attrs).distinct()

    totals = {h.name: leaf_df(h, attrs).count() for h, attrs in hier_attrs}
    n_rows = math.prod(totals.values())

    counts: Dict[str, pd.Series] = {}
    cofs: Dict[Tuple[str, str], pd.Series] = {}
    for h, attrs in hier_attrs:
        scale = n_rows // totals[h.name]
        for a in attrs:
            # independent job: recompute the leaf table, then aggregate
            pdf = (
                leaf_df(h, attrs)
                .groupBy(a)
                .agg(F.count(F.lit(1)).alias("c"))
                .orderBy(a)
                .toPandas()
            )
            counts[a] = pd.Series(
                pdf["c"].to_numpy() * scale, index=pdf[a].to_numpy()
            )
        for i, a in enumerate(attrs):
            for b in attrs[i + 1 :]:
                pdf = (
                    leaf_df(h, attrs)
                    .groupBy(a, b)
                    .agg(F.count(F.lit(1)).alias("c"))
                    .orderBy(a, b)
                    .toPandas()
                )
                cofs[(a, b)] = pd.Series(
                    pdf["c"].to_numpy() * scale,
                    index=pd.MultiIndex.from_frame(pdf[[a, b]]),
                )
    # cross-hierarchy COFs: materialized cartesian products (no independence)
    for i, (h1, attrs1) in enumerate(hier_attrs):
        for h2, attrs2 in hier_attrs[i + 1 :]:
            scale = n_rows // (totals[h1.name] * totals[h2.name])
            for a in attrs1:
                for b in attrs2:
                    pdf = (
                        leaf_df(h1, attrs1)
                        .crossJoin(leaf_df(h2, attrs2))
                        .groupBy(a, b)
                        .agg(F.count(F.lit(1)).alias("c"))
                        .orderBy(a, b)
                        .toPandas()
                    )
                    cofs[(a, b)] = pd.Series(
                        pdf["c"].to_numpy() * scale,
                        index=pd.MultiIndex.from_frame(pdf[[a, b]]),
                    )
    return {"count": counts, "cof": cofs, "total": n_rows}


def compute_shared(
    df: DataFrame, schema: Schema, depths: Optional[Dict[str, int]] = None
) -> DecomposedAggregates:
    """Reptile's multi-query plan: one path job per hierarchy, shared."""
    rels = collect_all(df, schema.hierarchies, depths)
    return DecomposedAggregates(rels)
