"""Per-hierarchy BCNF relations — the Factorizer's storage layer (App. C).

For a hierarchy ``[A_1, ..., A_k]`` (least → most specific) the paper's
Factorizer stores the normalized relations ``R_1[A_1]`` and
``R_j[A_{j-1}, A_j]`` as sorted maps.  Here each hierarchy additionally keeps
its *path table* — the within-hierarchy join ``R_1 ⋈ ... ⋈ R_k`` with one row
per leaf (distinct most-specific value), sorted in attribute order.  The path
table is O(w) rows by construction, is computed once per hierarchy as a Spark
``distinct`` job (this is the multi-query work sharing of Alg. 10: every
decomposed aggregate of the hierarchy reuses it), and is what the factorised
matrix operations traverse.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Sequence, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.core.hierarchy import Hierarchy


@dataclass
class HierarchyRelations:
    """Collected, sorted relations of one hierarchy at some drill depth."""

    hierarchy: Hierarchy
    #: attributes currently included (a prefix of hierarchy.attrs)
    attrs: Tuple[str, ...]
    #: within-hierarchy join of the BCNF relations; one sorted row per leaf
    path: pd.DataFrame
    #: BCNF relations: attrs[0] -> distinct values, attrs[j] -> (parent, child)
    bcnf: Dict[str, pd.DataFrame] = field(default_factory=dict)

    @property
    def n_leaves(self) -> int:
        return len(self.path)

    def domain(self, attr: str) -> np.ndarray:
        """Sorted distinct values of one attribute."""
        return np.sort(self.path[attr].unique())

    def within_count(self, attr: str) -> pd.Series:
        """COUNT_A restricted to this hierarchy: leaves per attribute value."""
        return self.path.groupby(attr, sort=True).size().astype("int64")

    def within_pair(self, attr_a: str, attr_b: str) -> pd.Series:
        """COF_{A,B} restricted to this hierarchy: leaves per (a, b) pair."""
        return self.path.groupby([attr_a, attr_b], sort=True).size().astype("int64")


def collect_hierarchy(
    df: DataFrame, hierarchy: Hierarchy, depth: int | None = None
) -> HierarchyRelations:
    """Build one hierarchy's relations from the base relation via Spark.

    ``depth`` limits the hierarchy to its first *depth* attributes (drill
    level); ``None`` means fully drilled.  The path table is one Spark
    ``select(...).distinct().orderBy(...)`` job; the BCNF relations are
    derived from it on the driver (they are projections of the path and at
    most O(w) rows, so recomputing them in Spark would add jobs, not fidelity).
    """
    attrs = hierarchy.attrs if depth is None else hierarchy.prefix(depth)
    if not attrs:
        raise ValueError(f"hierarchy {hierarchy.name!r} needs depth >= 1")
    path = (
        df.select(*attrs).distinct().orderBy(*attrs).toPandas().reset_index(drop=True)
    )
    bcnf: Dict[str, pd.DataFrame] = {attrs[0]: path[[attrs[0]]].drop_duplicates()}
    for parent, child in zip(attrs, attrs[1:]):
        bcnf[child] = path[[parent, child]].drop_duplicates()
    return HierarchyRelations(
        hierarchy=hierarchy, attrs=tuple(attrs), path=path, bcnf=bcnf
    )


def collect_all(
    df: DataFrame,
    hierarchies: Sequence[Hierarchy],
    depths: Dict[str, int] | None = None,
) -> List[HierarchyRelations]:
    """Collect relations for several hierarchies (one Spark job each)."""
    out = []
    for h in hierarchies:
        d = None if depths is None else depths.get(h.name)
        out.append(collect_hierarchy(df, h, d))
    return out
