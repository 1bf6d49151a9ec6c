"""Decomposed count aggregates TOTAL / COUNT / COF (paper §4.2.1, App. I/J).

The factorised feature matrix is the cross product of the hierarchies' leaf
tables.  Every matrix-operation cell reduces to counting how often attribute
values (or value pairs) are duplicated in that cross product.  Exploiting
independence between hierarchies (App. J), those counts factor into

* a *within-hierarchy* part — counts over one hierarchy's O(w) path table, and
* a *scalar* part — the product of the other hierarchies' leaf totals.

``DecomposedAggregates`` stores the within parts (computed from the shared
path tables: the Alg. 10 work sharing) plus the totals, and exposes
full-matrix counts.  Cross-hierarchy COFs are never materialized: they are
returned as a :class:`CrossCOF` outer-product view (§4.3: "avoid materializing
the cartesian product for attributes from different hierarchies").
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Dict, List, Sequence, Tuple

import pandas as pd

from .relations import HierarchyRelations


@dataclass(frozen=True)
class CrossCOF:
    """Lazy COF_{A,B} for attributes of *different* hierarchies.

    Represents ``scale · (a_counts ⊗ b_counts)`` without materializing the
    outer product.  ``materialize()`` exists only for tests / the LMFAO
    comparison; the matrix operations consume the factors directly.
    """

    a_counts: pd.Series
    b_counts: pd.Series
    scale: int

    def materialize(self) -> pd.Series:
        idx = pd.MultiIndex.from_product([self.a_counts.index, self.b_counts.index])
        vals = (
            self.a_counts.values[:, None] * self.b_counts.values[None, :]
        ).ravel() * self.scale
        return pd.Series(vals, index=idx)


class DecomposedAggregates:
    """TOTAL/COUNT/COF over the cross product of hierarchies, factorised."""

    def __init__(self, relations: Sequence[HierarchyRelations]):
        self.relations: List[HierarchyRelations] = list(relations)
        #: attribute -> index of its hierarchy
        self.attr_hier: Dict[str, int] = {}
        for i, rel in enumerate(self.relations):
            for a in rel.attrs:
                self.attr_hier[a] = i
        self.totals: List[int] = [rel.n_leaves for rel in self.relations]
        # Work sharing (Alg. 10): each within-count / within-pair is one
        # O(w) groupby over the hierarchy's already-computed path table.
        self._within_count: Dict[str, pd.Series] = {}
        self._within_pair: Dict[Tuple[str, str], pd.Series] = {}
        for rel in self.relations:
            for a in rel.attrs:
                self._within_count[a] = rel.within_count(a)
            for i, a in enumerate(rel.attrs):
                for b in rel.attrs[i + 1 :]:
                    self._within_pair[(a, b)] = rel.within_pair(a, b)

    # -- scalars -----------------------------------------------------------
    @property
    def n_rows(self) -> int:
        """TOTAL over all attributes = number of rows of the full matrix."""
        return math.prod(self.totals)

    def scale_excluding(self, *hier_idx: int) -> int:
        """Product of leaf totals of every hierarchy not listed."""
        out = 1
        for i, t in enumerate(self.totals):
            if i not in hier_idx:
                out *= t
        return out

    # -- full-matrix counts ------------------------------------------------
    def total(self, attr: str) -> int:
        """TOTAL_A: full-matrix row count (same for every attribute)."""
        self._require(attr)
        return self.n_rows

    def count(self, attr: str) -> pd.Series:
        """COUNT_A: full-matrix multiplicity of each value of ``attr``."""
        self._require(attr)
        s = self.attr_hier[attr]
        return self._within_count[attr] * self.scale_excluding(s)

    def cof(self, attr_a: str, attr_b: str):
        """COF_{A,B}: full-matrix multiplicity of each (a, b) value pair.

        Same hierarchy → a materialized O(w) Series over the pairs that
        actually co-occur (the hierarchy's FDs prune the rest).  Different
        hierarchies → a lazy :class:`CrossCOF` (independence).
        """
        self._require(attr_a)
        self._require(attr_b)
        s, v = self.attr_hier[attr_a], self.attr_hier[attr_b]
        if s == v:
            key = (attr_a, attr_b)
            pair = self._within_pair.get(key)
            if pair is None:  # order-insensitive lookup
                pair = self._within_pair[(attr_b, attr_a)].swaplevel().sort_index()
            return pair * self.scale_excluding(s)
        return CrossCOF(
            a_counts=self._within_count[attr_a],
            b_counts=self._within_count[attr_b],
            scale=self.scale_excluding(s, v),
        )

    def _require(self, attr: str) -> None:
        if attr not in self.attr_hier:
            raise KeyError(f"unknown attribute {attr!r}")
