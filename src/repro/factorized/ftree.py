"""Factorised feature matrix — the f-tree (paper §3.4, App. B/C).

The feature matrix ``X`` is the cross product of the hierarchies' leaf
tables, one column (or feature block) per attribute, ordered by hierarchy
(drill-down hierarchy last) and least→most specific within a hierarchy.
``FTree`` never materializes ``X``; it stores the per-hierarchy leaf tables
(O(w) rows each) plus per-attribute *encodings* mapping attribute values to
feature values (App. B isolates the attribute matrix from the feature matrix
via this one-to-one mapping).

Row-order convention: hierarchy 0 varies slowest, the last hierarchy fastest;
within a hierarchy, leaves appear in sorted path order.  ``outer(s)`` /
``inner(s)`` are the products of the other hierarchies' leaf counts before /
after hierarchy ``s`` — every factorised matrix operation is expressed with
tile/repeat arithmetic over these.
"""
from __future__ import annotations

import math
from typing import Callable, Dict, List, Sequence

import numpy as np
import pandas as pd

from .aggregates import DecomposedAggregates
from .relations import HierarchyRelations

#: An encoding maps an attribute's value Series to an (n_leaves, f) array.
Encoding = Callable[[pd.Series], np.ndarray]


def ordinal_encoding(features_per_attr: int = 1) -> Encoding:
    """Default encoding: value rank (1-based) in the sorted domain.

    With ``features_per_attr > 1`` each attribute contributes f columns
    (rank, rank², …, each rescaled) — mirroring the Fig. 7 setup where the
    matrix has ``t·d`` feature columns for ``d`` attributes.
    """

    def enc(values: pd.Series) -> np.ndarray:
        domain = np.sort(pd.unique(values))
        rank = pd.Series(np.arange(1, len(domain) + 1, dtype=np.float64), index=domain)
        base = rank.loc[values].to_numpy()
        cols = [base ** (k + 1) / len(domain) ** k for k in range(features_per_attr)]
        return np.column_stack(cols)

    return enc


class FTree:
    """Factorised representation of the (cross-product) feature matrix."""

    def __init__(
        self,
        relations: Sequence[HierarchyRelations],
        encoding: Encoding | None = None,
        encodings: Dict[str, Encoding] | None = None,
    ):
        self.relations: List[HierarchyRelations] = list(relations)
        default_enc = encoding or ordinal_encoding(1)
        encodings = encodings or {}
        #: per-hierarchy encoded leaf matrix (n_leaves × sum of attr widths)
        self._leaf: List[np.ndarray] = []
        #: per-hierarchy list of (attr, width)
        self._attr_widths: List[List[tuple]] = []
        for rel in self.relations:
            blocks, widths = [], []
            for a in rel.attrs:
                enc = encodings.get(a, default_enc)
                block = np.asarray(enc(rel.path[a]), dtype=np.float64)
                if block.ndim == 1:
                    block = block[:, None]
                blocks.append(block)
                widths.append((a, block.shape[1]))
            self._leaf.append(np.hstack(blocks))
            self._attr_widths.append(widths)
        self.aggregates = DecomposedAggregates(self.relations)

    # -- shape -------------------------------------------------------------
    @property
    def n_hierarchies(self) -> int:
        return len(self.relations)

    @property
    def n_rows(self) -> int:
        return self.aggregates.n_rows

    @property
    def n_cols(self) -> int:
        return sum(m.shape[1] for m in self._leaf)

    @property
    def columns(self) -> List[str]:
        """Column labels, 'attr' or 'attr#k' for multi-feature attributes."""
        out: List[str] = []
        for widths in self._attr_widths:
            for a, w in widths:
                out.extend([a] if w == 1 else [f"{a}#{k}" for k in range(w)])
        return out

    def leaf_matrix(self, s: int) -> np.ndarray:
        """Hierarchy s's encoded leaf matrix (n_leaves × m_s)."""
        return self._leaf[s]

    def col_slice(self, s: int) -> slice:
        """Columns of the full matrix contributed by hierarchy s."""
        start = sum(m.shape[1] for m in self._leaf[:s])
        return slice(start, start + self._leaf[s].shape[1])

    def outer(self, s: int) -> int:
        """Rows repeat count of hierarchy s's block pattern (slower hiers)."""
        return math.prod(r.n_leaves for r in self.relations[:s])

    def inner(self, s: int) -> int:
        """Within-block repeat count of each hierarchy-s leaf (faster hiers)."""
        return math.prod(r.n_leaves for r in self.relations[s + 1 :])

    # -- materialization ---------------------------------------------------
    def materialize(self) -> np.ndarray:
        """The full n×m feature matrix (dense baseline; exponential in d)."""
        cols = []
        for s in range(self.n_hierarchies):
            block = np.repeat(self._leaf[s], self.inner(s), axis=0)
            cols.append(np.tile(block, (self.outer(s), 1)))
        return np.hstack(cols)

    def materialize_attrs(self) -> pd.DataFrame:
        """The full attribute matrix (values, not encodings) — tests only."""
        frames = []
        for s, rel in enumerate(self.relations):
            rep = rel.path.loc[rel.path.index.repeat(self.inner(s))].reset_index(
                drop=True
            )
            frames.append(pd.concat([rep] * self.outer(s), ignore_index=True))
        return pd.concat(frames, axis=1)
