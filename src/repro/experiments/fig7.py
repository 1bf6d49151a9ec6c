"""Matrix-operation runtime sweep (paper Fig. 7 + App. F Fig. 15).

Configuration mirrors §5.1.1: d hierarchies with one attribute each of
cardinality w = 10, so the feature matrix is 10^d × (f·d).  For each d we
time factorised vs dense (numpy/BLAS — the Lapack stand-in):

* materialize — building the f-representation vs writing the full matrix
* gram        — ``gram_factorized`` vs ``XᵀX``
* left        — random 1×10^d input
* right       — random (f·d)×1 input
* cluster_*   — the per-cluster variants of App. F

Dense arms are skipped (None) above ``dense_cap`` rows to keep sweeps
bounded; the factorised arms keep going.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Dict, List, Optional, Sequence

import numpy as np
import pandas as pd

from repro.core.hierarchy import Hierarchy
from repro.factorized import matops
from repro.factorized.cluster_ops import (
    cluster_grams_dense,
    cluster_grams_factorized,
    cluster_index,
    cluster_left_mult_dense,
    cluster_left_mult_factorized,
    cluster_right_mult_dense,
    cluster_right_mult_factorized,
)
from repro.factorized.ftree import FTree, ordinal_encoding
from repro.factorized.relations import HierarchyRelations


def synthetic_relations(d: int, w: int) -> List[HierarchyRelations]:
    """d single-attribute hierarchies with w values each (no Spark needed)."""
    rels = []
    for s in range(d):
        attr = f"h{s}a0"
        h = Hierarchy(f"h{s}", [attr])
        path = pd.DataFrame({attr: [f"v{i:03d}" for i in range(w)]})
        rels.append(
            HierarchyRelations(hierarchy=h, attrs=(attr,), path=path, bcnf={attr: path})
        )
    return rels


def _timed(fn) -> float:
    t0 = time.perf_counter()
    fn()
    return time.perf_counter() - t0


@dataclass
class OpTiming:
    op: str
    d: int
    n_rows: int
    factorized_s: float
    dense_s: Optional[float]

    @property
    def speedup(self) -> Optional[float]:
        return None if self.dense_s is None else self.dense_s / self.factorized_s


def sweep(
    *,
    ds: Sequence[int] = (1, 2, 3, 4, 5, 6),
    w: int = 10,
    features_per_attr: int = 1,
    dense_cap: int = 2_000_000,
    clusters: bool = False,
    seed: int = 0,
) -> List[OpTiming]:
    rng = np.random.default_rng(seed)
    out: List[OpTiming] = []
    for d in ds:
        rels = synthetic_relations(d, w)
        enc = ordinal_encoding(features_per_attr)
        ft = FTree(rels, encoding=enc)
        n = ft.n_rows
        run_dense = n <= dense_cap

        t_fact = _timed(lambda: FTree(synthetic_relations(d, w), encoding=enc))
        x = None
        t_dense = None
        if run_dense:
            t_dense = _timed(lambda: ft.materialize())
            x = ft.materialize()
        out.append(OpTiming("materialize", d, n, t_fact, t_dense))

        t_fact = _timed(lambda: matops.gram_factorized(ft))
        t_dense = _timed(lambda: matops.gram_dense(x)) if run_dense else None
        out.append(OpTiming("gram", d, n, t_fact, t_dense))

        a = rng.normal(size=(1, n))
        t_fact = _timed(lambda: matops.left_mult_factorized(a, ft))
        t_dense = (
            _timed(lambda: matops.left_mult_dense(a, x)) if run_dense else None
        )
        out.append(OpTiming("left", d, n, t_fact, t_dense))

        c = rng.normal(size=(ft.n_cols, 1))
        t_fact = _timed(lambda: matops.right_mult_factorized(ft, c))
        t_dense = (
            _timed(lambda: matops.right_mult_dense(x, c)) if run_dense else None
        )
        out.append(OpTiming("right", d, n, t_fact, t_dense))

        if clusters:
            ci = cluster_index(ft)
            sizes = ci.row_sizes()
            t_fact = _timed(lambda: cluster_grams_factorized(ft))
            t_dense = (
                _timed(lambda: cluster_grams_dense(x, sizes)) if run_dense else None
            )
            out.append(OpTiming("cluster_gram", d, n, t_fact, t_dense))

            cpc = rng.normal(size=(ci.n_clusters, ft.n_cols))
            t_fact = _timed(lambda: cluster_right_mult_factorized(ft, cpc))
            t_dense = (
                _timed(lambda: cluster_right_mult_dense(x, sizes, cpc))
                if run_dense
                else None
            )
            out.append(OpTiming("cluster_right", d, n, t_fact, t_dense))

            af = rng.normal(size=n)
            t_fact = _timed(lambda: cluster_left_mult_factorized(af, ft))
            t_dense = (
                _timed(lambda: cluster_left_mult_dense(af, x, sizes))
                if run_dense
                else None
            )
            out.append(OpTiming("cluster_left", d, n, t_fact, t_dense))
    return out


def format_table(timings: List[OpTiming]) -> str:
    lines = ["op            d  rows       factorized(s)  dense(s)    speedup"]
    for t in timings:
        dense = f"{t.dense_s:.4f}" if t.dense_s is not None else "-"
        spd = f"{t.speedup:.1f}x" if t.speedup is not None else "-"
        lines.append(
            f"{t.op:<13} {t.d:<2} {t.n_rows:<10} {t.factorized_s:<14.4f} "
            f"{dense:<11} {spd}"
        )
    return "\n".join(lines)
