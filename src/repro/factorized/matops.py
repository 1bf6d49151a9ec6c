"""Factorised matrix operations (paper §4.2.2, App. E, Algs. 2–4).

Gram matrix, left multiplication and right multiplication over the
f-representation, plus their dense counterparts over the materialized
matrix (numpy's BLAS — the stand-in for the paper's Lapack/Matlab arms).

The factorised forms never touch the n-row cross product:

* gram:   within-hierarchy leaf grams + outer products of per-attribute
          weighted sums, scaled by the other hierarchies' totals (Alg. 2's
          ``COF`` / ``TOTAL`` bookkeeping, vectorised).
* left:   block-sum the input rows down to each hierarchy's leaf resolution
          (the prefix-sum range trick of Alg. 3, as one numpy reshape-sum).
* right:  per-hierarchy leaf products expanded by repeat/tile (the
          row-increment sharing of Alg. 4: vertically adjacent rows differ
          in one hierarchy's leaf only).
"""
from __future__ import annotations

import numpy as np

from .ftree import FTree


# ---------------------------------------------------------------------------
# Gram matrix
# ---------------------------------------------------------------------------
def gram_factorized(ftree: FTree) -> np.ndarray:
    """``XᵀX`` computed from decomposed aggregates in O(Σ w_s·m_s²)."""
    m = ftree.n_cols
    out = np.empty((m, m), dtype=np.float64)
    k = ftree.n_hierarchies
    # Per-hierarchy ingredients (leaf tables are O(w)):
    grams = [ftree.leaf_matrix(s).T @ ftree.leaf_matrix(s) for s in range(k)]
    sums = [ftree.leaf_matrix(s).sum(axis=0) for s in range(k)]
    agg = ftree.aggregates
    for s in range(k):
        cs = ftree.col_slice(s)
        out[cs, cs] = grams[s] * agg.scale_excluding(s)
        for v in range(s + 1, k):
            cv = ftree.col_slice(v)
            block = np.outer(sums[s], sums[v]) * agg.scale_excluding(s, v)
            out[cs, cv] = block
            out[cv, cs] = block.T
    return out


def gram_dense(x: np.ndarray) -> np.ndarray:
    """Dense baseline: BLAS gram over the materialized matrix."""
    return x.T @ x


# ---------------------------------------------------------------------------
# Left multiplication  A · X   (A: q×n)
# ---------------------------------------------------------------------------
def left_mult_factorized(a: np.ndarray, ftree: FTree) -> np.ndarray:
    """``A·X`` without materializing X.

    For hierarchy s, column block values repeat with period ``inner(s)`` and
    tile ``outer(s)`` times, so each column's dot product is a weighted sum
    of *range sums* of A (Alg. 3).  The range sums nest across hierarchies:
    summing out the innermost hierarchy's blocks gives the next hierarchy's
    range sums — so the whole set costs O(q·n) additions once (≈ 2n with
    w=10), versus the dense GEMM's O(q·n·m) multiply-adds.
    """
    a = np.atleast_2d(np.asarray(a, dtype=np.float64))
    q, n = a.shape
    if n != ftree.n_rows:
        raise ValueError(f"A has {n} columns; X has {ftree.n_rows} rows")
    k = ftree.n_hierarchies
    blocks: list = [None] * k
    # innermost-first: partial[s] holds A summed over inner(s) blocks,
    # shape (q, outer(s) * leaves(s))
    partial = a
    for s in range(k - 1, -1, -1):
        leaves = ftree.relations[s].n_leaves
        r = partial.reshape(q, ftree.outer(s), leaves).sum(axis=1)
        blocks[s] = r @ ftree.leaf_matrix(s)
        if s > 0:
            partial = partial.reshape(q, -1, leaves).sum(axis=2)
    return np.hstack(blocks)


def left_mult_dense(a: np.ndarray, x: np.ndarray) -> np.ndarray:
    return np.atleast_2d(a) @ x


# ---------------------------------------------------------------------------
# Right multiplication  X · C   (C: m×p)
# ---------------------------------------------------------------------------
def right_mult_factorized(ftree: FTree, c: np.ndarray) -> np.ndarray:
    """``X·C``; the n×p output is materialized (it has no redundancy).

    Vertically adjacent rows of X share everything but the innermost
    hierarchy's leaf (Alg. 4), so the output builds outside-in: each
    hierarchy's per-leaf contribution ``leaf_matrix_s @ C_s`` (an O(w) GEMM)
    is broadcast-added onto the accumulator of the hierarchies before it.
    Total cost ≈ n·(1 + 1/w + ...) additions vs the dense O(n·m) GEMM.
    """
    c = np.asarray(c, dtype=np.float64)
    if c.ndim == 1:
        c = c[:, None]
    if c.shape[0] != ftree.n_cols:
        raise ValueError(f"C has {c.shape[0]} rows; X has {ftree.n_cols} columns")
    p = c.shape[1]
    acc = np.zeros((1, p), dtype=np.float64)
    for s in range(ftree.n_hierarchies):
        part = ftree.leaf_matrix(s) @ c[ftree.col_slice(s), :]  # (leaves, p)
        acc = (acc[:, None, :] + part[None, :, :]).reshape(-1, p)
    return acc


def right_mult_dense(x: np.ndarray, c: np.ndarray) -> np.ndarray:
    c = np.asarray(c, dtype=np.float64)
    return x @ (c[:, None] if c.ndim == 1 else c)
