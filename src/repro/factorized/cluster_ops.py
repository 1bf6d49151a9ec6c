"""Per-cluster matrix operations over the f-representation (App. F).

Clusters are the multi-level model's parent groups: all attributes except the
*intra-cluster* attribute (the most specific attribute of the drill-down
hierarchy, which is ordered last).  With the FTree row convention, every
cluster is a contiguous row slice, the inter-cluster columns are constant
within a cluster, and only the last attribute's feature block varies — the
structure Algorithms 5–7 exploit by updating only the difference between
adjacent clusters.  Here those incremental updates are expressed as
broadcasted numpy einsums over

* ``U``  — the materialized cross product of the *other* hierarchies
  (o rows; this is also the per-cluster output size, so materializing it
  does not change the asymptotics: the outputs have no redundancy), and
* per within-group summaries of the last hierarchy: sizes ``n_g``, constant
  parent-prefix features ``P``, varying-column sums ``S`` and grams ``Q``.

Dense baselines loop over clusters and slice the materialized matrix.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Tuple

import numpy as np

from .ftree import FTree


@dataclass(frozen=True)
class ClusterIndex:
    """Cluster structure of an FTree (intra attr = last attr of last hier)."""

    n_other: int  #: combos of all non-last hierarchies (outer loop)
    n_groups: int  #: parent-prefix groups inside the last hierarchy
    sizes: np.ndarray  #: rows per within-group, shape (n_groups,)
    group_of_leaf: np.ndarray  #: within-group id per last-hierarchy leaf

    @property
    def n_clusters(self) -> int:
        return self.n_other * self.n_groups

    def row_sizes(self) -> np.ndarray:
        """Rows per cluster, in cluster (row-slice) order."""
        return np.tile(self.sizes, self.n_other)


def cluster_index(ftree: FTree) -> ClusterIndex:
    last = ftree.relations[-1]
    parent_attrs = list(last.attrs[:-1])
    if parent_attrs:
        codes = last.path.groupby(parent_attrs, sort=False).ngroup().to_numpy()
    else:
        codes = np.zeros(last.n_leaves, dtype=np.int64)
    # path is sorted, so groups are consecutive runs
    n_groups = int(codes.max()) + 1 if len(codes) else 0
    sizes = np.bincount(codes, minlength=n_groups)
    return ClusterIndex(
        n_other=ftree.outer(ftree.n_hierarchies - 1),
        n_groups=n_groups,
        sizes=sizes,
        group_of_leaf=codes,
    )


def _parts(ftree: FTree):
    """Split the feature columns into (constant-within-cluster, varying).

    Returns (U, P, V_groups, widths) where U is the other-hierarchy cross
    product (n_other × m_u), P the last hierarchy's parent-prefix features per
    within-group (n_groups × m_p), and V_groups the varying feature rows per
    within-group (list of (n_g × m_v)).
    """
    ci = cluster_index(ftree)
    k = ftree.n_hierarchies
    # cross product of all non-last hierarchies
    if k > 1:
        sub_cols = []
        for s in range(k - 1):
            inner = int(np.prod([r.n_leaves for r in ftree.relations[s + 1 : k - 1]]))
            outer = int(np.prod([r.n_leaves for r in ftree.relations[:s]]))
            block = np.repeat(ftree.leaf_matrix(s), inner, axis=0)
            sub_cols.append(np.tile(block, (outer, 1)))
        u = np.hstack(sub_cols)
    else:
        u = np.zeros((1, 0))
    leaf = ftree.leaf_matrix(k - 1)
    last = ftree.relations[-1]
    widths = dict(ftree._attr_widths[k - 1])
    m_v = widths[last.attrs[-1]]
    v_cols = leaf[:, leaf.shape[1] - m_v :]
    p_cols = leaf[:, : leaf.shape[1] - m_v]
    starts = np.concatenate([[0], np.cumsum(ci.sizes)])
    v_groups = [v_cols[starts[g] : starts[g + 1]] for g in range(ci.n_groups)]
    p = np.vstack(
        [p_cols[starts[g]] for g in range(ci.n_groups)]
    ) if ci.n_groups else np.zeros((0, p_cols.shape[1]))
    return ci, u, p, v_groups


# ---------------------------------------------------------------------------
# Gram matrices per cluster (Alg. 5)
# ---------------------------------------------------------------------------
def cluster_grams_factorized(ftree: FTree) -> np.ndarray:
    """All per-cluster gram matrices, shape (G, m, m), cluster-slice order."""
    ci, u, p, v_groups = _parts(ftree)
    m_u, m_p = u.shape[1], p.shape[1]
    m_v = v_groups[0].shape[1] if v_groups else 0
    m = m_u + m_p + m_v
    n_g = ci.sizes.astype(np.float64)
    s = np.vstack([v.sum(axis=0) for v in v_groups])  # (n_groups, m_v)
    q = np.stack([v.T @ v for v in v_groups])  # (n_groups, m_v, m_v)
    # constant feature vector per (other-combo o, within-group g)
    c = np.concatenate(
        [
            np.repeat(u[:, None, :], ci.n_groups, axis=1),
            np.repeat(p[None, :, :], ci.n_other, axis=0),
        ],
        axis=2,
    )  # (n_other, n_groups, m_u + m_p)
    out = np.empty((ci.n_other, ci.n_groups, m, m))
    cc = np.einsum("ogi,ogj->ogij", c, c) * n_g[None, :, None, None]
    out[:, :, : m_u + m_p, : m_u + m_p] = cc
    cv = np.einsum("ogi,gj->ogij", c, s)
    out[:, :, : m_u + m_p, m_u + m_p :] = cv
    out[:, :, m_u + m_p :, : m_u + m_p] = np.swapaxes(cv, 2, 3)
    out[:, :, m_u + m_p :, m_u + m_p :] = q[None, :, :, :]
    return out.reshape(ci.n_clusters, m, m)


def cluster_grams_dense(x: np.ndarray, row_sizes: np.ndarray) -> np.ndarray:
    """Dense baseline: a GEMM per cluster slice of the materialized matrix."""
    out = np.empty((len(row_sizes), x.shape[1], x.shape[1]))
    start = 0
    for i, n in enumerate(row_sizes):
        xc = x[start : start + n]
        out[i] = xc.T @ xc
        start += n
    return out


# ---------------------------------------------------------------------------
# Right multiplication per cluster (Alg. 7): X_i · C_i
# ---------------------------------------------------------------------------
def cluster_right_mult_factorized(ftree: FTree, c_per_cluster: np.ndarray) -> np.ndarray:
    """``X_i · C_i`` for every cluster; returns flat (n_rows, p).

    ``c_per_cluster``: (G, m, p) or (G, m) — one multiplier per cluster in
    cluster-slice order.  The constant part contributes one base value per
    cluster (Alg. 7's ``base``); only the intra-attribute part varies by row.
    """
    ci, u, p, v_groups = _parts(ftree)
    cm = np.asarray(c_per_cluster, dtype=np.float64)
    if cm.ndim == 2:
        cm = cm[:, :, None]
    g_count, m, p_out = cm.shape
    if g_count != ci.n_clusters:
        raise ValueError(f"need {ci.n_clusters} cluster multipliers, got {g_count}")
    m_u, m_p = u.shape[1], p.shape[1]
    const = np.concatenate(
        [
            np.repeat(u[:, None, :], ci.n_groups, axis=1),
            np.repeat(p[None, :, :], ci.n_other, axis=0),
        ],
        axis=2,
    ).reshape(ci.n_clusters, m_u + m_p)
    base = np.einsum("gi,gip->gp", const, cm[:, : m_u + m_p, :])  # (G, p)
    if ci.n_groups == 1:
        # Uniform clusters: batch every cluster's intra product in one
        # einsum (the fully-shared case of Alg. 7 — all clusters share the
        # same intra-attribute leaf block).
        v = v_groups[0]  # (N, m_v)
        intra = np.einsum("nv,gvp->gnp", v, cm[:, m_u + m_p :, :])
        return (base[:, None, :] + intra).reshape(ftree.n_rows, p_out)
    out = np.empty((ftree.n_rows, p_out))
    start = 0
    sizes = ci.row_sizes()
    for gidx in range(ci.n_clusters):
        v = v_groups[gidx % ci.n_groups]
        n = sizes[gidx]
        out[start : start + n] = base[gidx] + v @ cm[gidx, m_u + m_p :, :]
        start += n
    return out


def cluster_right_mult_dense(
    x: np.ndarray, row_sizes: np.ndarray, c_per_cluster: np.ndarray
) -> np.ndarray:
    cm = np.asarray(c_per_cluster, dtype=np.float64)
    if cm.ndim == 2:
        cm = cm[:, :, None]
    out = np.empty((x.shape[0], cm.shape[2]))
    start = 0
    for i, n in enumerate(row_sizes):
        out[start : start + n] = x[start : start + n] @ cm[i]
        start += n
    return out


# ---------------------------------------------------------------------------
# Left multiplication per cluster (Alg. 6): D_i · X_i
# ---------------------------------------------------------------------------
def cluster_left_mult_factorized(a_flat: np.ndarray, ftree: FTree) -> np.ndarray:
    """``D_i · X_i`` with a row vector per cluster; returns (G, m).

    ``a_flat`` has length n_rows; each cluster's slice is its ``D_i``.  The
    inter-cluster output block is ``rowsum(D_i) · const`` (Alg. 6's rowSum
    sharing); only the intra block needs the per-row values.
    """
    ci, u, p, v_groups = _parts(ftree)
    a_flat = np.asarray(a_flat, dtype=np.float64).ravel()
    if a_flat.shape[0] != ftree.n_rows:
        raise ValueError(f"need length {ftree.n_rows}, got {a_flat.shape[0]}")
    m_u, m_p = u.shape[1], p.shape[1]
    m_v = v_groups[0].shape[1] if v_groups else 0
    const = np.concatenate(
        [
            np.repeat(u[:, None, :], ci.n_groups, axis=1),
            np.repeat(p[None, :, :], ci.n_other, axis=0),
        ],
        axis=2,
    ).reshape(ci.n_clusters, m_u + m_p)
    if ci.n_groups == 1:
        # Uniform clusters: one reshape gives every cluster's row segment;
        # row sums and intra products batch into two GEMM-shaped ops.
        segs = a_flat.reshape(ci.n_clusters, -1)
        out = np.empty((ci.n_clusters, m_u + m_p + m_v))
        out[:, : m_u + m_p] = segs.sum(axis=1)[:, None] * const
        out[:, m_u + m_p :] = segs @ v_groups[0]
        return out
    out = np.empty((ci.n_clusters, m_u + m_p + m_v))
    start = 0
    sizes = ci.row_sizes()
    for gidx in range(ci.n_clusters):
        n = sizes[gidx]
        seg = a_flat[start : start + n]
        out[gidx, : m_u + m_p] = seg.sum() * const[gidx]
        out[gidx, m_u + m_p :] = seg @ v_groups[gidx % ci.n_groups]
        start += n
    return out


def cluster_left_mult_dense(
    a_flat: np.ndarray, x: np.ndarray, row_sizes: np.ndarray
) -> np.ndarray:
    out = np.empty((len(row_sizes), x.shape[1]))
    start = 0
    for i, n in enumerate(row_sizes):
        out[i] = a_flat[start : start + n] @ x[start : start + n]
        start += n
    return out
