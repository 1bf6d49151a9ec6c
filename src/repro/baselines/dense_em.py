"""Dense EM baseline — the paper's "Matlab (Lapack)" arm (§5.1.4, Fig. 10).

Trains the identical multi-level model, but the way a Matlab script over the
fully materialized feature matrix would: the matrix is collected to the
driver, and every EM iteration recomputes all matrix products (global and
per-cluster GEMMs) from the raw matrix — no sufficient-statistic sharing
across iterations, no factorised operations.  Numerically it converges to
the same parameters as :func:`repro.core.em.fit_em` (asserted in tests);
only the work per iteration differs, which is exactly what Fig. 10 measures.
"""
from __future__ import annotations

from typing import Dict, List, Optional, Sequence

import numpy as np
import pandas as pd

from repro.core.em import MixedModel, _inv_psd, _solve_psd


def fit_dense_em(
    pdf: pd.DataFrame,
    feature_cols: Sequence[str],
    *,
    y_col: str = "y",
    cluster_col: str = "cluster",
    z_cols: Optional[Sequence[str]] = None,
    n_iter: int = 20,
) -> MixedModel:
    """EM over the materialized matrix with per-iteration recomputation."""
    cols = list(feature_cols)
    z_cols = list(z_cols) if z_cols is not None else list(cols)
    z_idx = np.array([cols.index(c) for c in z_cols], dtype=np.int64)
    x = np.column_stack(
        [np.nan_to_num(pdf[c].to_numpy(dtype=np.float64)) for c in cols]
    )
    y = np.nan_to_num(pdf[y_col].to_numpy(dtype=np.float64))
    labels = pdf[cluster_col].astype(str).to_numpy()
    keys = sorted(set(labels))
    masks = {k: labels == k for k in keys}
    n, m, q = len(y), len(cols), len(z_idx)

    beta = _solve_psd(x.T @ x, x.T @ y)
    sigma2 = max(float(np.mean((y - x @ beta) ** 2)), 1e-12)
    Sigma = np.eye(q) * max(sigma2, 1e-6)
    mu: Dict[str, np.ndarray] = {}

    for _ in range(n_iter):
        inv_Sigma = _inv_psd(Sigma)
        # deliberately recomputed every iteration (no suffstat caching)
        xtx = x.T @ x
        xty = x.T @ y
        sum_ztx_mu = np.zeros(m)
        sum_ebb = np.zeros((q, q))
        sum_tr = 0.0
        sum_rz_mu = 0.0
        for k in keys:
            xi = x[masks[k]]
            yi = y[masks[k]]
            zi = xi[:, z_idx]
            ztz = zi.T @ zi
            v = _inv_psd(ztz / sigma2 + inv_Sigma)
            rz = zi.T @ (yi - xi @ beta)
            mu_i = v @ rz / sigma2
            mu[k] = mu_i
            ebb = v + np.outer(mu_i, mu_i)
            sum_ztx_mu += (zi.T @ xi).T @ mu_i
            sum_ebb += ebb
            sum_tr += float(np.trace(ztz @ ebb))
            sum_rz_mu += float(rz @ mu_i)
        beta = _solve_psd(xtx, xty - sum_ztx_mu)
        Sigma = sum_ebb / len(keys) + 1e-9 * np.eye(q)
        resid = y - x @ beta
        sigma2 = max((resid @ resid + sum_tr - 2 * sum_rz_mu) / n, 1e-12)

    return MixedModel(
        feature_cols=cols,
        z_cols=z_cols,
        beta=beta,
        sigma2=sigma2,
        Sigma=Sigma,
        b=mu,
        loglik=float("nan"),  # Fig. 10 is runtime-only; tests compare params
        n_iter=n_iter,
    )
