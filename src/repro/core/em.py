"""Multi-level linear model trained by EM over sufficient statistics (App. D).

The model (paper Eq. 6):  ``y_i = X_i β + Z_i b_i + ε_i`` per cluster i, with
``b_i ~ N(0, Σ)`` and ``ε_i ~ N(0, σ² I)``; ``Z_i = X_i`` by default or a
column subset (§3.3.4).

Every quantity EM needs — V_i, μ_i, β̂, Σ̂, σ̂² (Eqs. 8–14) — is an algebraic
function of the per-cluster moments {XᵀX, Xᵀy, yᵀy, n}: the matrix products
of Appendix D reduce to the aggregation-query outputs of
:mod:`repro.core.suffstats`, so one distributed pass suffices for all
iterations.  The marginal log-likelihood (for AIC, App. K) also follows from
the same moments via the Woodbury identity and the matrix determinant lemma.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence

import numpy as np
import pandas as pd

from .suffstats import SuffStats

_JITTER = 1e-9


def _solve_psd(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Solve a·x = b for symmetric PSD a, ridged for rank deficiency."""
    m = a.shape[0]
    try:
        return np.linalg.solve(a + _JITTER * np.eye(m), b)
    except np.linalg.LinAlgError:
        return np.linalg.lstsq(a, b, rcond=None)[0]


def _inv_psd(a: np.ndarray) -> np.ndarray:
    m = a.shape[0]
    try:
        return np.linalg.inv(a + _JITTER * np.eye(m))
    except np.linalg.LinAlgError:
        return np.linalg.pinv(a)


@dataclass
class MixedModel:
    """Fitted multi-level model: global β plus per-cluster random effects."""

    feature_cols: List[str]
    z_cols: List[str]
    beta: np.ndarray
    sigma2: float
    Sigma: np.ndarray
    b: Dict[str, np.ndarray]
    loglik: float
    n_iter: int

    @property
    def n_params(self) -> int:
        q = len(self.z_cols)
        return len(self.beta) + q * (q + 1) // 2 + 1

    @property
    def aic(self) -> float:
        """Akaike information criterion (App. K model comparison)."""
        return 2.0 * self.n_params - 2.0 * self.loglik

    def predict(self, pdf: pd.DataFrame, cluster_col: str = "cluster") -> np.ndarray:
        """ŷ = Xβ + Z b̂_cluster; unseen clusters get b = 0 (shrunk fully)."""
        x = np.column_stack(
            [np.nan_to_num(pdf[c].to_numpy(dtype=np.float64)) for c in self.feature_cols]
        )
        z = np.column_stack(
            [np.nan_to_num(pdf[c].to_numpy(dtype=np.float64)) for c in self.z_cols]
        )
        out = x @ self.beta
        zero = np.zeros(len(self.z_cols))
        bmat = np.vstack(
            [self.b.get(str(c), zero) for c in pdf[cluster_col].astype(str)]
        )
        return out + np.einsum("ij,ij->i", z, bmat)


def fit_em(
    stats: SuffStats,
    *,
    z_cols: Optional[Sequence[str]] = None,
    n_iter: int = 20,
    tol: float = 0.0,
) -> MixedModel:
    """Fit the multi-level model by EM (Appendix D, Eqs. 8–14).

    ``z_cols`` selects the random-effects columns (default: all features,
    Z_i = X_i).  ``tol`` > 0 enables early stopping on the β update norm;
    the paper's experiments run a fixed 20 iterations.
    """
    cols = stats.feature_cols
    z_cols = list(z_cols) if z_cols is not None else list(cols)
    z_idx = np.array([cols.index(c) for c in z_cols], dtype=np.int64)
    m, q = len(cols), len(z_idx)
    n = stats.n
    xtx, xty, yty = stats.xtx, stats.xty, stats.yty

    # Stack the per-cluster blocks so every E-step is *batched* linear
    # algebra across all G clusters at once — the vectorised counterpart of
    # the paper's shared per-cluster matrix operations (Algs. 5–7).
    keys = list(stats.clusters.keys())
    g = len(keys)
    ztz = np.stack([stats.clusters[k].xtx[np.ix_(z_idx, z_idx)] for k in keys])
    ztx = np.stack([stats.clusters[k].xtx[z_idx, :] for k in keys])
    zty = np.stack([stats.clusters[k].xty[z_idx] for k in keys])

    # Initialise from the pooled OLS fit.
    beta = _solve_psd(xtx, xty)
    rss = max(yty - 2 * beta @ xty + beta @ xtx @ beta, 1e-12)
    sigma2 = rss / max(n, 1.0)
    Sigma = np.eye(q) * max(sigma2, 1e-6)

    eye = np.eye(q)
    mu = np.zeros((g, q))
    it = 0
    for it in range(1, n_iter + 1):
        inv_Sigma = _inv_psd(Sigma)
        v = np.linalg.inv(
            ztz / sigma2 + inv_Sigma[None, :, :] + _JITTER * eye[None, :, :]
        )  # Eq. 8, batched
        rz = zty - ztx @ beta  # (G, q): Z_iᵀ(y_i − X_i β)
        mu = np.einsum("gij,gj->gi", v, rz) / sigma2  # Eq. 9
        ebb = v + np.einsum("gi,gj->gij", mu, mu)  # Eq. 11
        sum_ztx_mu = np.einsum("gij,gi->j", ztx, mu)
        new_beta = _solve_psd(xtx, xty - sum_ztx_mu)  # Eq. 12
        Sigma = ebb.mean(axis=0) + _JITTER * eye  # Eq. 13
        # Eq. 14 — note rz/μ were computed with the *old* β (standard ECM).
        rss = yty - 2 * new_beta @ xty + new_beta @ xtx @ new_beta
        sum_tr = float(np.einsum("gij,gji->", ztz, ebb))
        sum_rz_mu = float(np.einsum("gi,gi->", rz, mu))
        sigma2 = max((rss + sum_tr - 2 * sum_rz_mu) / n, 1e-12)
        delta = float(np.linalg.norm(new_beta - beta))
        beta = new_beta
        if tol > 0 and delta < tol:
            break

    ll = _marginal_loglik(stats, z_idx, beta, Sigma, sigma2)
    return MixedModel(
        feature_cols=list(cols),
        z_cols=z_cols,
        beta=beta,
        sigma2=sigma2,
        Sigma=Sigma,
        b={k: mu[i] for i, k in enumerate(keys)},
        loglik=ll,
        n_iter=it,
    )


def _marginal_loglik(
    stats: SuffStats,
    z_idx: np.ndarray,
    beta: np.ndarray,
    Sigma: np.ndarray,
    sigma2: float,
) -> float:
    """Marginal log p(y | β, Σ, σ²) from sufficient statistics only.

    Per cluster, with Λ_i = σ²I + Z_i Σ Z_iᵀ:
      log|Λ_i| = n_i·log σ² + log|I + Σ ZᵀZ / σ²|            (det. lemma)
      rᵀΛ⁻¹r  = rᵀr/σ² − rᵀZ (σ²Σ⁻¹ + ZᵀZ)⁻¹ Zᵀr / σ²        (Woodbury)
    """
    q = len(z_idx)
    inv_Sigma = _inv_psd(Sigma)
    keys = list(stats.clusters.keys())
    ztz = np.stack([stats.clusters[k].xtx[np.ix_(z_idx, z_idx)] for k in keys])
    ztx = np.stack([stats.clusters[k].xtx[z_idx, :] for k in keys])
    zty = np.stack([stats.clusters[k].xty[z_idx] for k in keys])
    cxtx = np.stack([stats.clusters[k].xtx for k in keys])
    cxty = np.stack([stats.clusters[k].xty for k in keys])
    cyty = np.array([stats.clusters[k].yty for k in keys])
    ns = np.array([stats.clusters[k].n for k in keys])

    rtr = np.maximum(
        cyty - 2 * cxty @ beta + np.einsum("i,gij,j->g", beta, cxtx, beta), 0.0
    )
    rz = zty - ztx @ beta  # (G, q)
    eye = np.eye(q)
    sign, logdet = np.linalg.slogdet(eye[None, :, :] + Sigma @ ztz / sigma2)
    logdet = np.where(sign > 0, logdet, 0.0)
    sol = np.linalg.solve(
        sigma2 * inv_Sigma[None, :, :] + ztz + _JITTER * eye[None, :, :],
        rz[:, :, None],
    )[:, :, 0]
    quad = rtr / sigma2 - np.einsum("gi,gi->g", rz, sol) / sigma2
    ll = -0.5 * (ns * np.log(2 * np.pi * sigma2) + logdet + quad)
    return float(ll.sum())


@dataclass
class LinearModel:
    """Pooled OLS baseline (the 'Linear' arm of App. K)."""

    feature_cols: List[str]
    beta: np.ndarray
    sigma2: float
    loglik: float

    @property
    def aic(self) -> float:
        return 2.0 * (len(self.beta) + 1) - 2.0 * self.loglik

    def predict(self, pdf: pd.DataFrame, cluster_col: str = "cluster") -> np.ndarray:
        x = np.column_stack(
            [np.nan_to_num(pdf[c].to_numpy(dtype=np.float64)) for c in self.feature_cols]
        )
        return x @ self.beta


def fit_linear(stats: SuffStats) -> LinearModel:
    """OLS from the same sufficient statistics (no random effects)."""
    beta = _solve_psd(stats.xtx, stats.xty)
    n = stats.n
    rss = max(stats.yty - 2 * beta @ stats.xty + beta @ stats.xtx @ beta, 1e-12)
    sigma2 = rss / max(n, 1.0)
    ll = -0.5 * n * (np.log(2 * np.pi * sigma2) + 1.0)
    return LinearModel(
        feature_cols=list(stats.feature_cols), beta=beta, sigma2=sigma2, loglik=ll
    )
