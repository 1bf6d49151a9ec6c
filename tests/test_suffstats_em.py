"""Tests: Spark sufficient statistics and the mixed-effects EM trainer."""
import numpy as np
import pandas as pd
import pytest

from repro.core.em import fit_em, fit_linear
from repro.core.suffstats import compute_suffstats, suffstats_from_pandas


def _lmm_data(
    n_clusters=30, rows_per=25, m=3, sd_b=2.0, sd_eps=0.5, seed=0
) -> tuple:
    """Simulated mixed-effects data with random intercepts per cluster."""
    rng = np.random.default_rng(seed)
    beta = rng.normal(0, 1, m)
    frames = []
    b_true = {}
    for g in range(n_clusters):
        x = np.column_stack([np.ones(rows_per)] + [
            rng.normal(0, 1, rows_per) for _ in range(m - 1)
        ])
        b = rng.normal(0, sd_b)
        b_true[f"c{g}"] = b
        y = x @ beta + b + rng.normal(0, sd_eps, rows_per)
        df = pd.DataFrame(x, columns=[f"f_{j}" for j in range(m)])
        df["y"] = y
        df["cluster"] = f"c{g}"
        frames.append(df)
    return pd.concat(frames, ignore_index=True), beta, b_true


FEATS = ["f_0", "f_1", "f_2"]


class TestSuffStats:
    def test_spark_matches_pandas(self, spark):
        pdf, _, _ = _lmm_data(n_clusters=5, rows_per=10)
        sdf = spark.createDataFrame(pdf)
        s_spark = compute_suffstats(sdf, FEATS)
        s_pd = suffstats_from_pandas(pdf, FEATS)
        assert set(s_spark.clusters) == set(s_pd.clusters)
        for k in s_pd.clusters:
            np.testing.assert_allclose(
                s_spark.clusters[k].xtx, s_pd.clusters[k].xtx, rtol=1e-9
            )
            np.testing.assert_allclose(
                s_spark.clusters[k].xty, s_pd.clusters[k].xty, rtol=1e-9
            )
            assert s_spark.clusters[k].n == s_pd.clusters[k].n

    def test_global_sums(self):
        pdf, _, _ = _lmm_data(n_clusters=4, rows_per=8)
        s = suffstats_from_pandas(pdf, FEATS)
        x = pdf[FEATS].to_numpy()
        y = pdf["y"].to_numpy()
        np.testing.assert_allclose(s.xtx, x.T @ x, rtol=1e-9)
        np.testing.assert_allclose(s.xty, x.T @ y, rtol=1e-9)
        np.testing.assert_allclose(s.yty, y @ y, rtol=1e-9)
        assert s.n == len(pdf)

    def test_nan_features_treated_as_zero(self):
        pdf, _, _ = _lmm_data(n_clusters=2, rows_per=5)
        pdf.loc[0, "f_1"] = np.nan
        s = suffstats_from_pandas(pdf, FEATS)
        assert np.isfinite(s.xtx).all()


class TestLinearModel:
    def test_ols_recovers_beta_without_cluster_effects(self):
        pdf, beta, _ = _lmm_data(n_clusters=20, rows_per=50, sd_b=0.0, sd_eps=0.1)
        model = fit_linear(suffstats_from_pandas(pdf, FEATS))
        np.testing.assert_allclose(model.beta, beta, atol=0.05)

    def test_predict_shape(self):
        pdf, _, _ = _lmm_data(n_clusters=3, rows_per=5)
        model = fit_linear(suffstats_from_pandas(pdf, FEATS))
        assert model.predict(pdf).shape == (len(pdf),)


class TestEM:
    def test_recovers_slopes(self):
        """Non-intercept slopes are fixed effects; EM must recover them."""
        pdf, beta, _ = _lmm_data(n_clusters=40, rows_per=40, seed=2)
        model = fit_em(
            suffstats_from_pandas(pdf, FEATS), z_cols=["f_0"], n_iter=40
        )
        np.testing.assert_allclose(model.beta[1:], beta[1:], atol=0.05)

    def test_random_intercepts_tracked(self):
        pdf, beta, b_true = _lmm_data(n_clusters=40, rows_per=40, seed=3)
        model = fit_em(
            suffstats_from_pandas(pdf, FEATS), z_cols=["f_0"], n_iter=40
        )
        # shrinkage: predicted b_i correlates strongly with the truth
        keys = sorted(b_true)
        got = np.array([model.b[k][0] for k in keys])
        want = np.array([b_true[k] for k in keys])
        r = np.corrcoef(got, want)[0, 1]
        assert r > 0.95

    def test_beats_ols_on_clustered_data(self):
        pdf, _, _ = _lmm_data(n_clusters=30, rows_per=30, sd_b=3.0, seed=4)
        stats = suffstats_from_pandas(pdf, FEATS)
        mm = fit_em(stats, z_cols=["f_0"], n_iter=30)
        lin = fit_linear(stats)
        rmse_mm = np.sqrt(np.mean((mm.predict(pdf) - pdf["y"]) ** 2))
        rmse_lin = np.sqrt(np.mean((lin.predict(pdf) - pdf["y"]) ** 2))
        assert rmse_mm < rmse_lin * 0.5

    def test_aic_prefers_multilevel_on_clustered_data(self):
        """App. K: ΔAIC >> 10 in favour of the multi-level model."""
        pdf, _, _ = _lmm_data(n_clusters=30, rows_per=30, sd_b=3.0, seed=5)
        stats = suffstats_from_pandas(pdf, FEATS)
        mm = fit_em(stats, z_cols=["f_0"], n_iter=30)
        lin = fit_linear(stats)
        assert lin.aic - mm.aic > 10

    def test_unseen_cluster_prediction_falls_back_to_fixed_effects(self):
        pdf, _, _ = _lmm_data(n_clusters=5, rows_per=20, seed=6)
        model = fit_em(suffstats_from_pandas(pdf, FEATS), z_cols=["f_0"])
        new = pdf.head(3).copy()
        new["cluster"] = "unseen"
        got = model.predict(new)
        x = new[FEATS].to_numpy()
        np.testing.assert_allclose(got, x @ model.beta, rtol=1e-9)

    def test_default_z_is_full_x(self):
        pdf, _, _ = _lmm_data(n_clusters=8, rows_per=20, seed=7)
        model = fit_em(suffstats_from_pandas(pdf, FEATS), n_iter=5)
        assert model.z_cols == FEATS
        assert model.Sigma.shape == (3, 3)

    def test_early_stopping(self):
        pdf, _, _ = _lmm_data(n_clusters=10, rows_per=30, seed=8)
        model = fit_em(
            suffstats_from_pandas(pdf, FEATS), z_cols=["f_0"], n_iter=100, tol=1e-10
        )
        assert model.n_iter < 100

    def test_loglik_improves_over_iterations(self):
        pdf, _, _ = _lmm_data(n_clusters=20, rows_per=30, sd_b=2.0, seed=9)
        stats = suffstats_from_pandas(pdf, FEATS)
        ll1 = fit_em(stats, z_cols=["f_0"], n_iter=1).loglik
        ll20 = fit_em(stats, z_cols=["f_0"], n_iter=20).loglik
        assert ll20 >= ll1 - 1e-6

    def test_singleton_clusters_dont_crash(self):
        pdf, _, _ = _lmm_data(n_clusters=4, rows_per=1, seed=10)
        model = fit_em(suffstats_from_pandas(pdf, FEATS), z_cols=["f_0"], n_iter=10)
        assert np.isfinite(model.beta).all()
        assert np.isfinite(model.loglik)
