"""Tests: LMFAO-style serial aggregates and the dense EM baseline."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.dense_em import fit_dense_em
from repro.baselines.lmfao import compute_serial, compute_shared
from repro.core.em import fit_em
from repro.core.suffstats import suffstats_from_pandas
from repro.synth.hier import hier_dataset, hier_schema


class TestLmfaoEquivalence:
    @pytest.fixture(scope="class")
    def both(self, spark):
        schema = hier_schema(d=2, t=2)
        df = hier_dataset(spark, d=2, t=2, w=15, n_rows=300, fanout=3, seed=9)
        df = df.cache()
        df.count()
        return compute_shared(df, schema), compute_serial(df, schema), schema

    def test_totals_agree(self, both):
        shared, serial, _ = both
        assert shared.n_rows == serial["total"]

    def test_counts_agree(self, both):
        shared, serial, _ = both
        for attr, got in serial["count"].items():
            want = shared.count(attr)
            pd.testing.assert_series_equal(
                got.sort_index(),
                want.sort_index(),
                check_names=False,
                check_index_type=False,
                check_dtype=False,
            )

    def test_same_hierarchy_cofs_agree(self, both):
        shared, serial, schema = both
        for (a, b), got in serial["cof"].items():
            if shared.attr_hier[a] != shared.attr_hier[b]:
                continue
            want = shared.cof(a, b)
            assert got.sort_index().to_numpy().tolist() == (
                want.sort_index().to_numpy().tolist()
            )

    def test_cross_hierarchy_cofs_agree(self, both):
        shared, serial, _ = both
        checked = 0
        for (a, b), got in serial["cof"].items():
            if shared.attr_hier[a] == shared.attr_hier[b]:
                continue
            want = shared.cof(a, b).materialize()
            got = got.sort_index()
            want = want.sort_index()
            assert got.sum() == want.sum()
            nz = want[want > 0]
            assert got[got > 0].to_numpy().tolist() == nz.to_numpy().tolist()
            checked += 1
        assert checked > 0


class TestDenseEMEquivalence:
    def _data(self, seed=0):
        rng = np.random.default_rng(seed)
        frames = []
        for g in range(12):
            x1 = rng.normal(0, 1, 30)
            y = 2.0 + 1.5 * x1 + rng.normal(0, 2) + rng.normal(0, 0.5, 30)
            frames.append(
                pd.DataFrame(
                    {"f_i": 1.0, "f_x": x1, "y": y, "cluster": f"c{g}"}
                )
            )
        return pd.concat(frames, ignore_index=True)

    def test_same_parameters_as_factorized_em(self):
        """Both EMs run the identical update sequence → same parameters."""
        pdf = self._data()
        cols = ["f_i", "f_x"]
        fast = fit_em(suffstats_from_pandas(pdf, cols), n_iter=15)
        dense = fit_dense_em(pdf, cols, n_iter=15)
        np.testing.assert_allclose(dense.beta, fast.beta, rtol=1e-6, atol=1e-8)
        np.testing.assert_allclose(dense.sigma2, fast.sigma2, rtol=1e-6)
        np.testing.assert_allclose(dense.Sigma, fast.Sigma, rtol=1e-5, atol=1e-8)

    def test_same_random_effects(self):
        pdf = self._data(1)
        cols = ["f_i", "f_x"]
        fast = fit_em(suffstats_from_pandas(pdf, cols), z_cols=["f_i"], n_iter=15)
        dense = fit_dense_em(pdf, cols, z_cols=["f_i"], n_iter=15)
        for k in fast.b:
            np.testing.assert_allclose(dense.b[k], fast.b[k], rtol=1e-5, atol=1e-8)

    def test_same_predictions(self):
        pdf = self._data(2)
        cols = ["f_i", "f_x"]
        fast = fit_em(suffstats_from_pandas(pdf, cols), n_iter=10)
        dense = fit_dense_em(pdf, cols, n_iter=10)
        np.testing.assert_allclose(
            dense.predict(pdf), fast.predict(pdf), rtol=1e-5, atol=1e-6
        )
