"""Factorised matrix operations vs dense numpy on the materialized matrix."""
import numpy as np
import pytest

from repro.factorized.ftree import FTree, ordinal_encoding
from repro.factorized.matops import (
    gram_dense,
    gram_factorized,
    left_mult_dense,
    left_mult_factorized,
    right_mult_dense,
    right_mult_factorized,
)
from repro.factorized.relations import collect_all
from repro.synth.hier import hier_dataset, hier_schema


def _ftree(spark, d, t, w, features_per_attr=1, seed=3):
    schema = hier_schema(d=d, t=t)
    df = hier_dataset(spark, d=d, t=t, w=w, n_rows=20 * w, fanout=3, seed=seed)
    rels = collect_all(df, schema.hierarchies)
    return FTree(rels, encoding=ordinal_encoding(features_per_attr))


@pytest.fixture(scope="module", params=[(1, 1, 8), (2, 2, 6), (3, 2, 4)])
def ftree(request, spark):
    d, t, w = request.param
    return _ftree(spark, d, t, w)


class TestFTreeShape:
    def test_n_rows_is_leaf_product(self, ftree):
        assert ftree.n_rows == np.prod([r.n_leaves for r in ftree.relations])

    def test_materialize_shape(self, ftree):
        x = ftree.materialize()
        assert x.shape == (ftree.n_rows, ftree.n_cols)

    def test_outer_inner_product(self, ftree):
        for s in range(ftree.n_hierarchies):
            assert (
                ftree.outer(s) * ftree.relations[s].n_leaves * ftree.inner(s)
                == ftree.n_rows
            )

    def test_columns_labeling(self, ftree):
        cols = ftree.columns
        assert len(cols) == ftree.n_cols
        assert len(set(cols)) == len(cols)

    def test_materialized_attrs_match_encoded(self, ftree):
        """Attribute matrix and feature matrix agree via the 1:1 encoding."""
        x = ftree.materialize()
        attrs = ftree.materialize_attrs()
        assert len(attrs) == x.shape[0]
        # ordinal encoding is monotone in the sorted domain per column
        for s in range(ftree.n_hierarchies):
            a0 = ftree.relations[s].attrs[0]
            col = x[:, ftree.col_slice(s)][:, 0]
            order = np.argsort(attrs[a0].to_numpy(), kind="stable")
            assert (np.diff(col[order]) >= 0).all()


class TestGram:
    def test_matches_dense(self, ftree):
        x = ftree.materialize()
        np.testing.assert_allclose(
            gram_factorized(ftree), gram_dense(x), rtol=1e-9, atol=1e-6
        )

    def test_multifeature_encoding(self, spark):
        ft = _ftree(spark, 2, 1, 5, features_per_attr=3)
        assert ft.n_cols == 6
        np.testing.assert_allclose(
            gram_factorized(ft), gram_dense(ft.materialize()), rtol=1e-9
        )

    def test_symmetry(self, ftree):
        g = gram_factorized(ftree)
        np.testing.assert_allclose(g, g.T)


class TestLeftMult:
    def test_matches_dense_single_row(self, ftree):
        rng = np.random.default_rng(0)
        a = rng.normal(size=(1, ftree.n_rows))
        np.testing.assert_allclose(
            left_mult_factorized(a, ftree),
            left_mult_dense(a, ftree.materialize()),
            rtol=1e-9,
            atol=1e-8,
        )

    def test_matches_dense_multi_row(self, ftree):
        rng = np.random.default_rng(1)
        a = rng.normal(size=(4, ftree.n_rows))
        np.testing.assert_allclose(
            left_mult_factorized(a, ftree),
            left_mult_dense(a, ftree.materialize()),
            rtol=1e-9,
            atol=1e-8,
        )

    def test_shape_mismatch_raises(self, ftree):
        with pytest.raises(ValueError):
            left_mult_factorized(np.ones((1, ftree.n_rows + 1)), ftree)


class TestRightMult:
    def test_matches_dense_vector(self, ftree):
        rng = np.random.default_rng(2)
        c = rng.normal(size=ftree.n_cols)
        np.testing.assert_allclose(
            right_mult_factorized(ftree, c),
            right_mult_dense(ftree.materialize(), c),
            rtol=1e-9,
            atol=1e-8,
        )

    def test_matches_dense_matrix(self, ftree):
        rng = np.random.default_rng(3)
        c = rng.normal(size=(ftree.n_cols, 3))
        np.testing.assert_allclose(
            right_mult_factorized(ftree, c),
            right_mult_dense(ftree.materialize(), c),
            rtol=1e-9,
            atol=1e-8,
        )

    def test_shape_mismatch_raises(self, ftree):
        with pytest.raises(ValueError):
            right_mult_factorized(ftree, np.ones(ftree.n_cols + 1))


class TestGramViaAggregates:
    def test_gram_uses_cof_semantics(self, spark):
        """Cross-hierarchy gram cell equals Σ COF(a,b)·enc(a)·enc(b)."""
        ft = _ftree(spark, 2, 1, 5)
        agg = ft.aggregates
        a_attr = ft.relations[0].attrs[0]
        b_attr = ft.relations[1].attrs[0]
        cof = agg.cof(a_attr, b_attr).materialize()
        enc_a = {
            v: ft.leaf_matrix(0)[i, 0]
            for i, v in enumerate(ft.relations[0].path[a_attr])
        }
        enc_b = {
            v: ft.leaf_matrix(1)[i, 0]
            for i, v in enumerate(ft.relations[1].path[b_attr])
        }
        manual = sum(
            cnt * enc_a[a] * enc_b[b] for (a, b), cnt in cof.items()
        )
        g = gram_factorized(ft)
        np.testing.assert_allclose(g[0, 1], manual)
