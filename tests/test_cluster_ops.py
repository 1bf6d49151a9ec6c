"""Per-cluster factorised matrix ops vs dense per-cluster GEMMs (App. F)."""
import numpy as np
import pytest

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
from repro.factorized.relations import collect_all
from repro.synth.hier import hier_dataset, hier_schema


def _ftree(spark, d, t, w, seed=11):
    schema = hier_schema(d=d, t=t)
    df = hier_dataset(spark, d=d, t=t, w=w, n_rows=20 * w, fanout=3, seed=seed)
    rels = collect_all(df, schema.hierarchies)
    return FTree(rels, encoding=ordinal_encoding(1))


@pytest.fixture(scope="module", params=[(1, 2, 8), (2, 1, 6), (2, 2, 6), (3, 2, 4)])
def ftree(request, spark):
    d, t, w = request.param
    return _ftree(spark, d, t, w)


class TestClusterIndex:
    def test_row_sizes_cover_matrix(self, ftree):
        ci = cluster_index(ftree)
        assert ci.row_sizes().sum() == ftree.n_rows

    def test_cluster_count(self, ftree):
        ci = cluster_index(ftree)
        assert ci.n_clusters == ci.n_other * ci.n_groups

    def test_single_attr_last_hierarchy_one_group(self, spark):
        ft = _ftree(spark, 2, 1, 5)
        ci = cluster_index(ft)
        assert ci.n_groups == 1
        assert ci.sizes[0] == ft.relations[-1].n_leaves


class TestClusterGrams:
    def test_matches_dense(self, ftree):
        ci = cluster_index(ftree)
        got = cluster_grams_factorized(ftree)
        exp = cluster_grams_dense(ftree.materialize(), ci.row_sizes())
        np.testing.assert_allclose(got, exp, rtol=1e-9, atol=1e-8)

    def test_sum_of_cluster_grams_is_global_gram(self, ftree):
        x = ftree.materialize()
        got = cluster_grams_factorized(ftree).sum(axis=0)
        np.testing.assert_allclose(got, x.T @ x, rtol=1e-9, atol=1e-6)


class TestClusterRightMult:
    def test_matches_dense(self, ftree):
        rng = np.random.default_rng(0)
        ci = cluster_index(ftree)
        c = rng.normal(size=(ci.n_clusters, ftree.n_cols, 2))
        got = cluster_right_mult_factorized(ftree, c)
        exp = cluster_right_mult_dense(ftree.materialize(), ci.row_sizes(), c)
        np.testing.assert_allclose(got, exp, rtol=1e-9, atol=1e-8)

    def test_vector_multipliers(self, ftree):
        rng = np.random.default_rng(1)
        ci = cluster_index(ftree)
        c = rng.normal(size=(ci.n_clusters, ftree.n_cols))
        got = cluster_right_mult_factorized(ftree, c)
        assert got.shape == (ftree.n_rows, 1)

    def test_wrong_cluster_count_raises(self, ftree):
        ci = cluster_index(ftree)
        with pytest.raises(ValueError):
            cluster_right_mult_factorized(
                ftree, np.ones((ci.n_clusters + 1, ftree.n_cols))
            )


class TestClusterLeftMult:
    def test_matches_dense(self, ftree):
        rng = np.random.default_rng(2)
        ci = cluster_index(ftree)
        a = rng.normal(size=ftree.n_rows)
        got = cluster_left_mult_factorized(a, ftree)
        exp = cluster_left_mult_dense(a, ftree.materialize(), ci.row_sizes())
        np.testing.assert_allclose(got, exp, rtol=1e-9, atol=1e-8)

    def test_wrong_length_raises(self, ftree):
        with pytest.raises(ValueError):
            cluster_left_mult_factorized(np.ones(ftree.n_rows + 1), ftree)
