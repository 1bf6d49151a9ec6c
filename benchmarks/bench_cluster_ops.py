"""App. F (Fig. 15) benchmark: per-cluster matrix ops, factorized vs dense."""
import numpy as np
import pytest

from repro.experiments.fig7 import synthetic_relations
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

D, W = 4, 10


@pytest.fixture(scope="module")
def ftree():
    return FTree(synthetic_relations(D, W), encoding=ordinal_encoding(1))


@pytest.fixture(scope="module")
def dense(ftree):
    return ftree.materialize()


@pytest.fixture(scope="module")
def sizes(ftree):
    return cluster_index(ftree).row_sizes()


class TestClusterGram:
    def test_factorized(self, benchmark, ftree):
        benchmark(cluster_grams_factorized, ftree)

    def test_dense(self, benchmark, dense, sizes):
        benchmark(cluster_grams_dense, dense, sizes)


class TestClusterRight:
    def test_factorized(self, benchmark, ftree, sizes):
        c = np.random.default_rng(0).normal(size=(len(sizes), ftree.n_cols))
        benchmark(cluster_right_mult_factorized, ftree, c)

    def test_dense(self, benchmark, ftree, dense, sizes):
        c = np.random.default_rng(0).normal(size=(len(sizes), ftree.n_cols))
        benchmark(cluster_right_mult_dense, dense, sizes, c)


class TestClusterLeft:
    def test_factorized(self, benchmark, ftree):
        a = np.random.default_rng(1).normal(size=ftree.n_rows)
        benchmark(cluster_left_mult_factorized, a, ftree)

    def test_dense(self, benchmark, ftree, dense, sizes):
        a = np.random.default_rng(1).normal(size=ftree.n_rows)
        benchmark(cluster_left_mult_dense, a, dense, sizes)
