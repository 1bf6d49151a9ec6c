"""Fig. 7 benchmark: factorized vs dense matrix operations at d=5, w=10.

The factorized arms must win on materialize/gram (exponential vs linear);
left/right are constant-factor (see EXPERIMENTS.md for full-sweep numbers).
"""
import numpy as np
import pytest

from repro.experiments.fig7 import synthetic_relations
from repro.factorized import matops
from repro.factorized.ftree import FTree, ordinal_encoding

D, W = 5, 10


@pytest.fixture(scope="module")
def ftree():
    return FTree(synthetic_relations(D, W), encoding=ordinal_encoding(1))


@pytest.fixture(scope="module")
def dense(ftree):
    return ftree.materialize()


class TestMaterialize:
    def test_factorized(self, benchmark):
        benchmark(lambda: FTree(synthetic_relations(D, W), encoding=ordinal_encoding(1)))

    def test_dense(self, benchmark, ftree):
        benchmark(ftree.materialize)


class TestGram:
    def test_factorized(self, benchmark, ftree):
        benchmark(matops.gram_factorized, ftree)

    def test_dense(self, benchmark, dense):
        benchmark(matops.gram_dense, dense)


class TestLeftMult:
    def test_factorized(self, benchmark, ftree):
        a = np.random.default_rng(0).normal(size=(1, ftree.n_rows))
        benchmark(matops.left_mult_factorized, a, ftree)

    def test_dense(self, benchmark, ftree, dense):
        a = np.random.default_rng(0).normal(size=(1, ftree.n_rows))
        benchmark(matops.left_mult_dense, a, dense)


class TestRightMult:
    def test_factorized(self, benchmark, ftree):
        c = np.random.default_rng(1).normal(size=(ftree.n_cols, 1))
        benchmark(matops.right_mult_factorized, ftree, c)

    def test_dense(self, benchmark, ftree, dense):
        c = np.random.default_rng(1).normal(size=(ftree.n_cols, 1))
        benchmark(matops.right_mult_dense, dense, c)
