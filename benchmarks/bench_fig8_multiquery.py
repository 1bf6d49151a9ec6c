"""Fig. 8 benchmark: shared multi-query plan vs LMFAO-style serial plan."""
import pytest

from repro.baselines.lmfao import compute_serial, compute_shared
from repro.synth.hier import hier_dataset, hier_schema

W = 300


@pytest.fixture(scope="module")
def data(spark):
    schema = hier_schema(3, 3)
    df = hier_dataset(spark, d=3, t=3, w=W, n_rows=5 * W, fanout=4, seed=0).cache()
    df.count()
    yield schema, df
    df.unpersist()


class TestMultiQuery:
    def test_shared(self, benchmark, data):
        schema, df = data
        benchmark.pedantic(
            lambda: compute_shared(df, schema), rounds=3, iterations=1
        )

    def test_serial(self, benchmark, data):
        schema, df = data
        benchmark.pedantic(
            lambda: compute_serial(df, schema), rounds=1, iterations=1
        )
