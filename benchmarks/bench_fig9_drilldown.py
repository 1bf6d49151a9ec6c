"""Fig. 9 benchmark: Static vs Dynamic vs Cache+Dynamic drill-down."""
import pytest

from repro.core.hierarchy import Hierarchy, Schema
from repro.factorized.drilldown import DrillDownEngine
from repro.synth.hier import hier_dataset

W = 800


@pytest.fixture(scope="module")
def data(spark):
    schema = Schema(
        [
            Hierarchy("h0", [f"h0a{i}" for i in range(6)]),
            Hierarchy("h1", [f"h1a{i}" for i in range(6)]),
        ],
        measure="m",
    )
    df = hier_dataset(spark, d=2, t=6, w=W, n_rows=5 * W, fanout=3, seed=0).cache()
    df.count()
    yield schema, df
    df.unpersist()


def _three_invocations(df, schema, strategy):
    eng = DrillDownEngine(df, schema, strategy=strategy, depths={"h0": 3, "h1": 3})
    for _ in range(3):
        eng.evaluate_candidates()
        eng.commit("h0")


@pytest.mark.parametrize("strategy", ["static", "dynamic", "cache"])
def test_strategy(benchmark, data, strategy):
    schema, df = data
    benchmark.pedantic(
        _three_invocations, args=(df, schema, strategy), rounds=1, iterations=1
    )
