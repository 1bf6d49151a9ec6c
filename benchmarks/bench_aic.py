"""App. K benchmark: the four-model AIC comparison."""
from repro.experiments.aic import run


def test_aic_comparison(benchmark):
    benchmark.pedantic(run, rounds=1, iterations=1)
