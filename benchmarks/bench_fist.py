"""§5.4 benchmark: per-complaint cost of the FIST study surrogate."""
import pytest

from repro.experiments.fist import evaluate_scenario
from repro.synth.fist import base_survey, scenarios


@pytest.fixture(scope="module")
def data():
    return base_survey(0)


def test_district_complaint(benchmark, spark, data):
    survey, rain = data
    scenario = scenarios()[0]
    benchmark.pedantic(
        lambda: evaluate_scenario(spark, scenario, survey, rain, n_iter=15),
        rounds=2,
        iterations=1,
    )
