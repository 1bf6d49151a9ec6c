"""Fig. 11/12 benchmark: per-trial cost of the accuracy harness."""
import pytest

from repro.experiments.fig11 import run_trial
from repro.synth.accuracy import make_multi_trial, make_trial


@pytest.mark.parametrize("error", ["missing", "dup", "inc", "missing+dec"])
def test_single_error_trial(benchmark, error):
    trial = make_trial(0, error, 0.8)
    benchmark(run_trial, trial)


def test_multi_error_trial(benchmark):
    trial = make_multi_trial(0, "dec+inc", 0.8)
    benchmark(run_trial, trial)
