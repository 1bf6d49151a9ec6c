"""Fig. 13 benchmark: per-complaint cost, Reptile vs deletion baselines."""
import pytest

from repro.baselines import explainers
from repro.core.complaint import Complaint
from repro.core.stats import GroupStats
from repro.experiments.covid import evaluate_issue
from repro.synth.covid import US_ISSUES, corrupt, panel_for


@pytest.fixture(scope="module")
def panel():
    return panel_for("us")


def test_reptile_complaint(benchmark, spark, panel):
    issue = US_ISSUES[0]
    benchmark.pedantic(
        lambda: evaluate_issue(spark, issue, panel, n_iter=20),
        rounds=2,
        iterations=1,
    )


def test_baseline_complaint(benchmark, panel):
    issue = US_ISSUES[0]
    dirty = corrupt(panel, issue)
    day = dirty.loc[dirty.day_idx == issue.day_idx, "day"].iloc[0]
    cand = dirty[dirty.day == day]
    observed = [GroupStats(count=1.0, mean=float(v)) for v in cand[issue.measure]]
    complaint = Complaint({"day": day}, "sum", "too_low")

    def both():
        explainers.sensitivity(observed, complaint)
        explainers.support(observed, complaint)

    benchmark(both)
