"""Tests for the FIST synthetic survey and the 22-complaint study."""
import numpy as np
import pandas as pd
import pytest

from repro.experiments.fist import evaluate_scenario, run_study
from repro.synth.fist import (
    REGIONS,
    Scenario,
    apply_corruptions,
    base_survey,
    scenarios,
)


@pytest.fixture(scope="module")
def survey():
    return base_survey(0)


class TestBaseSurvey:
    def test_hierarchy_shape(self, survey):
        rows, rain = survey
        assert set(rows["region"]) == set(REGIONS)
        assert rows["district"].nunique() == 18
        assert rows["village"].nunique() == 180
        assert rows["year"].nunique() == 34

    def test_severity_range(self, survey):
        rows, _ = survey
        assert rows["severity"].between(1, 10).all()

    def test_fd_village_to_district(self, survey):
        rows, _ = survey
        assert (rows.groupby("village")["district"].nunique() == 1).all()

    def test_rainfall_negatively_correlated_with_severity(self, survey):
        rows, rain = survey
        sev = rows.groupby(["village", "year"])["severity"].mean().reset_index()
        merged = sev.merge(rain, on=["village", "year"])
        assert merged["severity"].corr(merged["rainfall"]) < -0.5

    def test_rainfall_covers_every_village_year(self, survey):
        rows, rain = survey
        assert len(rain) == 180 * 34


class TestScenarioCatalog:
    def test_22_scenarios(self):
        assert len(scenarios()) == 22

    def test_exactly_two_designed_failures(self):
        fails = [s for s in scenarios() if s.failure_mode]
        assert len(fails) == 2
        assert {s.failure_mode for s in fails} == {"ambiguous", "multi-group"}

    def test_single_cause_scenarios_have_one_truth(self):
        for s in scenarios():
            if not s.failure_mode:
                assert len(s.truth) == 1

    def test_sids_unique_and_sequential(self):
        sids = [s.sid for s in scenarios()]
        assert sids == list(range(1, 23))


class TestApplyCorruptions:
    def test_shift_applied(self, survey):
        rows, _ = survey
        s = scenarios()[0]  # Tigray 1996 district shift +3
        dirty = apply_corruptions(rows, s)
        filt, kind, mag = s.corruptions[0]
        mask_clean = (rows["district"] == filt["district"]) & (
            rows["year"] == filt["year"]
        )
        mask_dirty = (dirty["district"] == filt["district"]) & (
            dirty["year"] == filt["year"]
        )
        assert (
            dirty.loc[mask_dirty, "severity"].mean()
            > rows.loc[mask_clean, "severity"].mean() + 1.5
        )

    def test_missing_reduces_rows(self, survey):
        rows, _ = survey
        s = next(
            sc
            for sc in scenarios()
            if sc.corruptions[0][1] == "missing" and not sc.failure_mode
        )
        dirty = apply_corruptions(rows, s)
        assert len(dirty) < len(rows)

    def test_dup_increases_rows(self, survey):
        rows, _ = survey
        s = next(sc for sc in scenarios() if sc.corruptions[0][1] == "dup")
        dirty = apply_corruptions(rows, s)
        assert len(dirty) > len(rows)

    def test_untouched_outside_filter(self, survey):
        rows, _ = survey
        s = scenarios()[0]
        dirty = apply_corruptions(rows, s)
        filt, _, _ = s.corruptions[0]
        mask = ~(
            (rows["district"] == filt["district"]) & (rows["year"] == filt["year"])
        )
        assert (
            dirty[
                ~(
                    (dirty["district"] == filt["district"])
                    & (dirty["year"] == filt["year"])
                )
            ]["severity"].sum()
            == pytest.approx(rows[mask]["severity"].sum())
        )


class TestStudySample:
    """Full Spark runs on representative scenarios (the whole 22 run in the
    fist_study job): one district mean, one village std, one count, and the
    two designed failures."""

    @pytest.fixture(scope="class")
    def results(self, spark):
        res = run_study(spark, only=[2, 18, 12, 21, 22], n_iter=10)
        return {r.scenario.sid: r for r in res}

    def test_single_cause_hits(self, results):
        for sid in (2, 18, 12):
            assert results[sid].hit, (sid, results[sid].top)

    def test_ambiguous_counted_as_failure(self, results):
        assert not results[21].hit

    def test_two_district_std_counted_as_failure(self, results):
        r = results[22]
        assert not r.hit
        # Reptile still surfaces one of the two responsible districts
        assert r.top in r.scenario.truth
