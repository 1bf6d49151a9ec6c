"""Tests for the COVID-19 synthetic panels, issue injection and case study."""
import numpy as np
import pandas as pd
import pytest

from repro.experiments.covid import evaluate_issue
from repro.synth.covid import (
    GLOBAL_ISSUES,
    US_ISSUES,
    US_STATES,
    Issue,
    all_issues,
    complaint_direction,
    corrupt,
    panel_for,
)


@pytest.fixture(scope="module")
def us_panel():
    return panel_for("us")


class TestPanel:
    def test_shape(self, us_panel):
        assert us_panel["location"].nunique() == len(US_STATES)
        assert us_panel["day"].nunique() == 180
        assert len(us_panel) == len(US_STATES) * 180

    def test_measures_nonnegative(self, us_panel):
        for m in ("confirmed", "deaths", "recovered"):
            assert (us_panel[m] >= 0).all()

    def test_population_scaling(self, us_panel):
        tot = us_panel.groupby("location")["confirmed"].sum()
        assert tot["California"] > 10 * tot["Wyoming"]

    def test_deterministic(self):
        pd.testing.assert_frame_equal(panel_for("us"), panel_for("us"))

    def test_unknown_dataset_rejected(self):
        with pytest.raises(ValueError):
            panel_for("mars")


class TestIssueCatalog:
    def test_counts_match_paper_tables(self):
        assert len(US_ISSUES) == 16
        assert len(GLOBAL_ISSUES) == 14

    def test_paper_reptile_hits_are_21_of_30(self):
        hits = sum(i.paper_reptile_hit for i in all_issues())
        assert hits == 21

    def test_prevalent_issues_marked_as_paper_misses(self):
        for i in all_issues():
            if i.prevalent:
                assert not i.paper_reptile_hit

    def test_issue_locations_exist(self, us_panel):
        for i in US_ISSUES:
            assert i.location in set(us_panel["location"])


class TestCorruption:
    def test_missing_zeroes_the_day(self, us_panel):
        issue = US_ISSUES[0]  # Texas missing reports
        dirty = corrupt(us_panel, issue)
        clean_val = us_panel[
            (us_panel.location == "Texas") & (us_panel.day_idx == issue.day_idx)
        ]["confirmed"].iloc[0]
        dirty_val = dirty[
            (dirty.location == "Texas") & (dirty.day_idx == issue.day_idx)
        ]["confirmed"].iloc[0]
        assert dirty_val < 0.1 * clean_val

    def test_other_cells_untouched(self, us_panel):
        issue = US_ISSUES[0]
        dirty = corrupt(us_panel, issue)
        mask = (dirty.location != "Texas") | (dirty.day_idx != issue.day_idx)
        pd.testing.assert_frame_equal(
            dirty[mask].reset_index(drop=True),
            us_panel[mask.to_numpy()].reset_index(drop=True),
        )

    def test_prevalent_affects_all_days(self, us_panel):
        issue = next(i for i in US_ISSUES if i.kind == "prevalent")
        dirty = corrupt(us_panel, issue)
        loc = dirty.location == issue.location
        ratio = dirty.loc[loc, "confirmed"].sum() / us_panel.loc[
            loc.to_numpy(), "confirmed"
        ].sum()
        assert 0.9 < ratio < 0.96

    def test_dayshift_preserves_total(self, us_panel):
        issue = next(i for i in US_ISSUES if i.kind == "dayshift")
        dirty = corrupt(us_panel, issue)
        loc_c = us_panel.location == issue.location
        loc_d = dirty.location == issue.location
        # totals preserved up to rounding plus the last day's shifted tail,
        # which falls outside the observation window
        last_day = us_panel.loc[loc_c].sort_values("day_idx")["confirmed"].iloc[-1]
        tail = (1.0 - issue.factor) * last_day
        assert abs(
            dirty.loc[loc_d, "confirmed"].sum()
            - us_panel.loc[loc_c, "confirmed"].sum()
        ) <= tail + len(us_panel[loc_c])

    def test_direction_inference(self, us_panel):
        missing = corrupt(us_panel, US_ISSUES[0])
        assert complaint_direction(us_panel, missing, US_ISSUES[0]) == "too_low"
        spike = corrupt(us_panel, US_ISSUES[1])
        assert complaint_direction(us_panel, spike, US_ISSUES[1]) == "too_high"

    def test_unknown_kind_rejected(self, us_panel):
        bad = Issue("x", "x", "us", "Texas", "confirmed", "wat", 0, 1.0)
        with pytest.raises(ValueError):
            corrupt(us_panel, bad)


class TestCaseStudySample:
    """Full Spark evaluation on a representative issue subset.

    One clear hit class (missing), one spike, one prevalent ★ (must miss),
    one subtle (must miss) — the per-issue behaviour Fig. 13's 70% rests on.
    """

    @pytest.fixture(scope="class")
    def results(self, spark, us_panel):
        picks = {
            "3572": True,   # Texas missing → hit
            "3438": True,   # Ohio backlog spike → hit
            "3476": False,  # Utah prevalent ★ → miss
            "3402": False,  # Washington typo (subtle) → miss
        }
        issues = [i for i in US_ISSUES if i.issue_id in picks]
        res = {
            i.issue_id: evaluate_issue(spark, i, us_panel, n_iter=10)
            for i in issues
        }
        return picks, res

    def test_expected_hits_and_misses(self, results):
        picks, res = results
        for iid, expected in picks.items():
            assert res[iid].hits["reptile"] == expected, (
                iid,
                res[iid].reptile_top,
            )

    def test_baselines_fail_on_missing_report(self, results):
        _, res = results
        assert not res["3572"].hits["sensitivity"]
        assert not res["3572"].hits["support"]
