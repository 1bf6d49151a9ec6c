"""Tests for the §5.2 synthetic accuracy data generators."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.synth.accuracy import (
    COMPLAINT_FOR_ERROR,
    ERROR_TYPES,
    base_dataset,
    clean_group_stats,
    correlated_series,
    make_multi_trial,
    make_trial,
)


class TestBaseDataset:
    def test_group_count(self):
        rows = base_dataset(0, n_groups=50)
        assert rows["g"].nunique() == 50

    def test_rows_per_group_distribution(self):
        rows = base_dataset(1)
        counts = rows.groupby("g").size()
        assert counts.min() >= 20
        assert 80 < counts.mean() < 120

    def test_measure_distribution(self):
        rows = base_dataset(2)
        assert 95 < rows["m"].mean() < 105
        assert 15 < rows["m"].std() < 25

    def test_deterministic_in_seed(self):
        a, b = base_dataset(3), base_dataset(3)
        pd.testing.assert_frame_equal(a, b)


def _spearman(a, b):
    """Rank correlation without scipy (Pearson over rank vectors)."""
    ra = pd.Series(a).rank().to_numpy()
    rb = pd.Series(b).rank().to_numpy()
    return float(np.corrcoef(ra, rb)[0, 1])


class TestCorrelatedSeries:
    @given(st.floats(min_value=0.6, max_value=1.0))
    @settings(max_examples=15, deadline=None)
    def test_rank_correlation_close_to_rho(self, rho):
        rng = np.random.default_rng(0)
        vals = rng.normal(100, 20, 400)
        aux = correlated_series(vals, rho, rng)
        assert abs(_spearman(vals, aux) - rho) < 0.12

    def test_perfect_correlation(self):
        rng = np.random.default_rng(1)
        vals = rng.normal(0, 1, 200)
        aux = correlated_series(vals, 1.0, rng)
        assert _spearman(vals, aux) > 0.999


class TestSingleErrorTrials:
    @pytest.mark.parametrize("error", ERROR_TYPES)
    def test_error_applied_to_target(self, error):
        trial = make_trial(11, error, 0.8)
        target = trial.true_groups[0]
        clean = clean_group_stats(base_dataset(11))
        clean_row = clean[clean.g == target].iloc[0]
        got = trial.rows[trial.rows.g == target]
        if "missing" in error:
            assert len(got) == pytest.approx(clean_row["count"] / 2, abs=1)
        if "dup" in error:
            assert len(got) == pytest.approx(clean_row["count"] * 1.5, abs=1)
        # For combo errors the surviving/duplicated subsample shifts the
        # group mean by a few units on its own, so only the pure drift
        # errors get a tight check; combos get a directional one.
        tol = 0.5 if "+" not in error else 4.0
        if "inc" in error:
            assert got["m"].mean() == pytest.approx(clean_row["mean"] + 5, abs=tol)
        if "dec" in error:
            assert got["m"].mean() == pytest.approx(clean_row["mean"] - 5, abs=tol)

    @pytest.mark.parametrize("error", ERROR_TYPES)
    def test_other_groups_untouched(self, error):
        trial = make_trial(12, error, 0.8)
        target = trial.true_groups[0]
        clean = base_dataset(12)
        others_clean = clean[clean.g != target]
        others = trial.rows[trial.rows.g != target]
        assert len(others) == len(others_clean)
        assert others["m"].sum() == pytest.approx(others_clean["m"].sum())

    def test_complaint_matches_error(self):
        for error, (agg, direction) in COMPLAINT_FOR_ERROR.items():
            trial = make_trial(13, error, 0.8)
            assert trial.complaint.agg == agg
            assert trial.complaint.direction == direction

    def test_unknown_error_rejected(self):
        with pytest.raises(ValueError):
            make_trial(0, "nope", 0.8)

    def test_aux_tables_cover_all_groups(self):
        trial = make_trial(14, "missing", 0.8)
        for stat in ("count", "mean"):
            assert trial.aux[stat]["g"].nunique() == 100


class TestMultiErrorTrials:
    def test_two_truths_one_decoy(self):
        trial = make_multi_trial(20, "missing+duplication", 0.8)
        assert len(trial.true_groups) == 2
        assert len(trial.decoys) == 1
        assert not set(trial.true_groups) & set(trial.decoys)

    def test_decoy_error_opposes_complaint(self):
        trial = make_multi_trial(21, "dec+inc", 0.8)
        clean = clean_group_stats(base_dataset(21))
        decoy = trial.decoys[0]
        got = trial.rows[trial.rows.g == decoy]["m"].mean()
        want = clean[clean.g == decoy]["mean"].iloc[0]
        assert got > want  # increased, while the complaint is 'mean too low'

    def test_all_condition_combines_errors(self):
        trial = make_multi_trial(22, "all", 0.8)
        assert trial.complaint.agg == "sum"
