"""Unit tests for the ranker and the baseline explainers."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import explainers
from repro.core.complaint import Complaint
from repro.core.ranker import rank_groups, repaired_stats
from repro.core.stats import GroupStats


def _obs():
    # group 1 has an inflated count (duplication error)
    return [
        GroupStats(count=100, mean=10.0, std=1.0),
        GroupStats(count=200, mean=10.0, std=1.0),
        GroupStats(count=100, mean=10.0, std=1.0),
    ]


def _preds(counts=(100, 100, 100), means=(10.0, 10.0, 10.0)):
    return pd.DataFrame({"count": counts, "mean": means})


class TestRepairedStats:
    def test_negative_count_clipped(self):
        s = repaired_stats(GroupStats(10, 5.0), {"count": -3.0})
        assert s.count == 0.0

    def test_std_preserved(self):
        s = repaired_stats(GroupStats(10, 5.0, 2.0), {"mean": 7.0})
        assert s.std == 2.0 and s.mean == 7.0


class TestRankGroups:
    def test_count_too_high_picks_duplicated_group(self):
        ranked = rank_groups(
            hierarchy="h",
            group_keys=[{"g": "a"}, {"g": "b"}, {"g": "c"}],
            observed=_obs(),
            predictions=_preds()[["count"]],
            complaint=Complaint({}, "count", "too_high"),
        )
        assert ranked[0].group["g"] == "b"
        assert ranked[0].improvement == pytest.approx(100.0)

    def test_mean_complaint_uses_mean_predictions(self):
        obs = [
            GroupStats(100, 10.0),
            GroupStats(100, 4.0),  # drifted low
            GroupStats(100, 10.0),
        ]
        ranked = rank_groups(
            hierarchy="h",
            group_keys=[{"g": "a"}, {"g": "b"}, {"g": "c"}],
            observed=obs,
            predictions=_preds()[["mean"]],
            complaint=Complaint({}, "mean", "too_low"),
        )
        assert ranked[0].group["g"] == "b"

    def test_misaligned_inputs_raise(self):
        with pytest.raises(ValueError):
            rank_groups(
                hierarchy="h",
                group_keys=[{"g": "a"}],
                observed=_obs(),
                predictions=_preds(),
                complaint=Complaint({}, "count", "too_high"),
            )

    def test_scores_sorted_ascending(self):
        ranked = rank_groups(
            hierarchy="h",
            group_keys=[{"g": "a"}, {"g": "b"}, {"g": "c"}],
            observed=_obs(),
            predictions=_preds(),
            complaint=Complaint({}, "count", "too_high"),
        )
        scores = [r.score for r in ranked]
        assert scores == sorted(scores)

    def test_std_complaint_resolved_by_mean_repair(self):
        """Repairing a child's deviant mean lowers the parent's STD."""
        obs = [
            GroupStats(50, 8.0, 1.0),
            GroupStats(50, 2.0, 1.0),  # Zata-like low mean
            GroupStats(50, 8.0, 1.0),
        ]
        ranked = rank_groups(
            hierarchy="h",
            group_keys=[{"g": "a"}, {"g": "b"}, {"g": "c"}],
            observed=obs,
            predictions=pd.DataFrame(
                {"count": [50.0, 50.0, 50.0], "mean": [8.0, 8.0, 8.0]}
            ),
            complaint=Complaint({}, "std", "too_high"),
        )
        assert ranked[0].group["g"] == "b"
        assert ranked[0].improvement > 0


class TestExplainers:
    def test_support_picks_largest_group(self):
        assert explainers.support(_obs(), Complaint({}, "count", "too_high")) == 1

    def test_sensitivity_deletion_semantics(self):
        # deleting the duplicated group best resolves "count too high"
        idx = explainers.sensitivity(_obs(), Complaint({}, "count", "too_high"))
        assert idx == 1

    def test_sensitivity_cannot_resolve_too_low(self):
        # deletion only lowers the count: best deletion is the smallest group
        obs = [GroupStats(10, 1.0), GroupStats(100, 1.0)]
        idx = explainers.sensitivity(obs, Complaint({}, "count", "too_low"))
        assert idx == 0

    def test_outlier_picks_max_residual(self):
        idx = explainers.outlier(
            _obs(), _preds()[["count"]], Complaint({}, "count", "too_high")
        )
        assert idx == 1

    def test_outlier_is_complaint_blind(self):
        """Outlier picks the biggest deviation regardless of direction."""
        obs = [
            GroupStats(100, 10.0),
            GroupStats(160, 10.0),  # +60 (against complaint direction)
            GroupStats(60, 10.0),  # −40 (supports 'too_low')
        ]
        c_low = Complaint({}, "count", "too_low")
        idx = explainers.outlier(obs, _preds()[["count"]], c_low)
        assert idx == 1  # decoy wins on magnitude

    def test_raw_winsorize_runs_and_returns_index(self):
        rng = np.random.default_rng(0)
        rows = pd.DataFrame(
            {
                "g": np.repeat(["a", "b", "c"], 50),
                "m": rng.normal(10, 2, 150),
            }
        )
        obs = [
            GroupStats(50, rows[rows.g == k].m.mean(), rows[rows.g == k].m.std())
            for k in ["a", "b", "c"]
        ]
        idx = explainers.raw_winsorize(
            rows,
            "g",
            "m",
            [{"g": "a"}, {"g": "b"}, {"g": "c"}],
            obs,
            Complaint({}, "mean", "too_high"),
        )
        assert idx in (0, 1, 2)

    def test_raw_empty_group_scored_inf(self):
        rows = pd.DataFrame({"g": ["a"], "m": [1.0]})
        obs = [GroupStats(1, 1.0), GroupStats(0, 0.0)]
        idx = explainers.raw_winsorize(
            rows,
            "g",
            "m",
            [{"g": "a"}, {"g": "zzz"}],
            obs,
            Complaint({}, "mean", "too_high"),
        )
        assert idx == 0
