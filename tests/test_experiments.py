"""Tests for the experiment harnesses (structure + cross-path equivalence)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.complaint import Complaint
from repro.core.features import AuxDataset, FeaturePlan
from repro.core.hierarchy import DrillState, Hierarchy, Schema
from repro.core.reptile import ReptileSession
from repro.experiments import fig7, fig11
from repro.experiments.fig11 import run_trial, sweep_single_errors
from repro.synth.accuracy import make_multi_trial, make_trial


class TestFig7Harness:
    def test_synthetic_relations_shape(self):
        rels = fig7.synthetic_relations(3, 7)
        assert len(rels) == 3
        assert all(r.n_leaves == 7 for r in rels)

    def test_sweep_structure(self):
        out = fig7.sweep(ds=(1, 2), w=5)
        ops = {t.op for t in out}
        assert ops == {"materialize", "gram", "left", "right"}
        assert all(t.factorized_s > 0 for t in out)

    def test_cluster_ops_included(self):
        out = fig7.sweep(ds=(2,), w=5, clusters=True)
        ops = {t.op for t in out}
        assert {"cluster_gram", "cluster_right", "cluster_left"} <= ops

    def test_dense_cap_skips_dense(self):
        out = fig7.sweep(ds=(3,), w=10, dense_cap=10)
        assert all(t.dense_s is None for t in out)
        assert all(t.speedup is None for t in out)

    def test_format_table(self):
        out = fig7.sweep(ds=(1,), w=5)
        text = fig7.format_table(out)
        assert "materialize" in text and "speedup" in text


class TestFig11Harness:
    def test_run_trial_returns_all_approaches(self):
        trial = make_trial(0, "missing", 1.0)
        hits = run_trial(trial)
        assert set(hits) == {"reptile", "outlier", "sensitivity", "support", "raw"}

    def test_perfect_aux_missing_always_found(self):
        for seed in range(5):
            trial = make_trial(seed, "missing", 1.0)
            assert run_trial(trial)["reptile"], seed

    def test_sweep_structure(self):
        pts = sweep_single_errors(rhos=(0.8,), errors=("missing",), n_trials=4)
        assert len(pts) == 1
        assert pts[0].n_trials == 4
        assert 0 <= pts[0].accuracy["reptile"] <= 1

    def test_multi_trial_outlier_bounded(self):
        """Outlier cannot reliably distinguish truths from the decoy."""
        hits_outlier = hits_reptile = 0
        n = 15
        for seed in range(n):
            trial = make_multi_trial(seed, "dec+inc", 1.0)
            h = run_trial(trial)
            hits_outlier += h["outlier"]
            hits_reptile += h["reptile"]
        assert hits_reptile > hits_outlier

    def test_format_table(self):
        pts = sweep_single_errors(rhos=(0.8,), errors=("dup",), n_trials=3)
        text = fig11.format_table(pts, ("reptile", "support"))
        assert "dup" in text


class TestFig11SparkEquivalence:
    """The pandas fast path and the full Spark session must agree."""

    def test_same_top1_on_missing_trial(self, spark):
        trial = make_trial(3, "missing", 1.0)
        hits = run_trial(trial)

        schema = Schema([Hierarchy("dim", ["g"])], measure="m")
        aux_df = spark.createDataFrame(trial.aux["count"])
        plan = FeaturePlan(
            aux=[AuxDataset("aux", aux_df, on=["g"], measures=["aux"])],
            use_main_effects=False,
        )
        session = ReptileSession(
            df=spark.createDataFrame(trial.rows),
            schema=schema,
            plan=plan,
            state=DrillState.initial(schema),
            n_iter=20,
        )
        rec = session.recommend(trial.complaint, hierarchies=["dim"], top_k=1)
        top = rec.per_hierarchy["dim"][0].group["g"]
        assert (top in trial.true_groups) == hits["reptile"]
        assert top in trial.true_groups  # rho=1.0 missing: both must hit
