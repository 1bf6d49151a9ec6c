"""Fig. 10 benchmark: Reptile training vs Matlab-style dense EM.

Small-scale arms of the §5.1.4 protocol (a single absentee drill step at the
deepest level, where the cluster count is largest); the full sequence runs
in jobs/fig10_end_to_end.py.
"""
import pytest

from repro.baselines.dense_em import fit_dense_em
from repro.core.em import fit_em
from repro.core.features import FeaturePlan, build_feature_table
from repro.core.stats import group_stats
from repro.core.suffstats import compute_suffstats
from repro.synth.hier import ABSENTEE_SCHEMA, absentee_like

N_ROWS = 30_000
N_ITER = 20


@pytest.fixture(scope="module")
def feat(spark):
    df = absentee_like(spark, n_rows=N_ROWS).cache()
    attrs = ["county", "party", "week", "gender"]
    grouped = group_stats(df, attrs, "m")
    feat_df, cols = build_feature_table(
        grouped,
        group_cols=attrs,
        cluster_cols=attrs[:-1],
        y_col="count",
        plan=FeaturePlan(),
    )
    feat_df = feat_df.cache()
    feat_df.count()
    pdf = feat_df.select("cluster", "y", *cols).toPandas()
    yield feat_df, pdf, cols
    feat_df.unpersist()
    df.unpersist()


class TestTraining:
    def test_reptile_suffstats_em(self, benchmark, feat):
        feat_df, _, cols = feat
        benchmark.pedantic(
            lambda: fit_em(compute_suffstats(feat_df, cols), n_iter=N_ITER),
            rounds=2,
            iterations=1,
        )

    def test_matlab_dense_em(self, benchmark, feat):
        _, pdf, cols = feat
        benchmark.pedantic(
            lambda: fit_dense_em(pdf, cols, n_iter=N_ITER), rounds=1, iterations=1
        )
