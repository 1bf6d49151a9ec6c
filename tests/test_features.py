"""Tests for featurization: main effects, normalization, aux joins, lags."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.features import (
    AuxDataset,
    FeaturePlan,
    add_lag_feature,
    build_feature_table,
    main_effect_features,
    normalize_columns,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def grouped(spark):
    rng = np.random.default_rng(0)
    pdf = pd.DataFrame(
        {
            "a": rng.choice(list("pqr"), 200),
            "b": rng.choice(list("xyz"), 200),
            "y": rng.normal(10, 3, 200),
        }
    )
    return spark.createDataFrame(pdf), pdf


class TestMainEffects:
    def test_matches_duckdb_median(self, grouped, spark):
        sdf, pdf = grouped
        out = main_effect_features(sdf, ["a"], "y").select("a", "b", "y", "f_a")
        assert_equivalent(
            out,
            """
            SELECT t.a, t.b, t.y, med.f_a
            FROM t JOIN (
              SELECT a, median(y) AS f_a FROM t GROUP BY a
            ) med USING (a)
            """,
            t=pdf,
        )

    def test_one_feature_per_attr(self, grouped):
        sdf, _ = grouped
        out = main_effect_features(sdf, ["a", "b"], "y")
        assert {"f_a", "f_b"} <= set(out.columns)


class TestNormalize:
    def test_zero_mean_unit_std(self, grouped):
        sdf, _ = grouped
        out = normalize_columns(sdf, ["y"]).agg(
            F.avg("y").alias("mu"), F.stddev_samp("y").alias("sd")
        ).collect()[0]
        assert abs(out["mu"]) < 1e-9
        assert abs(out["sd"] - 1.0) < 1e-9

    def test_constant_column_no_nan(self, spark):
        sdf = spark.createDataFrame(pd.DataFrame({"y": [2.0, 2.0, 2.0]}))
        vals = [r["y"] for r in normalize_columns(sdf, ["y"]).collect()]
        assert all(np.isfinite(v) for v in vals)

    def test_empty_cols_noop(self, grouped):
        sdf, _ = grouped
        assert normalize_columns(sdf, []) is sdf


class TestLagFeature:
    def test_lag_values(self, spark):
        pdf = pd.DataFrame(
            {
                "loc": ["a"] * 4 + ["b"] * 4,
                "day": list("1234") * 2,
                "y": [1.0, 2.0, 3.0, 4.0, 10.0, 20.0, 30.0, 40.0],
            }
        )
        out = (
            add_lag_feature(
                spark.createDataFrame(pdf),
                partition_cols=["loc"],
                order_col="day",
                value_col="y",
                lag=1,
            )
            .orderBy("loc", "day")
            .toPandas()
        )
        a = out[out.loc_ if hasattr(out, "loc_") else out["loc"] == "a"]
        assert list(a["f_lag1_y"])[1:] == [1.0, 2.0, 3.0]

    def test_series_start_filled_with_partition_mean(self, spark):
        pdf = pd.DataFrame({"loc": ["a", "a"], "day": ["1", "2"], "y": [2.0, 4.0]})
        out = (
            add_lag_feature(
                spark.createDataFrame(pdf),
                partition_cols=["loc"],
                order_col="day",
                value_col="y",
                lag=1,
            )
            .orderBy("day")
            .toPandas()
        )
        assert out["f_lag1_y"].iloc[0] == 3.0  # partition mean


class TestBuildFeatureTable:
    def test_intercept_first(self, grouped):
        sdf, _ = grouped
        df, cols = build_feature_table(
            sdf.withColumn("count", F.lit(1.0)),
            group_cols=["a", "b"],
            cluster_cols=["a"],
            y_col="y",
        )
        assert cols[0] == "f_intercept"
        assert set(cols) == {"f_intercept", "f_a", "f_b"}

    def test_cluster_column(self, grouped):
        sdf, _ = grouped
        df, _ = build_feature_table(
            sdf, group_cols=["a", "b"], cluster_cols=["a"], y_col="y"
        )
        vals = {r["cluster"] for r in df.select("cluster").distinct().collect()}
        assert vals == {"p", "q", "r"}

    def test_no_cluster_cols_single_cluster(self, grouped):
        sdf, _ = grouped
        df, _ = build_feature_table(
            sdf, group_cols=["a"], cluster_cols=[], y_col="y"
        )
        vals = {r["cluster"] for r in df.select("cluster").distinct().collect()}
        assert vals == {"_all"}

    def test_main_effects_disabled(self, grouped):
        sdf, _ = grouped
        _, cols = build_feature_table(
            sdf,
            group_cols=["a"],
            cluster_cols=[],
            y_col="y",
            plan=FeaturePlan(use_main_effects=False),
        )
        assert cols == ["f_intercept"]

    def test_applicable_aux_joined_and_normalized(self, grouped, spark):
        sdf, pdf = grouped
        aux = spark.createDataFrame(
            pd.DataFrame({"a": list("pqr"), "v": [1.0, 2.0, 3.0]})
        )
        df, cols = build_feature_table(
            sdf,
            group_cols=["a"],
            cluster_cols=[],
            y_col="y",
            plan=FeaturePlan(aux=[AuxDataset("x", aux, on=["a"], measures=["v"])]),
        )
        assert "f_x_v" in cols
        got = df.agg(F.avg("f_x_v")).collect()[0][0]
        assert abs(got) < 0.2  # centred

    def test_inapplicable_aux_skipped(self, grouped, spark):
        sdf, _ = grouped
        aux = spark.createDataFrame(pd.DataFrame({"zz": ["1"], "v": [1.0]}))
        _, cols = build_feature_table(
            sdf,
            group_cols=["a"],
            cluster_cols=[],
            y_col="y",
            plan=FeaturePlan(aux=[AuxDataset("x", aux, on=["zz"], measures=["v"])]),
        )
        assert "f_x_v" not in cols

    def test_missing_aux_rows_filled_with_zero(self, grouped, spark):
        sdf, _ = grouped
        aux = spark.createDataFrame(
            pd.DataFrame({"a": ["p"], "v": [5.0]})  # q, r missing
        )
        df, _ = build_feature_table(
            sdf,
            group_cols=["a"],
            cluster_cols=[],
            y_col="y",
            plan=FeaturePlan(aux=[AuxDataset("x", aux, on=["a"], measures=["v"])]),
        )
        vals = df.where(F.col("a") != "p").select("f_x_v").distinct().collect()
        assert [r["f_x_v"] for r in vals] == [0.0]
