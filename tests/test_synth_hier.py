"""Tests for synthetic dataset generators (hier_dataset, Fig. 10 shapes,
and the provided TPC-H-lite module)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.hierarchy import validate_hierarchy_fds
from repro.core.stats import group_stats
from repro.oracle import assert_equivalent
from repro.synth.hier import (
    ABSENTEE_SCHEMA,
    COMPAS_SCHEMA,
    absentee_like,
    compas_like,
    hier_dataset,
    hier_schema,
)


class TestHierDataset:
    @pytest.fixture(scope="class")
    def df(self, spark):
        return hier_dataset(spark, d=2, t=3, w=16, n_rows=400, fanout=2, seed=1)

    def test_columns(self, df):
        assert set(df.columns) == {
            "h0a0", "h0a1", "h0a2", "h1a0", "h1a1", "h1a2", "m"
        }

    def test_fds_hold(self, df):
        schema = hier_schema(2, 3)
        for h in schema.hierarchies:
            assert validate_hierarchy_fds(df, h) == []

    def test_leaf_cardinality(self, df):
        assert df.select("h0a2").distinct().count() <= 16

    def test_fanout_structure(self, df):
        # top level has ~w / fanout^(t-1) distinct values
        assert df.select("h0a0").distinct().count() <= 4

    def test_deterministic(self, spark):
        a = hier_dataset(spark, d=1, t=2, w=8, n_rows=50, seed=3).toPandas()
        b = hier_dataset(spark, d=1, t=2, w=8, n_rows=50, seed=3).toPandas()
        pd.testing.assert_frame_equal(a, b)


class TestFig10Shapes:
    def test_absentee_cardinalities(self, spark):
        df = absentee_like(spark, n_rows=5000)
        assert df.select("county").distinct().count() <= 100
        assert df.select("party").distinct().count() <= 6
        assert df.select("week").distinct().count() <= 53
        assert df.select("gender").distinct().count() <= 3

    def test_compas_time_fds(self, spark):
        df = compas_like(spark, n_rows=5000)
        time_h = COMPAS_SCHEMA.hierarchy("time")
        assert validate_hierarchy_fds(df, time_h) == []

    def test_compas_day_count(self, spark):
        df = compas_like(spark, n_rows=30000)
        assert df.select("day").distinct().count() <= 704

    def test_schemas_well_formed(self):
        assert [h.name for h in ABSENTEE_SCHEMA.hierarchies] == [
            "county", "party", "week", "gender"
        ]
        assert COMPAS_SCHEMA.hierarchy("time").attrs == ("year", "month", "day")


class TestTpchLite:
    """The provided TPC-H-lite generators feed the oracle-backed stats path."""

    def test_lineitem_group_stats_vs_duckdb(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        pdf = li.toPandas()
        out = group_stats(li, ["l_returnflag", "l_linestatus"], "l_quantity")
        assert_equivalent(
            out,
            """
            SELECT l_returnflag, l_linestatus,
                   CAST(count(*) AS DOUBLE) AS count,
                   avg(l_quantity) AS mean,
                   coalesce(stddev_samp(l_quantity), 0.0) AS std
            FROM t GROUP BY l_returnflag, l_linestatus
            """,
            t=pdf,
        )

    def test_orders_join_lineitem(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        joined = li.join(o, li.l_orderkey == o.o_orderkey)
        assert joined.count() > 0

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]
        )
        assert top["count"] > 5000 / 100 * 5  # heavy head
