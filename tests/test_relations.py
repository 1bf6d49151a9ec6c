"""Tests for per-hierarchy relations and decomposed aggregates."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.core.hierarchy import Hierarchy
from repro.factorized.aggregates import CrossCOF, DecomposedAggregates
from repro.factorized.relations import collect_all, collect_hierarchy
from repro.synth.hier import hier_dataset, hier_schema


@pytest.fixture(scope="module")
def data(spark):
    schema = hier_schema(d=2, t=2)
    df = hier_dataset(spark, d=2, t=2, w=12, n_rows=300, fanout=3, seed=7)
    return schema, df, df.toPandas()


class TestCollectHierarchy:
    def test_path_rows_are_distinct_leaves(self, data):
        schema, df, pdf = data
        rel = collect_hierarchy(df, schema.hierarchies[0])
        expected = pdf[["h0a0", "h0a1"]].drop_duplicates()
        assert rel.n_leaves == len(expected)

    def test_path_is_sorted(self, data):
        schema, df, _ = data
        rel = collect_hierarchy(df, schema.hierarchies[0])
        assert rel.path.equals(
            rel.path.sort_values(list(rel.attrs)).reset_index(drop=True)
        )

    def test_depth_limits_attrs(self, data):
        schema, df, pdf = data
        rel = collect_hierarchy(df, schema.hierarchies[0], depth=1)
        assert rel.attrs == ("h0a0",)
        assert rel.n_leaves == pdf["h0a0"].nunique()

    def test_depth_zero_rejected(self, data):
        schema, df, _ = data
        with pytest.raises(ValueError):
            collect_hierarchy(df, schema.hierarchies[0], depth=0)

    def test_bcnf_relations(self, data):
        schema, df, pdf = data
        rel = collect_hierarchy(df, schema.hierarchies[0])
        assert list(rel.bcnf["h0a0"].columns) == ["h0a0"]
        assert list(rel.bcnf["h0a1"].columns) == ["h0a0", "h0a1"]
        # FD: each child value appears exactly once in the mapping relation
        assert rel.bcnf["h0a1"]["h0a1"].is_unique

    def test_within_count_matches_duckdb(self, data):
        schema, df, pdf = data
        rel = collect_hierarchy(df, schema.hierarchies[0])
        con = duckdb.connect()
        exp = con.execute(
            """
            SELECT h0a0, count(*) AS c
            FROM (SELECT DISTINCT h0a0, h0a1 FROM pdf)
            GROUP BY h0a0 ORDER BY h0a0
            """
        ).fetchdf()
        con.close()
        got = rel.within_count("h0a0")
        assert list(got.index) == list(exp["h0a0"])
        assert list(got.values) == list(exp["c"])

    def test_within_pair_covers_all_leaves(self, data):
        schema, df, _ = data
        rel = collect_hierarchy(df, schema.hierarchies[0])
        assert rel.within_pair("h0a0", "h0a1").sum() == rel.n_leaves


class TestDecomposedAggregates:
    @pytest.fixture(scope="class")
    def agg(self, data):
        schema, df, _ = data
        rels = collect_all(df, schema.hierarchies)
        return DecomposedAggregates(rels), rels

    def test_n_rows_is_product_of_leaf_totals(self, agg):
        a, rels = agg
        assert a.n_rows == rels[0].n_leaves * rels[1].n_leaves

    def test_total_equals_n_rows_for_all_attrs(self, agg):
        a, _ = agg
        for attr in a.attr_hier:
            assert a.total(attr) == a.n_rows

    def test_count_sums_to_total(self, agg):
        a, _ = agg
        for attr in a.attr_hier:
            assert a.count(attr).sum() == a.n_rows

    def test_count_matches_cross_product(self, agg):
        """COUNT_A equals the value counts in the materialized cross product."""
        a, rels = agg
        cross = rels[0].path.merge(rels[1].path, how="cross")
        for attr in a.attr_hier:
            exp = cross.groupby(attr).size()
            got = a.count(attr)
            pd.testing.assert_series_equal(
                got.sort_index(), exp.sort_index(), check_names=False
            )

    def test_same_hierarchy_cof_matches_cross_product(self, agg):
        a, rels = agg
        cross = rels[0].path.merge(rels[1].path, how="cross")
        exp = cross.groupby(["h0a0", "h0a1"]).size()
        got = a.cof("h0a0", "h0a1")
        pd.testing.assert_series_equal(
            got.sort_index(), exp.sort_index(), check_names=False
        )

    def test_cof_order_insensitive(self, agg):
        a, _ = agg
        fwd = a.cof("h0a0", "h0a1")
        rev = a.cof("h0a1", "h0a0")
        assert fwd.sum() == rev.sum()

    def test_cross_hierarchy_cof_is_lazy(self, agg):
        a, _ = agg
        c = a.cof("h0a1", "h1a1")
        assert isinstance(c, CrossCOF)

    def test_cross_cof_materialization_matches_cross_product(self, agg):
        a, rels = agg
        cross = rels[0].path.merge(rels[1].path, how="cross")
        exp = cross.groupby(["h0a0", "h1a0"]).size()
        got = a.cof("h0a0", "h1a0").materialize()
        assert got.sum() == exp.sum()
        got = got[got > 0].sort_index()
        pd.testing.assert_series_equal(got, exp.sort_index(), check_names=False)

    def test_scale_excluding(self, agg):
        a, rels = agg
        assert a.scale_excluding(0) == rels[1].n_leaves
        assert a.scale_excluding(0, 1) == 1
        assert a.scale_excluding() == a.n_rows

    def test_unknown_attr_raises(self, agg):
        a, _ = agg
        with pytest.raises(KeyError):
            a.count("nope")
