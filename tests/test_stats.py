"""Unit tests for the distributive-statistics algebra (App. A)."""
import math

import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.stats import (
    GroupStats,
    combine,
    combine_with_repair,
    group_stats,
    stats_from_rows,
)
from repro.oracle import assert_equivalent


def _np_stats(values: np.ndarray) -> GroupStats:
    n = len(values)
    return GroupStats(
        count=float(n),
        mean=float(values.mean()) if n else 0.0,
        std=float(values.std(ddof=1)) if n > 1 else 0.0,
    )


class TestGroupStats:
    def test_sum_is_count_times_mean(self):
        s = GroupStats(count=4, mean=2.5)
        assert s.sum == 10.0

    def test_get_each_supported_agg(self):
        s = GroupStats(count=3, mean=2.0, std=1.0)
        assert s.get("count") == 3
        assert s.get("mean") == 2.0
        assert s.get("sum") == 6.0
        assert s.get("std") == 1.0

    def test_get_unknown_agg_raises(self):
        with pytest.raises(ValueError):
            GroupStats(1, 1).get("median")

    def test_replace_is_partial(self):
        s = GroupStats(count=3, mean=2.0, std=1.0).replace(mean=9.0)
        assert (s.count, s.mean, s.std) == (3, 9.0, 1.0)


class TestCombine:
    def test_count_sums(self):
        parts = [GroupStats(2, 0), GroupStats(3, 0)]
        assert combine(parts).count == 5

    def test_mean_is_weighted(self):
        parts = [GroupStats(1, 0.0), GroupStats(3, 4.0)]
        assert combine(parts).mean == 3.0

    def test_empty_partition(self):
        assert combine([]).count == 0

    def test_zero_count_parts_ignored(self):
        parts = [GroupStats(0, 99.0, 99.0), GroupStats(2, 1.0, 0.0)]
        c = combine(parts)
        assert (c.count, c.mean) == (2, 1.0)

    def test_singleton_total_has_zero_std(self):
        assert combine([GroupStats(1, 5.0)]).std == 0.0

    @given(
        st.lists(
            st.lists(
                st.floats(min_value=-1e3, max_value=1e3, allow_nan=False),
                min_size=1,
                max_size=30,
            ),
            min_size=1,
            max_size=6,
        )
    )
    @settings(max_examples=60, deadline=None)
    def test_combiner_matches_pooled_numpy(self, groups):
        """G(f(R_1)..f(R_J)) == f(R) for arbitrary partitions (App. A)."""
        parts = [_np_stats(np.array(g)) for g in groups]
        pooled = _np_stats(np.concatenate([np.array(g) for g in groups]))
        got = combine(parts)
        assert got.count == pooled.count
        assert math.isclose(got.mean, pooled.mean, rel_tol=1e-9, abs_tol=1e-7)
        assert math.isclose(got.std, pooled.std, rel_tol=1e-6, abs_tol=1e-6)

    def test_combine_with_repair_replaces_one_member(self):
        parts = [GroupStats(10, 1.0), GroupStats(10, 3.0)]
        repaired = combine_with_repair(parts, 1, GroupStats(10, 1.0))
        assert repaired.mean == 1.0
        # original list untouched
        assert parts[1].mean == 3.0

    def test_repair_to_zero_count_deletes_group(self):
        parts = [GroupStats(10, 1.0), GroupStats(10, 3.0)]
        repaired = combine_with_repair(parts, 1, GroupStats(0, 0.0))
        assert (repaired.count, repaired.mean) == (10, 1.0)


class TestGroupStatsSpark:
    @pytest.fixture(scope="class")
    def data(self, spark):
        rng = np.random.default_rng(0)
        pdf = pd.DataFrame(
            {
                "g": rng.integers(0, 5, 400),
                "h": rng.choice(list("xy"), 400),
                "m": rng.normal(10, 2, 400),
            }
        )
        return spark.createDataFrame(pdf), pdf

    def test_matches_duckdb(self, data):
        sdf, pdf = data
        out = group_stats(sdf, ["g", "h"], "m")
        assert_equivalent(
            out,
            """
            SELECT g, h,
                   CAST(count(*) AS DOUBLE) AS count,
                   avg(m) AS mean,
                   coalesce(stddev_samp(m), 0.0) AS std
            FROM t GROUP BY g, h
            """,
            t=pdf,
        )

    def test_combiner_reproduces_parent_level(self, data):
        """Combining child stats reproduces the parent-level Spark stats."""
        sdf, pdf = data
        child = stats_from_rows(group_stats(sdf, ["g", "h"], "m").collect())
        parent = stats_from_rows(group_stats(sdf, [], "m").collect())[0]
        got = combine(child)
        assert got.count == parent.count
        assert math.isclose(got.mean, parent.mean, rel_tol=1e-9)
        assert math.isclose(got.std, parent.std, rel_tol=1e-9)

    def test_singleton_groups_have_zero_std(self, spark):
        sdf = spark.createDataFrame(pd.DataFrame({"g": [1, 2], "m": [1.0, 2.0]}))
        rows = group_stats(sdf, ["g"], "m").collect()
        assert all(r["std"] == 0.0 for r in rows)
