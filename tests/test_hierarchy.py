"""Unit tests for hierarchy/schema metadata and FD validation."""
import pandas as pd
import pytest

from repro.core.complaint import Complaint
from repro.core.hierarchy import DrillState, Hierarchy, Schema, validate_hierarchy_fds
from repro.core.stats import GroupStats


GEO = Hierarchy("geo", ["district", "village"])
TIME = Hierarchy("time", ["year"])
SCHEMA = Schema([GEO, TIME], measure="severity")


class TestHierarchy:
    def test_depth_and_prefix(self):
        assert GEO.depth == 2
        assert GEO.prefix(0) == ()
        assert GEO.prefix(1) == ("district",)
        assert GEO.prefix(2) == ("district", "village")

    def test_empty_hierarchy_rejected(self):
        with pytest.raises(ValueError):
            Hierarchy("bad", [])


class TestSchema:
    def test_lookup(self):
        assert SCHEMA.hierarchy("geo") is not None
        with pytest.raises(KeyError):
            SCHEMA.hierarchy("nope")

    def test_all_attrs_order(self):
        assert SCHEMA.all_attrs == ["district", "village", "year"]

    def test_duplicate_hierarchy_names_rejected(self):
        with pytest.raises(ValueError):
            Schema([GEO, Hierarchy("geo", ["x"])], measure="m")

    def test_shared_attribute_rejected(self):
        with pytest.raises(ValueError):
            Schema([GEO, Hierarchy("t2", ["village"])], measure="m")

    def test_measure_cannot_be_attribute(self):
        with pytest.raises(ValueError):
            Schema([GEO], measure="village")


class TestDrillState:
    def test_initial_depths(self):
        st = DrillState.initial(SCHEMA, time=1)
        assert st.depths == {"geo": 0, "time": 1}
        assert st.groupby_attrs(SCHEMA) == ["year"]

    def test_initial_unknown_hierarchy(self):
        with pytest.raises(KeyError):
            DrillState.initial(SCHEMA, nope=1)

    def test_drill_sequence(self):
        st = DrillState.initial(SCHEMA)
        assert st.can_drill(SCHEMA, "geo")
        assert st.next_attr(SCHEMA, "geo") == "district"
        st = st.drilled("geo")
        assert st.next_attr(SCHEMA, "geo") == "village"
        st = st.drilled("geo")
        assert not st.can_drill(SCHEMA, "geo")
        with pytest.raises(ValueError):
            st.next_attr(SCHEMA, "geo")

    def test_groupby_attrs_hierarchy_order(self):
        st = DrillState.initial(SCHEMA, geo=2, time=1)
        assert st.groupby_attrs(SCHEMA) == ["district", "village", "year"]

    def test_drilled_is_persistent(self):
        st = DrillState.initial(SCHEMA)
        st2 = st.drilled("geo")
        assert st.depths["geo"] == 0 and st2.depths["geo"] == 1


class TestFDValidation:
    def test_valid_fd(self, spark):
        pdf = pd.DataFrame(
            {"district": ["d1", "d1", "d2"], "village": ["v1", "v2", "v3"]}
        )
        assert validate_hierarchy_fds(spark.createDataFrame(pdf), GEO) == []

    def test_violated_fd_reported(self, spark):
        pdf = pd.DataFrame(
            {"district": ["d1", "d2"], "village": ["v1", "v1"]}
        )
        out = validate_hierarchy_fds(spark.createDataFrame(pdf), GEO)
        assert len(out) == 1 and "v1" in out[0]

    def test_single_attr_hierarchy_trivially_valid(self, spark):
        pdf = pd.DataFrame({"year": [1, 2, 3]})
        assert validate_hierarchy_fds(spark.createDataFrame(pdf), TIME) == []


class TestComplaint:
    def test_too_high_score_is_value(self):
        c = Complaint({"year": 1986}, "std", "too_high")
        assert c.score(5.0) == 5.0

    def test_too_low_score_is_negated(self):
        c = Complaint({}, "count", "too_low")
        assert c.score(5.0) == -5.0

    def test_target_score_is_distance(self):
        c = Complaint({}, "count", "target", target=70)
        assert c.score(67.0) == 3.0

    def test_target_requires_value(self):
        with pytest.raises(ValueError):
            Complaint({}, "count", "target")

    def test_invalid_agg_and_direction(self):
        with pytest.raises(ValueError):
            Complaint({}, "median", "too_high")
        with pytest.raises(ValueError):
            Complaint({}, "count", "sideways")

    def test_modeled_stats_decomposition(self):
        assert Complaint({}, "count", "too_low").modeled_stats == ("count",)
        assert Complaint({}, "mean", "too_low").modeled_stats == ("mean",)
        assert Complaint({}, "sum", "too_low").modeled_stats == ("count", "mean")
        assert Complaint({}, "std", "too_high").modeled_stats == ("count", "mean")

    def test_score_stats_uses_complained_agg(self):
        c = Complaint({}, "sum", "too_low")
        assert c.score_stats(GroupStats(count=2, mean=3.0)) == -6.0
