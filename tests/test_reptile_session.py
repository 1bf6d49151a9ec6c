"""End-to-end ReptileSession tests on the paper's Figure-1 toy scenario."""
import numpy as np
import pandas as pd
import pytest

from repro.core.complaint import Complaint
from repro.core.features import AuxDataset, FeaturePlan
from repro.core.hierarchy import DrillState, Hierarchy, Schema
from repro.core.reptile import ReptileSession
from repro.core.stats import group_stats
from repro.oracle import assert_equivalent

SCHEMA = Schema(
    [Hierarchy("time", ["year"]), Hierarchy("geo", ["district", "village"])],
    measure="severity",
)


def _fist_toy(seed=0):
    """Figure 1: Ofla district, 1984–88, five villages; in 1986 Zata's mean
    is anomalously low (the planted error) which inflates Ofla's 1986 STD.
    A second district provides parallel groups."""
    rng = np.random.default_rng(seed)
    villages = {
        "Ofla": ["Adishim", "Darube", "Dinka", "Fala", "Zata"],
        "Endam": ["Hiwane", "Adigolo", "Senale", "Gonka"],
    }
    rows = []
    for year in range(1984, 1989):
        for district, vs in villages.items():
            for v in vs:
                base = 7.0 + rng.normal(0, 0.3)
                n = 12
                sev = rng.normal(base, 1.0, n)
                if year == 1986 and v == "Zata":
                    sev = sev - 5.0  # planted systematic value error
                for s in sev:
                    rows.append((year, district, v, float(np.clip(s, 1, 10))))
    return pd.DataFrame(rows, columns=["year", "district", "village", "severity"])


@pytest.fixture(scope="module")
def toy(spark):
    pdf = _fist_toy()
    return spark.createDataFrame(pdf).cache(), pdf


class TestDrilldownView:
    def test_view_matches_duckdb(self, toy, spark):
        sdf, pdf = toy
        view = group_stats(sdf, ["year", "district"], "severity")
        assert_equivalent(
            view,
            """
            SELECT year, district,
                   CAST(count(*) AS DOUBLE) AS count,
                   avg(severity) AS mean,
                   coalesce(stddev_samp(severity), 0.0) AS std
            FROM t GROUP BY year, district
            """,
            t=pdf,
        )


class TestSessionRecommend:
    @pytest.fixture(scope="class")
    def session(self, toy):
        sdf, _ = toy
        return ReptileSession(
            df=sdf,
            schema=SCHEMA,
            state=DrillState.initial(SCHEMA, time=1, geo=1),
            n_iter=10,
        )

    def test_std_complaint_finds_zata(self, session):
        """The paper's running example: Ofla-1986 STD too high → Zata."""
        complaint = Complaint(
            {"year": 1986, "district": "Ofla"}, "std", "too_high"
        )
        rec = session.recommend(complaint, hierarchies=["geo"])
        top = rec.per_hierarchy["geo"][0]
        assert top.group["village"] == "Zata"
        assert top.improvement > 0

    def test_best_across_hierarchies(self, session):
        complaint = Complaint(
            {"year": 1986, "district": "Ofla"}, "std", "too_high"
        )
        rec = session.recommend(complaint)
        assert set(rec.per_hierarchy) == {"geo"}  # time is fully drilled
        assert rec.best is not None

    def test_candidates_limited_to_provenance(self, session):
        complaint = Complaint(
            {"year": 1986, "district": "Ofla"}, "std", "too_high"
        )
        rec = session.recommend(complaint, hierarchies=["geo"], top_k=10)
        groups = {r.group["village"] for r in rec.per_hierarchy["geo"]}
        assert groups <= {"Adishim", "Darube", "Dinka", "Fala", "Zata"}

    def test_empty_provenance_returns_no_groups(self, session):
        complaint = Complaint(
            {"year": 1986, "district": "Atlantis"}, "std", "too_high"
        )
        rec = session.recommend(complaint, hierarchies=["geo"])
        assert rec.per_hierarchy["geo"] == []
        assert rec.best is None

    def test_mean_complaint_too_low(self, session):
        complaint = Complaint(
            {"year": 1986, "district": "Ofla"}, "mean", "too_low"
        )
        rec = session.recommend(complaint, hierarchies=["geo"])
        assert rec.per_hierarchy["geo"][0].group["village"] == "Zata"

    def test_model_cache_reused(self, toy):
        sdf, _ = toy
        s = ReptileSession(
            df=sdf,
            schema=SCHEMA,
            state=DrillState.initial(SCHEMA, time=1, geo=1),
            n_iter=5,
        )
        c = Complaint({"year": 1986, "district": "Ofla"}, "mean", "too_low")
        s.recommend(c, hierarchies=["geo"])
        assert ("geo", 1, "mean") in s._model_cache
        before = len(s._model_cache)
        s.recommend(c, hierarchies=["geo"])
        assert len(s._model_cache) == before

    def test_drill_advances_state(self, toy):
        sdf, _ = toy
        s = ReptileSession(df=sdf, schema=SCHEMA)
        s.drill("time")
        assert s.state.depths["time"] == 1


class TestAuxiliaryExplainsAway:
    def test_aux_rainfall_changes_prediction(self, toy, spark):
        """Figure 1c: high rainfall for Darube explains its low severity.

        With a village-level rainfall auxiliary that encodes Darube's low
        severity as expected, Reptile must prefer Zata over Darube even if
        Darube's severity is equally low.
        """
        _, pdf = toy
        pdf = pdf.copy()
        # make Darube 1986 equally low
        mask = (pdf.year == 1986) & (pdf.village == "Darube")
        pdf.loc[mask, "severity"] = pdf.loc[mask, "severity"] - 5.0
        pdf["severity"] = pdf["severity"].clip(1, 10)
        sdf = spark.createDataFrame(pdf)
        # rainfall: high where severity is legitimately low (Darube), per year
        rain = []
        for year in range(1984, 1989):
            for v in ["Adishim", "Darube", "Dinka", "Fala", "Zata"] + [
                "Hiwane", "Adigolo", "Senale", "Gonka"
            ]:
                high = (v == "Darube") and (year == 1986)
                rain.append((year, v, 600.0 if high else 200.0))
        rain_df = spark.createDataFrame(
            pd.DataFrame(rain, columns=["year", "village", "rainfall"])
        )
        plan = FeaturePlan(
            aux=[AuxDataset("rain", rain_df, on=["year", "village"], measures=["rainfall"])]
        )
        s = ReptileSession(
            df=sdf,
            schema=SCHEMA,
            plan=plan,
            state=DrillState.initial(SCHEMA, time=1, geo=1),
            n_iter=10,
        )
        complaint = Complaint({"year": 1986, "district": "Ofla"}, "std", "too_high")
        rec = s.recommend(complaint, hierarchies=["geo"])
        ranked = rec.per_hierarchy["geo"]
        villages = [r.group["village"] for r in ranked]
        assert villages.index("Zata") < villages.index("Darube")
