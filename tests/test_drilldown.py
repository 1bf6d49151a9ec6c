"""Drill-down aggregate maintenance: correctness and job-count accounting."""
import pytest

from repro.factorized.drilldown import DrillDownEngine
from repro.synth.hier import hier_dataset, hier_schema


@pytest.fixture(scope="module")
def base(spark):
    schema = hier_schema(d=2, t=3)
    df = hier_dataset(spark, d=2, t=3, w=27, n_rows=600, fanout=3, seed=5)
    df = df.cache()
    df.count()
    return schema, df


def _drain(engine, picks):
    """Run one invocation per pick, committing the picked hierarchy."""
    results = []
    for p in picks:
        results.append(engine.evaluate_candidates())
        engine.commit(p)
    return results


class TestEngineBasics:
    def test_bad_strategy_rejected(self, base):
        schema, df = base
        with pytest.raises(ValueError):
            DrillDownEngine(df, schema, strategy="wat")

    def test_initial_depths_are_one(self, base):
        schema, df = base
        eng = DrillDownEngine(df, schema, strategy="static")
        assert eng.depths == {"h0": 1, "h1": 1}

    def test_candidates_orders_drilled_last(self, base):
        schema, df = base
        eng = DrillDownEngine(df, schema, strategy="dynamic")
        aggs = eng.evaluate_candidates()
        assert set(aggs) == {"h0", "h1"}
        # candidate hierarchy must be last in the relation order
        assert aggs["h0"].relations[-1].hierarchy.name == "h0"
        assert aggs["h1"].relations[-1].hierarchy.name == "h1"

    def test_candidate_is_drilled_one_deeper(self, base):
        schema, df = base
        eng = DrillDownEngine(df, schema, strategy="dynamic")
        aggs = eng.evaluate_candidates()
        assert aggs["h0"].relations[-1].attrs == ("h0a0", "h0a1")
        # the non-candidate stays at its current depth
        assert aggs["h0"].relations[0].attrs == ("h1a0",)

    def test_commit_past_max_depth_raises(self, base):
        schema, df = base
        eng = DrillDownEngine(df, schema, strategy="dynamic")
        eng.commit("h0")
        eng.commit("h0")
        with pytest.raises(ValueError):
            eng.commit("h0")


class TestStrategyEquivalence:
    def test_all_strategies_agree(self, base):
        """Static, dynamic and cache must produce identical aggregates."""
        schema, df = base
        results = {}
        for strat in ("static", "dynamic", "cache"):
            eng = DrillDownEngine(df, schema, strategy=strat)
            results[strat] = _drain(eng, ["h0", "h0"])
        for invocation in range(2):
            for cand in ("h0", "h1"):
                ref = results["static"][invocation][cand]
                for strat in ("dynamic", "cache"):
                    got = results[strat][invocation][cand]
                    assert got.n_rows == ref.n_rows
                    for attr in ref.attr_hier:
                        assert got.count(attr).equals(ref.count(attr)), (
                            strat,
                            invocation,
                            cand,
                            attr,
                        )


class TestJobAccounting:
    def test_dynamic_issues_fewer_jobs_than_static(self, base):
        schema, df = base
        stat = DrillDownEngine(df, schema, strategy="static")
        dyn = DrillDownEngine(df, schema, strategy="dynamic")
        _drain(stat, ["h0", "h0"])
        _drain(dyn, ["h0", "h0"])
        assert dyn.jobs < stat.jobs

    def test_cache_issues_fewer_jobs_than_dynamic(self, base):
        schema, df = base
        dyn = DrillDownEngine(df, schema, strategy="dynamic")
        cache = DrillDownEngine(df, schema, strategy="cache")
        # drilling h0 repeatedly re-evaluates candidate h1 at the same depth:
        # cache reuses it, dynamic recollects it
        _drain(dyn, ["h0", "h0"])
        _drain(cache, ["h0", "h0"])
        assert cache.jobs < dyn.jobs
