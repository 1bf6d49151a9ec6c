"""FIST user-study surrogate harness (paper §5.4, App. M).

Runs each of the 22 scripted complaints through a full Reptile session over
the corrupted synthetic survey (rainfall auxiliary attached at the village
level) and checks whether the top-1 recommendation matches the scenario's
ground truth.  The two designed failure modes — the ambiguous complaint and
the two-district STD complaint — have no single correct answer, so they are
counted as failures exactly as in the paper (expected score: 20/22).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Dict, List, Optional, Sequence

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.complaint import Complaint
from repro.core.features import AuxDataset, FeaturePlan
from repro.core.hierarchy import DrillState, Hierarchy, Schema
from repro.core.reptile import ReptileSession
from repro.synth.fist import Scenario, apply_corruptions, base_survey, scenarios

SCHEMA = Schema(
    [
        Hierarchy("time", ["year"]),
        Hierarchy("geo", ["region", "district", "village"]),
    ],
    measure="severity",
)


@dataclass
class ScenarioResult:
    scenario: Scenario
    top: str
    hit: bool
    seconds: float


def evaluate_scenario(
    spark: SparkSession,
    scenario: Scenario,
    survey: pd.DataFrame,
    rainfall: pd.DataFrame,
    *,
    n_iter: int = 15,
) -> ScenarioResult:
    dirty = apply_corruptions(survey, scenario)
    sdf = spark.createDataFrame(dirty)
    plan = FeaturePlan(
        aux=[
            AuxDataset(
                "rain",
                spark.createDataFrame(rainfall),
                on=["village", "year"],
                measures=["rainfall"],
            )
        ]
    )
    geo_depth = 1 if scenario.level == "district" else 2
    session = ReptileSession(
        df=sdf,
        schema=SCHEMA,
        plan=plan,
        state=DrillState.initial(SCHEMA, time=1, geo=geo_depth),
        n_iter=n_iter,
    )
    complaint = Complaint(scenario.where, scenario.agg, scenario.direction)
    t0 = time.perf_counter()
    rec = session.recommend(complaint, hierarchies=["geo"], top_k=3)
    seconds = time.perf_counter() - t0
    ranked = rec.per_hierarchy["geo"]
    top = ranked[0].group[scenario.level] if ranked else "<none>"
    # A hit requires the full ground truth: multi-group / ambiguous scenarios
    # cannot be satisfied by a single recommendation (App. M).
    hit = len(scenario.truth) == 1 and top == scenario.truth[0]
    return ScenarioResult(scenario=scenario, top=top, hit=hit, seconds=seconds)


def run_study(
    spark: SparkSession,
    *,
    only: Optional[Sequence[int]] = None,
    n_iter: int = 15,
    seed: int = 0,
) -> List[ScenarioResult]:
    survey, rainfall = base_survey(seed)
    todo = scenarios()
    if only is not None:
        todo = [s for s in todo if s.sid in set(only)]
    return [
        evaluate_scenario(spark, s, survey, rainfall, n_iter=n_iter) for s in todo
    ]


def format_table(results: List[ScenarioResult]) -> str:
    lines = ["sid  hit  top-1                     description"]
    for r in results:
        mark = "✓" if r.hit else ("✗*" if r.scenario.failure_mode else "✗")
        lines.append(
            f"{r.scenario.sid:<4} {mark:<4} {r.top:<25} {r.scenario.description}"
        )
    n_hit = sum(r.hit for r in results)
    lines.append(f"resolved {n_hit}/{len(results)} (paper: 20/22)")
    return "\n".join(lines)
