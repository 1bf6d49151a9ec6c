"""COVID-19 case study harness (paper §5.3, Fig. 13, Tables 1–2).

For every replayed issue: corrupt the synthetic panel, submit the national
complaint for the issue's day, and ask Reptile (full Spark session with
lag-1/lag-7 features, per App. L), Sensitivity and Support for the
responsible location.  Reports per-issue hit/miss (the Tables 1–2 layout)
plus overall accuracy and mean per-complaint runtime (Fig. 13).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from functools import partial
from typing import Dict, List, Optional, Sequence

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines import explainers
from repro.core.complaint import Complaint
from repro.core.features import FeaturePlan, add_lag_feature
from repro.core.hierarchy import DrillState, Hierarchy, Schema
from repro.core.reptile import ReptileSession
from repro.core.stats import GroupStats
from repro.synth.covid import (
    GLOBAL_ISSUES,
    US_ISSUES,
    Issue,
    complaint_direction,
    corrupt,
    panel_for,
)

SCHEMA = Schema(
    [Hierarchy("time", ["day"]), Hierarchy("location", ["location"])],
    measure="value",
)


def _lag_plan() -> FeaturePlan:
    """Main effects + per-location lag-1 and lag-7 features (App. L)."""
    return FeaturePlan(
        custom=[
            partial(
                add_lag_feature,
                partition_cols=["location"],
                order_col="day",
                value_col="y",
                lag=1,
            ),
            partial(
                add_lag_feature,
                partition_cols=["location"],
                order_col="day",
                value_col="y",
                lag=7,
            ),
        ],
    )


@dataclass
class IssueResult:
    issue: Issue
    direction: str
    hits: Dict[str, bool]
    reptile_top: str
    reptile_seconds: float
    baseline_seconds: float


def evaluate_issue(
    spark: SparkSession,
    issue: Issue,
    base: pd.DataFrame,
    *,
    n_iter: int = 20,
) -> IssueResult:
    """Run all approaches on one issue; hit = top-1 location matches."""
    dirty = corrupt(base, issue)
    direction = complaint_direction(base, dirty, issue)
    day = dirty.loc[dirty.day_idx == issue.day_idx, "day"].iloc[0]
    rows = dirty[["location", "day", issue.measure]].rename(
        columns={issue.measure: "value"}
    )
    sdf = spark.createDataFrame(rows)
    session = ReptileSession(
        df=sdf,
        schema=SCHEMA,
        plan=_lag_plan(),
        state=DrillState.initial(SCHEMA, time=1),
        n_iter=n_iter,
    )
    complaint = Complaint({"day": day}, "sum", direction)
    t0 = time.perf_counter()
    rec = session.recommend(complaint, hierarchies=["location"], top_k=1)
    reptile_seconds = time.perf_counter() - t0
    top = rec.per_hierarchy["location"][0].group["location"]

    # Baselines operate on the same candidate groups (states on that day).
    cand = rows[rows.day == day].sort_values("location").reset_index(drop=True)
    observed = [
        GroupStats(count=1.0, mean=float(v)) for v in cand["value"]
    ]
    t0 = time.perf_counter()
    sens = cand["location"][explainers.sensitivity(observed, complaint)]
    supp = cand["location"][explainers.support(observed, complaint)]
    baseline_seconds = (time.perf_counter() - t0) / 2.0
    return IssueResult(
        issue=issue,
        direction=direction,
        hits={
            "reptile": top == issue.location,
            "sensitivity": sens == issue.location,
            "support": supp == issue.location,
        },
        reptile_top=top,
        reptile_seconds=reptile_seconds,
        baseline_seconds=baseline_seconds,
    )


def run_case_study(
    spark: SparkSession,
    *,
    issues: Optional[Sequence[Issue]] = None,
    n_iter: int = 20,
    seed: int = 0,
) -> List[IssueResult]:
    issues = list(issues) if issues is not None else US_ISSUES + GLOBAL_ISSUES
    panels = {ds: panel_for(ds, seed) for ds in {i.dataset for i in issues}}
    return [evaluate_issue(spark, i, panels[i.dataset], n_iter=n_iter) for i in issues]


def format_issue_table(results: List[IssueResult]) -> str:
    """Per-issue table in the Tables 1–2 layout (★ = prevalent)."""
    lines = [
        "ID      Issue                                      RP  ST  SP  paper-RP"
    ]
    for r in results:
        star = "★ " if r.issue.prevalent else "  "
        marks = "".join(
            ("✓   " if r.hits[a] else "    ")
            for a in ("reptile", "sensitivity", "support")
        )
        paper = "✓" if r.issue.paper_reptile_hit else " "
        lines.append(
            f"{r.issue.issue_id:<7} {star}{r.issue.name:<40} {marks}{paper}"
        )
    return "\n".join(lines)


def summarize(results: List[IssueResult]) -> Dict[str, float]:
    n = len(results)
    out = {
        a: sum(r.hits[a] for r in results) / n
        for a in ("reptile", "sensitivity", "support")
    }
    out["reptile_seconds"] = sum(r.reptile_seconds for r in results) / n
    out["baseline_seconds"] = sum(r.baseline_seconds for r in results) / n
    out["paper_reptile"] = sum(r.issue.paper_reptile_hit for r in results) / n
    return out
