"""Drill-down optimization benchmark (paper Fig. 9, §5.1.3).

Two hierarchies A and B with 6 attributes each.  A starts drilled to its 3rd
attribute, B to n ∈ {3, 4, 5}.  Reptile is invoked three times, drilling A
each time (A4, A5, A6); every invocation re-evaluates *both* hierarchies as
candidates.  Strategies:

* Static          — recompute all hierarchies' aggregates per candidate
* Dynamic         — recompute only the drilled hierarchy (independence)
* Cache + Dynamic — additionally reuse B's aggregates across invocations

Reports wall time and Spark collection jobs for the three invocations.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Dict, List, Sequence

from pyspark.sql import SparkSession

from repro.core.hierarchy import Hierarchy, Schema
from repro.factorized.drilldown import STRATEGIES, DrillDownEngine
from repro.synth.hier import hier_dataset


def _schema() -> Schema:
    return Schema(
        [
            Hierarchy("h0", [f"h0a{i}" for i in range(6)]),
            Hierarchy("h1", [f"h1a{i}" for i in range(6)]),
        ],
        measure="m",
    )


@dataclass
class DrillTiming:
    strategy: str
    n_pre_b: int
    seconds: float
    jobs: int


def sweep(
    spark: SparkSession,
    *,
    n_pre_bs: Sequence[int] = (3, 4, 5),
    w: int = 2000,
    n_invocations: int = 3,
    seed: int = 0,
) -> List[DrillTiming]:
    schema = _schema()
    df = hier_dataset(
        spark, d=2, t=6, w=w, n_rows=5 * w, fanout=3, seed=seed
    ).cache()
    df.count()
    out: List[DrillTiming] = []
    for n_pre in n_pre_bs:
        for strategy in STRATEGIES:
            eng = DrillDownEngine(
                df, schema, strategy=strategy, depths={"h0": 3, "h1": n_pre}
            )
            t0 = time.perf_counter()
            for _ in range(n_invocations):
                eng.evaluate_candidates()
                eng.commit("h0")
            out.append(
                DrillTiming(
                    strategy=strategy,
                    n_pre_b=n_pre,
                    seconds=time.perf_counter() - t0,
                    jobs=eng.jobs,
                )
            )
    df.unpersist()
    return out


def format_table(timings: List[DrillTiming]) -> str:
    lines = ["B-depth  strategy  seconds  spark-jobs"]
    for t_ in timings:
        lines.append(
            f"{t_.n_pre_b:<8} {t_.strategy:<9} {t_.seconds:<8.3f} {t_.jobs}"
        )
    return "\n".join(lines)
