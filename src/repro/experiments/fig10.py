"""End-to-end runtime evaluation (paper Fig. 10, §5.1.4).

Replays the paper's protocol on the synthetic Absentee- and COMPAS-shaped
datasets: the initial complaint is "overall COUNT is too high", Reptile is
invoked once per drill-down step along a fixed attribute sequence, and each
model is trained for 20 EM iterations.

Both arms share the drill-down aggregation and featurization (Spark jobs);
they differ in the §4.1 bottleneck — model training:

* **Reptile** — one distributed sufficient-statistics pass
  (``groupBy().applyInPandas``) + EM over the per-cluster blocks; iterations
  reuse the precomputed statistics (§4.2's work sharing).
* **Matlab/Lapack** — collect the fully materialized feature matrix to the
  driver and run EM that recomputes every matrix product per iteration
  (``baselines.dense_em``), as a Lapack-backed script would.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import List, Sequence, Tuple

from pyspark.sql import DataFrame, SparkSession

from repro.baselines.dense_em import fit_dense_em
from repro.core.em import fit_em
from repro.core.features import FeaturePlan, build_feature_table
from repro.core.hierarchy import Schema
from repro.core.stats import group_stats
from repro.core.suffstats import compute_suffstats
from repro.synth.hier import (
    ABSENTEE_SCHEMA,
    COMPAS_SCHEMA,
    absentee_like,
    compas_like,
)

#: drill sequences from §5.1.4 (hierarchy names in drill order)
ABSENTEE_SEQUENCE = ("county", "party", "week", "gender")
COMPAS_SEQUENCE = ("time", "time", "time", "age", "race", "degree")


@dataclass
class InvocationTiming:
    step: int
    drilled: str
    n_groups: int
    reptile_s: float
    dense_s: float


@dataclass
class EndToEndResult:
    dataset: str
    invocations: List[InvocationTiming]

    @property
    def reptile_s(self) -> float:
        return sum(t.reptile_s for t in self.invocations)

    @property
    def dense_s(self) -> float:
        return sum(t.dense_s for t in self.invocations)

    @property
    def speedup(self) -> float:
        return self.dense_s / self.reptile_s


def _run_sequence(
    df: DataFrame,
    schema: Schema,
    sequence: Sequence[str],
    *,
    n_iter: int = 20,
) -> List[InvocationTiming]:
    depths = {h.name: 0 for h in schema.hierarchies}
    out: List[InvocationTiming] = []
    for step, name in enumerate(sequence):
        cluster_cols = [
            a for h in schema.hierarchies for a in h.prefix(depths[h.name])
        ]
        next_attr = schema.hierarchy(name).attrs[depths[name]]
        attrs = cluster_cols + [next_attr]
        grouped = group_stats(df, attrs, schema.measure)
        feat_df, feature_cols = build_feature_table(
            grouped,
            group_cols=attrs,
            cluster_cols=cluster_cols,
            y_col="count",
            plan=FeaturePlan(),
        )
        feat_df = feat_df.cache()
        n_groups = feat_df.count()

        t0 = time.perf_counter()
        stats = compute_suffstats(feat_df, feature_cols)
        fit_em(stats, n_iter=n_iter)
        reptile_s = time.perf_counter() - t0

        t0 = time.perf_counter()
        pdf = feat_df.select("cluster", "y", *feature_cols).toPandas()
        fit_dense_em(pdf, feature_cols, n_iter=n_iter)
        dense_s = time.perf_counter() - t0

        feat_df.unpersist()
        out.append(
            InvocationTiming(
                step=step,
                drilled=next_attr,
                n_groups=n_groups,
                reptile_s=reptile_s,
                dense_s=dense_s,
            )
        )
        depths[name] += 1
    return out


def run(
    spark: SparkSession,
    *,
    datasets: Sequence[str] = ("absentee", "compas"),
    n_rows_absentee: int = 179_000,
    n_rows_compas: int = 60_843,
    n_iter: int = 20,
    seed: int = 0,
) -> List[EndToEndResult]:
    out: List[EndToEndResult] = []
    for name in datasets:
        if name == "absentee":
            df = absentee_like(spark, n_rows=n_rows_absentee, seed=seed).cache()
            schema, seq = ABSENTEE_SCHEMA, ABSENTEE_SEQUENCE
        elif name == "compas":
            df = compas_like(spark, n_rows=n_rows_compas, seed=seed).cache()
            schema, seq = COMPAS_SCHEMA, COMPAS_SEQUENCE
        else:
            raise ValueError(f"unknown dataset {name!r}")
        df.count()
        out.append(
            EndToEndResult(
                dataset=name,
                invocations=_run_sequence(df, schema, seq, n_iter=n_iter),
            )
        )
        df.unpersist()
    return out


def format_table(results: List[EndToEndResult]) -> str:
    lines = ["dataset    reptile(s)  matlab-dense(s)  speedup"]
    for r in results:
        lines.append(
            f"{r.dataset:<10} {r.reptile_s:<11.2f} {r.dense_s:<16.2f} "
            f"{r.speedup:.1f}x"
        )
        for t_ in r.invocations:
            lines.append(
                f"  step {t_.step} drill {t_.drilled:<10} groups={t_.n_groups:<7} "
                f"reptile={t_.reptile_s:.2f}s dense={t_.dense_s:.2f}s"
            )
    return "\n".join(lines)
