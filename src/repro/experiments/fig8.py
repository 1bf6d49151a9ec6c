"""Multi-query execution benchmark (paper Fig. 8, §5.1.2).

d = 3 hierarchies × t = 3 attributes; attribute cardinality w on the x-axis.
Compares Reptile's shared multi-query plan (one path job per hierarchy, all
COUNT/COF aggregates derived from it, cross-hierarchy COFs factorised)
against the LMFAO-style serial plan (one independent Spark job per
aggregate, cross-hierarchy COFs materialized via crossJoin).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import List, Sequence

from pyspark.sql import SparkSession

from repro.baselines.lmfao import compute_serial, compute_shared
from repro.synth.hier import hier_dataset, hier_schema


@dataclass
class MQTiming:
    w: int
    shared_s: float
    serial_s: float

    @property
    def speedup(self) -> float:
        return self.serial_s / self.shared_s


def sweep(
    spark: SparkSession,
    *,
    ws: Sequence[int] = (100, 1000, 10_000),
    d: int = 3,
    t: int = 3,
    cross_cofs_serial: bool = True,
    seed: int = 0,
) -> List[MQTiming]:
    out: List[MQTiming] = []
    for w in ws:
        df = hier_dataset(
            spark, d=d, t=t, w=w, n_rows=5 * w, fanout=4, seed=seed
        ).cache()
        df.count()  # materialize the cache so both arms read identical input
        schema = hier_schema(d, t)
        t0 = time.perf_counter()
        shared = compute_shared(df, schema)
        # force the same outputs the serial arm materializes (sans cross COFs)
        for attr in shared.attr_hier:
            shared.count(attr)
        shared_s = time.perf_counter() - t0
        t0 = time.perf_counter()
        compute_serial(df, schema)
        serial_s = time.perf_counter() - t0
        df.unpersist()
        out.append(MQTiming(w=w, shared_s=shared_s, serial_s=serial_s))
    return out


def format_table(timings: List[MQTiming]) -> str:
    lines = ["w          shared(s)   serial(s)   speedup"]
    for t_ in timings:
        lines.append(
            f"{t_.w:<10} {t_.shared_s:<11.3f} {t_.serial_s:<11.3f} "
            f"{t_.speedup:.1f}x"
        )
    return "\n".join(lines)
