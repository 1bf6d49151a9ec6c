"""Drill-down maintenance of decomposed aggregates (paper §4.4, App. J).

Each Reptile invocation evaluates *every* candidate hierarchy: it drills the
candidate one attribute deeper and needs the decomposed aggregates under the
new attribute order (candidate last).  Three maintenance strategies:

* ``static``  — recompute every hierarchy's relations and aggregates from the
  base relation (Spark jobs for all hierarchies).
* ``dynamic`` — recompute only the *drilled* hierarchy; the other hierarchies'
  full-matrix counts depend on it only through the scalar ``TOTAL`` product
  (independence between hierarchies), which `DecomposedAggregates` derives
  lazily — an O(1) update.
* ``cache``   — ``dynamic`` plus a cross-invocation cache keyed by
  (hierarchy, depth): when the next complaint re-evaluates a hierarchy that
  was already drilled to this depth in a previous invocation, its relations
  are reused without any Spark job (App. J's caching).

The paper's Fig. 9 experiment measures exactly the per-invocation aggregate
(re)computation cost of these three strategies.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Tuple

from pyspark.sql import DataFrame

from repro.core.hierarchy import Schema
from .aggregates import DecomposedAggregates
from .relations import HierarchyRelations, collect_hierarchy

STRATEGIES = ("static", "dynamic", "cache")


@dataclass
class DrillDownEngine:
    """Maintains per-hierarchy relations across successive drill-downs."""

    df: DataFrame
    schema: Schema
    strategy: str = "cache"
    #: current drill depth per hierarchy (>=1: hierarchies start visible at
    #: their first attribute, mirroring the Fig. 9 setup)
    depths: Dict[str, int] = field(default_factory=dict)
    _current: Dict[str, HierarchyRelations] = field(default_factory=dict)
    _cache: Dict[Tuple[str, int], HierarchyRelations] = field(default_factory=dict)
    #: candidate relations from the latest evaluate_candidates() call, so a
    #: commit() of a just-evaluated candidate never re-runs its Spark job
    _last_eval: Dict[Tuple[str, int], HierarchyRelations] = field(
        default_factory=dict
    )
    #: Spark collection jobs issued (the recomputation cost Fig. 9 measures)
    jobs: int = 0

    def __post_init__(self) -> None:
        if self.strategy not in STRATEGIES:
            raise ValueError(f"strategy must be one of {STRATEGIES}")
        for h in self.schema.hierarchies:
            self.depths.setdefault(h.name, 1)

    # -- internal ----------------------------------------------------------
    def _collect(self, name: str, depth: int) -> HierarchyRelations:
        key = (name, depth)
        if self.strategy == "cache" and key in self._cache:
            return self._cache[key]
        rel = collect_hierarchy(self.df, self.schema.hierarchy(name), depth)
        self.jobs += 1
        if self.strategy == "cache":
            self._cache[key] = rel
        return rel

    def _ordered(self, rels: Dict[str, HierarchyRelations], last: str) -> List[
        HierarchyRelations
    ]:
        order = [h.name for h in self.schema.hierarchies if h.name != last] + [last]
        return [rels[n] for n in order]

    # -- API ---------------------------------------------------------------
    def evaluate_candidates(self) -> Dict[str, DecomposedAggregates]:
        """One Reptile invocation: aggregates for each drillable hierarchy.

        For candidate H the aggregates are computed with H drilled one level
        deeper and ordered last.  Under ``static`` every hierarchy is
        recollected per candidate; under ``dynamic``/``cache`` only the
        candidate itself is (re)collected and the rest reuse the current
        relations (their cross-hierarchy scalars update in O(1) inside
        ``DecomposedAggregates``).
        """
        out: Dict[str, DecomposedAggregates] = {}
        self._last_eval = {}
        if self.strategy != "static" and not self._current:
            for h in self.schema.hierarchies:
                self._current[h.name] = self._collect(h.name, self.depths[h.name])
        for cand in self.schema.hierarchies:
            if self.depths[cand.name] >= cand.depth:
                continue
            depth = self.depths[cand.name] + 1
            if self.strategy == "static":
                rels = {
                    h.name: self._collect(
                        h.name,
                        depth if h.name == cand.name else self.depths[h.name],
                    )
                    for h in self.schema.hierarchies
                }
            else:
                rels = dict(self._current)
                rels[cand.name] = self._collect(cand.name, depth)
                self._last_eval[(cand.name, depth)] = rels[cand.name]
            out[cand.name] = DecomposedAggregates(self._ordered(rels, cand.name))
        return out

    def commit(self, name: str) -> None:
        """The user picked hierarchy ``name``: advance its drill depth."""
        if self.depths[name] >= self.schema.hierarchy(name).depth:
            raise ValueError(f"hierarchy {name!r} is fully drilled")
        self.depths[name] += 1
        if self.strategy != "static":
            key = (name, self.depths[name])
            self._current[name] = self._last_eval.get(key) or self._collect(*key)
