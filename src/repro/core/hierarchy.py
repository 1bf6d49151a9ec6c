"""Hierarchy and schema metadata for Reptile (paper §3.1).

A dimension's hierarchy ``H = [A_1, ..., A_k]`` is an ordered attribute list,
least→most specific, with the functional dependency ``A_n → A_m`` for m < n
(every village belongs to exactly one district).  ``Schema`` groups the
hierarchies of a relation plus the measure attribute; ``DrillState`` tracks
how deep each hierarchy has been drilled so far during a Reptile session.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Sequence

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class Hierarchy:
    """One dimension's ordered attribute list, least → most specific."""

    name: str
    attrs: tuple

    def __init__(self, name: str, attrs: Sequence[str]):
        object.__setattr__(self, "name", name)
        object.__setattr__(self, "attrs", tuple(attrs))
        if not attrs:
            raise ValueError(f"hierarchy {name!r} must have at least one attribute")

    @property
    def depth(self) -> int:
        return len(self.attrs)

    def prefix(self, k: int) -> tuple:
        """The k least-specific attributes (k may be 0)."""
        return self.attrs[:k]


@dataclass(frozen=True)
class Schema:
    """All hierarchies of a relation plus the measure attribute."""

    hierarchies: tuple
    measure: str

    def __init__(self, hierarchies: Sequence[Hierarchy], measure: str):
        object.__setattr__(self, "hierarchies", tuple(hierarchies))
        object.__setattr__(self, "measure", measure)
        names = [h.name for h in hierarchies]
        if len(set(names)) != len(names):
            raise ValueError(f"duplicate hierarchy names: {names}")
        attrs = [a for h in hierarchies for a in h.attrs]
        if len(set(attrs)) != len(attrs):
            raise ValueError(f"attribute appears in two hierarchies: {attrs}")
        if measure in attrs:
            raise ValueError(f"measure {measure!r} cannot be a hierarchy attribute")

    def hierarchy(self, name: str) -> Hierarchy:
        for h in self.hierarchies:
            if h.name == name:
                return h
        raise KeyError(f"no hierarchy named {name!r}")

    @property
    def all_attrs(self) -> List[str]:
        return [a for h in self.hierarchies for a in h.attrs]


@dataclass
class DrillState:
    """Per-hierarchy drill depth (0 = not in the group-by yet)."""

    depths: Dict[str, int] = field(default_factory=dict)

    @classmethod
    def initial(cls, schema: Schema, **depths: int) -> "DrillState":
        d = {h.name: 0 for h in schema.hierarchies}
        for name, k in depths.items():
            if name not in d:
                raise KeyError(f"no hierarchy named {name!r}")
            d[name] = k
        return cls(depths=d)

    def groupby_attrs(self, schema: Schema) -> List[str]:
        """Current group-by attribute list, in hierarchy order."""
        out: List[str] = []
        for h in schema.hierarchies:
            out.extend(h.prefix(self.depths[h.name]))
        return out

    def can_drill(self, schema: Schema, name: str) -> bool:
        return self.depths[name] < schema.hierarchy(name).depth

    def next_attr(self, schema: Schema, name: str) -> str:
        """The next (strictly more specific) attribute of a hierarchy."""
        h = schema.hierarchy(name)
        k = self.depths[name]
        if k >= h.depth:
            raise ValueError(f"hierarchy {name!r} is fully drilled")
        return h.attrs[k]

    def drilled(self, name: str) -> "DrillState":
        d = dict(self.depths)
        d[name] += 1
        return DrillState(depths=d)


def validate_hierarchy_fds(df: DataFrame, hierarchy: Hierarchy) -> List[str]:
    """Check the FD ``A_n → A_m`` (m < n) for consecutive attribute pairs.

    A hierarchy is valid iff every value of a more specific attribute maps to
    exactly one value of its parent attribute.  Checking consecutive pairs
    suffices by transitivity.  Returns a list of human-readable violations
    (empty = valid).  Runs one Spark aggregation per consecutive pair.
    """
    violations: List[str] = []
    for parent, child in zip(hierarchy.attrs, hierarchy.attrs[1:]):
        bad = (
            df.groupBy(child)
            .agg(F.countDistinct(parent).alias("n_parents"))
            .where(F.col("n_parents") > 1)
            .limit(5)
            .collect()
        )
        for r in bad:
            violations.append(
                f"FD {child} -> {parent} violated: {child}={r[child]!r} has "
                f"{r['n_parents']} distinct {parent} values"
            )
    return violations
