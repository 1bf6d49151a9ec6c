"""End-to-end Reptile session (paper §2.1 architecture, §4.5 loop).

Per invocation, for every candidate hierarchy the session:

1. drills one attribute deeper and computes the parallel-group statistics
   (a Spark ``groupBy``/``agg`` over the *whole* relation, §3.2's parallel
   groups);
2. builds the feature table (main effects, auxiliary joins, custom features)
   as Spark jobs;
3. trains one multi-level model per modeled distributive statistic via the
   sufficient-statistics pass + EM;
4. predicts the expected statistics of the complained tuple's child groups,
   repairs each in turn, re-combines with the distributive combiner, and
   ranks by the residual complaint.

``recommend`` returns the per-hierarchy rankings plus the global best
``(H*, t*)`` of Problem 1.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence

import pandas as pd
from pyspark.sql import DataFrame

from .complaint import Complaint
from .em import fit_em
from .features import CLUSTER_COL, FeaturePlan, build_feature_table
from .hierarchy import DrillState, Schema
from .ranker import RankedGroup, rank_groups
from .stats import GroupStats, group_stats
from .suffstats import compute_suffstats


@dataclass
class Recommendation:
    """Result of one invocation: ranked groups for each candidate hierarchy."""

    per_hierarchy: Dict[str, List[RankedGroup]]

    @property
    def best(self) -> Optional[RankedGroup]:
        """The global argmin (H*, t*) over all hierarchies."""
        tops = [r[0] for r in self.per_hierarchy.values() if r]
        return min(tops, key=lambda r: r.score) if tops else None

    def top(self, k: int = 5) -> List[RankedGroup]:
        all_groups = [g for r in self.per_hierarchy.values() for g in r]
        return sorted(all_groups, key=lambda r: r.score)[:k]


@dataclass
class ReptileSession:
    """Stateful drill-down session over one relation."""

    df: DataFrame
    schema: Schema
    plan: FeaturePlan = field(default_factory=FeaturePlan)
    state: DrillState = None
    n_iter: int = 20
    #: cache of trained models keyed by (hierarchy, depth, stat) (App. J's
    #: cross-invocation reuse, applied at the model level)
    use_cache: bool = True

    def __post_init__(self) -> None:
        if self.state is None:
            self.state = DrillState.initial(self.schema)
        self._model_cache: Dict[tuple, tuple] = {}

    # -- internals ---------------------------------------------------------
    def _train(
        self, hierarchy_name: str, stat: str
    ) -> tuple:
        """Train (or fetch) the model for one hierarchy/statistic pair.

        Returns (model, feature pandas table, feature columns): the pandas
        table holds every parallel group with its features, used afterwards
        to look up the candidate groups' feature rows.
        """
        depth = self.state.depths[hierarchy_name]
        key = (hierarchy_name, depth, stat)
        if self.use_cache and key in self._model_cache:
            return self._model_cache[key]
        cluster_cols = self.state.groupby_attrs(self.schema)
        attrs = cluster_cols + [self.state.next_attr(self.schema, hierarchy_name)]
        grouped = group_stats(self.df, attrs, self.schema.measure)
        feat_df, feature_cols = build_feature_table(
            grouped,
            group_cols=attrs,
            cluster_cols=cluster_cols,
            y_col=stat,
            plan=self.plan,
        )
        feat_df = feat_df.cache()
        stats = compute_suffstats(feat_df, feature_cols)
        model = fit_em(
            stats,
            z_cols=self.plan.z_features,
            n_iter=self.n_iter,
        )
        pdf = feat_df.toPandas()
        feat_df.unpersist()
        result = (model, pdf, feature_cols)
        if self.use_cache:
            self._model_cache[key] = result
        return result

    @staticmethod
    def _filter(pdf: pd.DataFrame, where: Dict[str, object]) -> pd.DataFrame:
        mask = pd.Series(True, index=pdf.index)
        for col, val in where.items():
            mask &= pdf[col] == val
        return pdf[mask]

    # -- API ---------------------------------------------------------------
    def recommend(
        self,
        complaint: Complaint,
        hierarchies: Optional[Sequence[str]] = None,
        top_k: int = 5,
    ) -> Recommendation:
        """Evaluate every drillable hierarchy and rank its child groups."""
        names = list(hierarchies) if hierarchies else [
            h.name
            for h in self.schema.hierarchies
            if self.state.can_drill(self.schema, h.name)
        ]
        per: Dict[str, List[RankedGroup]] = {}
        for name in names:
            ranked = self._rank_hierarchy(name, complaint)
            per[name] = ranked[:top_k]
        return Recommendation(per_hierarchy=per)

    def _rank_hierarchy(self, name: str, complaint: Complaint) -> List[RankedGroup]:
        trained = {
            stat: self._train(name, stat) for stat in complaint.modeled_stats
        }
        # Candidate groups: children of the complained tuple.
        first_stat = complaint.modeled_stats[0]
        _, pdf, _ = trained[first_stat]
        attrs = self.state.groupby_attrs(self.schema) + [
            self.state.next_attr(self.schema, name)
        ]
        cand = (
            self._filter(pdf, complaint.where)
            .sort_values(attrs)
            .reset_index(drop=True)
        )
        if cand.empty:
            return []
        group_keys = cand[attrs].to_dict("records")
        observed = [
            GroupStats(
                count=float(r["count"]), mean=float(r["mean"]), std=float(r["std"])
            )
            for _, r in cand.iterrows()
        ]
        # Each stat's feature table comes from its own Spark job, so rows are
        # aligned to the candidate order by the group-by attributes.
        preds = {}
        for stat, (model, full_pdf, _cols) in trained.items():
            rows = (
                self._filter(full_pdf, complaint.where)
                .sort_values(attrs)
                .reset_index(drop=True)
            )
            if len(rows) != len(cand):
                raise RuntimeError(
                    f"feature tables disagree on candidate groups for {stat!r}"
                )
            preds[stat] = model.predict(rows, cluster_col=CLUSTER_COL)
        predictions = pd.DataFrame(preds)
        return rank_groups(
            hierarchy=name,
            group_keys=group_keys,
            observed=observed,
            predictions=predictions,
            complaint=complaint,
        )

    def drill(self, name: str) -> None:
        """Commit a drill-down along hierarchy ``name``."""
        self.state = self.state.drilled(name)
