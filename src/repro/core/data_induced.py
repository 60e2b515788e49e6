"""Data-induced optimizations (§4.2).

Column statistics — min/max for numeric columns, the set of present
categories for categorical columns — induce predicates that feed the same
pruning machinery as the WHERE-clause rule: a tree split on ``age <= 60``
collapses when the data provably lies on one side.

The partitioned variant compiles **one optimized model per partition**: for
each value of a partition column, per-partition statistics induce stronger
predicates, after which model-projection pushdown removes per-partition
unused columns (Table 2 counts exactly those).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.predicate_pruning import PruneResult
from repro.core.projection_pushdown import apply_projection_pushdown
from repro.ir.graph import Pipeline
from repro.ir.slots import model_input_slots, slot_intervals


@dataclass
class ColumnStats:
    """min/max per numeric column, present-category sets per cat column."""

    num_ranges: dict[str, tuple[float, float]] = field(default_factory=dict)
    cat_domains: dict[str, set] = field(default_factory=dict)

    def as_predicates(self) -> dict[str, tuple]:
        out: dict[str, tuple] = {
            c: ("range", lo, hi) for c, (lo, hi) in self.num_ranges.items()
        }
        for c, dom in self.cat_domains.items():
            out[c] = ("in", {str(v) for v in dom})
        return out


def collect_stats(
    df: DataFrame, num_cols: list[str], cat_cols: list[str]
) -> ColumnStats:
    """Gather the statistics a data engine keeps per column (one Spark agg
    for numeric ranges; distinct scans for categorical domains)."""
    stats = ColumnStats()
    if num_cols:
        aggs = []
        for c in num_cols:
            aggs += [F.min(c).alias(f"min_{c}"), F.max(c).alias(f"max_{c}")]
        row = df.agg(*aggs).collect()[0]
        for c in num_cols:
            stats.num_ranges[c] = (float(row[f"min_{c}"]), float(row[f"max_{c}"]))
    for c in cat_cols:
        vals = [r[0] for r in df.select(c).distinct().collect()]
        stats.cat_domains[c] = {str(v) for v in vals}
    return stats


def collect_stats_pandas(
    pdf: pd.DataFrame, num_cols: list[str], cat_cols: list[str]
) -> ColumnStats:
    stats = ColumnStats()
    for c in num_cols:
        stats.num_ranges[c] = (float(pdf[c].min()), float(pdf[c].max()))
    for c in cat_cols:
        stats.cat_domains[c] = {str(v) for v in pdf[c].unique()}
    return stats


def apply_data_induced_pruning(p: Pipeline, stats: ColumnStats) -> PruneResult:
    """Prune the model against statistics-induced predicates.

    Unlike WHERE-predicate pruning, inputs are never bound to constants
    (a min==max column would qualify but is rare); only intervals flow.
    """
    p = p.clone()
    preds = {
        c: v for c, v in stats.as_predicates().items() if c in set(p.input_cols)
    }
    if not preds:
        return PruneResult(p)
    try:
        slots = model_input_slots(p)
    except ValueError:
        return PruneResult(p)
    lo, hi = slot_intervals(slots, preds)
    model = p.model_node
    removed = 0
    if model.op == "tree_ensemble":
        new_trees = []
        for t in model.attrs["trees"]:
            nt = t.prune_with_intervals(lo, hi)
            removed += t.n_nodes - nt.n_nodes
            new_trees.append(nt)
        model.attrs["trees"] = new_trees
    else:
        coef = np.asarray(model.attrs["coef"], dtype=np.float64).copy()
        intercept = float(model.attrs["intercept"])
        known = lo == hi
        intercept += float(np.sum(coef[known] * lo[known]))
        removed = int(np.sum(known & (coef != 0.0)))
        coef[known] = 0.0
        model.attrs["coef"] = coef
        model.attrs["intercept"] = intercept
    return PruneResult(p, {}, removed)


@dataclass
class PartitionedModels:
    """One optimized pipeline per partition value, plus pruning metrics."""

    partition_col: str
    models: dict[str, Pipeline]
    pruned_cols: dict[str, list[str]]

    @property
    def avg_pruned_cols(self) -> float:
        if not self.pruned_cols:
            return 0.0
        return float(np.mean([len(v) for v in self.pruned_cols.values()]))


def compile_partitioned_models(
    p: Pipeline,
    pdf: pd.DataFrame,
    partition_col: str,
    num_cols: list[str],
    cat_cols: list[str],
) -> PartitionedModels:
    """§4.2: per-partition stats -> per-partition pruned+densified model.

    ``pdf`` is (a sample of) the scored data used to derive partition
    statistics; in a warehouse these come from partition metadata. The
    partition column itself also induces an equality-like domain: within
    partition v, ``partition_col in {v}``.
    """
    models: dict[str, Pipeline] = {}
    pruned: dict[str, list[str]] = {}
    base_inputs = set(p.input_cols)
    for v, part in pdf.groupby(partition_col, sort=True):
        stats = collect_stats_pandas(
            part,
            [c for c in num_cols if c in base_inputs],
            [c for c in cat_cols if c in base_inputs],
        )
        pr = apply_data_induced_pruning(p, stats)
        pushed = apply_projection_pushdown(pr.pipeline)
        models[str(v)] = pushed.pipeline
        pruned[str(v)] = pushed.removed_cols
    return PartitionedModels(partition_col, models, pruned)
