"""Execute rewritten plans (min-cost WCG forests) on Spark DataFrames.

``execute_wcg`` interprets a :class:`~repro.core.mincost.MinCostWCG` in
topological order: root windows aggregate the raw stream
(:func:`partial_window_agg`), children roll up their parent's partial
states (:func:`rollup`), and the final result unions the finalized rows
of every *exposed* window — factor windows are computed but contribute
no output rows, exactly as §4 requires.

Windows with several children are shared sub-plans (the MultiCast of
§3.3); in batch mode Spark would otherwise recompute them per consumer,
so they are persisted. ``execute_plan`` dispatches between the baseline
and the rewritten plan from a :class:`~repro.core.plan.Plan` object.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame

from repro.core.aggregates import AggSpec
from repro.core.mincost import MinCostWCG
from repro.core.windows import Window
from repro.engine.rollup import rollup
from repro.engine.window_agg import baseline_union, finalize, partial_window_agg


@dataclass
class ExecutionResult:
    """The unioned output plus handles for cleanup/inspection."""

    output: DataFrame
    partials: dict[Window, DataFrame]
    persisted: list[DataFrame] = field(default_factory=list)

    def unpersist(self) -> None:
        for df in self.persisted:
            df.unpersist()


def execute_wcg(
    events: DataFrame,
    mincost: MinCostWCG,
    agg: AggSpec,
    *,
    persist_shared: bool = True,
) -> ExecutionResult:
    """Run the rewritten plan; returns the union over exposed windows."""
    partials: dict[Window, DataFrame] = {}
    persisted: list[DataFrame] = []
    n_children = {w: len(mincost.children(w)) for w in mincost.windows}
    for w in mincost.topological():
        parent = mincost.parent[w]
        if parent is None:
            df = partial_window_agg(events, w, agg)
        else:
            df = rollup(partials[parent], w, agg)
        if persist_shared and n_children[w] > 1:
            df = df.persist()
            persisted.append(df)
        partials[w] = df

    output: DataFrame | None = None
    for w in sorted(mincost.exposed()):
        d = finalize(partials[w], w, agg)
        output = d if output is None else output.unionByName(d)
    assert output is not None, "plan exposes no windows"
    return ExecutionResult(output=output, partials=partials, persisted=persisted)


def execute_baseline(
    events: DataFrame, windows: list[Window], agg: AggSpec
) -> DataFrame:
    """Run the Figure-1(b) plan (each window from raw, unioned)."""
    return baseline_union(events, windows, agg)
