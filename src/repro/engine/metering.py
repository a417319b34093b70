"""Metering: measure what the executed plans actually process.

The paper's evaluation compares *analytic* costs (events or
sub-aggregates read per hyperperiod). These helpers count the same
quantities on the executed Spark plans — (input row, window instance)
assignment pairs — so tests can assert that over exactly one hyperperiod
of a steady η-rate stream the measured counts equal the model's ``c_i``:

* a root window processes ``n_i · η · r_i`` event-instance pairs;
* a rolled-up window processes ``n_i · M(W_i, parent)`` sub-aggregate-
  instance pairs (per key, times the number of keys carrying state).

Only instances fully inside ``[0, horizon]`` are counted, mirroring the
model's recurrence count (Figure 5).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.aggregates import AggSpec
from repro.core.mincost import MinCostWCG
from repro.core.windows import Window
from repro.engine.rollup import _candidate_starts, assignment_count
from repro.engine.window_agg import partial_window_agg


def raw_assignment_count(events: DataFrame, w: Window, horizon: int) -> int:
    """(event, instance) pairs a direct window aggregate processes.

    An event at ``tick`` belongs to instance ``[a, a+r)`` iff
    ``a ≤ tick < a + r``, which over integer ticks is the same as the
    rollup's containment test applied to the unit interval
    ``[tick, tick+1)`` — so the rollup's candidate-start column is
    reused with ``win_start = tick``, ``win_end = tick + 1``.
    """
    pseudo = events.select(
        F.col("tick").alias("win_start"), (F.col("tick") + 1).alias("win_end")
    )
    assigned = pseudo.withColumn("_j", F.explode(_candidate_starts(w.r, w.s)))
    return assigned.where(F.col("_j") * w.s + w.r <= horizon).count()


def plan_assignment_counts(
    events: DataFrame, mincost: MinCostWCG, agg: AggSpec, horizon: int
) -> dict[Window, int]:
    """Measured per-window processing counts for a rewritten plan.

    Root windows count event-instance pairs; children count
    (parent-sub-aggregate, instance) pairs from the parent's *actual*
    partial output (which is per key — divide by the key count to
    compare with the paper's keyless cost model, or generate a 1-key
    stream as the metering tests do).
    """
    partials: dict[Window, DataFrame] = {}
    counts: dict[Window, int] = {}
    for w in mincost.topological():
        parent = mincost.parent[w]
        if parent is None:
            counts[w] = raw_assignment_count(events, w, horizon)
        else:
            up = partials[parent].where(F.col("win_end") <= horizon)
            counts[w] = assignment_count(up, w, horizon)
        # For metering, a window's partial *instances* are the same
        # whether produced directly or by rollup (only the state values
        # could differ, and counts ignore state) — computing them
        # directly keeps each count independent of upstream plumbing.
        partials[w] = partial_window_agg(events, w, agg)
    return counts
