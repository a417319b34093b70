"""Direct window aggregation over raw events (the plans' root operator).

``partial_window_agg`` groups a stream by (window instance, key) and
computes the aggregate's *partial state* columns; ``finalize`` turns
partial state into the user-visible value. The baseline plan is
``finalize(partial_window_agg(...))`` per window, unioned.

Window instances follow the paper's interval representation
``[m·s, m·s + r), m ≥ 0``: Spark's ``window()`` also emits instances
with negative starts for early events, which are filtered out so the
engine, the cost model, and the DuckDB oracle all count the same
instances.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.aggregates import AggSpec
from repro.core.windows import Window

#: Output schema shared by every operator in the engine:
#: (win_start, win_end, key, *state) for partials;
#: (window_id, win_start, win_end, key, value) for finals.
PARTIAL_KEYS = ["win_start", "win_end", "key"]


def window_id(w: Window) -> str:
    """Stable identifier of a window in the union output, ``"r/s"``."""
    return f"{w.r}/{w.s}"


def partial_window_agg(events: DataFrame, w: Window, agg: AggSpec) -> DataFrame:
    """Aggregate raw events into per-(instance, key) partial states.

    Uses Catalyst's native ``window()`` (which internally expands each
    event to its ``r/s`` containing instances for hopping windows — the
    same ``η·r`` per-instance cost the paper's model charges).
    """
    win = F.window(F.col("ts"), f"{w.r} seconds", f"{w.s} seconds")
    out = (
        events.groupBy(win.alias("w"), F.col("key"))
        .agg(*agg.partial_exprs("v"))
        .select(
            F.unix_timestamp(F.col("w.start")).alias("win_start"),
            F.unix_timestamp(F.col("w.end")).alias("win_end"),
            F.col("key"),
            *[F.col(c) for c in agg.state_cols],
        )
        .where(F.col("win_start") >= 0)
    )
    return out


def finalize(partials: DataFrame, w: Window, agg: AggSpec) -> DataFrame:
    """Partial state → user-visible rows tagged with the window id."""
    return partials.select(
        F.lit(window_id(w)).alias("window_id"),
        F.col("win_start"),
        F.col("win_end"),
        F.col("key"),
        agg.final_expr().alias("value"),
    )


def baseline_union(events: DataFrame, windows: list[Window], agg: AggSpec) -> DataFrame:
    """Figure 1(b): each window from raw events, results unioned."""
    out: DataFrame | None = None
    for w in sorted(windows):
        d = finalize(partial_window_agg(events, w, agg), w, agg)
        out = d if out is None else out.unionByName(d)
    assert out is not None, "empty window set"
    return out
