"""SQL text for the DuckDB oracle to recompute window aggregates.

``multi_window_sql`` produces, for a window set and aggregate, the exact
rows the engine's plans must return: for every window instance
``[m·s, m·s + r), m ≥ 0`` that contains at least one event, one row per
key with the directly-computed aggregate. The engine result (baseline,
rewritten, or sliced) is then diffed against it by
``repro.oracle.assert_equivalent`` — a wrong rollup or slice assignment
fails the diff, not just "it ran".
"""
from __future__ import annotations

from repro.core.aggregates import AggSpec
from repro.core.windows import Window
from repro.engine.window_agg import window_id


def single_window_sql(
    w: Window, agg: AggSpec, horizon: int, events: str = "events"
) -> str:
    """Expected rows of one window, via an interval join on all starts."""
    fn = agg.duckdb_expr("e.v")
    cast = "::BIGINT" if agg.name == "count" else "::DOUBLE"
    return (
        f"SELECT '{window_id(w)}' AS window_id, "
        f"g.s::BIGINT AS win_start, (g.s + {w.r})::BIGINT AS win_end, "
        f"e.key AS key, ({fn}){cast} AS value "
        f"FROM generate_series(0, {horizon}, {w.s}) AS g(s) "
        f"JOIN {events} e ON e.tick >= g.s AND e.tick < g.s + {w.r} "
        f"GROUP BY g.s, e.key"
    )


def multi_window_sql(
    windows: list[Window], agg: AggSpec, horizon: int, events: str = "events"
) -> str:
    """Expected rows of the whole query (union over the window set)."""
    return " UNION ALL ".join(
        single_window_sql(w, agg, horizon, events) for w in sorted(windows)
    )
