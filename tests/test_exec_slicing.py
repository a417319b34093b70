"""Executable window slicing on Spark: shared/unshared × paned/paired
must reproduce the baseline plan's results exactly (DuckDB oracle)."""
import pytest

from repro.core.aggregates import get_aggregate
from repro.core.windows import Window
from repro.engine.oracle_sql import multi_window_sql
from repro.engine.sliced_exec import assign_slices, sliced_window_agg, slice_partials
from repro.engine.streams import event_stream, event_stream_pdf
from repro.oracle import assert_equivalent

HORIZON = 60
GENERAL = [Window(12, 4), Window(10, 2), Window(6, 6)]
TUMBLING = [Window(4, 4), Window(6, 6), Window(12, 12)]


@pytest.fixture(scope="module")
def events(spark):
    df = event_stream(spark, horizon=HORIZON, eta=2, n_keys=2, seed=11)
    df.persist().count()
    yield df
    df.unpersist()


@pytest.fixture(scope="module")
def events_pdf():
    return event_stream_pdf(horizon=HORIZON, eta=2, n_keys=2, seed=11)


class TestSliceAssignment:
    def test_every_event_in_its_slice(self, spark, events):
        edges = [4, 8, 10, 20, 40, 60]
        rows = assign_slices(events, edges).collect()
        assert len(rows) == HORIZON * 2
        for r in rows:
            assert r.slice_start <= r.tick < r.slice_end

    def test_partials_one_row_per_slice_key(self, spark, events):
        agg = get_aggregate("count")
        edges = list(range(10, HORIZON + 1, 10))
        partials = slice_partials(events, edges, agg).collect()
        # every (slice, key) pair has events in a steady stream:
        assert len(partials) == len(edges) * 2
        assert sum(r._count for r in partials) == HORIZON * 2


@pytest.mark.parametrize("technique", ["paned", "paired"])
@pytest.mark.parametrize("shared", [True, False])
class TestSlicedEvaluation:
    def test_general_windows_min(self, spark, events, events_pdf, technique, shared):
        agg = get_aggregate("min")
        got = sliced_window_agg(
            events, GENERAL, agg, technique=technique, shared=shared, horizon=HORIZON
        )
        assert_equivalent(
            got, multi_window_sql(GENERAL, agg, HORIZON), events=events_pdf
        )

    def test_tumbling_windows_sum(self, spark, events, events_pdf, technique, shared):
        agg = get_aggregate("sum")
        got = sliced_window_agg(
            events, TUMBLING, agg, technique=technique, shared=shared, horizon=HORIZON
        )
        assert_equivalent(
            got, multi_window_sql(TUMBLING, agg, HORIZON), events=events_pdf
        )

    def test_avg_algebraic_state(self, spark, events, events_pdf, technique, shared):
        agg = get_aggregate("avg")
        ws = [Window(6, 2), Window(12, 6)]
        got = sliced_window_agg(
            events, ws, agg, technique=technique, shared=shared, horizon=HORIZON
        )
        assert_equivalent(got, multi_window_sql(ws, agg, HORIZON), events=events_pdf)
