"""Structured Streaming execution of rewritten plans: chained window
aggregations must emit the same rows as the batch engine (modulo the
watermark cutoff) for the paper's examples."""
import pytest

from repro.core.aggregates import get_aggregate
from repro.core.factor import algorithm2
from repro.core.mincost import find_min_cost_wcg
from repro.core.windows import Window
from repro.engine.executor import execute_wcg
from repro.engine.streaming import (
    build_streaming_partials,
    run_streaming_plan,
    streaming_supported,
)
from repro.engine.streams import event_stream
from repro.engine.window_agg import window_id

EX6 = [Window(x, x) for x in (10, 20, 30, 40)]
EX7 = [Window(x, x) for x in (20, 30, 40)]
HORIZON = 120
SUM = get_aggregate("sum")
MIN = get_aggregate("min")


@pytest.fixture(scope="module")
def stream_dir(spark, tmp_path_factory):
    """Events written to parquet, with one sentinel event far past the
    horizon so the watermark closes every in-horizon window."""
    path = str(tmp_path_factory.mktemp("stream") / "events")
    ev = event_stream(spark, horizon=HORIZON, eta=2, n_keys=2, seed=3)
    sentinel = spark.createDataFrame(
        [(10_000, 0, 0.0)], "tick long, key long, v double"
    ).selectExpr("tick", "timestamp_seconds(tick) as ts", "key", "v")
    ev.select("tick", "ts", "key", "v").unionByName(sentinel).write.parquet(path)
    return path


def batch_rows(spark, mincost, agg, w):
    ev = event_stream(spark, horizon=HORIZON, eta=2, n_keys=2, seed=3)
    res = execute_wcg(ev, mincost, agg)
    rows = (
        res.output.where(f"window_id = '{window_id(w)}' AND win_end <= {HORIZON}")
        .collect()
    )
    res.unpersist()
    return sorted(map(tuple, rows))


class TestSupportMatrix:
    def test_tumbling_forest_supported(self):
        assert streaming_supported(find_min_cost_wcg(EX6, SUM, eta=1))

    def test_hopping_parent_rejected(self, spark):
        ws = [Window(8, 2), Window(10, 2)]
        m = find_min_cost_wcg(ws, MIN, eta=100)
        if streaming_supported(m):  # parent selection may vary with eta
            pytest.skip("optimizer chose no hopping parent")
        ev = event_stream(spark, horizon=20, eta=1, n_keys=1, seed=0)
        with pytest.raises(ValueError, match="hopping parent"):
            build_streaming_partials(ev, m, MIN)


class TestStreamingMatchesBatch:
    @pytest.mark.parametrize("agg_name", ["sum", "min"])
    def test_example6_chain(self, spark, stream_dir, agg_name):
        agg = get_aggregate(agg_name)
        m = find_min_cost_wcg(EX6, agg, eta=1)
        schema = "tick long, ts timestamp, key long, v double"
        sinks = run_streaming_plan(
            spark, stream_dir, schema, m, agg, sink_prefix=f"ex6_{agg_name}"
        )
        for w, table in sinks.items():
            got = sorted(
                map(
                    tuple,
                    spark.table(table).where(f"win_end <= {HORIZON}").collect(),
                )
            )
            assert got == batch_rows(spark, m, agg, w), f"window {w}"

    def test_example7_factor_window_hidden(self, spark, stream_dir):
        m = algorithm2(EX7, SUM, eta=1)
        assert Window(10, 10) in m.factors
        schema = "tick long, ts timestamp, key long, v double"
        sinks = run_streaming_plan(
            spark, stream_dir, schema, m, SUM, sink_prefix="ex7"
        )
        # only the query's windows are sunk:
        assert set(sinks) == set(EX7)
        for w, table in sinks.items():
            got = sorted(
                map(
                    tuple,
                    spark.table(table).where(f"win_end <= {HORIZON}").collect(),
                )
            )
            assert got == batch_rows(spark, m, SUM, w), f"window {w}"
