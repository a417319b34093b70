"""End-to-end correctness of executed plans on Spark, against the DuckDB
oracle and against each other: baseline vs rewritten (WCG) vs rewritten
with factor windows (WCG-FW)."""
import pytest

from repro.core.aggregates import get_aggregate
from repro.core.factor import algorithm2, optimize
from repro.core.mincost import find_min_cost_wcg
from repro.core.windows import Window
from repro.engine.executor import execute_baseline, execute_wcg
from repro.engine.oracle_sql import multi_window_sql
from repro.engine.streams import event_stream, event_stream_pdf, lineitem_stream
from repro.engine.window_agg import finalize, partial_window_agg, window_id
from repro.engine.rollup import rollup
from repro.oracle import assert_equivalent
from repro.workloads.generators import chain_gen, star_gen

EX6 = [Window(x, x) for x in (10, 20, 30, 40)]
EX7 = [Window(x, x) for x in (20, 30, 40)]
HORIZON = 120


@pytest.fixture(scope="module")
def events(spark):
    df = event_stream(spark, horizon=HORIZON, eta=2, n_keys=3, seed=7)
    df.persist().count()
    yield df
    df.unpersist()


@pytest.fixture(scope="module")
def events_pdf():
    return event_stream_pdf(horizon=HORIZON, eta=2, n_keys=3, seed=7)


class TestDirectWindowAgg:
    @pytest.mark.parametrize("agg_name", ["min", "max", "sum", "count", "avg"])
    def test_single_tumbling_vs_oracle(self, spark, events, events_pdf, agg_name):
        agg = get_aggregate(agg_name)
        w = Window(10, 10)
        got = finalize(partial_window_agg(events, w, agg), w, agg)
        assert_equivalent(
            got, multi_window_sql([w], agg, HORIZON), events=events_pdf
        )

    @pytest.mark.parametrize("agg_name", ["min", "sum", "avg"])
    def test_single_hopping_vs_oracle(self, spark, events, events_pdf, agg_name):
        agg = get_aggregate(agg_name)
        w = Window(12, 4)
        got = finalize(partial_window_agg(events, w, agg), w, agg)
        assert_equivalent(
            got, multi_window_sql([w], agg, HORIZON), events=events_pdf
        )

    def test_no_negative_window_starts(self, spark, events):
        agg = get_aggregate("min")
        w = Window(12, 4)
        got = partial_window_agg(events, w, agg)
        assert got.where("win_start < 0").count() == 0
        # but the instance starting at 0 exists:
        assert got.where("win_start = 0").count() > 0


class TestRollupOperator:
    def test_rollup_equals_direct_tumbling(self, spark, events, events_pdf):
        agg = get_aggregate("sum")
        parent, child = Window(10, 10), Window(20, 20)
        up = partial_window_agg(events, parent, agg)
        got = finalize(rollup(up, child, agg), child, agg)
        assert_equivalent(
            got, multi_window_sql([child], agg, HORIZON), events=events_pdf
        )

    def test_rollup_equals_direct_covered_hopping(self, spark, events, events_pdf):
        # W(10,2) ≤ W(8,2) (the paper's Example 2) with MIN: overlapping
        # covering sets are sound (Theorem 6).
        agg = get_aggregate("min")
        parent, child = Window(8, 2), Window(10, 2)
        up = partial_window_agg(events, parent, agg)
        got = finalize(rollup(up, child, agg), child, agg)
        assert_equivalent(
            got, multi_window_sql([child], agg, HORIZON), events=events_pdf
        )

    def test_rollup_hopping_child_from_tumbling_parent(
        self, spark, events, events_pdf
    ):
        agg = get_aggregate("avg")
        parent, child = Window(4, 4), Window(12, 4)
        up = partial_window_agg(events, parent, agg)
        got = finalize(rollup(up, child, agg), child, agg)
        assert_equivalent(
            got, multi_window_sql([child], agg, HORIZON), events=events_pdf
        )

    def test_chained_rollup(self, spark, events, events_pdf):
        agg = get_aggregate("max")
        w1, w2, w4 = Window(10, 10), Window(20, 20), Window(40, 40)
        up1 = partial_window_agg(events, w1, agg)
        up2 = rollup(up1, w2, agg)
        got = finalize(rollup(up2, w4, agg), w4, agg)
        assert_equivalent(
            got, multi_window_sql([w4], agg, HORIZON), events=events_pdf
        )


class TestBaselinePlan:
    @pytest.mark.parametrize("agg_name", ["min", "sum"])
    def test_example6_vs_oracle(self, spark, events, events_pdf, agg_name):
        agg = get_aggregate(agg_name)
        got = execute_baseline(events, EX6, agg)
        assert_equivalent(
            got, multi_window_sql(EX6, agg, HORIZON), events=events_pdf
        )


class TestRewrittenPlans:
    @pytest.mark.parametrize("agg_name", ["min", "max", "sum", "count", "avg"])
    def test_example6_wcg_vs_oracle(self, spark, events, events_pdf, agg_name):
        agg = get_aggregate(agg_name)
        m = find_min_cost_wcg(EX6, agg, eta=1)
        res = execute_wcg(events, m, agg)
        try:
            assert_equivalent(
                res.output, multi_window_sql(EX6, agg, HORIZON), events=events_pdf
            )
        finally:
            res.unpersist()

    @pytest.mark.parametrize("agg_name", ["min", "sum", "avg"])
    def test_example7_factor_plan_vs_oracle(self, spark, events, events_pdf, agg_name):
        # The factor window W(10,10) participates but is not exposed.
        agg = get_aggregate(agg_name)
        m = algorithm2(EX7, agg, eta=1)
        assert Window(10, 10) in m.factors
        res = execute_wcg(events, m, agg)
        try:
            out = res.output
            ids = {r.window_id for r in out.select("window_id").distinct().collect()}
            assert ids == {window_id(w) for w in EX7}
            assert_equivalent(
                out, multi_window_sql(EX7, agg, HORIZON), events=events_pdf
            )
        finally:
            res.unpersist()

    @pytest.mark.parametrize("seed", range(3))
    @pytest.mark.parametrize("agg_name", ["min", "sum"])
    def test_random_chain_plans_match_baseline(
        self, spark, events, events_pdf, seed, agg_name
    ):
        agg = get_aggregate(agg_name)
        tumbling = agg_name == "sum"
        ws = chain_gen(n=4, s_max=6, k_max=3, seed=seed, tumbling=tumbling)
        m = optimize(ws, agg, eta=10)
        res = execute_wcg(events, m, agg)
        try:
            assert_equivalent(
                res.output, multi_window_sql(ws, agg, HORIZON), events=events_pdf
            )
        finally:
            res.unpersist()

    @pytest.mark.parametrize("seed", range(2))
    def test_star_plan_min_vs_oracle(self, spark, events, events_pdf, seed):
        agg = get_aggregate("min")
        ws = star_gen(n=4, s_max=8, k_max=3, seed=seed)
        m = optimize(ws, agg, eta=10)
        res = execute_wcg(events, m, agg)
        try:
            assert_equivalent(
                res.output, multi_window_sql(ws, agg, HORIZON), events=events_pdf
            )
        finally:
            res.unpersist()


class TestLineitemStream:
    def test_wcg_plan_on_tpch_lite(self, spark):
        # Realistic values: lineitem as an event stream (tick = days).
        agg = get_aggregate("min")
        ws = [Window(7, 7), Window(14, 14), Window(28, 28)]
        ev = lineitem_stream(spark, sf=0.002).persist()
        try:
            horizon = ev.agg({"tick": "max"}).collect()[0][0] + 1
            m = find_min_cost_wcg(ws, agg, eta=1)
            res = execute_wcg(ev, m, agg)
            base = execute_baseline(ev, ws, agg)
            assert_equivalent(
                res.output,
                multi_window_sql(ws, agg, int(horizon), events="events"),
                events=ev.select("tick", "key", "v"),
            )
            assert sorted(map(tuple, res.output.collect())) == sorted(
                map(tuple, base.collect())
            )
            res.unpersist()
        finally:
            ev.unpersist()
