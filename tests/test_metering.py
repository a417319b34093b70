"""Cost-model validation: over one hyperperiod of a steady η-rate,
single-key stream, the measured (input row, window instance) assignment
counts of the executed plans equal the analytic ``c_i`` exactly."""
import pytest

from repro.core.aggregates import get_aggregate
from repro.core.cost import raw_cost, rollup_cost
from repro.core.factor import algorithm2
from repro.core.mincost import find_min_cost_wcg
from repro.core.windows import Window
from repro.engine.metering import plan_assignment_counts, raw_assignment_count
from repro.engine.streams import event_stream

EX6 = [Window(x, x) for x in (10, 20, 30, 40)]
EX7 = [Window(x, x) for x in (20, 30, 40)]
R = 120  # hyperperiod of both examples
MIN = get_aggregate("min")
SUM = get_aggregate("sum")


@pytest.fixture(scope="module", params=[1, 3])
def eta_events(request, spark):
    eta = request.param
    df = event_stream(spark, horizon=R, eta=eta, n_keys=1, seed=5)
    df.persist().count()
    yield eta, df
    df.unpersist()


class TestRawCounts:
    @pytest.mark.parametrize("w", EX6 + [Window(12, 4), Window(10, 2)])
    def test_direct_agg_processes_n_eta_r(self, spark, eta_events, w):
        eta, events = eta_events
        measured = raw_assignment_count(events, w, R)
        assert measured == raw_cost(w, R, eta)


class TestPlanCounts:
    def test_example6_wcg_counts_match_model(self, spark, eta_events):
        eta, events = eta_events
        m = find_min_cost_wcg(EX6, MIN, eta=eta)
        counts = plan_assignment_counts(events, m, MIN, R)
        for w in m.windows:
            assert counts[w] == m.cost[w], f"{w}: {counts[w]} != {m.cost[w]}"
        assert sum(counts.values()) == m.total

    def test_example7_factor_plan_counts_match_model(self, spark, eta_events):
        eta, events = eta_events
        m = algorithm2(EX7, SUM, eta=eta)
        counts = plan_assignment_counts(events, m, SUM, R)
        for w in m.windows:
            assert counts[w] == m.cost[w], f"{w}: {counts[w]} != {m.cost[w]}"

    def test_rollup_count_equals_n_times_M(self, spark, eta_events):
        eta, events = eta_events
        m = find_min_cost_wcg(EX6, MIN, eta=eta)
        counts = plan_assignment_counts(events, m, MIN, R)
        w1, w2 = Window(10, 10), Window(20, 20)
        assert counts[w2] == rollup_cost(w2, w1, R)  # 6·2 = 12

    def test_hopping_chain_counts(self, spark, eta_events):
        eta, events = eta_events
        ws = [Window(8, 2), Window(10, 2)]  # Example 2's coverage pair
        m = find_min_cost_wcg(ws, MIN, eta=eta)
        # rollup only chosen when cheaper than raw:
        if m.parent[Window(10, 2)] is not None:
            # meter over the set's own hyperperiod (lcm(8,10) = 40).
            counts = plan_assignment_counts(events, m, MIN, m.R)
            assert counts[Window(10, 2)] == m.cost[Window(10, 2)]
