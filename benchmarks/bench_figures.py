"""Benchmarks for the analytic figure tables (Figures 11–15).

Each benchmark regenerates one figure's full table (10 window sets × 5
techniques, all panels) — the cost-model counterpart of the paper's
evaluation. Wall time here is optimizer time (WCG construction,
Algorithm 1/2, slicing-cost evaluation), i.e. the query-compile-time
overhead the paper's techniques add.
"""
import pytest

from repro.evalfw.harness import figure11, figure12, figure13, figure14, figure15
from repro.evalfw.report import geomean_ratios


def _check(panels):
    # sanity: every panel produced 10 rows with positive costs
    for rows in panels.values():
        assert len(rows) == 10
        g = geomean_ratios(rows)
        assert all(v > 0 for v in g.values())
    return panels


@pytest.mark.benchmark(group="figures")
def test_bench_fig11_random_general(benchmark):
    _check(benchmark(figure11))


@pytest.mark.benchmark(group="figures")
def test_bench_fig12_random_tumbling(benchmark):
    _check(benchmark(figure12))


@pytest.mark.benchmark(group="figures")
def test_bench_fig13_chain(benchmark):
    _check(benchmark(figure13))


@pytest.mark.benchmark(group="figures")
def test_bench_fig14_star(benchmark):
    _check(benchmark(figure14))


@pytest.mark.benchmark(group="figures")
def test_bench_fig15_randomgraph(benchmark):
    _check(benchmark(figure15))
