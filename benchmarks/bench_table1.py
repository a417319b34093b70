"""Benchmark for Table 1: the four slicing-cost formulas (including the
composed-edge count, the expensive part) across the ten RandomGen sets.
"""
import pytest

from repro.slicing.cost import table1
from repro.workloads.generators import random_gen

SETS = [random_gen(n=5, s_max=16, k_max=8, seed=s) for s in range(10)]


@pytest.mark.benchmark(group="table1")
def test_bench_table1_costs(benchmark):
    def run():
        return [table1(ws, eta=100) for ws in SETS]

    rows = benchmark(run)
    assert len(rows) == 10
    for r in rows:
        assert r["shared_paired"].total <= r["unshared_paired"].total
