"""Workload generators (§5.2, Algorithms 5–6): structural invariants and
determinism."""
import random

import pytest

from repro.core.windows import Window, covers
from repro.workloads.generators import (
    chain_gen,
    random_gen,
    random_graph_gen,
    random_subset,
    random_window,
    star_gen,
    tumbling_variant,
)

SEEDS = range(10)


class TestRandomWindowAlgorithm5:
    def test_bounds(self):
        rnd = random.Random(0)
        for _ in range(200):
            w = random_window(rnd, 2, 16, 8)
            assert 2 <= w.s <= 16
            assert w.r % w.s == 0
            assert 1 <= w.r // w.s <= 8

    def test_tumbling_flag(self):
        rnd = random.Random(1)
        assert all(random_window(rnd, 2, 16, 8, tumbling=True).is_tumbling for _ in range(50))

    def test_invalid_bounds(self):
        with pytest.raises(ValueError):
            random_window(random.Random(0), 10, 5, 3)


class TestRandomGen:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_size_and_uniqueness(self, seed):
        ws = random_gen(n=5, seed=seed)
        assert len(ws) == 5 and len(set(ws)) == 5

    @pytest.mark.parametrize("seed", SEEDS)
    def test_deterministic(self, seed):
        assert random_gen(n=5, seed=seed) == random_gen(n=5, seed=seed)

    def test_seeds_differ(self):
        assert random_gen(n=5, seed=0) != random_gen(n=5, seed=1)

    @pytest.mark.parametrize("seed", SEEDS)
    def test_tumbling_variant_flag(self, seed):
        assert all(w.is_tumbling for w in random_gen(n=5, seed=seed, tumbling=True))

    def test_n10(self):
        assert len(random_gen(n=10, seed=3)) == 10


class TestChainGen:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_chain_coverage(self, seed):
        ws = chain_gen(n=5, seed=seed)
        for a, b in zip(ws, ws[1:]):
            assert covers(b, a), f"{b} must be covered by {a}"

    @pytest.mark.parametrize("seed", SEEDS)
    def test_tumbling_chain(self, seed):
        ws = chain_gen(n=5, seed=seed, tumbling=True)
        assert all(w.is_tumbling for w in ws)
        for a, b in zip(ws, ws[1:]):
            assert b.r % a.r == 0 and b.r > a.r

    @pytest.mark.parametrize("seed", SEEDS)
    def test_strictly_growing_ranges(self, seed):
        ws = chain_gen(n=5, seed=seed)
        assert all(b.r > a.r for a, b in zip(ws, ws[1:]))


class TestStarGen:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_spokes_covered_by_hub(self, seed):
        ws = star_gen(n=5, seed=seed)
        hub = ws[0]
        for spoke in ws[1:]:
            assert covers(spoke, hub)

    @pytest.mark.parametrize("seed", SEEDS)
    def test_tumbling_star(self, seed):
        ws = star_gen(n=5, seed=seed, tumbling=True)
        assert all(w.is_tumbling for w in ws)
        for spoke in ws[1:]:
            assert spoke.r % ws[0].r == 0


class TestRandomSubset:
    def test_nonempty(self):
        rnd = random.Random(0)
        items = [Window(2, 2), Window(3, 3)]
        for _ in range(50):
            sub = random_subset(rnd, items, 0.5)
            assert sub and all(w in items for w in sub)


class TestRandomGraphGen:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_paper_configuration(self, seed):
        # 3 levels with 2, 4, 6 windows (paper §5.2); duplicates across
        # levels are collapsed so the total may dip slightly below 12.
        ws = random_graph_gen(levels=3, base=2, delta=2, seed=seed)
        assert 10 <= len(ws) <= 12
        assert len(set(ws)) == len(ws)

    @pytest.mark.parametrize("seed", SEEDS)
    def test_coverage_edges_exist(self, seed):
        ws = random_graph_gen(levels=3, base=2, delta=2, seed=seed)
        pairs = sum(
            1 for a in ws for b in ws if a != b and covers(a, b)
        )
        assert pairs > 0, "generated DAG must contain coverage edges"

    @pytest.mark.parametrize("seed", SEEDS)
    def test_tumbling_graph(self, seed):
        ws = random_graph_gen(levels=3, base=2, delta=2, seed=seed, tumbling=True)
        assert all(w.is_tumbling for w in ws)

    @pytest.mark.parametrize("seed", range(5))
    def test_deterministic(self, seed):
        a = random_graph_gen(seed=seed)
        assert a == random_graph_gen(seed=seed)


class TestTumblingVariant:
    def test_replaces_slides(self):
        ws = [Window(10, 2), Window(20, 5)]
        assert tumbling_variant(ws) == [Window(10, 10), Window(20, 20)]

    def test_collapses_duplicates(self):
        ws = [Window(10, 2), Window(10, 5)]
        assert tumbling_variant(ws) == [Window(10, 10)]
