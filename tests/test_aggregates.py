"""Aggregate taxonomy (§3.1): semantics dispatch, Theorem 5/6 properties
checked on concrete data (pure Python here; Spark execution of the same
specs is covered in test_exec_batch.py)."""
import random

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.aggregates import AGGREGATES, Semantics, get_aggregate


class TestTaxonomy:
    @pytest.mark.parametrize("name", ["min", "max"])
    def test_min_max_are_covered_by(self, name):
        # Theorem 6: MIN/MAX tolerate overlapping pieces.
        assert get_aggregate(name).semantics is Semantics.COVERED_BY

    @pytest.mark.parametrize("name", ["sum", "count", "avg"])
    def test_sum_count_avg_are_partitioned_by(self, name):
        assert get_aggregate(name).semantics is Semantics.PARTITIONED_BY

    @pytest.mark.parametrize("name", ["median", "rank", "percentile"])
    def test_holistic_rejected(self, name):
        with pytest.raises(ValueError, match="holistic"):
            get_aggregate(name)

    def test_unknown_rejected(self):
        with pytest.raises(ValueError, match="unknown"):
            get_aggregate("frobnicate")

    def test_case_insensitive(self):
        assert get_aggregate("MIN") is AGGREGATES["min"]

    @pytest.mark.parametrize("name", sorted(AGGREGATES))
    def test_duckdb_expr(self, name):
        assert get_aggregate(name).duckdb_expr("v") == f"{name}(v)"

    @pytest.mark.parametrize("name", sorted(AGGREGATES))
    def test_state_cols_prefixed(self, name):
        # State columns are underscore-prefixed so they never collide
        # with user columns in rewritten plans.
        assert all(c.startswith("_") for c in get_aggregate(name).state_cols)


def py_agg(name, values):
    if name == "min":
        return min(values)
    if name == "max":
        return max(values)
    if name == "sum":
        return sum(values)
    if name == "count":
        return len(values)
    if name == "avg":
        return sum(values) / len(values)
    raise AssertionError(name)


def py_merge(name, partials):
    """Merge partial states the way the AggSpec's merge step does."""
    if name in ("min", "max"):
        return py_agg(name, partials)
    if name in ("sum", "count"):
        return sum(partials)
    raise AssertionError(name)


class TestTheorem5And6Semantics:
    """Distributive/algebraic merge over a disjoint partition equals the
    direct aggregate (Theorem 5); MIN/MAX also survive overlap (Thm 6)."""

    @given(st.lists(st.integers(-1000, 1000), min_size=1, max_size=40))
    @settings(max_examples=150, deadline=None)
    def test_disjoint_partition_all_aggregates(self, values):
        rnd = random.Random(len(values))
        cuts = sorted({0, len(values), *(rnd.randrange(len(values) + 1) for _ in range(3))})
        pieces = [
            values[a:b] for a, b in zip(cuts, cuts[1:]) if values[a:b]
        ]
        for name in ("min", "max", "sum", "count"):
            partials = [py_agg(name, p) for p in pieces]
            assert py_merge(name, partials) == py_agg(name, values)
        # AVG via (sum, count) algebraic state:
        s = sum(py_agg("sum", p) for p in pieces)
        c = sum(py_agg("count", p) for p in pieces)
        assert s / c == pytest.approx(py_agg("avg", values))

    @given(st.lists(st.integers(-1000, 1000), min_size=1, max_size=40))
    @settings(max_examples=150, deadline=None)
    def test_overlapping_cover_min_max_only(self, values):
        rnd = random.Random(len(values) * 7 + 1)
        # Overlapping pieces whose union is the whole list (Theorem 6).
        pieces = []
        i = 0
        while i < len(values):
            j = min(len(values), i + rnd.randrange(1, 6))
            lo = max(0, i - rnd.randrange(0, 3))  # overlap backwards
            pieces.append(values[lo:j])
            i = j
        for name in ("min", "max"):
            partials = [py_agg(name, p) for p in pieces]
            assert py_merge(name, partials) == py_agg(name, values)
        # SUM over the same overlapping cover is generally wrong — this is
        # exactly why SUM/COUNT/AVG demand "partitioned by" edges.
        if any(len(p1) + len(p2) > len(values) for p1, p2 in zip(pieces, pieces[1:])):
            if all(v > 0 for v in values) and len(pieces) > 1:
                over = sum(py_agg("sum", p) for p in pieces)
                assert over >= py_agg("sum", values)
