"""WCG construction (§2.3) and augmentation (§4.1)."""
import pytest

from repro.core.aggregates import Semantics
from repro.core.wcg import UNIT_WINDOW, WCG, augment_wcg, build_wcg, edge_allowed
from repro.core.windows import Window, covers, partitions

TUMB = [Window(x, x) for x in (10, 20, 30, 40)]


class TestEdgeAllowed:
    def test_no_self_edge(self):
        w = Window(10, 10)
        assert not edge_allowed(w, w, Semantics.COVERED_BY)
        assert not edge_allowed(w, w, Semantics.PARTITIONED_BY)

    def test_covered_by_uses_coverage(self):
        c, p = Window(10, 2), Window(8, 2)
        assert edge_allowed(c, p, Semantics.COVERED_BY)
        # p is hopping → partitioning fails (Theorem 4 condition 3).
        assert not edge_allowed(c, p, Semantics.PARTITIONED_BY)

    def test_partitioned_by_requires_tumbling_parent(self):
        assert edge_allowed(Window(20, 10), Window(5, 5), Semantics.PARTITIONED_BY)


class TestBuildWCG:
    def test_example6_graph(self):
        # Figure 6(a): edges W1→{W2,W3,W4}, W2→W4 (tumbling ⇒ both
        # semantics coincide, as the paper notes in Example 6).
        for sem in Semantics:
            g = build_wcg(TUMB, sem)
            w1, w2, w3, w4 = TUMB
            assert g.edges[w1] == {w2, w3, w4}
            assert g.edges[w2] == {w4}
            assert g.edges[w3] == set()
            assert g.edges[w4] == set()
            assert g.parents[w4] == {w1, w2}

    def test_duplicates_rejected(self):
        with pytest.raises(ValueError, match="duplicates"):
            build_wcg([Window(10, 10), Window(10, 10)], Semantics.COVERED_BY)

    def test_parents_is_reverse_of_edges(self):
        g = build_wcg(TUMB, Semantics.COVERED_BY)
        for p, cs in g.edges.items():
            for c in cs:
                assert p in g.parents[c]

    def test_no_factor_vertices_initially(self):
        g = build_wcg(TUMB, Semantics.COVERED_BY)
        assert g.factors == set()
        assert g.exposed() == TUMB

    def test_general_windows_covered_by(self):
        # W(10,2) ≤ W(8,2) (paper Example 2) appears as an edge.
        g = build_wcg([Window(10, 2), Window(8, 2)], Semantics.COVERED_BY)
        assert Window(10, 2) in g.edges[Window(8, 2)]

    def test_edges_match_predicate_exhaustively(self):
        ws = [Window(k * s, s) for s in (2, 3, 4) for k in (1, 2, 3)]
        for sem, pred in [
            (Semantics.COVERED_BY, covers),
            (Semantics.PARTITIONED_BY, partitions),
        ]:
            g = build_wcg(ws, sem)
            for p in ws:
                for c in ws:
                    expect = c != p and pred(c, p)
                    assert (c in g.edges[p]) == expect


class TestAugmentWCG:
    def test_adds_unit_root_as_factor(self):
        g = augment_wcg(build_wcg(TUMB, Semantics.PARTITIONED_BY))
        assert UNIT_WINDOW in g.edges
        assert UNIT_WINDOW in g.factors
        # S covers every window under both semantics.
        assert g.edges[UNIT_WINDOW] == set(TUMB)

    def test_does_not_duplicate_existing_unit_window(self):
        ws = [UNIT_WINDOW, Window(10, 10)]
        g = augment_wcg(build_wcg(ws, Semantics.PARTITIONED_BY))
        assert g.windows.count(UNIT_WINDOW) == 1
        # S was a query window here, so it must stay exposed.
        assert UNIT_WINDOW not in g.factors

    def test_original_untouched(self):
        base = build_wcg(TUMB, Semantics.PARTITIONED_BY)
        augment_wcg(base)
        assert UNIT_WINDOW not in base.edges

    def test_exposed_excludes_root(self):
        g = augment_wcg(build_wcg(TUMB, Semantics.PARTITIONED_BY))
        assert g.exposed() == TUMB


class TestAddWindow:
    def test_add_factor_recomputes_edges(self):
        g = build_wcg([Window(20, 20), Window(30, 30)], Semantics.PARTITIONED_BY)
        g.add_window(Window(10, 10), factor=True)
        assert g.edges[Window(10, 10)] == {Window(20, 20), Window(30, 30)}
        assert Window(10, 10) in g.factors

    def test_add_existing_nonfactor_raises(self):
        g = build_wcg(TUMB, Semantics.COVERED_BY)
        with pytest.raises(ValueError):
            g.add_window(Window(10, 10))

    def test_add_existing_as_factor_is_noop(self):
        g = build_wcg(TUMB, Semantics.COVERED_BY)
        g.add_window(Window(10, 10), factor=True)
        assert g.windows.count(Window(10, 10)) == 1
        assert Window(10, 10) not in g.factors
