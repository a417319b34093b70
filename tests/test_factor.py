"""Factor windows (§4): Equations 2–3, Algorithms 2–4, Theorems 8–9,
and the paper's Examples 7 and 8."""
import pytest

from repro.core.aggregates import Semantics, get_aggregate
from repro.core.factor import (
    algorithm2,
    algorithm3,
    algorithm4,
    eligible,
    find_best_factor_generic,
    generate_candidates,
    optimize,
    pattern_cost_delta,
    theorem9_prefers,
    transitive_reduction_children,
)
from repro.core.mincost import find_min_cost_wcg
from repro.core.wcg import UNIT_WINDOW, augment_wcg, build_wcg
from repro.core.windows import Window, hyperperiod
from repro.workloads.generators import chain_gen, random_gen, star_gen

MIN = get_aggregate("min")
SUM = get_aggregate("sum")
EX7 = [Window(x, x) for x in (20, 30, 40)]  # Example 7's query windows
W10 = Window(10, 10)


class TestTransitiveReduction:
    def test_example6(self):
        g = build_wcg([Window(x, x) for x in (10, 20, 30, 40)], Semantics.COVERED_BY)
        # W1 directly feeds W2 and W3; W4 is reached through W2.
        assert transitive_reduction_children(g, Window(10, 10)) == [
            Window(20, 20),
            Window(30, 30),
        ]
        assert transitive_reduction_children(g, Window(20, 20)) == [Window(40, 40)]

    def test_root_children_match_paper_augmentation(self):
        # §4.1 wires S only to windows with no other incoming edge: for
        # Example 7 that is {W2, W3} (W4 is covered by W2) — exactly the
        # transitive reduction of S's out-edges.
        g = augment_wcg(build_wcg(EX7, Semantics.PARTITIONED_BY))
        assert transitive_reduction_children(g, UNIT_WINDOW) == [
            Window(20, 20),
            Window(30, 30),
        ]


class TestPatternCostDelta:
    def test_example8_candidate_costs(self):
        # Footnote 8 of the paper: pattern = S with children {W2, W3}.
        R = 120
        children = [Window(20, 20), Window(30, 30)]
        # Pattern cost without a factor window: W2,W3 each read from S.
        without = 6 * 20 + 4 * 30  # n_j·M(W_j,S) = 240
        for r_f, expect in [(2, 240), (5, 168), (10, 144)]:
            wf = Window(r_f, r_f)
            delta = pattern_cost_delta(UNIT_WINDOW, children, wf, R)
            assert without + delta == expect

    def test_delta_zero_for_useless_factor(self):
        # W(2,2) leaves the pattern cost unchanged (footnote 8).
        assert (
            pattern_cost_delta(
                UNIT_WINDOW, [Window(20, 20), Window(30, 30)], Window(2, 2), 120
            )
            == 0
        )


class TestEligibility:
    def test_figure9_constraints(self):
        children = [Window(20, 20), Window(30, 30)]
        assert eligible(UNIT_WINDOW, children, W10)
        assert not eligible(UNIT_WINDOW, children, UNIT_WINDOW)  # wf == w
        assert not eligible(UNIT_WINDOW, children, Window(20, 20))  # wf ∈ children
        # wf must cover w and be covered by every child:
        assert not eligible(Window(4, 4), children, Window(6, 6))  # 6 % 4 ≠ 0

    def test_generate_candidates_example8(self):
        children = [Window(20, 20), Window(30, 30)]
        cands = generate_candidates(UNIT_WINDOW, children, Semantics.PARTITIONED_BY)
        assert set(cands) == {Window(2, 2), Window(5, 5), Window(10, 10)}

    def test_generate_candidates_covered_by_superset(self):
        children = [Window(20, 2), Window(30, 2)]
        cands = generate_candidates(UNIT_WINDOW, children, Semantics.COVERED_BY)
        # hopping candidates are allowed under covered-by:
        assert Window(10, 2) in cands
        assert all(eligible(UNIT_WINDOW, children, c) for c in cands)


class TestAlgorithm3:
    R = 120

    def test_k_ge_2_always_true(self):
        assert algorithm3(W10, UNIT_WINDOW, [Window(20, 20), Window(30, 30)], self.R)

    def test_single_tumbling_child_false(self):
        # Case 1: K=1 and k1=1 — the factor window cannot help.
        assert not algorithm3(W10, UNIT_WINDOW, [Window(20, 20)], self.R)

    def test_single_hopping_child_k3_m3_true(self):
        # K=1, k1 ≥ 3 and m1 ≥ 3 ⇒ true.
        child = Window(30, 10)  # k1 = 3, m1 = 120/30 = 4
        assert algorithm3(W10, Window(5, 5), [child], self.R)

    def test_ratio_branch(self):
        # k1 = 2, m1 = 2 ⇒ λ/(λ−1) = 1 + 2/(1·1) = 3: need r_f/r_W ≥ 3.
        child = Window(60, 30)  # k1 = 2, m1 = 120/60 = 2
        assert not algorithm3(Window(30, 30), Window(15, 15), [child], self.R)
        assert algorithm3(Window(30, 30), Window(10, 10), [child], self.R)

    def test_m1_equal_1_false(self):
        child = Window(120, 60)  # m1 = 1 ⇒ n1 = 1, λ = 1
        assert not algorithm3(Window(60, 60), Window(30, 30), [child], self.R)

    def test_requires_tumbling(self):
        with pytest.raises(ValueError):
            algorithm3(Window(10, 5), UNIT_WINDOW, [Window(20, 20)], self.R)

    @pytest.mark.parametrize("k1", [2, 3, 4, 5])
    @pytest.mark.parametrize("m1", [2, 3, 4])
    @pytest.mark.parametrize("rf_mult", [2, 3, 4, 6])
    def test_matches_equation3_theorem8(self, k1, m1, rf_mult):
        # Build a concrete configuration: W tumbling with range rw, child
        # with range m·?·... and verify Algorithm 3 == (Eq. 2 delta ≤ 0).
        rw = 2
        rf = rw * rf_mult
        s1 = rf  # child slide must make wf cover child: s1 % rf == 0
        r1 = k1 * s1
        R = m1 * r1
        child = Window(r1, s1)
        wf, w = Window(rf, rf), Window(rw, rw)
        delta = pattern_cost_delta(w, [child], wf, R)
        assert algorithm3(wf, w, [child], R) == (delta <= 0) or delta == 0


class TestTheorem9:
    def test_reduces_to_bigger_range_wins(self):
        # For tumbling candidates the pattern cost is Σn_j·r_j/r_f + R/r_W,
        # strictly decreasing in r_f — Theorem 9 must agree.
        children = [Window(20, 20), Window(30, 30)]
        R = 120
        assert theorem9_prefers(W10, Window(5, 5), UNIT_WINDOW, children, R)
        assert not theorem9_prefers(Window(5, 5), W10, UNIT_WINDOW, children, R)

    @pytest.mark.parametrize("rf,rf2", [(2, 5), (2, 10), (5, 10), (10, 10)])
    def test_consistent_with_direct_costs(self, rf, rf2):
        children = [Window(20, 20), Window(30, 30)]
        R = 120
        wf, wf2 = Window(rf, rf), Window(rf2, rf2)
        direct = pattern_cost_delta(UNIT_WINDOW, children, wf, R) <= (
            pattern_cost_delta(UNIT_WINDOW, children, wf2, R)
        )
        assert theorem9_prefers(wf, wf2, UNIT_WINDOW, children, R) == direct


class TestAlgorithm4:
    def test_example8_picks_w10(self):
        children = [Window(20, 20), Window(30, 30)]
        assert algorithm4(UNIT_WINDOW, children, 120) == W10

    def test_no_candidate_when_gcd_equals_rw(self):
        # line 2–3: d == r_W ⇒ nothing fits between W and its children.
        assert algorithm4(W10, [Window(20, 20), Window(30, 30)], 120) is None

    def test_single_tumbling_child_yields_none(self):
        # All candidates fail Algorithm 3's K=1, k1=1 case.
        assert algorithm4(UNIT_WINDOW, [Window(20, 20)], 120) is None

    def test_excludes_taken_windows(self):
        children = [Window(20, 20), Window(30, 30)]
        got = algorithm4(UNIT_WINDOW, children, 120, taken={W10})
        assert got != W10


class TestAlgorithm2AndOptimize:
    def test_example7_with_factors_is_150(self):
        m = algorithm2(EX7, SUM, eta=1)
        assert m.total == 150
        assert W10 in m.windows and W10 in m.factors
        assert m.parent[Window(20, 20)] == W10
        assert m.parent[Window(30, 30)] == W10
        assert m.parent[Window(40, 40)] == Window(20, 20)
        # 58.3% below BL=360, 39% below the no-factor 246 (Example 7).
        assert 1 - 150 / 360 == pytest.approx(0.583, abs=1e-3)
        assert 1 - 150 / 246 == pytest.approx(0.39, abs=5e-3)

    def test_example7_covered_by_same_result(self):
        assert algorithm2(EX7, MIN, eta=1).total == 150

    def test_factor_not_exposed(self):
        m = algorithm2(EX7, SUM, eta=1)
        assert m.exposed() == EX7

    def test_unused_root_pruned(self):
        # At η=1 nothing benefits from reading S, so S must be gone.
        m = algorithm2(EX7, SUM, eta=1)
        assert UNIT_WINDOW not in m.windows

    def test_unit_root_used_at_high_eta(self):
        # At η=100 reading per-tick sub-aggregates from S beats raw for
        # the factor window (cost n_f·r_f vs n_f·η·r_f).
        m = algorithm2(EX7, SUM, eta=100)
        assert m.total < find_min_cost_wcg(EX7, SUM, eta=100).total

    def test_optimize_returns_best_of_both(self):
        for eta in (1, 10, 100):
            m_opt = optimize(EX7, SUM, eta=eta)
            m1 = find_min_cost_wcg(EX7, SUM, eta=eta)
            m2 = algorithm2(EX7, SUM, eta=eta)
            assert m_opt.total == min(m1.total, m2.total)

    def test_optimize_no_factor_flag(self):
        m = optimize(EX7, SUM, eta=1, allow_factor=False)
        assert m.total == 246

    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("gen", [random_gen, chain_gen, star_gen])
    def test_factor_never_hurts_after_best_of(self, seed, gen):
        ws = gen(n=5, s_max=8, k_max=4, seed=seed)
        for eta in (1, 100):
            assert optimize(ws, MIN, eta=eta).total <= find_min_cost_wcg(
                ws, MIN, eta=eta
            ).total

    @pytest.mark.parametrize("seed", range(6))
    def test_factor_windows_forest_and_exposure(self, seed):
        ws = chain_gen(n=5, s_max=8, k_max=4, seed=seed, tumbling=True)
        m = algorithm2(ws, SUM, eta=100)
        assert set(m.exposed()) == set(ws)
        topo = m.topological()
        assert sorted(topo) == sorted(m.windows)

    def test_example6_gains_little_from_factors(self):
        # Example 6's set already contains W(10,10); Algorithm 2 should
        # not beat 150 at η=1.
        ws = [Window(x, x) for x in (10, 20, 30, 40)]
        assert optimize(ws, SUM, eta=1).total == 150
