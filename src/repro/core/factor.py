"""Factor windows — §4 of the paper.

A *factor window* is an auxiliary window not present in the query that is
inserted between a window ``W`` and its downstream windows ``W_1…W_K``
(Figure 9) so that the children roll up from the factor's sub-aggregates
instead of ``W``'s, lowering total cost. Its own result is never exposed.

This module implements:

* ``pattern_cost_delta`` — Equation 2 (``c − c'``) computed exactly on the
  Figure-9 pattern; Equation 3's benefit test is ``delta ≤ 0``.
* ``generate_candidates`` — §4.2.1 generic candidate enumeration
  (eligible slides dividing ``gcd`` of child slides, eligible ranges up
  to ``min`` child range, coverage constraints of Figure 9).
* ``algorithm3`` — the closed-form benefit test under "partitioned by"
  semantics (both ``W_f`` and ``W`` tumbling), Theorem 8.
* ``algorithm4`` — best factor window under "partitioned by": candidate
  ranges are common factors of child ranges that are multiples of
  ``r_W``; dependent candidates pruned; winner picked per Theorem 9.
* ``theorem9_prefers`` — the ratio comparator of Theorem 9.
* ``algorithm2`` / ``optimize`` — expand the augmented WCG with the best
  factor window per vertex, rerun Algorithm 1 (unused factors pruned),
  and return the better of the factor-free and factor-enabled plans
  (§4.3: Algorithm 2 is a Steiner-tree heuristic, not guaranteed
  optimal, so the paper keeps whichever of Alg 1/Alg 2 wins).
"""
from __future__ import annotations

from fractions import Fraction

from repro.core.aggregates import AggSpec, Semantics
from repro.core.cost import recurrence_count, rollup_cost
from repro.core.mincost import MinCostWCG, find_min_cost_wcg, minimize_over_graph
from repro.core.wcg import WCG, augment_wcg, build_wcg, edge_allowed
from repro.core.windows import Window, covers, gcd_many, hyperperiod


def transitive_reduction_children(g: WCG, w: Window) -> list[Window]:
    """Direct successors of ``w`` in the coverage partial order.

    Figure 9's ``W_1…W_K`` are ``W``'s *immediate* downstream windows: a
    child covered by some other child of ``w`` is reached through that
    intermediate window, not directly (this is also why the paper's
    augmentation wires ``S`` only to windows with no other parent).
    """
    cs = g.edges[w]
    return sorted(
        c for c in cs if not any(o != c and c != w and covers(c, o) for o in cs)
    )


def pattern_cost_delta(
    w: Window, children: list[Window], wf: Window, R: int
) -> int:
    """Equation 2: ``c − c'`` for inserting ``wf`` between ``w`` and its
    children. Negative ⇒ the factor window lowers the pattern's cost;
    Equation 3's benefit condition is ``delta ≤ 0``.

    Computed directly from the cost model (``Σ n_j·M(W_j,·)`` plus the
    factor's own ``n_f·M(W_f, W)``), which is what Equation 2 expands.
    """
    with_f = sum(rollup_cost(c, wf, R) for c in children) + rollup_cost(wf, w, R)
    without = sum(rollup_cost(c, w, R) for c in children)
    return with_f - without


def eligible(w: Window, children: list[Window], wf: Window) -> bool:
    """Figure 9's coverage constraints: ``wf ≤ w`` and ``c ≤ wf`` ∀c."""
    return (
        wf != w
        and wf not in children
        and covers(wf, w)
        and all(covers(c, wf) for c in children)
    )


def generate_candidates(
    w: Window, children: list[Window], semantics: Semantics
) -> list[Window]:
    """§4.2.1 candidate enumeration for the Figure-9 pattern at ``w``.

    Slides: divisors of ``s_d = gcd(child slides)`` that are multiples of
    ``s_W``. Ranges: multiples of ``s_f`` up to ``min(child ranges)``.
    Each (s_f, r_f) pair is kept only if the full coverage constraints of
    Figure 9 hold. Under "partitioned by" semantics candidates must be
    tumbling (Theorem 4), which Algorithm 4 exploits; this generic path
    still honours it via ``edge_allowed``.
    """
    if not children:
        return []
    s_d = gcd_many([c.s for c in children])
    r_min = min(c.r for c in children)
    out = []
    for s_f in range(1, s_d + 1):
        if s_d % s_f or s_f % w.s:
            continue
        for r_f in range(s_f, r_min + 1, s_f):
            wf = Window(r_f, s_f)
            if not eligible(w, children, wf):
                continue
            if not edge_allowed(wf, w, semantics):
                continue
            if not all(edge_allowed(c, wf, semantics) for c in children):
                continue
            out.append(wf)
    return out


def find_best_factor_generic(
    w: Window, children: list[Window], semantics: Semantics, R: int
) -> Window | None:
    """FindBestFactorWindow of Algorithm 2 (lines 9–12): keep beneficial
    candidates (Eq. 3) and return the one with maximum estimated cost
    reduction (Eq. 2); ``None`` when no candidate strictly improves."""
    best: Window | None = None
    best_delta = 0  # require strict improvement to insert a vertex
    for wf in generate_candidates(w, children, semantics):
        delta = pattern_cost_delta(w, children, wf, R)
        if delta < best_delta or (delta == best_delta and best and wf.r > best.r):
            best, best_delta = wf, delta
    return best


def algorithm3(wf: Window, w: Window, children: list[Window], R: int) -> bool:
    """Algorithm 3: does tumbling factor ``wf`` help under "partitioned
    by"? (Theorem 8 proves this matches Equation 3.)

    ``K ≥ 2`` → yes. ``K = 1``: no if the only child is tumbling
    (``k₁ = 1``) or fires once (``m₁ = 1``); yes if ``k₁ ≥ 3 ∧ m₁ ≥ 3``;
    otherwise the exact ratio test ``r_f/r_W ≥ λ/(λ−1)`` with
    ``λ/(λ−1) = 1 + m₁/((m₁−1)(k₁−1))``.
    """
    if not (wf.is_tumbling and w.is_tumbling):
        raise ValueError("Algorithm 3 requires tumbling W_f and W")
    K = len(children)
    if K == 0:
        return False
    if K >= 2:
        return True
    (c1,) = children
    k1 = c1.k
    m1 = R // c1.r
    if k1 == 1 or m1 == 1:
        return False
    if k1 >= 3 and m1 >= 3:
        return True
    threshold = 1 + Fraction(m1, (m1 - 1) * (k1 - 1))
    return Fraction(wf.r, w.r) >= threshold


def theorem9_prefers(
    wf: Window, wf2: Window, w: Window, children: list[Window], R: int
) -> bool:
    """Theorem 9: True iff ``c_f ≤ c'_f`` — tumbling candidate ``wf`` is
    at least as good as independent tumbling candidate ``wf2`` — via the
    ratio test ``r_f/r'_f ≥ (λ − r_f/r_W)/(λ − r'_f/r_W)`` where
    ``λ = Σ_j n_j/m_j``.

    Both sides are exact fractions. The test's derivation divides by
    ``λ − r'_f/r_W``; when that quantity is ≤ 0 the inequality flips, so
    we compare the underlying (pre-division) linear form instead, which
    is sign-safe and equivalent.
    """
    lam = sum(
        Fraction(recurrence_count(c, R), R // c.r) for c in children
    )
    # (1 − r_f/r'_f)·λ + (r'_f/r_W)·(r_f/r'_f − n'_f/n_f) ≤ 0, with
    # (r'_f/r_W)·(n'_f/n_f) = r_f/r_W for tumbling candidates (see the
    # Theorem 9 proof), i.e. (1 − ρ)·λ + ρ·r'_f/r_W − r_f/r_W ≤ 0.
    rho = Fraction(wf.r, wf2.r)
    lhs = (1 - rho) * lam + rho * Fraction(wf2.r, w.r) - Fraction(wf.r, w.r)
    return lhs <= 0


def _divisors(n: int) -> list[int]:
    out = []
    d = 1
    while d * d <= n:
        if n % d == 0:
            out.append(d)
            if d != n // d:
                out.append(n // d)
        d += 1
    return sorted(out)


def algorithm4(
    w: Window, children: list[Window], R: int, taken: set[Window] | None = None
) -> Window | None:
    """Algorithm 4: best factor window under "partitioned by" semantics.

    Candidate ranges are the common factors of the child ranges that are
    multiples of ``r_W`` (all candidates tumbling, Theorem 4); candidates
    rejected by Algorithm 3 or *dependent* on (covered by) another
    candidate are pruned; the winner minimizes the Figure-9 pattern cost
    (exactly what Theorem 9's comparator decides — tests assert the
    comparator agrees with the direct costs).

    ``taken`` are windows already in the graph; a "candidate" equal to an
    existing window is meaningless as a new vertex.
    """
    if not children or not w.is_tumbling:
        return None
    taken = taken or set()
    d = gcd_many([c.r for c in children])
    if d == w.r:
        return None  # line 3: no room between W and its children
    cands = []
    for r_f in _divisors(d):
        if r_f % w.r or r_f == w.r:
            continue
        wf = Window(r_f, r_f)
        if wf in taken or wf in children:
            continue
        if algorithm3(wf, w, children, R):
            cands.append(wf)
    # Lines 11–13: drop W_f when another candidate is covered by it.
    cands = [
        wf
        for wf in cands
        if not any(o != wf and covers(o, wf) for o in cands)
    ]
    if not cands:
        return None
    best = min(
        cands,
        key=lambda wf: (pattern_cost_delta(w, children, wf, R), -wf.r),
    )
    if pattern_cost_delta(w, children, best, R) >= 0:
        return None
    return best


def algorithm2(
    windows: list[Window], agg: AggSpec, eta: int = 1, R: int | None = None
) -> MinCostWCG:
    """Algorithm 2: min-cost WCG with factor windows allowed.

    Builds the augmented WCG (virtual root ``S⟨1,1⟩``), finds the best
    factor window for every vertex's Figure-9 pattern (Algorithm 4 under
    "partitioned by", the generic Eq.-2/3 search under "covered by"),
    adds them all, and reruns Algorithm 1 over the expanded graph.
    Factor vertices nothing reads from — including ``S`` — are pruned.

    Candidates are chosen against the *original* augmented graph (one
    pattern per vertex, as the paper's `foreach` does), then inserted in
    one batch so the result is independent of iteration order.
    """
    R = hyperperiod(windows) if R is None else R
    g = augment_wcg(build_wcg(windows, agg.semantics))
    taken = set(g.windows)
    chosen: list[Window] = []
    for w in sorted(g.windows):
        children = transitive_reduction_children(g, w)
        if not children:
            continue  # Figure 8(b): no downstream windows to improve
        if agg.semantics is Semantics.PARTITIONED_BY and w.is_tumbling:
            wf = algorithm4(w, children, R, taken=taken | set(chosen))
        else:
            wf = find_best_factor_generic(w, children, agg.semantics, R)
        if wf is not None and wf not in taken and wf not in chosen:
            chosen.append(wf)
    for wf in chosen:
        g.add_window(wf, factor=True)
    return minimize_over_graph(g, eta, R)


def optimize(
    windows: list[Window],
    agg: AggSpec,
    eta: int = 1,
    R: int | None = None,
    allow_factor: bool = True,
) -> MinCostWCG:
    """§4.3: run Algorithm 1, and when factor windows are allowed also
    Algorithm 2, returning whichever plan is cheaper (Algorithm 2 is a
    heuristic and can lose to Algorithm 1)."""
    base = find_min_cost_wcg(windows, agg, eta, R)
    if not allow_factor:
        return base
    with_f = algorithm2(windows, agg, eta, R)
    return with_f if with_f.total < base.total else base
