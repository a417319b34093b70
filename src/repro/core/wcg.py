"""Window coverage graph (WCG) construction — §2.3 and §4.1.

The WCG of a window set ``W`` has an edge ``(W2, W1)`` for every pair with
``W1 ≤ W2`` (``W2`` covers ``W1``; data flows *from* W2's sub-aggregates
*to* W1). Construction is O(|W|²) pairwise tests (Theorems 1/4 make each
test O(1)).

The *augmented* WCG (§4.1) additionally contains the virtual unit
tumbling window ``S⟨1,1⟩`` with an edge to every window that has no other
incoming edge, so factor-window insertion has a root to hang candidates
off. ``S`` is marked as a factor window (its output is never exposed) and
is pruned from the final plan when nothing reads from it.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.aggregates import Semantics
from repro.core.windows import Window, covers, partitions

#: The virtual root window S⟨1,1⟩ of the augmented WCG.
UNIT_WINDOW = Window(1, 1)


def edge_allowed(child: Window, parent: Window, semantics: Semantics) -> bool:
    """True iff ``child`` may roll up from ``parent`` under ``semantics``.

    "covered by" for MIN/MAX, "partitioned by" for COUNT/SUM/AVG (§3.1).
    Self-edges are excluded — a window cannot be its own upstream.
    """
    if child == parent:
        return False
    if semantics is Semantics.COVERED_BY:
        return covers(child, parent)
    return partitions(child, parent)


@dataclass
class WCG:
    """A window coverage graph over ``windows``.

    ``edges`` maps each window to the set of windows it covers (its
    potential *downstream* consumers); ``parents`` is the reverse map.
    ``factors`` records which vertices are auxiliary (factor windows or
    the virtual root) whose results must not be exposed to the user.
    """

    windows: list[Window]
    semantics: Semantics
    edges: dict[Window, set[Window]] = field(default_factory=dict)
    parents: dict[Window, set[Window]] = field(default_factory=dict)
    factors: set[Window] = field(default_factory=set)

    def __post_init__(self) -> None:
        for w in self.windows:
            self.edges.setdefault(w, set())
            self.parents.setdefault(w, set())

    def add_edge(self, parent: Window, child: Window) -> None:
        self.edges[parent].add(child)
        self.parents[child].add(parent)

    def add_window(self, w: Window, *, factor: bool = False) -> None:
        """Insert a vertex (typically a factor window) with all coverage
        edges to/from the existing vertices recomputed."""
        if w in self.edges:
            if factor:
                return  # already present as a query window; nothing to add
            raise ValueError(f"{w} already in WCG")
        self.windows.append(w)
        self.edges[w] = set()
        self.parents[w] = set()
        if factor:
            self.factors.add(w)
        for other in self.windows:
            if other == w:
                continue
            if edge_allowed(other, w, self.semantics):
                self.add_edge(w, other)
            if edge_allowed(w, other, self.semantics):
                self.add_edge(other, w)

    def exposed(self) -> list[Window]:
        """Windows whose results the query returns (non-factor vertices)."""
        return [w for w in self.windows if w not in self.factors]


def build_wcg(windows: list[Window], semantics: Semantics) -> WCG:
    """Construct the (non-augmented) WCG of §2.3."""
    if len(set(windows)) != len(windows):
        raise ValueError("window set contains duplicates")
    g = WCG(windows=list(windows), semantics=semantics)
    for w1 in windows:
        for w2 in windows:
            if edge_allowed(w1, w2, semantics):
                g.add_edge(w2, w1)
    return g


def augment_wcg(g: WCG) -> WCG:
    """Return a copy of ``g`` augmented with the virtual root ``S⟨1,1⟩``.

    §4.1: ``S`` is added (unless already a query window) and covers every
    window; the paper draws edges only to windows with no other incoming
    edge, but since ``S`` covers *all* windows under both semantics we add
    all edges — Algorithm 1's min-selection makes the extra edges harmless
    and they let every vertex be treated uniformly as Figure 9's ``W``.
    """
    out = WCG(windows=list(g.windows), semantics=g.semantics, factors=set(g.factors))
    for p, cs in g.edges.items():
        for c in cs:
            out.add_edge(p, c)
    if UNIT_WINDOW not in out.edges:
        out.add_window(UNIT_WINDOW, factor=True)
    return out
