"""Paned windows (Li et al., "No pane, no gain") — §5.1.

A paned window of ``W⟨r, s⟩`` slices each period of length ``s`` into
``m = s/g`` equal panes of length ``g = gcd(r, s)``. Partial aggregates
are computed per pane; each window firing combines the ``r/g`` panes
covering its range.
"""
from __future__ import annotations

import math

from repro.core.windows import Window


def pane_size(w: Window) -> int:
    """``g = gcd(r, s)`` — the pane length."""
    return math.gcd(w.r, w.s)


def panes_per_period(w: Window) -> int:
    """``m = s/g`` — number of panes per slide period."""
    return w.s // pane_size(w)


def panes_per_window(w: Window) -> int:
    """``r/g`` — panes combined by each firing's final aggregate."""
    return w.r // pane_size(w)


def slice_edges_per_period(w: Window) -> list[int]:
    """Pane end positions within one period ``(0, s]``: ``g, 2g, …, s``.

    An "edge" at position ``e`` means a slice boundary at every time
    ``k·s + e``; following [29]'s Definition 2 we record the *ends* of
    slices, so each period contributes exactly ``m`` edges.
    """
    g = pane_size(w)
    return list(range(g, w.s + 1, g))


def slices(w: Window) -> list[int]:
    """Slice lengths ``(g_1, …, g_m)``, all equal to ``g``."""
    return [pane_size(w)] * panes_per_period(w)
