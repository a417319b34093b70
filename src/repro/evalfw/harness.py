"""Experiment harness for Figures 11–15 (§5.3) as numeric tables.

Each figure plots, for ten seeded random window sets, the costs of the
five techniques. The paper's figures are log-scale bar charts of exactly
these numbers; here each figure becomes a list of result rows (one per
window set) that the jobs print and EXPERIMENTS.md records.

Aggregate-function choice follows footnote 5: general window sets use
MIN ("covered by" semantics), tumbling-only variants use SUM
("partitioned by").
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from repro.core.aggregates import get_aggregate
from repro.core.windows import Window
from repro.evalfw.techniques import TECHNIQUE_ORDER, TechniqueCosts, evaluate_techniques
from repro.workloads import generators as G

#: Unstated paper parameters, fixed here (DESIGN.md §5): Algorithm 5's
#: slide cap and range/slide-ratio cap.
S_MAX = 16
K_MAX = 8
N_SETS = 10  # window sets per experiment ("ten randomly-generated")
N_WINDOWS = 5  # the paper reports |W| = 5 (|W| = 10 "very similar")


@dataclass(frozen=True)
class ExperimentRow:
    """One window set's outcome within a figure."""

    set_id: int
    windows: tuple[Window, ...]
    eta: int
    tumbling: bool
    costs: TechniqueCosts


def _window_sets(
    gen: Callable[..., list[Window]], *, tumbling: bool, n: int = N_WINDOWS
) -> list[list[Window]]:
    return [
        gen(n=n, s_max=S_MAX, k_max=K_MAX, seed=seed, tumbling=tumbling)
        for seed in range(N_SETS)
    ]


def _graph_sets(*, tumbling: bool) -> list[list[Window]]:
    # Paper §5.2: base level 2 windows, 3 levels, +2 per level (2/4/6).
    return [
        G.random_graph_gen(
            levels=3, base=2, delta=2, s_max=S_MAX, k_max=K_MAX,
            seed=seed, tumbling=tumbling,
        )
        for seed in range(N_SETS)
    ]


def run_experiment(
    sets: list[list[Window]], *, eta: int, tumbling: bool
) -> list[ExperimentRow]:
    agg = get_aggregate("sum" if tumbling else "min")
    rows = []
    for i, ws in enumerate(sets):
        rows.append(
            ExperimentRow(
                set_id=i,
                windows=tuple(ws),
                eta=eta,
                tumbling=tumbling,
                costs=evaluate_techniques(ws, agg, eta),
            )
        )
    return rows


def figure11(etas: tuple[int, ...] = (1, 10, 100)) -> dict[int, list[ExperimentRow]]:
    """RandomGen, general windows, one panel per event rate η."""
    sets = _window_sets(G.random_gen, tumbling=False)
    return {eta: run_experiment(sets, eta=eta, tumbling=False) for eta in etas}


def figure12(etas: tuple[int, ...] = (1, 10, 100)) -> dict[int, list[ExperimentRow]]:
    """RandomGen, tumbling-only variant (partitioned-by semantics)."""
    sets = _window_sets(G.random_gen, tumbling=True)
    return {eta: run_experiment(sets, eta=eta, tumbling=True) for eta in etas}


def figure13(eta: int = 100) -> dict[str, list[ExperimentRow]]:
    """ChainGen: (a) general, (b) tumbling — both at η = 100."""
    return {
        "general": run_experiment(
            _window_sets(G.chain_gen, tumbling=False), eta=eta, tumbling=False
        ),
        "tumbling": run_experiment(
            _window_sets(G.chain_gen, tumbling=True), eta=eta, tumbling=True
        ),
    }


def figure14(eta: int = 100) -> dict[str, list[ExperimentRow]]:
    """StarGen: (a) general, (b) tumbling — both at η = 100."""
    return {
        "general": run_experiment(
            _window_sets(G.star_gen, tumbling=False), eta=eta, tumbling=False
        ),
        "tumbling": run_experiment(
            _window_sets(G.star_gen, tumbling=True), eta=eta, tumbling=True
        ),
    }


def figure15(eta: int = 100) -> dict[str, list[ExperimentRow]]:
    """RandomGraphGen (3 levels, 2/4/6 windows): general and tumbling."""
    return {
        "general": run_experiment(_graph_sets(tumbling=False), eta=eta, tumbling=False),
        "tumbling": run_experiment(_graph_sets(tumbling=True), eta=eta, tumbling=True),
    }


ALL_FIGURES = {
    "fig11": figure11,
    "fig12": figure12,
    "fig13": figure13,
    "fig14": figure14,
    "fig15": figure15,
}
