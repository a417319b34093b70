"""Rendering and shape analysis of experiment results.

``markdown_table`` prints one figure panel the way EXPERIMENTS.md
records it; ``geomean_ratios`` condenses a panel into per-technique
geometric-mean cost ratios versus BL — the quantity behind the paper's
qualitative claims ("SP improves over UP by more than 10×",
"WCG-FW exhibits performance similar to SP", …), which the shape tests
assert on.
"""
from __future__ import annotations

import math
from typing import Iterable

from repro.evalfw.harness import ExperimentRow
from repro.evalfw.techniques import TECHNIQUE_ORDER


def markdown_table(rows: list[ExperimentRow], title: str) -> str:
    """One panel as a GitHub-flavored markdown table of raw costs."""
    out = [f"**{title}**", ""]
    out.append("| set | windows | " + " | ".join(TECHNIQUE_ORDER) + " |")
    out.append("|---" * (len(TECHNIQUE_ORDER) + 2) + "|")
    for r in rows:
        wins = " ".join(f"⟨{w.r},{w.s}⟩" for w in r.windows)
        cells = " | ".join(str(r.costs[t]) for t in TECHNIQUE_ORDER)
        out.append(f"| {r.set_id} | {wins} | {cells} |")
    out.append("")
    out.append(
        "| geo-mean cost/BL | | "
        + " | ".join(f"{v:.4f}" for v in geomean_ratios(rows).values())
        + " |"
    )
    return "\n".join(out)


def geomean_ratios(rows: Iterable[ExperimentRow]) -> dict[str, float]:
    """Geometric mean of cost(technique)/cost(BL) over the window sets."""
    rows = list(rows)
    out: dict[str, float] = {}
    for t in TECHNIQUE_ORDER:
        logs = [math.log(r.costs[t] / r.costs["BL"]) for r in rows]
        out[t] = math.exp(sum(logs) / len(logs))
    return out


def win_rate(rows: Iterable[ExperimentRow], a: str, b: str) -> float:
    """Fraction of window sets where technique ``a`` costs ≤ ``b``."""
    rows = list(rows)
    return sum(1 for r in rows if r.costs[a] <= r.costs[b]) / len(rows)
