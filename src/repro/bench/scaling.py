"""The §7.2 verification-effort scaling study (Figures 11–12 analog).

The paper's study is a human experiment on the "Times Square Food &
Beverage Locations" phone column at three sizes — 10 records / 2
patterns, 100(4), 300(6) — measuring completion and *verification* time.
Figures are out of scope; we reproduce the underlying quantities with
the simulated users plus an explicit verification-cost model
(DESIGN.md §4):

- A **FlashFill** user must eyeball transformed records to find the next
  wrong one; per interaction round their verification cost is the number
  of records scanned until the first wrong record (the whole data set on
  the final, all-correct round) — exactly the "needle in a haystack"
  behaviour Figure 11c shows.
- A **CLX** user verifies at the pattern level: per interaction round
  the cost is the number of pattern clusters on screen.

Costs are unitless "records/patterns read"; the paper's claim is about
*growth* (×1.3 for CLX vs ×11.4 for FlashFill when data grows 30×),
which this model makes measurable.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Tuple

import numpy as np

from .. import synth_data as sd
from ..core.cluster import build_hierarchy
from .simulate import simulate_clx, simulate_flashfill
from ..baselines import flashfill as ff_mod


@dataclass
class ScalingPoint:
    """One (size, heterogeneity) test case's simulated costs."""

    label: str
    n: int
    n_patterns: int
    clx_interactions: int
    ff_interactions: int
    clx_verification_cost: int
    ff_verification_cost: int


def phone_task(n: int, n_formats: int, seed: int = 7) -> Tuple[List[str], List[str]]:
    """The §7.2 task: normalize phone numbers to ``<D>3-<D>3-<D>4``
    (format index 0). Returns row-aligned (inputs, expected)."""
    g = np.random.default_rng(seed)
    fmts = sd.PHONE_FORMATS[:n_formats]
    inputs, outputs = [], []
    for _ in range(n):
        row = {"a": sd.digits(g, 3), "b": sd.digits(g, 3), "c": sd.digits(g, 4)}
        fmt = fmts[int(g.integers(0, len(fmts)))]
        inputs.append(
            fmt.replace("A", row["a"]).replace("B", row["b"]).replace("C", row["c"])
        )
        outputs.append(f"{row['a']}-{row['b']}-{row['c']}")
    return inputs, outputs


def _ff_verification_cost(inputs: List[str], outputs: List[str]) -> Tuple[int, int]:
    """Replay the FlashFill example loop, accumulating the scan cost:
    records read up to (and including) the first wrong one each round."""
    examples = []
    given = set()
    current = list(inputs)
    cost = 0
    for _ in range(30):
        # scan for first wrong record
        wrong = None
        for k, (g, w) in enumerate(zip(current, outputs)):
            if g != w:
                wrong = k
                break
        cost += len(current) if wrong is None else wrong + 1
        if wrong is None:
            break
        if (inputs[wrong], outputs[wrong]) in given:
            break
        examples.append((inputs[wrong], outputs[wrong]))
        given.add(examples[-1])
        prog = ff_mod.learn(examples)
        current = [prog.apply(s) for s in inputs]
    return len(examples), cost


def run_point(label: str, n: int, n_formats: int, seed: int = 7) -> ScalingPoint:
    inputs, outputs = phone_task(n, n_formats, seed)
    h = build_hierarchy(inputs)
    n_patterns = len(h.leaves)

    clx = simulate_clx((inputs, outputs))
    # CLX verification: one read of the pattern list per interaction
    # (initial labeling + each repair) plus the final post-transform list.
    clx_rounds = 1 + clx.repairs + 1
    clx_cost = clx_rounds * n_patterns

    ff_examples, ff_cost = _ff_verification_cost(inputs, outputs)

    return ScalingPoint(
        label=label,
        n=n,
        n_patterns=n_patterns,
        clx_interactions=clx.selections + clx.repairs,
        ff_interactions=ff_examples,
        clx_verification_cost=clx_cost,
        ff_verification_cost=ff_cost,
    )


def run_study(seed: int = 7) -> List[ScalingPoint]:
    """The paper's three test cases: 10(2), 100(4), 300(6)."""
    return [
        run_point("10(2)", 10, 2, seed),
        run_point("100(4)", 100, 4, seed),
        run_point("300(6)", 300, 6, seed),
    ]


def growth_ratios(points: List[ScalingPoint]) -> dict:
    """The headline numbers: verification-cost growth from the smallest
    to the largest case (paper: CLX ×1.3, FlashFill ×11.4)."""
    base, last = points[0], points[-1]
    return {
        "clx_growth": round(
            last.clx_verification_cost / max(1, base.clx_verification_cost), 1
        ),
        "ff_growth": round(
            last.ff_verification_cost / max(1, base.ff_verification_cost), 1
        ),
    }
