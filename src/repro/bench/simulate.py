"""Simulated users for the three systems (paper §7.4).

The paper cannot run 47 user studies, so it simulates Gulwani et al.'s
"lazy approach" user. We reproduce those simulations:

- **CLX**: the user selects target pattern(s) from the cluster hierarchy
  (each selection = 1 Step), then — for each source pattern whose
  *default* (MDL-minimal) atomic plan is wrong on its cluster — repairs
  by picking another plan from the ranked top-k list (1 Step per
  repaired source). Records left wrong at the end are added to the Step
  count as punishment.
- **FlashFill**: the user gives the first positive example on the first
  ill-formatted record, then iteratively an example for the first record
  the synthesized program still gets wrong. Steps = #examples + final
  #failures.
- **RegexReplace**: see :mod:`repro.baselines.regexreplace`; each
  Replace = 2 Steps, + final failures.

Target selection mimics the paper's prototype: candidates are hierarchy
nodes at levels 0–1 only (precise token classes — the paper's popl-13
discussion shows users selecting exactly such patterns), greedily chosen
to cover the expected outputs' patterns. Output shapes with no matching
input-side node cannot be selected — the paper's "missing representative
target pattern" failure mode.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence, Tuple

from ..baselines import flashfill, regexreplace
from ..core.cluster import ClusterNode, PatternHierarchy, build_hierarchy
from ..core.patterns import Pattern, matches, pattern_of, render
from ..core.synthesis import SynthesisResult, synthesize
from ..core.tokens import token_text, tokenize
from ..core.unifi import Plan, apply_plan
from .cases import Case

_MAX_FF_ROUNDS = 30


# ---------------------------------------------------------------------------
# CLX simulation.
# ---------------------------------------------------------------------------

@dataclass
class CLXResult:
    """Outcome of the CLX lazy-user simulation on one case."""

    selections: int = 0
    repairs: int = 0
    failures: int = 0
    perfect: bool = False
    #: per selected target: rendered pattern string
    targets: List[str] = field(default_factory=list)
    outputs: List[str] = field(default_factory=list)
    #: per selected target: (target pattern, post-repair SynthesisResult)
    programs: List[Tuple[Pattern, SynthesisResult]] = field(
        default_factory=list
    )

    @property
    def steps(self) -> int:
        return self.selections + self.repairs + self.failures


def choose_targets(
    hierarchy: PatternHierarchy, outputs: Sequence[str]
) -> Tuple[List[Pattern], List[int]]:
    """Greedy target-pattern selection from hierarchy levels 0–1.

    Returns ``(selected_patterns, uncovered_row_indices)``. Prefers the
    candidate covering the most still-uncovered outputs; ties go to the
    more specific (lower-level, then more tokens) pattern.
    """
    candidates: List[ClusterNode] = list(hierarchy.by_level.get(0, [])) + list(
        hierarchy.by_level.get(1, [])
    )
    uncovered = set(range(len(outputs)))
    chosen: List[Pattern] = []
    while uncovered:
        best, best_cov, best_key = None, (), None
        for node in candidates:
            cov = tuple(
                i for i in uncovered if matches(node.pattern, outputs[i])
            )
            if not cov:
                continue
            key = (len(cov), -node.level, len(node.pattern))
            if best_key is None or key > best_key:
                best, best_cov, best_key = node, cov, key
        if best is None:
            break
        chosen.append(best.pattern)
        uncovered.difference_update(best_cov)
    return chosen, sorted(uncovered)


def _plan_correct(
    plan: Plan, source: Pattern, rows: Sequence[Tuple[str, str]]
) -> bool:
    from ..core.patterns import align_spans

    for i, o in rows:
        spans = align_spans(source, i)
        if spans is None:
            return False
        try:
            if apply_plan(plan, spans) != o:
                return False
        except IndexError:
            return False
    return True


def simulate_clx(case_or_io, *, top_k: int = 10) -> CLXResult:
    """Run the lazy-approach CLX user on one case."""
    if isinstance(case_or_io, Case):
        inputs, outputs = list(case_or_io.inputs), list(case_or_io.outputs)
    else:
        inputs, outputs = [list(x) for x in case_or_io]
    res = CLXResult()
    hierarchy = build_hierarchy(inputs)
    targets, uncovered = choose_targets(hierarchy, outputs)
    res.selections = len(targets)
    res.targets = [render(t) for t in targets]

    final = list(inputs)  # start unchanged; branches overwrite
    for tgt in targets:
        # Rows whose expected output matches this target are this
        # target's responsibility (the human routes by intent).
        rows = [
            (i, k)
            for k, i in enumerate(inputs)
            if matches(tgt, outputs[k])
        ]
        if not rows:
            continue
        sub_inputs = [i for i, _ in rows]
        sub_h = build_hierarchy(sub_inputs)
        synth: SynthesisResult = synthesize(sub_h, tgt, top_k=top_k)
        for sol in synth.solutions:
            cluster_rows = [
                (inputs[k], outputs[k])
                for _, k in rows
                if matches(sol.source, inputs[k])
                and not matches(tgt, inputs[k])
            ]
            if not cluster_rows:
                continue
            if not _plan_correct(sol.default_plan, sol.source, cluster_rows):
                fixed = False
                for alt_idx in range(1, len(sol.plans)):
                    if _plan_correct(
                        sol.plans[alt_idx], sol.source, cluster_rows
                    ):
                        sol.chosen = alt_idx
                        res.repairs += 1
                        fixed = True
                        break
                if not fixed:
                    continue  # imperfect source: leave default, punished below
        res.programs.append((tgt, synth))
        prog = synth.program()
        for _, k in rows:
            if matches(tgt, inputs[k]):
                final[k] = inputs[k]
            else:
                out, ok = prog.transform(inputs[k])
                if ok:
                    final[k] = out
    res.outputs = final
    res.failures = sum(1 for k in range(len(inputs)) if final[k] != outputs[k])
    res.perfect = res.failures == 0
    return res


# ---------------------------------------------------------------------------
# FlashFill simulation.
# ---------------------------------------------------------------------------

@dataclass
class FFResult:
    examples: int = 0
    failures: int = 0
    perfect: bool = False
    outputs: List[str] = field(default_factory=list)

    @property
    def steps(self) -> int:
        return self.examples + self.failures


def simulate_flashfill(case_or_io) -> FFResult:
    """Iterative-example FlashFill user (paper §7.4 simulation)."""
    if isinstance(case_or_io, Case):
        inputs, outputs = list(case_or_io.inputs), list(case_or_io.outputs)
    else:
        inputs, outputs = [list(x) for x in case_or_io]
    res = FFResult()
    examples: List[Tuple[str, str]] = []
    given = set()

    def first_wrong(current: List[str]) -> Optional[int]:
        for k, (got, want) in enumerate(zip(current, outputs)):
            if got != want:
                return k
        return None

    current = list(inputs)
    for _ in range(_MAX_FF_ROUNDS):
        k = first_wrong(current)
        if k is None:
            break
        if (inputs[k], outputs[k]) in given:
            break  # example already provided and still wrong: stuck
        examples.append((inputs[k], outputs[k]))
        given.add((inputs[k], outputs[k]))
        prog = flashfill.learn(examples)
        current = [prog.apply(s) for s in inputs]
    res.examples = len(examples)
    res.outputs = current
    res.failures = sum(1 for g, w in zip(current, outputs) if g != w)
    res.perfect = res.failures == 0
    return res


# ---------------------------------------------------------------------------
# RegexReplace simulation + the combined sweep.
# ---------------------------------------------------------------------------

def simulate_regexreplace(case_or_io) -> regexreplace.RRResult:
    if isinstance(case_or_io, Case):
        inputs, outputs = list(case_or_io.inputs), list(case_or_io.outputs)
    else:
        inputs, outputs = [list(x) for x in case_or_io]
    # target pattern: of the most common expected-output shape (unused by
    # the per-pattern expert beyond bookkeeping).
    tgt = pattern_of(outputs[0])
    return regexreplace.simulate(inputs, outputs, tgt)


@dataclass
class CaseComparison:
    """All three systems on one case."""

    case: str
    clx: CLXResult
    ff: FFResult
    rr: regexreplace.RRResult


def run_all(cases: Sequence[Case]) -> List[CaseComparison]:
    return [
        CaseComparison(
            c.name,
            simulate_clx(c),
            simulate_flashfill(c),
            simulate_regexreplace(c),
        )
        for c in cases
    ]


def win_tie_lose(
    comparisons: Sequence[CaseComparison], other: str
) -> Tuple[int, int, int]:
    """Table 7 aggregation: (#CLX wins, #ties, #CLX loses) against
    ``other`` in {'ff', 'rr'} by total Steps (fewer wins)."""
    w = t = l = 0
    for c in comparisons:
        a = c.clx.steps
        b = c.ff.steps if other == "ff" else c.rr.steps
        if a < b:
            w += 1
        elif a == b:
            t += 1
        else:
            l += 1
    return w, t, l
