"""FlashFill-lite: a clean-room PBE string-transformation synthesizer.

Excel's FlashFill [Gulwani, POPL'11] is closed source, so the paper's
baseline is reproduced with a synthesizer that keeps the behaviours the
paper measures (DESIGN.md §4):

- learns from **input-output example pairs**;
- per example, enumerates *trace expressions* — every way to write the
  output as a concatenation of input-token extracts and constants
  (instance-level, content-grounded, so one example usually
  disambiguates positions the way real FlashFill's ranking does);
- supports **conditionals** as Switch branches keyed on the input's
  token pattern, generalizing to the ``+``-quantifier level when all
  examples of a branch agree (version-space intersection);
- applies the learned program to all rows; rows matching no branch are
  returned unchanged (this is the "functions unexpectedly on new input"
  failure mode of §2 — the sim then feeds another example).

The op vocabulary (``Extract``/``ConstStr``) and MDL ranking are shared
with the CLX core so the comparison is apples-to-apples.
"""
from __future__ import annotations

from collections import defaultdict
from dataclasses import dataclass
from typing import Dict, List, Optional, Sequence, Set, Tuple

from ..core.cluster import generalize_quantifier
from ..core.patterns import Pattern, align_spans, pattern_of
from ..core.synthesis import description_length
from ..core.tokens import token_text, tokenize
from ..core.unifi import ConstStr, Extract, Op, Plan, apply_plan

_MAX_TRACES = 4000


def _canonical(plan: Sequence[Op]) -> Plan:
    """Merge adjacent ConstStr ops so plans have one canonical form for
    set intersection."""
    out: List[Op] = []
    for op in plan:
        if isinstance(op, ConstStr) and out and isinstance(out[-1], ConstStr):
            out[-1] = ConstStr(out[-1].s + op.s)
        else:
            out.append(op)
    return tuple(out)


def enumerate_traces(inp: str, out: str, *, cap: int = _MAX_TRACES) -> Set[Plan]:
    """All trace expressions writing ``out`` from the tokens of ``inp``.

    DP over positions of ``out``: at each position either some
    contiguous input-token span whose text equals the next chunk of
    ``out`` is extracted, or one constant character is emitted.
    """
    toks = tokenize(inp)
    spans = token_text(inp, toks)
    n = len(spans)
    # Precompute concatenated span texts for every (i, j).
    span_text: Dict[Tuple[int, int], str] = {}
    for i in range(n):
        acc = ""
        for j in range(i, n):
            acc += spans[j]
            span_text[(i, j)] = acc

    m = len(out)
    partial: List[List[Plan]] = [[] for _ in range(m + 1)]
    partial[0] = [()]
    for k in range(m):
        if not partial[k]:
            continue
        # Extract moves
        for (i, j), text in span_text.items():
            if text and out.startswith(text, k):
                nxt = k + len(text)
                for pre in partial[k]:
                    if len(partial[nxt]) < cap:
                        partial[nxt].append(pre + (Extract(i + 1, j + 1),))
        # Constant move (single char; canonicalization merges runs)
        for pre in partial[k]:
            if len(partial[k + 1]) < cap:
                partial[k + 1].append(pre + (ConstStr(out[k]),))
    return {_canonical(p) for p in partial[m]}


@dataclass(frozen=True)
class FFBranch:
    """One conditional branch: applies ``plan`` to inputs matching
    ``pattern`` (leaf or ``+``-generalized)."""

    pattern: Pattern
    plan: Plan


@dataclass
class FFProgram:
    """Learned program: first branch whose pattern matches wins."""

    branches: List[FFBranch]

    def apply(self, s: str) -> str:
        for b in self.branches:
            spans = align_spans(b.pattern, s)
            if spans is not None:
                try:
                    return apply_plan(b.plan, spans)
                except IndexError:
                    continue
        return s


def _best(plans: Set[Plan], n_tokens: int) -> Optional[Plan]:
    if not plans:
        return None
    return min(
        plans,
        key=lambda pl: (
            description_length(pl, n_tokens),
            tuple(
                (0, op.i, op.j) if isinstance(op, Extract) else (1, op.s)
                for op in pl
            ),
        ),
    )


def learn(examples: Sequence[Tuple[str, str]]) -> FFProgram:
    """Synthesize a program consistent with all examples.

    Examples are grouped by the ``+``-generalized pattern of the input;
    trace sets are intersected within each group (version space). If a
    group's intersection is empty the group splits into leaf-pattern
    subgroups; a subgroup whose intersection is still empty yields no
    branch (the program will fail on those shapes and the simulated user
    observes failures).
    """
    groups: Dict[Pattern, List[Tuple[str, str]]] = defaultdict(list)
    for inp, out in examples:
        groups[generalize_quantifier(pattern_of(inp))].append((inp, out))

    branches: List[FFBranch] = []
    for gpat, exs in groups.items():
        traces = None
        for inp, out in exs:
            t = enumerate_traces(inp, out)
            traces = t if traces is None else (traces & t)
        n_tokens = len(gpat)
        best = _best(traces or set(), n_tokens)
        if best is not None:
            branches.append(FFBranch(gpat, best))
            continue
        # Fall back to leaf-level branches.
        leaf_groups: Dict[Pattern, List[Tuple[str, str]]] = defaultdict(list)
        for inp, out in exs:
            leaf_groups[pattern_of(inp)].append((inp, out))
        for lpat, lexs in leaf_groups.items():
            ltraces = None
            for inp, out in lexs:
                t = enumerate_traces(inp, out)
                ltraces = t if ltraces is None else (ltraces & t)
            lbest = _best(ltraces or set(), len(lpat))
            if lbest is not None:
                branches.append(FFBranch(lpat, lbest))
    # Leaf branches (more specific) first.
    branches.sort(key=lambda b: sum(1 for t in b.pattern if t.quant != "+"), reverse=True)
    return FFProgram(branches)
