"""RegexReplace baseline: Trifacta-style manual regexp replace (§7.1).

The paper simulates an expert user who writes a ``Replace`` with two
regular expressions (match pattern + replacement) for each ill-formatted
shape, iterating "until all data were in the correct format"; each
``Replace`` costs **2 Steps** (two regexps ≈ twice the effort of one
FlashFill example).

A competent regex author writes quantifier-generalized patterns
(``{digit}+``, not ``{digit}{3}``), so the simulated expert works per
ill-formatted *level-1 pattern* (natural-number quantifiers replaced by
``+``). For each such shape they write the correct replacement when one
exists in the (complete) plan space — the expert, unlike CLX, knows the
intent, so they pick the right plan, not the MDL default. Failing that:

1. **content-split**: regexes can match constant text CLX's token
   patterns abstract away (e.g. a ``picture`` keyword), so the expert
   may split a shape on the value of one token position and write one
   Replace per sub-group;
2. **per-record replaces**: a regex matching one exact value — always
   expressible, 2 Steps per record.

Records with identical inputs but different expected outputs are not
expressible with any set of replaces and remain as failures.
"""
from __future__ import annotations

from collections import defaultdict
from dataclasses import dataclass
from typing import Dict, List, Optional, Sequence, Tuple

from ..core.align import align
from ..core.cluster import generalize_quantifier
from ..core.patterns import Pattern, align_spans, pattern_of
from ..core.synthesis import enumerate_plans, rank_plans
from ..core.tokens import tokenize
from ..core.unifi import Plan, apply_plan


@dataclass
class RRResult:
    """Outcome of the RegexReplace simulation on one case."""

    n_replaces: int = 0
    failures: int = 0
    perfect: bool = True

    @property
    def steps(self) -> int:
        return 2 * self.n_replaces + self.failures


def _find_plan(
    source: Pattern, rows: Sequence[Tuple[str, str]], top_k: int
) -> Optional[Plan]:
    """The plan (if any) that reproduces the ground truth on every row of
    a shape — searched over the complete alignment plan space."""
    tpat = generalize_quantifier(pattern_of(rows[0][1]))
    if any(generalize_quantifier(pattern_of(o)) != tpat for _, o in rows):
        return None
    dag = align(tpat, source)
    # A regex replacement may contain arbitrary literal text, so any
    # target position whose text is constant across the group is also
    # writable as a constant — inject ConstStr edges for those (CLX's
    # Alg. 3 only does this for literal target tokens; the expert is
    # not so constrained).
    tspans = [align_spans(tpat, o) for _, o in rows]
    if all(sp is not None for sp in tspans):
        from ..core.unifi import ConstStr

        for i in range(len(tpat)):
            vals = {sp[i] for sp in tspans}
            if len(vals) == 1:
                c = ConstStr(next(iter(vals)))
                dag.edges.setdefault((i, i + 1), [])
                if c not in dag.edges[(i, i + 1)]:
                    dag.edges[(i, i + 1)].append(c)
    for plan in rank_plans(enumerate_plans(dag), source, top_k=top_k):
        ok = True
        for i, o in rows:
            spans = align_spans(source, i)
            if spans is None:
                ok = False
                break
            try:
                if apply_plan(plan, spans) != o:
                    ok = False
                    break
            except IndexError:
                ok = False
                break
        if ok:
            return plan
    return None


def simulate(
    inputs: Sequence[str],
    outputs: Sequence[str],
    target: Pattern | None = None,
    *,
    top_k: int = 50,
) -> RRResult:
    """Run the simulated RegexReplace expert on one case."""
    res = RRResult()
    clusters: Dict[Pattern, List[int]] = defaultdict(list)
    for idx, (i, o) in enumerate(zip(inputs, outputs)):
        if i == o:
            continue  # already in the correct format: nothing to write
        clusters[generalize_quantifier(pattern_of(i))].append(idx)

    for pat, idxs in clusters.items():
        rows = [(inputs[k], outputs[k]) for k in idxs]
        if _find_plan(pat, rows, top_k) is not None:
            res.n_replaces += 1
            continue
        # Content-split: partition the shape on one token position's
        # value (a keyword the regex can match literally) and write one
        # Replace per sub-group if every sub-group then admits a plan.
        if _content_split(pat, rows, top_k, res):
            continue
        # Per-record exact replaces; truly ambiguous rows (same input,
        # different outputs) cannot be expressed at all.
        by_input: Dict[str, set] = defaultdict(set)
        for i, o in rows:
            by_input[i].add(o)
        for i, outs in by_input.items():
            if len(outs) == 1:
                res.n_replaces += 1
            else:
                res.failures += sum(1 for j, _ in rows if j == i)
                res.perfect = False
    return res


def _content_split(
    pat: Pattern,
    rows: Sequence[Tuple[str, str]],
    top_k: int,
    res: RRResult,
    *,
    max_groups: int = 4,
) -> bool:
    """Try splitting one shape by the text of a single token position."""
    spans_per_row = []
    for i, _ in rows:
        sp = align_spans(pat, i)
        if sp is None:
            return False
        spans_per_row.append(sp)
    n_tok = len(pat)
    for pos in range(n_tok):
        groups: Dict[str, List[Tuple[str, str]]] = defaultdict(list)
        for (row, sp) in zip(rows, spans_per_row):
            groups[sp[pos]].append(row)
        if not (1 < len(groups) <= max_groups):
            continue
        plans = [_find_plan(pat, g, top_k) for g in groups.values()]
        if all(p is not None for p in plans):
            res.n_replaces += len(groups)
            return True
    return False
