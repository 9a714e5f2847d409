"""Plan enumeration, MDL ranking, and the synthesis driver (paper §6.3,
Algorithm 2, Appendix B).

The paper's Eq. 4/5 and Example 9 disagree numerically (DESIGN.md §6);
we implement a consistent MDL that preserves the orderings the paper
relies on: fewer ops beat more ops, extracts beat constants.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence, Tuple

from .align import AlignmentDAG, align, validate
from .cluster import ClusterNode, PatternHierarchy
from .patterns import Pattern, render
from .unifi import (
    Branch,
    ConstStr,
    Extract,
    Op,
    Plan,
    Program,
    canonicalize_plan,
    plans_equivalent,
)

#: Number of distinct operation types in UniFi (Extract, ConstStr).
_N_OP_TYPES = 2
#: Printable-character alphabet size for ConstStr encoding (paper: 95).
_PRINTABLE = 95


def description_length(plan: Plan, n_source_tokens: int) -> float:
    """MDL of a plan: ``L(E) + L(T|E)`` (Eq. 3).

    ``L(E) = |E| * log2(#op types)``; per-op data cost is
    ``2*log2(n_src)`` for an Extract (two token indices) and
    ``|s|*log2(95)`` for a ConstStr.
    """
    model = len(plan) * math.log2(_N_OP_TYPES)
    data = 0.0
    for op in plan:
        if isinstance(op, Extract):
            data += 2 * math.log2(max(2, n_source_tokens))
        else:
            data += len(op.s) * math.log2(_PRINTABLE)
    return model + data


def _op_cost(op, n_source_tokens: int) -> float:
    base = math.log2(_N_OP_TYPES)
    if isinstance(op, Extract):
        return base + 2 * math.log2(max(2, n_source_tokens))
    return base + len(op.s) * math.log2(_PRINTABLE)


def enumerate_plans(dag: AlignmentDAG, *, cap: int = 400) -> List[Plan]:
    """The ``cap`` cheapest source-to-target paths of the DAG as plans,
    by description length (uniform-cost / K-shortest-path search).

    The path space can be exponential for dense alignments, so instead
    of materializing all paths we pop them best-first; the returned list
    is DL-sorted, and since ranking only ever shows the user the top-k
    (k << cap), the truncation is invisible unless a correct plan is
    costlier than ``cap`` alternatives — the same trade-off the paper's
    ranked-list UI makes."""
    import heapq

    n_src = dag.n_source
    out_edges: Dict[int, List[Tuple[int, object]]] = {}
    for (a, b), ops in dag.edges.items():
        for op in ops:
            out_edges.setdefault(a, []).append((b, op))

    results: List[Plan] = []
    visits: Dict[int, int] = {}
    counter = 0
    heap: List[Tuple[float, int, int, Plan]] = [(0.0, 0, 0, ())]
    while heap and len(results) < cap:
        cost, _, node, plan = heapq.heappop(heap)
        visits[node] = visits.get(node, 0) + 1
        if visits[node] > cap:
            continue
        if node == dag.n_target:
            results.append(plan)
            continue
        for b, op in out_edges.get(node, ()):
            counter += 1
            heapq.heappush(
                heap, (cost + _op_cost(op, n_src), counter, b, plan + (op,))
            )
    return results


def rank_plans(
    plans: Sequence[Plan], source: Pattern, *, top_k: int = 10
) -> List[Plan]:
    """Rank by MDL (stable) and de-duplicate equivalent plans keeping the
    simplest representative (Appendix B), returning the top ``k``."""
    ranked = sorted(
        {canonicalize_plan(pl) for pl in plans},
        key=lambda pl: (description_length(pl, len(source)), _plan_key(pl)),
    )
    kept: List[Plan] = []
    for pl in ranked:
        if any(plans_equivalent(pl, other, source) for other in kept):
            continue
        kept.append(pl)
        if len(kept) >= top_k:
            break
    return kept


def _plan_key(plan: Plan) -> Tuple:
    """Deterministic tie-break ordering for equal-MDL plans.

    Primary: fewer *inversions* — pairs of consecutive extracts that move
    backwards or reuse source tokens. Left-to-right consumption is the
    common shape of real transformations (separator swaps, trims), so
    this is the "good guess" heuristic behind the paper's observation
    that the default plan is right about half the time; genuine
    reorderings (swaps) still need a repair, as in the paper.
    Secondary: extracts before constants, then earlier source positions.
    """
    inversions = 0
    last_end = 0
    for op in plan:
        if isinstance(op, Extract):
            if op.i <= last_end:
                inversions += 1
            last_end = op.j
    key = [inversions]
    for op in plan:
        if isinstance(op, Extract):
            key.append((0, op.i, op.j))
        else:
            key.append((1, op.s))
    return tuple(key)


@dataclass
class SourceSolution:
    """Candidate plans for one source pattern."""

    source: Pattern
    plans: List[Plan]
    #: index into ``plans`` of the chosen plan (default 0 = MDL-min).
    chosen: int = 0

    @property
    def default_plan(self) -> Plan:
        return self.plans[self.chosen]


@dataclass
class SynthesisResult:
    """Output of Algorithm 2 plus the ranked alternatives per source."""

    target: Pattern
    solutions: List[SourceSolution] = field(default_factory=list)

    def program(self) -> Program:
        """The UniFi program from the currently chosen plans.

        Branches are ordered most-specific-first (leaf patterns before
        generalized ones) so Switch's first-match-wins is deterministic.
        """
        branches = [
            Branch(sol.source, sol.default_plan) for sol in self.solutions
        ]
        branches.sort(key=lambda b: -_specificity(b.source))
        return Program(tuple(branches))


def _specificity(p: Pattern) -> int:
    """Higher = more specific: numeric quantifiers and precise classes."""
    score = 0
    for t in p:
        if t.is_literal:
            score += 3
        elif t.quant != "+":
            score += 2
        elif t.cls in ("D", "L", "U"):
            score += 1
    return score


def _alias_chain(p: Pattern) -> List[Pattern]:
    from .cluster import STRATEGIES

    chain = [p]
    for s in STRATEGIES:
        chain.append(s(chain[-1]))
    return chain


def is_target_like(p: Pattern, target: Pattern) -> bool:
    """True if ``p`` denotes already-clean data w.r.t. ``target``: it is
    the target, a generalization-level alias of it, or a pattern whose
    generalization chain passes through the target (a leaf under a
    generalized target — every string it matches already matches the
    target). Such clusters need no branch."""
    return p in _alias_chain(target) or target in _alias_chain(p)


def synthesize(
    hierarchy: PatternHierarchy,
    target: Pattern,
    *,
    top_k: int = 30,
    plan_cap: int = 400,
) -> SynthesisResult:
    """Algorithm 2: traverse the hierarchy top-down; for each validated
    candidate source build the alignment DAG and keep its ranked plans;
    descend into children of rejected patterns.

    A node whose pattern is (an alias of) the target is skipped along
    with its entire subtree — those strings are already clean. A
    validated node claims its whole subtree *only if* alignment actually
    produced at least one plan; otherwise its children are tried
    (the validate heuristic is high-precision, not high-recall, §6.1).
    """
    result = SynthesisResult(target=target)
    queue: List[ClusterNode] = list(hierarchy.roots)
    while queue:
        node = queue.pop(0)
        p = node.pattern
        if is_target_like(p, target):
            if target in _alias_chain(p):
                # Node is at least as specific as the target: everything
                # it matches is already clean — skip the whole subtree.
                continue
            # Node is a generalization of the target: it may cover messy
            # leaves too, so descend.
            queue.extend(node.children)
            continue
        if node.level <= 1 and validate(p, target):
            # Levels 2–3 (<A>/<AN>) are "too general" (§6.1 reason 3):
            # always descend past them; only precise-class patterns
            # (levels 0–1) may claim their subtree.
            dag = align(target, p)
            plans = enumerate_plans(dag, cap=plan_cap)
            if plans:
                ranked = rank_plans(plans, p, top_k=top_k)
                result.solutions.append(SourceSolution(p, ranked))
                continue  # subtree claimed
        queue.extend(node.children)
    return result
