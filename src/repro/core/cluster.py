"""Pattern clustering and the pattern-cluster hierarchy (paper §4).

Phase 1 — *initial clustering through tokenization* (§4.1): every string
maps to its leaf pattern; strings sharing a pattern form a cluster.
Constant-valued tokens are then discovered per cluster: a base token
whose text is identical across every member of a sufficiently large
cluster is replaced by a literal token of that value (the ``'Dr.'``
example).

Phase 2 — *agglomerative refinement* (§4.2, Algorithm 1): three
generalization strategies applied bottom-up build a 4-level hierarchy

- level 0: leaf patterns (tokenizer output + constants),
- level 1: natural-number quantifiers -> ``+``,
- level 2: ``<L>``/``<U>`` -> ``<A>`` (adjacent same-class merged),
- level 3: ``<A>``/``<D>``/``'-'``/``'_'`` -> ``<AN>`` (adjacent merged).
"""
from __future__ import annotations

from collections import Counter, defaultdict
from dataclasses import dataclass, field
from typing import Callable, Dict, Iterable, List, Optional, Sequence, Tuple

from .patterns import Pattern, pattern_of, render
from .tokens import A, AN, D, L, LIT, Token, U, token_text, tokenize

Strategy = Callable[[Pattern], Pattern]


# ---------------------------------------------------------------------------
# Generalization strategies (§4.2). Each is a getParent(p, g) in Alg. 1.
# ---------------------------------------------------------------------------

def _merge_adjacent(toks: Iterable[Token]) -> Pattern:
    """Merge adjacent tokens of the same base class.

    Quantifiers add; any ``+`` absorbs (``+`` + n = ``+``). Literal
    tokens never merge.
    """
    out: List[Token] = []
    for t in toks:
        if out and not t.is_literal and not out[-1].is_literal and out[-1].cls == t.cls:
            prev = out.pop()
            q = "+" if "+" in (prev.quant, t.quant) else prev.quant + t.quant
            out.append(Token(t.cls, q))
        else:
            out.append(t)
    return tuple(out)


def generalize_quantifier(p: Pattern) -> Pattern:
    """Strategy 1: every natural-number quantifier becomes ``+``."""
    return _merge_adjacent(
        Token(t.cls, "+") if not t.is_literal else t for t in p
    )


def generalize_alpha(p: Pattern) -> Pattern:
    """Strategy 2: ``<L>``, ``<U>`` -> ``<A>`` (then merge adjacent)."""
    return _merge_adjacent(
        Token(A, t.quant) if (not t.is_literal and t.cls in (L, U)) else t
        for t in p
    )


def generalize_alnum(p: Pattern) -> Pattern:
    """Strategy 3: ``<A>``, ``<D>``, ``'-'``, ``'_'`` -> ``<AN>``."""
    return _merge_adjacent(
        Token(AN, "+")
        if (
            (not t.is_literal and t.cls in (A, D, L, U))
            or (t.is_literal and t.value in ("-", "_"))
        )
        else t
        for t in p
    )


STRATEGIES: Tuple[Strategy, ...] = (
    generalize_quantifier,
    generalize_alpha,
    generalize_alnum,
)


def refine(patterns: Sequence[Pattern], strategy: Strategy) -> Dict[Pattern, List[Pattern]]:
    """Algorithm 1: one refinement round.

    Maps every child pattern through ``strategy`` (lines 3–6), then keeps
    a greedy frequency-ranked cover of the parents (lines 7–10). Because
    ``strategy`` is a function, each child has exactly one parent, so the
    cover is all distinct parents; the ranking fixes iteration order as
    in the paper. Returns parent -> list of covered children.
    """
    raw: Dict[Pattern, List[Pattern]] = defaultdict(list)
    counts: Counter = Counter()
    for p in patterns:
        parent = strategy(p)
        raw[parent].append(p)
        counts[parent] += 1
    final: Dict[Pattern, List[Pattern]] = {}
    remaining = set(patterns)
    for parent, _ in counts.most_common():
        children = [c for c in raw[parent] if c in remaining]
        if not children:
            continue
        final[parent] = children
        remaining.difference_update(children)
    return final


# ---------------------------------------------------------------------------
# Constant-token discovery (§4.1).
# ---------------------------------------------------------------------------

def find_constants(
    strings: Sequence[str], *, min_support: int = 4
) -> Pattern:
    """Refine the shared leaf pattern of a cluster with constant tokens.

    ``strings`` must all share one leaf pattern. Any *base* token whose
    text is identical across all members of a cluster with at least
    ``min_support`` rows becomes a literal token of that value (cf. the
    paper's ``'Dr.'`` faculty-list example, which uses "statistics over
    tokenized strings"). All-equal within the cluster is required so the
    constantified pattern still matches every member.
    """
    if not strings:
        raise ValueError("empty cluster")
    p = tokenize(strings[0])
    if len(strings) < min_support:
        return p
    spans = [token_text(s, tokenize(s)) for s in strings]
    out: List[Token] = []
    for i, t in enumerate(p):
        if not t.is_literal:
            vals = {sp[i] for sp in spans}
            if len(vals) == 1:
                out.append(Token(LIT, 1, next(iter(vals))))
                continue
        out.append(t)
    return tuple(out)


# ---------------------------------------------------------------------------
# The hierarchy object.
# ---------------------------------------------------------------------------

@dataclass
class ClusterNode:
    """One node of the pattern-cluster hierarchy."""

    pattern: Pattern
    level: int  # 0 = leaf
    count: int = 0  # number of raw strings under this node
    children: List["ClusterNode"] = field(default_factory=list)
    examples: List[str] = field(default_factory=list)

    def render(self) -> str:
        return render(self.pattern)


@dataclass
class PatternHierarchy:
    """Pattern-cluster hierarchy (Figure 6): leaves from tokenization,
    three refinement rounds above them, plus a virtual root."""

    roots: List[ClusterNode]
    leaves: Dict[Pattern, ClusterNode]
    by_level: Dict[int, List[ClusterNode]]

    def leaf_counts(self) -> Dict[Pattern, int]:
        return {p: n.count for p, n in self.leaves.items()}

    def node_for(self, pattern: Pattern) -> Optional[ClusterNode]:
        for nodes in self.by_level.values():
            for n in nodes:
                if n.pattern == pattern:
                    return n
        return None

    def all_nodes(self) -> List[ClusterNode]:
        return [n for nodes in self.by_level.values() for n in nodes]


def build_hierarchy(
    strings: Sequence[str],
    *,
    const_min_support: int = 4,
    max_examples: int = 3,
) -> PatternHierarchy:
    """Cluster ``strings`` and build the full hierarchy (§4.1 + §4.2)."""
    clusters: Dict[Pattern, List[str]] = defaultdict(list)
    for s in strings:
        clusters[pattern_of(s)].append(s)

    # Constant discovery may merge nothing (patterns keyed identically);
    # two raw patterns cannot collide after constantification because the
    # token structure is preserved, only classes change to LIT.
    leaves: Dict[Pattern, ClusterNode] = {}
    for _, members in clusters.items():
        cp = find_constants(members, min_support=const_min_support)
        node = leaves.get(cp)
        if node is None:
            node = ClusterNode(cp, 0)
            leaves[cp] = node
        node.count += len(members)
        for m in members[:max_examples]:
            if len(node.examples) < max_examples:
                node.examples.append(m)

    by_level: Dict[int, List[ClusterNode]] = {0: list(leaves.values())}
    current = by_level[0]
    for lvl, strat in enumerate(STRATEGIES, start=1):
        mapping = refine([n.pattern for n in current], strat)
        nodes: List[ClusterNode] = []
        node_of = {n.pattern: n for n in current}
        for parent, kids in mapping.items():
            kid_nodes = [node_of[k] for k in kids]
            pn = ClusterNode(
                parent,
                lvl,
                count=sum(k.count for k in kid_nodes),
                children=kid_nodes,
            )
            for k in kid_nodes:
                if pn.examples.__len__() < max_examples and k.examples:
                    pn.examples.append(k.examples[0])
            nodes.append(pn)
        by_level[lvl] = nodes
        current = nodes

    return PatternHierarchy(roots=current, leaves=leaves, by_level=by_level)


def cluster_summary(strings: Sequence[str]) -> List[Tuple[str, int]]:
    """The Figure 3 view: (rendered leaf pattern, count), descending."""
    h = build_hierarchy(strings)
    rows = [(render(p), n.count) for p, n in h.leaves.items()]
    return sorted(rows, key=lambda r: (-r[1], r[0]))
