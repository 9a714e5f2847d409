"""Source-candidate validation (§6.1) and token alignment (§6.2, Alg. 3).

``validate`` prunes patterns that cannot possibly transform into the
target using the token-class frequency heuristic of Eq. 1–2. The
alignment DAG has nodes ``0..m`` (``m`` = #target tokens); an edge
``(a, b)`` carries an op that produces target tokens ``a+1..b``.
Sequential extracts are combined to a fixpoint, which (Appendix A) makes
the edge set complete: every UniFi plan for the pair is a path.
"""
from __future__ import annotations

from collections import defaultdict
from dataclasses import dataclass, field
from typing import Dict, List, Tuple

from .patterns import Pattern
from .tokens import BASE_CLASSES, Token
from .unifi import ConstStr, Extract, Op


def _char_cls(ch: str) -> str:
    if "0" <= ch <= "9":
        return "D"
    if "a" <= ch <= "z":
        return "L"
    if "A" <= ch <= "Z":
        return "U"
    return ""


def token_frequency(cls: str, p: Pattern) -> int:
    """Eq. 1: summed quantifiers of tokens of class ``cls`` (``+`` counts
    as 1).

    Constant-valued (literal) tokens contribute their characters to the
    corresponding base class: a pattern constantified to ``'USA'`` still
    carries three uppercase characters, and dropping them would make
    ``validate`` reject sources that are perfectly transformable (the
    constant-token discovery of §4.1 must not weaken Eq. 2)."""
    total = 0
    for t in p:
        if t.is_literal:
            total += sum(1 for ch in t.value if _char_cls(ch) == cls)
        elif t.cls == cls:
            total += 1 if t.quant == "+" else int(t.quant)
    return total


def demand(cls: str, p: Pattern) -> int:
    """Base-token-only frequency of the *target* side of Eq. 2.

    Literal target tokens are excluded: a ``ConstStr`` synthesizes them
    without source support (constant-token discovery must not inflate
    the demand — e.g. a constantified ``'1'`` in ``'+1 (xxx) ...'``)."""
    total = 0
    for t in p:
        if not t.is_literal and t.cls == cls:
            total += 1 if t.quant == "+" else int(t.quant)
    return total


def validate(source: Pattern, target: Pattern) -> bool:
    """Eq. 2: true iff for every base token class the source's supply is
    at least the target's demand. Class counting is exact-name, as in
    the paper — a pattern generalized to ``<A>``/``<AN>`` therefore
    fails against a precise target and synthesis descends to its
    children (§6.1 reason 3)."""
    return all(
        token_frequency(c, source) >= demand(c, target)
        for c in BASE_CLASSES
    )


def syntactically_similar(t_target: Token, t_source: Token) -> bool:
    """Definition 6.1, extended to literal tokens.

    Extensions beyond the paper's base-token definition (both required
    for the paper's own examples to work):

    - literal vs literal: similar iff the constant values are equal —
      Example 9's ``Extract(1,3)`` spans a ``/``;
    - literal *source* vs base *target*: similar iff the constant's text
      matches the target's class and quantifier — after constant-token
      discovery (§4.1) turns ``www`` into a literal, it must still be
      extractable into an ``<L>+`` slot.
    """
    if t_target.is_literal:
        return t_source.is_literal and t_target.value == t_source.value
    if t_source.is_literal:
        v = t_source.value

        def _fits(ch: str) -> bool:
            if t_target.cls == "AN" and ch in "-_":
                return True  # strategy 3 folds - and _ into <AN>
            return _char_cls(ch) in _SUBSUMED.get(t_target.cls, ())

        if not v or not all(_fits(ch) for ch in v):
            return False
        return t_target.quant == "+" or int(t_target.quant) == len(v)
    if t_target.cls != t_source.cls:
        return False
    if t_target.quant == t_source.quant:
        return True
    return t_target.quant == "+" or t_source.quant == "+"


#: Which precise char classes a (possibly generalized) target class accepts.
_SUBSUMED = {
    "D": {"D"},
    "L": {"L"},
    "U": {"U"},
    "A": {"L", "U"},
    "AN": {"L", "U", "D"},
}


@dataclass
class AlignmentDAG:
    """Result of Algorithm 3.

    ``edges[(a, b)]`` lists ops generating target tokens ``a+1..b``.
    ``n_target`` is the number of target tokens (final node id).
    """

    n_target: int
    n_source: int
    edges: Dict[Tuple[int, int], List[Op]] = field(default_factory=dict)

    def has_path(self) -> bool:
        reach = {0}
        frontier = [0]
        while frontier:
            a = frontier.pop()
            for (x, y) in self.edges:
                if x == a and y not in reach:
                    reach.add(y)
                    frontier.append(y)
        return self.n_target in reach


def align(target: Pattern, source: Pattern) -> AlignmentDAG:
    """Algorithm 3: build the token-alignment DAG.

    Lines 2–9: per-target-token matches (``Extract`` of any syntactically
    similar source token; ``ConstStr`` for literal targets). Lines 10–17
    generalized: combine extracts on adjacent edges whose source spans
    are consecutive, iterated to a fixpoint so extracts spanning any
    number of tokens are found (Appendix A's proof walks the same
    induction).
    """
    m, n = len(target), len(source)
    edges: Dict[Tuple[int, int], List[Op]] = defaultdict(list)

    # Pairwise similarity matrix (lines 2–9 of Alg. 3).
    sim = [
        [syntactically_similar(t, ts) for ts in source] for t in target
    ]
    for i, t in enumerate(target, start=1):
        for j in range(1, n + 1):
            if sim[i - 1][j - 1]:
                edges[(i - 1, i)].append(Extract(j, j))
        if t.is_literal:
            edges[(i - 1, i)].append(ConstStr(t.value))

    # Sequential-extract combination (lines 10–17, run to its closure).
    # Each pairwise combination step concatenates extracts that are
    # consecutive in BOTH the target positions and the source indices,
    # so the closure is exactly the set of diagonal runs of the
    # similarity matrix: Extract(j, j + k) on edge (i - 1, i + k) exists
    # iff sim[i - 1 + d][j - 1 + d] for d in 0..k. Computing runs
    # directly is equivalent to the paper's iterated combination
    # (Appendix A's induction walks the same diagonals) and avoids the
    # quadratic fixpoint loop.
    for i in range(1, m + 1):
        for j in range(1, n + 1):
            if not sim[i - 1][j - 1]:
                continue
            d = 1
            while i + d <= m and j + d <= n and sim[i - 1 + d][j - 1 + d]:
                edges[(i - 1, i + d)].append(Extract(j, j + d))
                d += 1
    return AlignmentDAG(n_target=m, n_source=n, edges=dict(edges))
