"""The UniFi DSL (paper §5, Figure 7) and its evaluator.

::

    Program    L := Switch((b1, E1), ..., (bn, En))
    Predicate  b := Match(s, p)
    Expression E := Concat(f1, ..., fn)
    String expr f := ConstStr(s~) | Extract(i, j)

``Extract(i, j)`` extracts the text of source-pattern tokens ``i..j``
(1-based, inclusive); ``Extract(i)`` is short for ``Extract(i, i)``.
Evaluation aligns the input string's tokens to the (possibly
generalized) source pattern via :func:`repro.core.patterns.align_spans`,
so a plan synthesized for a level-1 pattern (``+`` quantifiers) applies
to every leaf under it.

Strings matching no branch are left unchanged and flagged (§6.1).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional, Sequence, Tuple, Union

from .patterns import Pattern, align_spans, render


@dataclass(frozen=True)
class ConstStr:
    """Emit the constant string ``s``."""

    s: str

    def render(self) -> str:
        return f"ConstStr({self.s!r})"


@dataclass(frozen=True)
class Extract:
    """Extract source tokens ``i..j`` (1-based, inclusive).

    ``Extract(i)`` is the paper's shorthand for ``Extract(i, i)``."""

    i: int
    j: int = 0

    def __post_init__(self) -> None:
        if self.j == 0:
            object.__setattr__(self, "j", self.i)
        if not (1 <= self.i <= self.j):
            raise ValueError(f"bad extract range ({self.i},{self.j})")

    def render(self) -> str:
        return f"Extract({self.i})" if self.i == self.j else f"Extract({self.i},{self.j})"


Op = Union[ConstStr, Extract]
Plan = Tuple[Op, ...]  # an atomic transformation plan (Concat of ops)


def render_plan(plan: Plan) -> str:
    return "Concat(" + ", ".join(op.render() for op in plan) + ")"


def apply_plan(plan: Plan, spans: Sequence[str]) -> str:
    """Run a plan over the per-token text spans of a matched string."""
    out = []
    for op in plan:
        if isinstance(op, ConstStr):
            out.append(op.s)
        else:
            if op.j > len(spans):
                raise IndexError(
                    f"{op.render()} out of range for {len(spans)} tokens"
                )
            out.append("".join(spans[op.i - 1 : op.j]))
    return "".join(out)


@dataclass(frozen=True)
class Branch:
    """One ``(Match(p), E)`` component of the Switch."""

    source: Pattern
    plan: Plan

    def render(self) -> str:
        return f"(Match({render(self.source)}), {render_plan(self.plan)})"


@dataclass(frozen=True)
class Program:
    """A full UniFi program: first matching branch wins."""

    branches: Tuple[Branch, ...]

    def render(self) -> str:
        inner = ",\n  ".join(b.render() for b in self.branches)
        return f"Switch(\n  {inner}\n)"

    def transform(self, s: str) -> Tuple[str, bool]:
        """Transform one string.

        Returns ``(output, matched)``; unmatched strings come back
        unchanged with ``matched=False`` (flagged for review, §6.1).
        """
        for b in self.branches:
            spans = align_spans(b.source, s)
            if spans is not None:
                return apply_plan(b.plan, spans), True
        return s, False

    def transform_all(self, strings: Sequence[str]) -> List[Tuple[str, bool]]:
        return [self.transform(s) for s in strings]


def canonicalize_plan(plan: Plan) -> Plan:
    """Merge adjacent ConstStr ops (``Concat`` is associative, so
    ``ConstStr(',') ConstStr(' ')`` ≡ ``ConstStr(', ')``) and adjacent
    extracts of consecutive source tokens. Gives every plan a single
    normal form, which both shrinks the ranked list and makes the MDL
    op-count honest."""
    out: List[Op] = []
    for op in plan:
        if out and isinstance(op, ConstStr) and isinstance(out[-1], ConstStr):
            out[-1] = ConstStr(out[-1].s + op.s)
        elif (
            out
            and isinstance(op, Extract)
            and isinstance(out[-1], Extract)
            and out[-1].j + 1 == op.i
        ):
            out[-1] = Extract(out[-1].i, op.j)
        else:
            out.append(op)
    return tuple(out)


def split_extracts(plan: Plan) -> Plan:
    """Split every ``Extract(m, n)`` into singleton extracts
    (Appendix B step 1)."""
    out: List[Op] = []
    for op in plan:
        if isinstance(op, Extract):
            out.extend(Extract(k, k) for k in range(op.i, op.j + 1))
        else:
            out.append(op)
    return tuple(out)


def plans_equivalent(
    p1: Plan, p2: Plan, source: Pattern
) -> bool:
    """Appendix B equivalence check.

    After singleton-splitting, the plans must have equal length and each
    op pair must be identical, or one an ``Extract`` of a *literal*
    source token whose constant value equals the other's ``ConstStr``
    content.
    """
    a, b = split_extracts(p1), split_extracts(p2)
    if len(a) != len(b):
        return False
    for op1, op2 in zip(a, b):
        if op1 == op2:
            continue
        if isinstance(op1, Extract) and isinstance(op2, ConstStr):
            ex, cs = op1, op2
        elif isinstance(op2, Extract) and isinstance(op1, ConstStr):
            ex, cs = op2, op1
        else:
            return False
        t = source[ex.i - 1]  # singleton extract
        if not (t.is_literal and t.value == cs.s):
            return False
    return True
