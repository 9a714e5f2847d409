"""Program explanation (paper §5, "Program Explanation"): render a UniFi
program as regexp ``Replace(p, f)`` operations.

Two forms are produced:

- **display form** — natural-language-like regexp with *merged* capture
  groups (consecutive extracted tokens become one group), as shown to
  users in Figure 4;
- **executable form** — a standard regex with one capture group per
  source token and a ``$k``-style replacement, used to cross-check the
  UniFi evaluator against DuckDB's ``regexp_replace`` (the oracle tests)
  and Spark's ``regexp_replace``.
"""
from __future__ import annotations

import re
from dataclasses import dataclass
from typing import List, Tuple

from .patterns import Pattern, render_natural, to_regex, _token_regex
from .unifi import Branch, ConstStr, Extract, Program, split_extracts


@dataclass(frozen=True)
class ReplaceOp:
    """One ``Replace(pattern_regex, replacement)`` operation."""

    pattern_regex: str  # anchored regex with capture groups
    replacement: str  # backreference template using $1, $2, ...
    display: str  # human-readable one-liner (Figure 4 style)

    def _convert(self, ref_template: str) -> str:
        # protect the escaped dollar before rewriting $k references
        s = self.replacement.replace("$$", "\x00")
        s = re.sub(r"\$(\d+)", ref_template, s)
        return s.replace("\x00", "$")

    def to_python(self) -> Tuple[str, str]:
        """(regex, repl) usable with :func:`re.sub` (``\\g<k>`` refs)."""
        return self.pattern_regex, self._convert(r"\\g<\1>")

    def to_duckdb(self) -> Tuple[str, str]:
        """(regex, repl) usable with DuckDB ``regexp_replace`` (RE2
        ``\\k`` refs)."""
        return self.pattern_regex, self._convert(r"\\\1")


def _source_regex_grouped(source: Pattern) -> str:
    """Anchored regex for ``source`` with every token in its own group,
    so group ``k`` is source token ``k``."""
    return "^" + "".join(_token_regex(t, group=True) for t in source) + "$"


def explain_branch(branch: Branch) -> ReplaceOp:
    """Explain one Switch component as a Replace operation."""
    regex = _source_regex_grouped(branch.source)
    parts: List[str] = []
    for op in branch.plan:
        if isinstance(op, ConstStr):
            # Escape $ so constants can't be misread as backreferences.
            parts.append(op.s.replace("$", "$$"))
        else:
            parts.extend(f"${k}" for k in range(op.i, op.j + 1))
    replacement = "".join(parts)

    # Display form: natural-language regex, merged consecutive extracts.
    merged: List[str] = []
    for op in branch.plan:
        if isinstance(op, ConstStr):
            merged.append(op.s)
        else:
            merged.append("$[" + ",".join(
                branch.source[k - 1].render_natural()
                for k in range(op.i, op.j + 1)
            ) + "]")
    display = (
        f"Replace(/{render_natural(branch.source)}/ -> {''.join(merged)})"
    )
    return ReplaceOp(regex, replacement, display)


def explain_program(program: Program) -> List[ReplaceOp]:
    """Explain every Switch component (Figure 4)."""
    return [explain_branch(b) for b in program.branches]


def apply_replaces(s: str, ops: List[ReplaceOp]) -> str:
    """Apply the explained Replace ops like a regex engine would: first
    matching operation wins (mirrors Switch semantics). Used to prove
    the explanation is faithful to the UniFi evaluator."""
    for op in ops:
        rx, repl = op.to_python()
        if re.fullmatch(rx[1:-1], s):
            return re.sub(rx, repl, s)
    return s


def duckdb_case_sql(ops: List[ReplaceOp], col: str = "s", out: str = "out") -> str:
    """A DuckDB ``CASE`` expression equivalent to the Switch program —
    lets :func:`repro.oracle.assert_equivalent` validate Spark-side
    transformation results end-to-end."""
    whens = []
    for op in ops:
        rx, repl = op.to_duckdb()
        rx_sql = rx.replace("'", "''")
        repl_sql = repl.replace("'", "''")
        whens.append(
            f"WHEN regexp_matches({col}, '{rx_sql}') "
            f"THEN regexp_replace({col}, '{rx_sql}', '{repl_sql}')"
        )
    body = " ".join(whens)
    return f"CASE {body} ELSE {col} END AS {out}"
