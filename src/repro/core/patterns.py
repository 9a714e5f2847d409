"""Pattern algebra (paper §3.1, §4).

A *pattern* is a tuple of :class:`~repro.core.tokens.Token`. This module
provides rendering, regex compilation, full-string matching, and the
token-span alignment needed to execute plans against raw strings even
when the source pattern is generalized (``+`` quantifiers, ``A``/``AN``
classes).
"""
from __future__ import annotations

import re
from functools import lru_cache
from typing import Optional, Tuple

from .tokens import AN, CLASS_INFO, LIT, SUBSUMES, Token, tokenize

Pattern = Tuple[Token, ...]


def render(p: Pattern) -> str:
    """Compact paper notation, e.g. ``<D>3'-'<D>4``."""
    return "".join(t.render() for t in p)


def render_natural(p: Pattern) -> str:
    """Wrangler-style rendering shown to users, e.g. ``{digit}3'-'{digit}4``."""
    return "".join(t.render_natural() for t in p)


def _token_regex(t: Token, *, group: bool = False) -> str:
    if t.is_literal:
        body = re.escape(t.value)
    else:
        cc = CLASS_INFO[t.cls][0]
        q = "+" if t.quant == "+" else (f"{{{t.quant}}}" if t.quant != 1 else "")
        body = cc + q
    return f"({body})" if group else body


def to_regex(p: Pattern, *, anchored: bool = True) -> str:
    """Compile a pattern to a plain regular expression string.

    Consecutive generalized tokens of the same class with ``+``
    quantifiers never occur (the hierarchy merges them), so greedy
    matching is unambiguous at token boundaries for tokenizer-produced
    strings.
    """
    body = "".join(_token_regex(t) for t in p)
    return f"^{body}$" if anchored else body


@lru_cache(maxsize=4096)
def _compiled(p: Pattern) -> "re.Pattern[str]":
    return re.compile(to_regex(p))


def matches(p: Pattern, s: str) -> bool:
    """Full-string match of ``s`` against pattern ``p``."""
    if align_spans(p, s) is not None:
        return True
    # Fall back to the regex for patterns whose token classes overlap in
    # ways the greedy span aligner cannot split (not produced by our
    # hierarchy, but kept for safety with hand-written patterns).
    return _compiled(p).fullmatch(s) is not None


def align_spans(p: Pattern, s: str) -> Optional[Tuple[str, ...]]:
    """Map each pattern token of ``p`` to its text span in ``s``.

    Returns one string per token of ``p`` (concatenated = ``s``) or
    ``None`` if ``s`` does not match ``p``. Works for generalized
    patterns: an ``A+`` token consumes a maximal run of ``L``/``U``
    tokenizer tokens, ``AN+`` a maximal run of ``L/U/D/'-'/'_'`` tokens,
    and a pattern token with quantifier ``+`` consumes one whole
    tokenizer token. Maximality makes the alignment deterministic and
    mirrors how the hierarchy merged tokens in the first place.
    """
    raw = tokenize(s)
    spans = []
    pos = 0  # character position in s
    ri = 0  # index into raw tokens
    for t in p:
        if t.is_literal:
            end = pos + len(t.value)
            if s[pos:end] != t.value:
                return None
            # advance past however many raw tokens the literal covers
            consumed = 0
            while consumed < len(t.value) and ri < len(raw):
                rt = raw[ri]
                ln = len(rt.value) if rt.is_literal else int(rt.quant)
                if consumed + ln > len(t.value):
                    return None  # literal splits a raw token: no match
                consumed += ln
                ri += 1
            if consumed != len(t.value):
                return None
            spans.append(t.value)
            pos = end
            continue
        allowed = SUBSUMES[t.cls]
        # Consume at least one raw token of an allowed class; for
        # precise classes (D/L/U) exactly one raw token exists per run,
        # for A/AN consume the maximal run. '-' and '_' literals are
        # folded into AN (strategy 3).
        def _ok(rt: Token) -> bool:
            if rt.is_literal:
                return t.cls == AN and rt.value in ("-", "_")
            return rt.cls in allowed

        if ri >= len(raw) or not _ok(raw[ri]):
            return None
        start = pos
        count = 0  # characters consumed by this pattern token
        first = True
        while ri < len(raw) and _ok(raw[ri]):
            rt = raw[ri]
            ln = len(rt.value) if rt.is_literal else int(rt.quant)
            if t.cls in (AN,) or t.cls == "A":
                count += ln
                ri += 1
                first = False
                continue
            # precise class: consume exactly one run
            count += ln
            ri += 1
            break
        if count == 0:
            return None
        if t.quant != "+" and count != int(t.quant):
            return None
        spans.append(s[start : start + count])
        pos = start + count
    if ri != len(raw) or pos != len(s):
        return None
    return tuple(spans)


def pattern_of(s: str) -> Pattern:
    """The leaf (tokenizer-level) pattern of a string."""
    return tokenize(s)


def parse(text: str) -> Pattern:
    """Parse the compact notation back into a pattern — test convenience.

    Accepts e.g. ``<D>3'-'<D>+'x'`` (literal values may be multi-char,
    may not contain a quote).
    """
    out = []
    i = 0
    rx_base = re.compile(r"<(D|L|U|A|AN)>(\+|\d+)")
    rx_lit = re.compile(r"'([^']+)'")
    while i < len(text):
        m = rx_base.match(text, i)
        if m:
            q = "+" if m.group(2) == "+" else int(m.group(2))
            out.append(Token(m.group(1), q))
            i = m.end()
            continue
        m = rx_lit.match(text, i)
        if m:
            out.append(Token(LIT, 1, m.group(1)))
            i = m.end()
            continue
        raise ValueError(f"cannot parse pattern at {text[i:]!r}")
    return tuple(out)
