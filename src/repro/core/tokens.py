"""Token classes and the tokenizer (paper §4.1, Table 2).

A *token* is a maximal group of characters treated as a unit:

- **base tokens** — runs of a single character class. The tokenizer only
  ever emits the three *precise* classes ``D`` (``[0-9]``), ``L``
  (``[a-z]``) and ``U`` (``[A-Z]``); the generalized classes ``A``
  (``[a-zA-Z]``) and ``AN`` (``[a-zA-Z0-9_-]``, see DESIGN.md §6) appear
  only through hierarchy generalization (§4.2).
- **literal tokens** — each non-alphanumeric character is an individual
  literal token; constant-token discovery (cluster.py) may later replace
  a base token with a multi-character literal (e.g. ``'Dr.'`` — in
  practice per-token, so ``'Dr'`` + ``'.'``).

A token carries a quantifier: a natural number (tokenizer output) or
``'+'`` (hierarchy levels).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional, Tuple

# Token class names. LIT is the class of literal (constant-value) tokens.
D, L, U, A, AN, LIT = "D", "L", "U", "A", "AN", "LIT"

BASE_CLASSES = (D, L, U, A, AN)

#: Table 2 of the paper: class name -> (regex char class, display name).
CLASS_INFO = {
    D: ("[0-9]", "digit"),
    L: ("[a-z]", "lower"),
    U: ("[A-Z]", "upper"),
    A: ("[a-zA-Z]", "alpha"),
    # Strategy 3 folds '-' and '_' into <AN>, so the matching regex must
    # accept them (DESIGN.md §6) even though Table 2 lists [a-zA-Z0-9].
    AN: ("[a-zA-Z0-9_-]", "alphanum"),
}

#: Which precise classes each (possibly generalized) class subsumes.
SUBSUMES = {
    D: {D},
    L: {L},
    U: {U},
    A: {A, L, U},
    AN: {AN, A, L, U, D},
}


@dataclass(frozen=True)
class Token:
    """One token of a pattern.

    ``cls``: one of ``D L U A AN LIT``.
    ``quant``: ``int`` (natural number) or the string ``'+'``.
    ``value``: for ``LIT`` tokens, the constant text; ``None`` otherwise.
    """

    cls: str
    quant: object = 1  # int | "+"
    value: Optional[str] = None

    def __post_init__(self) -> None:
        if self.cls == LIT:
            if not self.value:
                raise ValueError("literal token requires a value")
        elif self.cls not in BASE_CLASSES:
            raise ValueError(f"unknown token class {self.cls!r}")
        if self.quant != "+" and (
            not isinstance(self.quant, int) or self.quant < 1
        ):
            raise ValueError(f"bad quantifier {self.quant!r}")

    @property
    def is_literal(self) -> bool:
        return self.cls == LIT

    def render(self) -> str:
        """Compact notation used throughout the paper: ``<D>3``, ``<L>+``,
        ``'@'``."""
        if self.is_literal:
            return f"'{self.value}'"
        q = "+" if self.quant == "+" else str(self.quant)
        return f"<{self.cls}>{q}"

    def render_natural(self) -> str:
        """Wrangler-style natural-language rendering (Figure 2):
        ``{digit}3``, ``{lower}+``, ``'@'``."""
        if self.is_literal:
            return f"'{self.value}'"
        q = "+" if self.quant == "+" else str(self.quant)
        return f"{{{CLASS_INFO[self.cls][1]}}}{q}"


def lit(value: str) -> Token:
    """Shorthand constructor for a literal token."""
    return Token(LIT, 1, value)


def tok(cls: str, quant=1) -> Token:
    """Shorthand constructor for a base token."""
    return Token(cls, quant)


def _char_class(ch: str) -> str:
    if "0" <= ch <= "9":
        return D
    if "a" <= ch <= "z":
        return L
    if "A" <= ch <= "Z":
        return U
    return LIT


def tokenize(s: str) -> Tuple[Token, ...]:
    """Tokenize a string per §4.1.

    Maximal runs of digits/lowercase/uppercase become base tokens with the
    most precise class and a numeric quantifier; every other character is
    an individual literal token.

    >>> [t.render() for t in tokenize("Bob123@gmail.com")]
    ["<U>1", "<L>2", "<D>3", "'@'", "<L>5", "'.'", "<L>3"]
    """
    out = []
    i, n = 0, len(s)
    while i < n:
        cls = _char_class(s[i])
        if cls == LIT:
            out.append(lit(s[i]))
            i += 1
            continue
        j = i + 1
        while j < n and _char_class(s[j]) == cls:
            j += 1
        out.append(Token(cls, j - i))
        i = j
    return tuple(out)


def token_text(s: str, tokens: Tuple[Token, ...]) -> Tuple[str, ...]:
    """Slice ``s`` into the text spans of its tokenizer output.

    ``tokens`` must be ``tokenize(s)`` (numeric quantifiers); used by the
    UniFi evaluator to read token contents.
    """
    spans = []
    pos = 0
    for t in tokens:
        ln = len(t.value) if t.is_literal else int(t.quant)
        spans.append(s[pos : pos + ln])
        pos += ln
    if pos != len(s):
        raise ValueError("tokens do not cover the string")
    return tuple(spans)
