"""Tests for repro.core.tokens — token classes and the tokenizer (§4.1,
Table 2)."""
import pytest
from hypothesis import given, strategies as st

from repro.core.tokens import (
    A,
    AN,
    BASE_CLASSES,
    CLASS_INFO,
    D,
    L,
    LIT,
    SUBSUMES,
    Token,
    U,
    lit,
    tok,
    token_text,
    tokenize,
)


class TestTable2:
    """Table 2 of the paper: the five token classes and their regexes."""

    def test_classes_present(self):
        assert set(BASE_CLASSES) == {D, L, U, A, AN}

    def test_digit_regex(self):
        assert CLASS_INFO[D][0] == "[0-9]"

    def test_lower_regex(self):
        assert CLASS_INFO[L][0] == "[a-z]"

    def test_upper_regex(self):
        assert CLASS_INFO[U][0] == "[A-Z]"

    def test_alpha_regex(self):
        assert CLASS_INFO[A][0] == "[a-zA-Z]"

    def test_alnum_regex_includes_dash_underscore(self):
        # DESIGN.md §6: strategy 3 folds - and _ into <AN>.
        assert CLASS_INFO[AN][0] == "[a-zA-Z0-9_-]"

    def test_display_names(self):
        assert CLASS_INFO[D][1] == "digit"
        assert CLASS_INFO[L][1] == "lower"
        assert CLASS_INFO[U][1] == "upper"

    def test_subsumption(self):
        assert SUBSUMES[A] == {A, L, U}
        assert D in SUBSUMES[AN] and L in SUBSUMES[AN]


class TestToken:
    def test_literal_requires_value(self):
        with pytest.raises(ValueError):
            Token(LIT, 1, None)

    def test_unknown_class_rejected(self):
        with pytest.raises(ValueError):
            Token("X", 1)

    def test_bad_quantifier_rejected(self):
        with pytest.raises(ValueError):
            Token(D, 0)
        with pytest.raises(ValueError):
            Token(D, "*")

    def test_render_numeric(self):
        assert tok(D, 3).render() == "<D>3"

    def test_render_plus(self):
        assert tok(L, "+").render() == "<L>+"

    def test_render_literal(self):
        assert lit("@").render() == "'@'"

    def test_render_natural(self):
        assert tok(D, 3).render_natural() == "{digit}3"
        assert tok(L, "+").render_natural() == "{lower}+"

    def test_tokens_hashable_and_equal(self):
        assert tok(D, 3) == tok(D, 3)
        assert len({tok(D, 3), tok(D, 3), lit("-")}) == 2


class TestTokenize:
    def test_paper_example_3(self):
        """Example 3: 'Bob123@gmail.com'."""
        got = [t.render() for t in tokenize("Bob123@gmail.com")]
        assert got == ["<U>1", "<L>2", "<D>3", "'@'", "<L>5", "'.'", "<L>3"]

    def test_empty_string(self):
        assert tokenize("") == ()

    def test_single_char_classes(self):
        assert tokenize("7") == (tok(D, 1),)
        assert tokenize("a") == (tok(L, 1),)
        assert tokenize("Z") == (tok(U, 1),)

    def test_each_symbol_is_individual_literal(self):
        got = tokenize("--")
        assert got == (lit("-"), lit("-"))

    def test_most_precise_class(self):
        # "cat" is lower, never alpha/alphanumeric (§4.1 rule 2).
        (t,) = tokenize("cat")
        assert t.cls == L and t.quant == 3

    def test_mixed_case_splits(self):
        got = [t.render() for t in tokenize("McMillan")]
        assert got == ["<U>1", "<L>1", "<U>1", "<L>5"]

    def test_phone(self):
        got = [t.render() for t in tokenize("(734) 645-8397")]
        assert got == [
            "'('", "<D>3", "')'", "' '", "<D>3", "'-'", "<D>4",
        ]

    def test_quantifiers_are_natural_numbers(self):
        assert all(
            isinstance(t.quant, int) or t.is_literal
            for t in tokenize("ab12CD-x")
        )

    def test_unicode_symbols_are_literals(self):
        toks = tokenize("a€b")
        assert toks[1].is_literal and toks[1].value == "€"


class TestTokenText:
    def test_spans_cover_string(self):
        s = "Bob123@gmail.com"
        spans = token_text(s, tokenize(s))
        assert "".join(spans) == s
        assert spans[0] == "B" and spans[2] == "123" and spans[3] == "@"

    def test_mismatched_tokens_raise(self):
        with pytest.raises(ValueError):
            token_text("abc", tokenize("abcd"))

    @given(st.text(min_size=0, max_size=40))
    def test_roundtrip_any_string(self, s):
        """Tokenization is a lossless partition of the string."""
        spans = token_text(s, tokenize(s))
        assert "".join(spans) == s

    @given(st.text(min_size=1, max_size=40))
    def test_token_runs_are_maximal(self, s):
        """Adjacent base tokens never share a class (runs are maximal)."""
        toks = tokenize(s)
        for a, b in zip(toks, toks[1:]):
            if not a.is_literal and not b.is_literal:
                assert a.cls != b.cls
