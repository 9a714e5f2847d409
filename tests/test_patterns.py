"""Tests for repro.core.patterns — rendering, regex compilation,
matching, and token-span alignment."""
import re

import pytest
from hypothesis import given, strategies as st

from repro.core.patterns import (
    align_spans,
    matches,
    parse,
    pattern_of,
    render,
    render_natural,
    to_regex,
)
from repro.core.cluster import (
    generalize_alnum,
    generalize_alpha,
    generalize_quantifier,
)
from repro.core.tokens import tokenize


class TestRenderParse:
    def test_render_phone(self):
        p = pattern_of("(734) 645-8397")
        assert render(p) == "'('<D>3')'' '<D>3'-'<D>4"

    def test_render_natural_phone(self):
        p = pattern_of("734-645-8397")
        assert render_natural(p) == "{digit}3'-'{digit}3'-'{digit}4"

    def test_parse_roundtrip_simple(self):
        p = pattern_of("Bob123@gmail.com")
        assert parse(render(p)) == p

    def test_parse_plus(self):
        p = parse("<D>+'-'<D>+")
        assert p[0].quant == "+" and p[1].value == "-"

    def test_parse_rejects_garbage(self):
        with pytest.raises(ValueError):
            parse("<Q>3")

    @given(st.text(min_size=1, max_size=25).filter(lambda s: "'" not in s))
    def test_parse_render_roundtrip_any(self, s):
        p = pattern_of(s)
        assert parse(render(p)) == p


class TestRegex:
    def test_leaf_regex_matches_own_string(self):
        for s in ["(734) 645-8397", "Bob123@gmail.com", "a-b_c.9"]:
            assert re.fullmatch(to_regex(pattern_of(s))[1:-1], s)

    def test_regex_escapes_metachars(self):
        p = pattern_of("a.b(c)")
        rx = to_regex(p)
        assert re.compile(rx).fullmatch("a.b(c)")
        assert not re.compile(rx).fullmatch("axb(c)")

    def test_plus_quantifier_regex(self):
        rx = to_regex(parse("<D>+'-'<D>+"))
        assert re.compile(rx).fullmatch("1-22")
        assert not re.compile(rx).fullmatch("-22")


class TestMatches:
    def test_leaf_pattern_matches_only_same_shape(self):
        p = pattern_of("734-645-8397")
        assert matches(p, "101-010-0001")
        assert not matches(p, "(734) 645-8397")
        assert not matches(p, "73-645-8397")

    def test_level1_matches_any_lengths(self):
        p = parse("<D>+'-'<D>+")
        assert matches(p, "1-2")
        assert matches(p, "123456-7")
        assert not matches(p, "1-2-3")

    def test_level2_alpha(self):
        p = generalize_alpha(generalize_quantifier(pattern_of("John")))
        assert render(p) == "<A>+"
        assert matches(p, "McMillan")
        assert matches(p, "john")
        assert not matches(p, "john7")

    def test_level3_alnum_includes_dash(self):
        p = generalize_alnum(
            generalize_alpha(generalize_quantifier(pattern_of("ab-12")))
        )
        assert render(p) == "<AN>+"
        assert matches(p, "x_1-y")
        assert not matches(p, "x 1")

    def test_empty_pattern_matches_empty_only(self):
        assert matches((), "")
        assert not matches((), "a")


class TestAlignSpans:
    def test_leaf_spans(self):
        p = pattern_of("(734) 645-8397")
        spans = align_spans(p, "(101) 010-0001")
        assert spans == ("(", "101", ")", " ", "010", "-", "0001")

    def test_generalized_spans(self):
        p = parse("<U>+<L>+' '<U>+<L>+")
        spans = align_spans(p, "John Smith")
        assert spans == ("J", "ohn", " ", "S", "mith")

    def test_alpha_consumes_camel_run(self):
        p = parse("<A>+','' '<A>+'.'")
        spans = align_spans(p, "McMillan, R.")
        assert spans == ("McMillan", ",", " ", "R", ".")

    def test_alnum_consumes_dash(self):
        p = parse("<AN>+'.'<AN>+")
        spans = align_spans(p, "a-1.b_2")
        assert spans == ("a-1", ".", "b_2")

    def test_multichar_literal(self):
        p = parse("'Dr''.'' '<U>1<L>+")
        spans = align_spans(p, "Dr. Smith")
        assert spans == ("Dr", ".", " ", "S", "mith")

    def test_literal_cannot_split_raw_token(self):
        # literal 'Dr' cannot match inside the token "Drew" (would split
        # the maximal <L> run).
        p = parse("'Dr'<L>+")
        assert align_spans(p, "Drew") is None

    def test_no_match_returns_none(self):
        p = pattern_of("123-456")
        assert align_spans(p, "123456") is None
        assert align_spans(p, "12-456") is None

    def test_quant_mismatch(self):
        assert align_spans(parse("<D>3"), "1234") is None

    @given(st.text(min_size=1, max_size=30))
    def test_own_pattern_always_aligns(self, s):
        spans = align_spans(pattern_of(s), s)
        assert spans is not None and "".join(spans) == s

    @given(st.text(min_size=1, max_size=30))
    def test_level1_always_aligns(self, s):
        p = generalize_quantifier(pattern_of(s))
        spans = align_spans(p, s)
        assert spans is not None and "".join(spans) == s

    @given(st.text(min_size=1, max_size=30))
    def test_level3_always_aligns(self, s):
        p = generalize_alnum(
            generalize_alpha(generalize_quantifier(pattern_of(s)))
        )
        spans = align_spans(p, s)
        assert spans is not None and "".join(spans) == s
