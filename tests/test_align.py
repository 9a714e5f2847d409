"""Tests for repro.core.align — validate (Eq. 1–2) and the token
alignment DAG (Algorithm 3), including the paper's worked examples and
the soundness/completeness properties of Appendix A."""
from hypothesis import given, strategies as st

from repro.core.align import (
    align,
    demand,
    syntactically_similar,
    token_frequency,
    validate,
)
from repro.core.patterns import align_spans, matches, parse, pattern_of
from repro.core.synthesis import enumerate_plans
from repro.core.tokens import lit, tok
from repro.core.unifi import ConstStr, Extract, apply_plan


class TestTokenFrequency:
    def test_numeric_quantifiers_sum(self):
        p = parse("<D>3'-'<D>4")
        assert token_frequency("D", p) == 7

    def test_plus_counts_as_one(self):
        p = parse("<D>+'-'<D>3")
        assert token_frequency("D", p) == 4

    def test_literal_chars_count_to_supply(self):
        p = parse("'USA'' '<D>2")
        assert token_frequency("U", p) == 3
        assert token_frequency("D", p) == 2

    def test_demand_excludes_literals(self):
        p = parse("'+''1'' ''('<D>3')'")
        assert demand("D", p) == 3  # the constant '1' is ConstStr-able
        assert token_frequency("D", p) == 4  # but supplies a digit


class TestValidate:
    def test_paper_example_7_accept(self):
        """['[',<U>3,'-',<D>5] is a candidate for ['[',<U>+,'-',<D>+,']']."""
        target = parse("'['<U>+'-'<D>+']'")
        cand = parse("'['<U>3'-'<D>5")
        assert validate(cand, target)

    def test_paper_example_7_reject(self):
        """['[',<U>3,'-'] lacks digits entirely."""
        target = parse("'['<U>+'-'<D>+']'")
        assert not validate(parse("'['<U>3'-'"), target)

    def test_generalized_source_rejected_for_precise_target(self):
        # §6.1 reason 3: <AN>+ carries no class-exact base tokens.
        assert not validate(parse("<AN>+','<AN>+"), parse("<U>1<L>+':'<D>+"))

    def test_equal_counts_accept(self):
        assert validate(parse("<D>3"), parse("<D>3"))

    def test_constantified_source_still_validates(self):
        # 'USA' supplies 3 uppercase chars.
        assert validate(parse("<U>1<L>+' ''USA'"), parse("<U>1<L>+','<U>3"))


class TestSyntacticallySimilar:
    def test_same_class_same_quant(self):
        assert syntactically_similar(tok("D", 3), tok("D", 3))

    def test_same_class_diff_naturals(self):
        assert not syntactically_similar(tok("D", 3), tok("D", 4))

    def test_plus_matches_natural(self):
        assert syntactically_similar(tok("D", "+"), tok("D", 3))
        assert syntactically_similar(tok("D", 3), tok("D", "+"))

    def test_diff_class(self):
        assert not syntactically_similar(tok("D", 3), tok("L", 3))

    def test_literal_equal_value(self):
        assert syntactically_similar(lit("-"), lit("-"))
        assert not syntactically_similar(lit("-"), lit("."))

    def test_literal_target_vs_base_source(self):
        assert not syntactically_similar(lit("-"), tok("D", 1))

    def test_literal_source_into_base_target(self):
        # constantified 'www' fits an <L>+ or <L>3 slot
        assert syntactically_similar(tok("L", "+"), lit("www"))
        assert syntactically_similar(tok("L", 3), lit("www"))
        assert not syntactically_similar(tok("L", 4), lit("www"))
        assert not syntactically_similar(tok("D", "+"), lit("www"))

    def test_literal_source_with_dash_into_an(self):
        assert syntactically_similar(tok("AN", "+"), lit("a-b"))
        assert not syntactically_similar(tok("A", "+"), lit("a-b"))


class TestAlignDAG:
    def test_paper_example_8_figure_9(self):
        """Source [<D>3,'.',<D>3,'.',<D>4], target
        ['(',<D>3,')',' ',<D>3,'-',<D>4]."""
        source = pattern_of("734.645.8397")
        target = pattern_of("(734) 645-8397")
        dag = align(target, source)
        # '(' can only be ConstStr
        assert dag.edges[(0, 1)] == [ConstStr("(")]
        # the first <D>3 of the target matches source tokens 1 and 3
        assert set(dag.edges[(1, 2)]) == {Extract(1, 1), Extract(3, 3)}
        # <D>4 matches only source token 5
        assert Extract(5, 5) in dag.edges[(6, 7)]
        assert dag.has_path()

    def test_paper_example_9_sequential_extract(self):
        """Source <D>2/<D>2/<D>4, target <D>2/<D>2: Extract(1,3) must be
        discovered (it spans the literal '/')."""
        source = parse("<D>2'/'<D>2'/'<D>4")
        target = parse("<D>2'/'<D>2")
        dag = align(target, source)
        assert Extract(1, 3) in dag.edges[(0, 3)]

    def test_figure_10_combination(self):
        source = parse("<U>1<D>+")
        target = parse("<U>1<D>+")
        dag = align(target, source)
        assert Extract(1, 2) in dag.edges[(0, 2)]

    def test_no_path_when_unfillable(self):
        # target has an <L> token the source cannot provide
        dag = align(parse("<L>3"), parse("<D>3"))
        assert not dag.has_path()

    def test_literal_target_always_fillable(self):
        dag = align(parse("'-'"), parse("<D>3"))
        assert dag.edges[(0, 1)] == [ConstStr("-")]
        assert dag.has_path()

    def test_diagonal_runs_complete(self):
        """Every contiguous similar run appears as a combined extract."""
        source = pattern_of("12-34-56")
        target = pattern_of("12-34")
        dag = align(target, source)
        assert Extract(1, 3) in dag.edges[(0, 3)]
        assert Extract(3, 5) in dag.edges[(0, 3)]


class TestSoundness:
    """Appendix A soundness: every enumerated plan, applied to a string
    matching the source, yields a string matching the target pattern."""

    CASES = [
        ("734.645.8397", "(734) 645-8397"),
        ("[CPT-00350", "[CPT-00350]"),
        ("Dr. Eran Yahav", "Yahav, E."),
        ("12/11/2017", "2017-12-11"),
    ]

    def test_all_plans_sound(self):
        for src_s, tgt_s in self.CASES:
            source, target = pattern_of(src_s), pattern_of(tgt_s)
            dag = align(target, source)
            spans = align_spans(source, src_s)
            for plan in enumerate_plans(dag, cap=100):
                out = apply_plan(plan, spans)
                assert matches(target, out), (plan, out, tgt_s)

    def test_completeness_known_plan_found(self):
        """Appendix A completeness spot-check: the known-correct plan is
        among the enumerated ones."""
        source = pattern_of("734.645.8397")
        target = pattern_of("734-645-8397")
        dag = align(target, source)
        plans = enumerate_plans(dag, cap=200)
        want = (Extract(1), ConstStr("-"), Extract(3), ConstStr("-"), Extract(5))
        assert want in plans
