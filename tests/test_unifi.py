"""Tests for repro.core.unifi — the DSL, evaluator, canonicalization and
Appendix B plan equivalence."""
import pytest

from repro.core.patterns import parse, pattern_of
from repro.core.unifi import (
    Branch,
    ConstStr,
    Extract,
    Program,
    apply_plan,
    canonicalize_plan,
    plans_equivalent,
    render_plan,
    split_extracts,
)


class TestOps:
    def test_extract_validates_range(self):
        with pytest.raises(ValueError):
            Extract(3, 2)
        with pytest.raises(ValueError):
            Extract(0, 1)

    def test_render(self):
        assert Extract(1, 1).render() == "Extract(1)"
        assert Extract(1, 3).render() == "Extract(1,3)"
        assert ConstStr("-").render() == "ConstStr('-')"
        assert render_plan((Extract(1, 2), ConstStr("x"))) == (
            "Concat(Extract(1,2), ConstStr('x'))"
        )


class TestApplyPlan:
    SPANS = ("734", ".", "645", ".", "8397")

    def test_identity(self):
        assert apply_plan((Extract(1, 5),), self.SPANS) == "734.645.8397"

    def test_reformat(self):
        plan = (Extract(1), ConstStr("-"), Extract(3), ConstStr("-"), Extract(5))
        assert apply_plan(plan, self.SPANS) == "734-645-8397"

    def test_out_of_range_raises(self):
        with pytest.raises(IndexError):
            apply_plan((Extract(1, 6),), self.SPANS)

    def test_reorder(self):
        assert apply_plan((Extract(5), Extract(1)), self.SPANS) == "8397734"


class TestProgram:
    def _prog(self):
        src = pattern_of("734.645.8397")
        plan = (Extract(1), ConstStr("-"), Extract(3), ConstStr("-"), Extract(5))
        return Program((Branch(src, plan),))

    def test_transform_matching(self):
        out, ok = self._prog().transform("101.010.0001")
        assert ok and out == "101-010-0001"

    def test_unmatched_flagged_and_unchanged(self):
        out, ok = self._prog().transform("N/A")
        assert not ok and out == "N/A"

    def test_first_match_wins(self):
        src = pattern_of("12")
        p = Program(
            (Branch(src, (ConstStr("first"),)), Branch(src, (ConstStr("second"),)))
        )
        assert p.transform("99") == ("first", True)

    def test_generalized_branch(self):
        src = parse("<U>+<L>+' '<U>+<L>+")
        plan = (Extract(4, 5), ConstStr(", "), Extract(1), ConstStr("."))
        prog = Program((Branch(src, plan),))
        assert prog.transform("Eran Yahav") == ("Yahav, E.", True)
        assert prog.transform("Al Wu") == ("Wu, A.", True)

    def test_transform_all(self):
        got = self._prog().transform_all(["111.222.3333", "x"])
        assert got == [("111-222-3333", True), ("x", False)]


class TestCanonicalize:
    def test_merges_adjacent_conststr(self):
        plan = (ConstStr(","), ConstStr(" "), Extract(1))
        assert canonicalize_plan(plan) == (ConstStr(", "), Extract(1))

    def test_merges_adjacent_extracts(self):
        plan = (Extract(1), Extract(2), Extract(3, 4))
        assert canonicalize_plan(plan) == (Extract(1, 4),)

    def test_nonconsecutive_extracts_kept(self):
        plan = (Extract(1), Extract(3))
        assert canonicalize_plan(plan) == plan

    def test_idempotent(self):
        plan = (ConstStr("a"), ConstStr("b"), Extract(1), Extract(2))
        once = canonicalize_plan(plan)
        assert canonicalize_plan(once) == once


class TestAppendixB:
    """Plan-equivalence detection (Appendix B)."""

    def test_split_extracts(self):
        assert split_extracts((Extract(1, 3),)) == (
            Extract(1),
            Extract(2),
            Extract(3),
        )

    def test_paper_example_equivalent(self):
        # Source [<D>2,'/',<D>2]: Extract(3),Const('/'),Extract(1) is
        # equivalent to Extract(3),Extract(2),Extract(1).
        src = parse("<D>2'/'<D>2")
        p1 = (Extract(3), ConstStr("/"), Extract(1))
        p2 = (Extract(3), Extract(2), Extract(1))
        assert plans_equivalent(p1, p2, src)

    def test_different_lengths_not_equivalent(self):
        src = parse("<D>2'/'<D>2")
        assert not plans_equivalent((Extract(1),), (Extract(1), Extract(2)), src)

    def test_extract_of_base_token_not_equivalent_to_const(self):
        src = parse("<D>2'/'<D>2")
        assert not plans_equivalent(
            (Extract(1),), (ConstStr("12"),), src
        )

    def test_literal_extract_equivalent_to_matching_const(self):
        src = parse("<D>2'/'<D>2")
        assert plans_equivalent((Extract(2),), (ConstStr("/"),), src)
        assert not plans_equivalent((Extract(2),), (ConstStr("-"),), src)

    def test_merged_vs_split_equivalent(self):
        src = parse("<D>2'/'<D>2")
        assert plans_equivalent(
            (Extract(1, 3),), (Extract(1), Extract(2), Extract(3)), src
        )
