"""Tests for repro.core.synthesis — MDL ranking (§6.3, Example 9), plan
enumeration, dedup, and the Algorithm 2 driver."""
import pytest

from repro.core.align import align
from repro.core.cluster import build_hierarchy
from repro.core.patterns import matches, parse, pattern_of, render
from repro.core.synthesis import (
    SynthesisResult,
    description_length,
    enumerate_plans,
    is_target_like,
    rank_plans,
    synthesize,
)
from repro.core.unifi import ConstStr, Extract


class TestDescriptionLength:
    def test_paper_example_9_ordering(self):
        """E1 = Concat(Extract(1,3)) beats
        E2 = Concat(Extract(1), ConstStr('/'), Extract(3))."""
        n_src = 5  # <D>2 '/' <D>2 '/' <D>4
        e1 = (Extract(1, 3),)
        e2 = (Extract(1), ConstStr("/"), Extract(3))
        assert description_length(e1, n_src) < description_length(e2, n_src)

    def test_fewer_ops_cheaper(self):
        assert description_length((Extract(1, 2),), 4) < description_length(
            (Extract(1), Extract(2)), 4
        )

    def test_const_cost_scales_with_length(self):
        assert description_length((ConstStr("ab"),), 4) > description_length(
            (ConstStr("a"),), 4
        )

    def test_extract_cost_scales_with_source_size(self):
        assert description_length((Extract(1),), 16) > description_length(
            (Extract(1),), 4
        )


class TestEnumerate:
    def test_returns_dl_sorted(self):
        source = pattern_of("734.645.8397")
        target = pattern_of("(734) 645-8397")
        plans = enumerate_plans(align(target, source), cap=50)
        dls = [description_length(p, 5) for p in plans]
        assert dls == sorted(dls)

    def test_cap_respected(self):
        source = pattern_of("111.222.333.444")
        target = pattern_of("111.222.333.444")
        plans = enumerate_plans(align(target, source), cap=17)
        assert len(plans) <= 17

    def test_empty_when_no_path(self):
        dag = align(parse("<L>3"), parse("<D>3"))
        assert enumerate_plans(dag) == []


class TestRankPlans:
    def test_dedups_equivalents(self):
        source = parse("<D>2'/'<D>2")
        target = parse("<D>2'/'<D>2")
        plans = enumerate_plans(align(target, source), cap=100)
        ranked = rank_plans(plans, source, top_k=50)
        # Extract(1,3) survives; Extract(1),Extract(2),Extract(3) and
        # Extract(1),Const('/'),Extract(3) are equivalent duplicates.
        assert ranked[0] == (Extract(1, 3),)
        for a in ranked:
            for b in ranked:
                if a is not b:
                    from repro.core.unifi import plans_equivalent

                    assert not plans_equivalent(a, b, source)

    def test_monotonic_default_for_separator_swap(self):
        """Changing separators must not swap the fields (tie-break)."""
        source = pattern_of("02.11.2017")
        target = pattern_of("02/11/2017")
        ranked = rank_plans(
            enumerate_plans(align(target, source)), source, top_k=5
        )
        assert ranked[0] == (
            Extract(1),
            ConstStr("/"),
            Extract(3),
            ConstStr("/"),
            Extract(5),
        )

    def test_top_k_limit(self):
        source = pattern_of("(734) 645-8397")
        target = pattern_of("734-645-8397")
        ranked = rank_plans(
            enumerate_plans(align(target, source)), source, top_k=3
        )
        assert len(ranked) <= 3


class TestSynthesize:
    PHONES = [
        "734-645-8397",
        "101-010-0001",
        "(734) 645-8397",
        "(123) 456-7890",
        "734.236.3466",
        "111.222.3333",
    ]

    def _result(self) -> SynthesisResult:
        h = build_hierarchy(self.PHONES)
        return synthesize(h, pattern_of("734-645-8397"))

    def test_one_solution_per_messy_shape(self):
        res = self._result()
        assert len(res.solutions) == 2
        srcs = {render(s.source) for s in res.solutions}
        assert "'('<D>3')'' '<D>3'-'<D>4" in srcs
        assert "<D>3'.'<D>3'.'<D>4" in srcs

    def test_target_cluster_not_transformed(self):
        res = self._result()
        assert all(
            render(s.source) != "<D>3'-'<D>3'-'<D>4" for s in res.solutions
        )

    def test_dot_format_default_correct(self):
        res = self._result()
        prog = res.program()
        out, ok = prog.transform("555.123.4567")
        assert ok and out == "555-123-4567"

    def test_program_output_matches_target_pattern(self):
        res = self._result()
        prog = res.program()
        target = pattern_of("734-645-8397")
        for s in ["(900) 111-2222", "900.111.2222"]:
            out, ok = prog.transform(s)
            assert ok and matches(target, out)

    def test_every_solution_has_plans(self):
        for sol in self._result().solutions:
            assert sol.plans
            assert sol.default_plan == sol.plans[0]

    def test_generalized_target_claims_level1(self):
        """A '+'-level target lets one branch cover many leaf shapes."""
        names = ["John Smith", "Al Wu", "Mary Jones", "Bo Li", "Smith, J."]
        h = build_hierarchy(names)
        target = parse("<U>+<L>+','' '<U>+'.'")
        res = synthesize(h, target)
        srcs = [render(s.source) for s in res.solutions]
        assert "<U>+<L>+' '<U>+<L>+" in srcs  # one level-1 source

    def test_never_claims_alpha_levels(self):
        names = ["John Smith", "Al Wu", "Smith, J."]
        h = build_hierarchy(names)
        res = synthesize(h, parse("<U>+<L>+','' '<U>+'.'"))
        for sol in res.solutions:
            assert all(
                t.is_literal or t.cls in ("D", "L", "U") for t in sol.source
            )


class TestIsTargetLike:
    def test_exact(self):
        t = pattern_of("12-34")
        assert is_target_like(t, t)

    def test_level1_alias(self):
        t = pattern_of("12-34")
        assert is_target_like(parse("<D>+'-'<D>+"), t)

    def test_level3_alias(self):
        t = pattern_of("12-34")
        assert is_target_like(parse("<AN>+"), t)

    def test_non_alias(self):
        t = pattern_of("12-34")
        assert not is_target_like(parse("<D>+'.'<D>+"), t)
