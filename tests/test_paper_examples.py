"""End-to-end reproduction of every worked example in the paper:
Examples 3–9, Tables 3 and 4, and the Figure 2/3/4 phone scenario."""
from repro.bench.cases import (
    TABLE3_EXPECTED,
    TABLE3_RAW,
    TABLE4_EXPECTED,
    TABLE4_RAW,
)
from repro.bench.simulate import simulate_clx
from repro.core.align import align, validate
from repro.core.cluster import STRATEGIES, build_hierarchy
from repro.core.explain import apply_replaces, explain_program
from repro.core.patterns import parse, pattern_of, render
from repro.core.synthesis import description_length, synthesize
from repro.core.tokens import tokenize
from repro.core.unifi import ConstStr, Extract


class TestExample3:
    def test_tokenization(self):
        got = [t.render() for t in tokenize("Bob123@gmail.com")]
        assert got == ["<U>1", "<L>2", "<D>3", "'@'", "<L>5", "'.'", "<L>3"]


class TestExample4Figure6:
    def test_hierarchy_chain(self):
        p = pattern_of("Bob123@gmail.com")
        chain = [render(p)]
        for s in STRATEGIES:
            p = s(p)
            chain.append(render(p))
        assert chain == [
            "<U>1<L>2<D>3'@'<L>5'.'<L>3",
            "<U>+<L>+<D>+'@'<L>+'.'<L>+",
            "<A>+<D>+'@'<A>+'.'<A>+",
            "<AN>+'@'<AN>+'.'<AN>+",
        ]


class TestExample5Table3:
    """BlinkFill 'Example 3': normalize CPT billing codes."""

    def test_clx_end_to_end(self):
        r = simulate_clx((TABLE3_RAW, TABLE3_EXPECTED))
        assert r.perfect
        assert r.outputs == TABLE3_EXPECTED

    def test_program_is_explainable(self):
        h = build_hierarchy(TABLE3_RAW)
        target = parse("'['<U>+'-'<D>+']'")
        prog = synthesize(h, target).program()
        ops = explain_program(prog)
        assert ops  # at least one Replace
        for s, want in zip(TABLE3_RAW, TABLE3_EXPECTED):
            got = apply_replaces(s, ops)
            if s != want:  # messy rows transformed by the Replace ops
                assert got == want or prog.transform(s)[0] == got


class TestExample6Table4:
    """FlashFill 'Example 9': normalize employee names."""

    def test_clx_end_to_end(self):
        r = simulate_clx((TABLE4_RAW, TABLE4_EXPECTED))
        assert r.perfect
        assert r.outputs == TABLE4_EXPECTED

    def test_single_target_selection(self):
        r = simulate_clx((TABLE4_RAW, TABLE4_EXPECTED))
        assert r.selections == 1
        assert r.targets == ["<U>+<L>+','' '<U>+'.'"]


class TestExample7:
    def test_validate_accept_and_reject(self):
        target = parse("'['<U>+'-'<D>+']'")
        assert validate(parse("'['<U>3'-'<D>5"), target)
        assert not validate(parse("'['<U>3'-'"), target)


class TestExample8Figure9:
    def test_alignment_edges(self):
        source = pattern_of("734.645.8397")
        target = pattern_of("(734) 645-8397")
        dag = align(target, source)
        assert ConstStr("(") in dag.edges[(0, 1)]
        assert Extract(1) in dag.edges[(1, 2)]
        assert Extract(3) in dag.edges[(1, 2)]
        assert Extract(5) in dag.edges[(6, 7)]


class TestExample9:
    def test_mdl_prefers_single_extract(self):
        e1 = (Extract(1, 3),)
        e2 = (Extract(1), ConstStr("/"), Extract(3))
        assert description_length(e1, 5) < description_length(e2, 5)

    def test_synthesis_picks_e1(self):
        source = parse("<D>2'/'<D>2'/'<D>4")
        target = parse("<D>2'/'<D>2")
        from repro.core.synthesis import enumerate_plans, rank_plans

        ranked = rank_plans(
            enumerate_plans(align(target, source)), source, top_k=5
        )
        assert ranked[0] == (Extract(1, 3),)


class TestMotivatingExampleFigures2to4:
    """The Section 2 phone-number scenario."""

    PHONES = [
        "(734) 645-8397",
        "(734)586-7252",
        "734-422-8073",
        "734.236.3466",
        "101-010-0001",
        "999.888.7777",
    ]

    def test_cluster_view(self):
        h = build_hierarchy(self.PHONES)
        assert len(h.leaves) == 4

    def test_transform_to_paren_format(self):
        """Figure 2: everything becomes (xxx) xxx-xxxx."""
        target = pattern_of("(734) 645-8397")
        h = build_hierarchy(self.PHONES)
        prog = synthesize(h, target).program()
        tgt_check = lambda s: pattern_of(s) == target  # noqa: E731
        for s in self.PHONES:
            if tgt_check(s):
                continue
            out, ok = prog.transform(s)
            assert ok and tgt_check(out), (s, out)

    def test_plus_one_phone_is_flagged_not_mangled(self):
        """§2: FlashFill silently mangled '+1 724-285-5210'; CLX flags
        unmatched inputs instead (§6.1)."""
        target = pattern_of("(734) 645-8397")
        h = build_hierarchy(self.PHONES)
        prog = synthesize(h, target).program()
        out, ok = prog.transform("+1 724-285-5210")
        assert not ok and out == "+1 724-285-5210"
