"""Tests for repro.core.cluster — initial clustering, constant-token
discovery, Algorithm 1 refinement, and the hierarchy (§4)."""
import pytest

from repro.core.cluster import (
    STRATEGIES,
    build_hierarchy,
    cluster_summary,
    find_constants,
    generalize_alnum,
    generalize_alpha,
    generalize_quantifier,
    refine,
)
from repro.core.patterns import parse, pattern_of, render


class TestStrategies:
    def test_strategy1_quantifiers(self):
        p = pattern_of("Bob123@gmail.com")
        got = render(generalize_quantifier(p))
        assert got == "<U>+<L>+<D>+'@'<L>+'.'<L>+"

    def test_strategy2_alpha_merges_adjacent(self):
        p = generalize_quantifier(pattern_of("Bob123@gmail.com"))
        got = render(generalize_alpha(p))
        assert got == "<A>+<D>+'@'<A>+'.'<A>+"

    def test_strategy3_alnum(self):
        p = generalize_alpha(generalize_quantifier(pattern_of("Bob123@gmail.com")))
        got = render(generalize_alnum(p))
        assert got == "<AN>+'@'<AN>+'.'<AN>+"

    def test_paper_example_4_chain(self):
        """Example 4 / Figure 6: the full generalization chain."""
        p = pattern_of("Bob123@gmail.com")
        for strat, expect in zip(
            STRATEGIES,
            [
                "<U>+<L>+<D>+'@'<L>+'.'<L>+",
                "<A>+<D>+'@'<A>+'.'<A>+",
                "<AN>+'@'<AN>+'.'<AN>+",
            ],
        ):
            p = strat(p)
            assert render(p) == expect

    def test_strategy3_folds_dash_underscore(self):
        p = parse("<A>+'-'<D>+'_'<A>+")
        assert render(generalize_alnum(p)) == "<AN>+"

    def test_strategy3_keeps_other_literals(self):
        p = parse("<A>+'.'<D>+")
        assert render(generalize_alnum(p)) == "<AN>+'.'<AN>+"

    def test_merge_sums_numeric_quantifiers(self):
        p = parse("<U>1<L>3")
        assert render(generalize_alpha(p)) == "<A>4"

    def test_literals_unchanged_by_strategy1(self):
        p = parse("'('<D>3")
        assert render(generalize_quantifier(p)) == "'('<D>+"


class TestRefine:
    def test_parents_cover_all_children(self):
        patterns = [pattern_of(s) for s in ["12-34", "1-2", "999-1"]]
        mapping = refine(patterns, generalize_quantifier)
        covered = [c for kids in mapping.values() for c in kids]
        assert sorted(map(render, covered)) == sorted(map(render, patterns))

    def test_identical_parents_merge(self):
        patterns = [pattern_of(s) for s in ["12-34", "1-2"]]
        mapping = refine(patterns, generalize_quantifier)
        assert len(mapping) == 1
        (parent,) = mapping
        assert render(parent) == "<D>+'-'<D>+"

    def test_ranked_by_frequency(self):
        patterns = [pattern_of(s) for s in ["1-2", "11-22", "a.b"]]
        mapping = refine(patterns, generalize_quantifier)
        first = next(iter(mapping))
        assert render(first) == "<D>+'-'<D>+"  # covers 2 of 3


class TestFindConstants:
    def test_constant_token_discovered(self):
        strings = [f"Dr. {n}" for n in ["Ann", "Bob", "Cat", "Dan"]]
        p = find_constants(strings)
        assert render(p).startswith("'D''r''.'' '")

    def test_varying_token_not_constant(self):
        strings = ["Dr. Ann", "Dr. Bob", "Dr. Cat", "Dr. Dan"]
        p = find_constants(strings)
        assert not p[-1].is_literal  # the name varies

    def test_below_support_no_constants(self):
        strings = ["Dr. Ann", "Dr. Bob"]
        p = find_constants(strings, min_support=4)
        # only the symbols are literals; no constantified base tokens
        assert render(p) == "<U>1<L>1'.'' '<U>1<L>2"

    def test_empty_cluster_raises(self):
        with pytest.raises(ValueError):
            find_constants([])


class TestHierarchy:
    PHONES = [
        "734-645-8397",
        "101-010-0001",
        "(734) 645-8397",
        "(123) 456-7890",
        "734.236.3466",
    ]

    def test_leaf_clusters(self):
        got = cluster_summary(self.PHONES)
        assert len(got) == 3
        assert dict(got)["<D>3'-'<D>3'-'<D>4"] == 2
        assert dict(got)["'('<D>3')'' '<D>3'-'<D>4"] == 2
        # ties sort alphabetically, then the singleton
        assert got[2] == ("<D>3'.'<D>3'.'<D>4", 1)

    def test_counts_roll_up(self):
        h = build_hierarchy(self.PHONES)
        assert sum(n.count for n in h.by_level[0]) == len(self.PHONES)
        for lvl in (1, 2, 3):
            assert sum(n.count for n in h.by_level[lvl]) == len(self.PHONES)

    def test_four_levels(self):
        h = build_hierarchy(self.PHONES)
        assert set(h.by_level) == {0, 1, 2, 3}

    def test_children_linked(self):
        h = build_hierarchy(self.PHONES)
        for lvl in (1, 2, 3):
            for node in h.by_level[lvl]:
                assert node.children
                assert node.count == sum(c.count for c in node.children)

    def test_examples_attached(self):
        h = build_hierarchy(self.PHONES)
        for node in h.by_level[0]:
            assert node.examples

    def test_root_generalizes_everything(self):
        h = build_hierarchy(["abc", "ABC", "a1-b2"])
        assert any(render(n.pattern) == "<AN>+" for n in h.roots)

    def test_node_for_lookup(self):
        h = build_hierarchy(self.PHONES)
        p = pattern_of("734-645-8397")
        node = h.node_for(p)
        assert node is not None and node.count == 2
        assert h.node_for(pattern_of("xyz")) is None

    def test_deterministic(self):
        a = build_hierarchy(self.PHONES)
        b = build_hierarchy(self.PHONES)
        assert [render(n.pattern) for n in a.all_nodes()] == [
            render(n.pattern) for n in b.all_nodes()
        ]

    def test_constants_flow_into_hierarchy(self):
        strings = [f"Dr. {n}" for n in ["Ann", "Bob", "Cat", "Dan"]]
        h = build_hierarchy(strings)
        leaf = h.by_level[0][0]
        assert leaf.pattern[0].is_literal and leaf.pattern[0].value == "D"
