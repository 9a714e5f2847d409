"""Tests for the FlashFill-lite baseline (repro.baselines.flashfill)."""
from repro.baselines.flashfill import (
    FFProgram,
    enumerate_traces,
    learn,
)
from repro.core.unifi import ConstStr, Extract


class TestEnumerateTraces:
    def test_identity_trace_found(self):
        traces = enumerate_traces("734-645", "734-645")
        assert (Extract(1, 3),) in traces

    def test_reformat_trace_found(self):
        traces = enumerate_traces("734.645.8397", "734-645-8397")
        assert (
            Extract(1),
            ConstStr("-"),
            Extract(3),
            ConstStr("-"),
            Extract(5),
        ) in traces

    def test_constant_only_output(self):
        traces = enumerate_traces("xyz", "Q")
        assert traces == {(ConstStr("Q"),)}

    def test_constants_canonicalized(self):
        traces = enumerate_traces("a", "xy")
        assert (ConstStr("xy"),) in traces
        assert (ConstStr("x"), ConstStr("y")) not in traces

    def test_empty_output(self):
        assert enumerate_traces("abc", "") == {()}

    def test_extract_grounded_in_content(self):
        # "645" appears at source token 3 only; "734" at token 1 only.
        traces = enumerate_traces("734.645", "645734")
        assert (Extract(3), Extract(1)) in traces
        assert (Extract(1), Extract(3)) not in traces


class TestLearn:
    def test_single_example_generalizes_lengths(self):
        prog = learn([("John Smith", "Smith, J.")])
        # the branch is at the '+' level, so other name lengths work
        assert prog.apply("Al Wu") == "Wu, A."

    def test_unmatched_input_unchanged(self):
        prog = learn([("John Smith", "Smith, J.")])
        assert prog.apply("Smith, J.") == "Smith, J."

    def test_two_formats_two_branches(self):
        prog = learn(
            [("111.222.3333", "111-222-3333"), ("(111) 222-3333", "111-222-3333")]
        )
        assert prog.apply("999.888.7777") == "999-888-7777"
        assert prog.apply("(999) 888-7777") == "999-888-7777"

    def test_examples_disambiguate(self):
        # One example is ambiguous about which field moves; a second
        # example pins it down (the version-space intersection).
        exs = [("2017/11/28", "28-11-2017"), ("1999/12/25", "25-12-1999")]
        prog = learn(exs)
        assert prog.apply("2005/10/17") == "17-10-2005"

    def test_conditional_same_shape_conflict_yields_no_branch(self):
        # same token shape, contradictory outputs -> version space empty
        prog = learn(
            [("picture alpha 123", "IMG alpha123"),
             ("project alpha 456", "DOC alpha456")]
        )
        assert prog.apply("picture bravo 789") == "picture bravo 789"

    def test_identity_example_protects_clean_rows(self):
        prog = learn([("x-1", "x:1"), ("a:2", "a:2")])
        assert prog.apply("b:3") == "b:3"
        assert prog.apply("y-4") == "y:4"

    def test_leaf_split_on_gpat_conflict(self):
        # Two examples share a '+' shape but need different constants;
        # with different leaf shapes they split into leaf branches.
        prog = learn(
            [("ab 1", "X-1"), ("abc 2", "Y-2")]
        )
        assert prog.apply("ab 9") == "X-9"
        assert prog.apply("abc 8") == "Y-8"


class TestFFProgramOrdering:
    def test_leaf_branch_beats_general(self):
        prog = learn(
            [("ab 1", "one"), ("abcd 2", "two")]
        )
        assert isinstance(prog, FFProgram)
        assert prog.apply("ab 1") == "one"
