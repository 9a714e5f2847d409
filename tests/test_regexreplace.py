"""Tests for the RegexReplace baseline (repro.baselines.regexreplace)."""
from repro.baselines.regexreplace import RRResult, simulate


class TestStepAccounting:
    def test_each_replace_is_two_steps(self):
        r = RRResult(n_replaces=3, failures=0)
        assert r.steps == 6

    def test_failures_are_punishment(self):
        r = RRResult(n_replaces=1, failures=4)
        assert r.steps == 6


class TestSimulate:
    def test_clean_data_costs_nothing(self):
        r = simulate(["1-2", "3-4"], ["1-2", "3-4"])
        assert r.steps == 0 and r.perfect

    def test_one_shape_one_replace(self):
        ins = ["111.222.3333", "444.555.6666", "1-2-3"]
        outs = ["111-222-3333", "444-555-6666", "1-2-3"]
        r = simulate(ins, outs)
        assert r.n_replaces == 1 and r.perfect

    def test_level1_generalization_one_replace_for_name_lengths(self):
        ins = ["John Smith", "Al Wu", "Smith, J."]
        outs = ["Smith, J.", "Wu, A.", "Smith, J."]
        r = simulate(ins, outs)
        assert r.n_replaces == 1 and r.perfect

    def test_two_shapes_two_replaces(self):
        ins = ["111.222.3333", "(111) 222-3333", "1-2-3"]
        outs = ["111-222-3333", "111-222-3333", "1-2-3"]
        r = simulate(ins, outs)
        assert r.n_replaces == 2 and r.perfect

    def test_content_split_for_keyword_conditional(self):
        ins = [
            "picture alpha 123", "picture bravo 456",
            "project alpha 789", "project bravo 111",
            "IMG alpha123",
        ]
        outs = [
            "IMG alpha123", "IMG bravo456",
            "DOC alpha789", "DOC bravo111",
            "IMG alpha123",
        ]
        r = simulate(ins, outs)
        assert r.perfect
        assert r.n_replaces == 2  # one Replace per keyword group

    def test_ambiguous_identical_inputs_fail(self):
        ins = ["ab 1", "ab 1"]
        outs = ["X 1", "Y 1"]
        r = simulate(ins, outs)
        assert not r.perfect and r.failures == 2

    def test_per_record_fallback(self):
        # outputs swap letters semantically (no syntactic plan), but each
        # record can still be fixed with an exact replace
        ins = ["ab", "cd", "zz"]
        outs = ["ba", "dc", "zz"]
        r = simulate(ins, outs)
        assert r.perfect
        assert r.n_replaces == 2
