"""Tests for the simulated users (repro.bench.simulate, §7.4)."""
import pytest

from repro.bench.cases import (
    TABLE3_EXPECTED,
    TABLE3_RAW,
    TABLE4_EXPECTED,
    TABLE4_RAW,
    case_by_name,
)
from repro.bench.simulate import (
    CaseComparison,
    choose_targets,
    simulate_clx,
    simulate_flashfill,
    simulate_regexreplace,
    win_tie_lose,
)
from repro.core.cluster import build_hierarchy
from repro.core.patterns import pattern_of, render


class TestChooseTargets:
    def test_single_leaf_target(self):
        strings = ["1-2", "3-4", "5.6"]
        h = build_hierarchy(strings)
        targets, unc = choose_targets(h, ["1-2", "3-4", "5-6"])
        assert len(targets) == 1 and not unc
        assert render(targets[0]) == "<D>1'-'<D>1"

    def test_level1_when_lengths_vary(self):
        strings = ["12-3", "1-23", "5.6"]
        h = build_hierarchy(strings)
        targets, unc = choose_targets(h, ["12-3", "1-23", "5-6"])
        assert len(targets) == 1 and not unc
        assert render(targets[0]) == "<D>+'-'<D>+"

    def test_uncovered_outputs_reported(self):
        strings = ["1-2", "3-4"]
        h = build_hierarchy(strings)
        targets, unc = choose_targets(h, ["1-2", "a_b"])
        assert unc == [1]  # no input-side pattern matches 'a_b'

    def test_multiple_targets_for_disjoint_shapes(self):
        strings = ["Chicago", "San Diego", "x.y"]
        h = build_hierarchy(strings)
        targets, unc = choose_targets(h, ["Chicago", "San Diego"])
        assert len(targets) == 2 and not unc


class TestCLXSimulation:
    def test_table3_perfect_one_step(self):
        r = simulate_clx((TABLE3_RAW, TABLE3_EXPECTED))
        assert r.perfect and r.selections == 1 and r.repairs == 0
        assert r.outputs == TABLE3_EXPECTED

    def test_table4_perfect_with_repairs(self):
        r = simulate_clx((TABLE4_RAW, TABLE4_EXPECTED))
        assert r.perfect
        assert r.repairs >= 1  # name reorderings are ambiguous
        assert r.outputs == TABLE4_EXPECTED

    def test_steps_is_sum(self):
        r = simulate_clx((TABLE4_RAW, TABLE4_EXPECTED))
        assert r.steps == r.selections + r.repairs + r.failures

    def test_programs_recorded(self):
        r = simulate_clx((TABLE3_RAW, TABLE3_EXPECTED))
        assert len(r.programs) == r.selections
        tgt, synth = r.programs[0]
        assert synth.solutions

    def test_conditional_case_imperfect(self):
        r = simulate_clx(case_by_name("ff_ex13_conditional"))
        assert not r.perfect and r.failures > 0

    def test_mcmillan_missing_representative(self):
        r = simulate_clx(case_by_name("ff_name_mcmillan"))
        assert not r.perfect  # camel-case outputs unrepresented

    def test_multiformat_phone_single_selection(self):
        r = simulate_clx(case_by_name("sygus_phone_parens"))
        assert r.perfect and r.selections == 1


class TestFlashFillSimulation:
    def test_table3(self):
        r = simulate_flashfill((TABLE3_RAW, TABLE3_EXPECTED))
        assert r.perfect
        assert r.examples == 3  # one per messy shape

    def test_table4(self):
        r = simulate_flashfill((TABLE4_RAW, TABLE4_EXPECTED))
        assert r.perfect and r.examples == 3

    def test_no_examples_needed_when_clean(self):
        r = simulate_flashfill((["a-b"], ["a-b"]))
        assert r.perfect and r.examples == 0 and r.steps == 0

    def test_stuck_detection_terminates(self):
        c = case_by_name("ff_ex13_conditional")
        r = simulate_flashfill(c)
        assert not r.perfect  # conflicting shapes cannot be learned


class TestRegexReplaceSimulation:
    def test_table3(self):
        r = simulate_regexreplace((TABLE3_RAW, TABLE3_EXPECTED))
        # one Replace per messy '+'-generalized shape: CPT-x, [CPT-x, CPTx
        assert r.perfect and r.n_replaces == 3

    def test_table4(self):
        r = simulate_regexreplace((TABLE4_RAW, TABLE4_EXPECTED))
        assert r.perfect


class TestWinTieLose:
    def _cmp(self, clx_steps, ff_steps, rr_steps):
        from repro.bench.simulate import CLXResult, FFResult
        from repro.baselines.regexreplace import RRResult

        clx = CLXResult(selections=clx_steps)
        ff = FFResult(examples=ff_steps)
        rr = RRResult(n_replaces=0, failures=rr_steps)
        return CaseComparison("x", clx, ff, rr)

    def test_counts(self):
        comps = [self._cmp(1, 2, 2), self._cmp(2, 2, 1), self._cmp(3, 1, 9)]
        assert win_tie_lose(comps, "ff") == (1, 1, 1)
        assert win_tie_lose(comps, "rr") == (2, 0, 1)
