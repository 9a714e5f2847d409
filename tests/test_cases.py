"""Tests for the 47-case benchmark suite (repro.bench.cases, Table 6)."""
from collections import Counter

import pytest

from repro.bench.cases import (
    TABLE3_EXPECTED,
    TABLE3_RAW,
    TABLE4_EXPECTED,
    TABLE4_RAW,
    Case,
    all_cases,
    case_by_name,
)
from repro.core.patterns import pattern_of


@pytest.fixture(scope="module")
def cases():
    return all_cases()


class TestSuiteShape:
    def test_exactly_47(self, cases):
        assert len(cases) == 47

    def test_source_mix_matches_table6(self, cases):
        counts = Counter(c.source for c in cases)
        assert counts == {
            "sygus": 27,
            "flashfill": 10,
            "blinkfill": 4,
            "predprog": 3,
            "prose": 3,
        }

    def test_unique_names(self, cases):
        assert len({c.name for c in cases}) == 47

    def test_row_alignment(self, cases):
        for c in cases:
            assert len(c.inputs) == len(c.outputs)

    def test_every_case_has_target_exemplar(self, cases):
        """The CLX prototype requires >=1 record already in target form
        (Appendix D); every case provides some."""
        for c in cases:
            assert any(i == o for i, o in zip(c.inputs, c.outputs)), c.name

    def test_every_case_has_messy_rows(self, cases):
        for c in cases:
            assert any(i != o for i, o in zip(c.inputs, c.outputs)), c.name

    def test_deterministic(self):
        a, b = all_cases(), all_cases()
        for x, y in zip(a, b):
            assert x.inputs == y.inputs and x.outputs == y.outputs

    def test_sizes_in_expected_ranges(self, cases):
        by_src = {}
        for c in cases:
            by_src.setdefault(c.source, []).append(c.size)
        # Table 6 average sizes: sygus large (~63), others ~10-40.
        import numpy as np

        assert 40 <= np.mean(by_src["sygus"]) <= 90
        assert 8 <= np.mean(by_src["flashfill"]) <= 15
        assert 8 <= np.mean(by_src["blinkfill"]) <= 15
        assert 8 <= np.mean(by_src["predprog"]) <= 15
        assert 25 <= np.mean(by_src["prose"]) <= 55

    def test_case_by_name(self):
        c = case_by_name("bf_ex3_cpt")
        assert c.source == "blinkfill"
        with pytest.raises(KeyError):
            case_by_name("nope")

    def test_case_validates_exemplar_requirement(self):
        with pytest.raises(AssertionError):
            Case("bad", "sygus", "x", ("a",), ("b",))


class TestDesignedCases:
    def test_conditional_case_shapes_collide(self):
        """ff_ex13: keyword rows share token patterns so no syntactic
        cluster separates them (the designed CLX failure)."""
        c = case_by_name("ff_ex13_conditional")
        pats = {}
        for i, o in zip(c.inputs, c.outputs):
            if i != o:
                pats.setdefault(pattern_of(i), set()).add(o[:3])
        assert any(len(v) > 1 for v in pats.values())

    def test_mcmillan_case_has_camel_names(self):
        c = case_by_name("ff_name_mcmillan")
        assert any("Mc" in i or "De" in i or "La" in i for i in c.inputs)
        # exemplars (clean rows) never contain camel-case last names
        for i, o in zip(c.inputs, c.outputs):
            if i == o:
                assert "Mc" not in i and "De" not in i and "La" not in i

    def test_popl13_univ_outputs_unrepresented(self):
        c = case_by_name("prose_popl13")
        clean = {o for i, o in zip(c.inputs, c.outputs) if i == o}
        assert all(not s.startswith("Univ.") for s in clean)
        assert any(o.startswith("Univ.") for o in c.outputs)


class TestPaperTables:
    def test_table3_rows_verbatim(self):
        assert TABLE3_RAW == ["CPT-00350", "[CPT-00340", "[CPT-11536]", "CPT115"]
        assert TABLE3_EXPECTED == [
            "[CPT-00350]", "[CPT-00340]", "[CPT-11536]", "[CPT-115]",
        ]

    def test_table4_rows_verbatim(self):
        assert TABLE4_RAW == [
            "Dr. Eran Yahav", "Fisher, K.", "Bill Gates, Sr.", "Oege de Moor",
        ]
        assert TABLE4_EXPECTED == ["Yahav, E.", "Fisher, K.", "Gates, B.", "Moor, O."]
