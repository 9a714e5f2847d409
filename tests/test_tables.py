"""Tests for the table builders (repro.bench.tables — Tables 5/6/7 and
the Appendix E summary)."""
import pytest

from repro.bench.cases import all_cases
from repro.bench.tables import (
    SOURCE_ORDER,
    TABLE5_TASKS,
    appendix_e_summary,
    expressivity_summary,
    format_table,
    speedup_rows,
    table5_rows,
    table6_rows,
    table7_rows,
    win_tie_lose,
)


class TestTable5:
    def test_three_tasks(self):
        rows = table5_rows()
        assert [r["Task ID"] for r in rows] == ["Task1", "Task2", "Task3"]

    def test_paper_shape_sizes(self):
        """Table 5: tasks 1 and 2 have 10 records; task 3 has 100."""
        rows = {r["Task ID"]: r for r in table5_rows()}
        assert rows["Task1"]["Size"] == 10
        assert rows["Task2"]["Size"] == 10
        assert rows["Task3"]["Size"] == 100

    def test_datatypes(self):
        rows = {r["Task ID"]: r for r in table5_rows()}
        assert rows["Task1"]["DataType"] == "human name"
        assert rows["Task2"]["DataType"] == "address"
        assert rows["Task3"]["DataType"] == "phone number"

    def test_task2_longest_strings(self):
        """Table 5 shape: the address task has the longest strings."""
        rows = {r["Task ID"]: r for r in table5_rows()}
        assert rows["Task2"]["MaxLen"] > rows["Task1"]["MaxLen"]
        assert rows["Task2"]["AvgLen"] > rows["Task1"]["AvgLen"]


class TestTable6:
    def test_rows_per_source_plus_overall(self):
        rows = table6_rows()
        assert [r["Sources"] for r in rows] == SOURCE_ORDER + ["Overall"]

    def test_test_counts(self):
        rows = {r["Sources"]: r for r in table6_rows()}
        assert rows["sygus"]["#tests"] == 27
        assert rows["flashfill"]["#tests"] == 10
        assert rows["blinkfill"]["#tests"] == 4
        assert rows["predprog"]["#tests"] == 3
        assert rows["prose"]["#tests"] == 3
        assert rows["Overall"]["#tests"] == 47

    def test_sygus_has_largest_avg_size(self):
        """Table 6 shape: SyGuS cases are the big ones."""
        rows = {r["Sources"]: r for r in table6_rows()}
        for src in ["flashfill", "blinkfill", "predprog"]:
            assert rows["sygus"]["AvgSize"] > rows[src]["AvgSize"]

    def test_overall_avg_len_reasonable(self):
        """Paper overall AvgLen is 13.0; ours should be same order."""
        rows = {r["Sources"]: r for r in table6_rows()}
        assert 8 <= rows["Overall"]["AvgLen"] <= 30


class TestFormatTable:
    def test_renders_header_and_rows(self):
        out = format_table([{"a": 1, "b": "xy"}, {"a": 22, "b": "z"}])
        lines = out.splitlines()
        assert lines[0].startswith("a")
        assert len(lines) == 4

    def test_empty(self):
        assert format_table([]) == "(empty)"


class TestTable7Builders:
    """Unit-level checks with synthetic comparisons; the real end-to-end
    sweep is covered by tests/test_simulation_full.py."""

    def _fake(self, clx_steps, ff_steps, rr_steps, perfect=True):
        from repro.baselines.regexreplace import RRResult
        from repro.bench.simulate import CaseComparison, CLXResult, FFResult

        clx = CLXResult(selections=1, repairs=clx_steps - 1, perfect=perfect)
        ff = FFResult(examples=ff_steps, perfect=True)
        rr = RRResult(n_replaces=rr_steps // 2, failures=rr_steps % 2)
        return CaseComparison("c", clx, ff, rr)

    def test_table7_rows_shape(self):
        comps = [self._fake(1, 2, 4), self._fake(2, 1, 2)]
        rows = table7_rows(comps)
        assert rows[0]["Baselines"] == "vs. FlashFill"
        assert rows[1]["Baselines"] == "vs. RegexReplace"
        assert rows[0]["CLX Wins"].startswith("1 ")

    def test_expressivity_summary(self):
        comps = [self._fake(1, 1, 2), self._fake(1, 1, 2, perfect=False)]
        s = expressivity_summary(comps)
        assert s["CLX"] == "1/2" and s["FlashFill"] == "2/2"

    def test_appendix_e_summary_fields(self):
        comps = [self._fake(1, 1, 2), self._fake(2, 1, 2)]
        s = appendix_e_summary(comps)
        assert set(s) == {
            "pct_perfect_within_2_steps",
            "pct_single_target_selection",
            "pct_no_repair",
            "pct_at_most_1_repair",
        }
        assert s["pct_single_target_selection"] == 100.0

    def test_speedup_rows(self):
        comps = [self._fake(2, 4, 8)]
        (row,) = speedup_rows(comps)
        assert row["speedup_vs_ff"] == 2.0
        assert row["speedup_vs_rr"] == 4.0
