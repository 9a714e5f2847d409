"""Benchmark regenerating Table 7: the full §7.4 user-effort simulation
(47 cases x 3 simulated users). Prints the table so the bench log is the
reproduction artifact."""
import pytest

from repro.bench.cases import all_cases
from repro.bench.simulate import run_all
from repro.bench.tables import (
    appendix_e_summary,
    expressivity_summary,
    format_table,
    table7_rows,
)


def test_table7_full_simulation(benchmark):
    cases = all_cases()

    def run():
        return run_all(cases)

    comparisons = benchmark.pedantic(run, rounds=1, iterations=1)
    print()
    print(format_table(table7_rows(comparisons)))
    print("expressivity:", expressivity_summary(comparisons))
    print("appendix E:", appendix_e_summary(comparisons))
    assert len(comparisons) == 47
