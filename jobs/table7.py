"""Reproduce paper Table 7 (user-effort simulation on 47 benchmarks),
the §7.4 expressivity counts, the Appendix E breakdown, and the
Figure 15 per-case speedup data — all from the simulated users.

Driver-only (the simulation runs over in-memory pattern lists; Spark is
exercised by the pipeline jobs/benchmarks).
"""
from repro.bench.tables import format_table, full_evaluation

if __name__ == "__main__":
    ev = full_evaluation()
    print("== Table 7: User effort simulation comparison ==")
    print(format_table(ev["table7"]))
    print()
    print("== Expressivity (perfect transformations) ==")
    for k, v in ev["expressivity"].items():
        print(f"  {k}: {v}")
    print()
    print("== Appendix E summary ==")
    for k, v in ev["appendix_e"].items():
        print(f"  {k}: {v}%")
    print()
    print("== Per-case detail (Figure 15 data) ==")
    print(format_table(ev["speedups"]))
