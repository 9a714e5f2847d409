"""Builders for the paper's evaluation tables (§7, Appendix E).

Each function returns plain Python rows (list of dicts) so jobs can
print them and tests can assert on them; EXPERIMENTS.md records these
next to the paper's numbers.
"""
from __future__ import annotations

from collections import defaultdict
from typing import Dict, List, Sequence

import numpy as np

from .cases import Case, all_cases, case_by_name
from .simulate import CaseComparison, run_all, win_tie_lose

#: Paper Table 6 row order.
SOURCE_ORDER = ["sygus", "flashfill", "blinkfill", "predprog", "prose"]

#: Table 5's three explainability tasks -> our benchmark case names.
TABLE5_TASKS = {
    "Task1": "ff_ex11_names",
    "Task2": "pp_ex3_address",
    "Task3": "sygus_phone_10_long",
}


def _len_stats(cases: Sequence[Case]) -> Dict[str, float]:
    lens = [len(s) for c in cases for s in c.inputs]
    sizes = [c.size for c in cases]
    return {
        "AvgSize": round(float(np.mean(sizes)), 1),
        "AvgLen": round(float(np.mean(lens)), 1),
        "MaxLen": int(max(lens)),
    }


def table5_rows() -> List[dict]:
    """Table 5: explainability test-case details."""
    rows = []
    for task, name in TABLE5_TASKS.items():
        c = case_by_name(name)
        lens = [len(s) for s in c.inputs]
        rows.append(
            {
                "Task ID": task,
                "Case": name,
                "Size": c.size,
                "AvgLen": round(float(np.mean(lens)), 1),
                "MaxLen": int(max(lens)),
                "DataType": c.datatype,
            }
        )
    return rows


def table6_rows(cases: Sequence[Case] | None = None) -> List[dict]:
    """Table 6: benchmark test-case details per source (+ overall)."""
    cases = list(cases) if cases is not None else all_cases()
    by_src: Dict[str, List[Case]] = defaultdict(list)
    for c in cases:
        by_src[c.source].append(c)
    rows = []
    for src in SOURCE_ORDER:
        group = by_src.get(src, [])
        if not group:
            continue
        r = {"Sources": src, "#tests": len(group)}
        r.update(_len_stats(group))
        r["DataType"] = ", ".join(sorted({c.datatype for c in group}))
        rows.append(r)
    overall = {"Sources": "Overall", "#tests": len(cases)}
    overall.update(_len_stats(cases))
    overall["DataType"] = ""
    rows.append(overall)
    return rows


def table7_rows(comparisons: Sequence[CaseComparison]) -> List[dict]:
    """Table 7: user-effort simulation comparison (CLX wins/ties/loses)."""
    n = len(comparisons)
    rows = []
    for label, key in (("vs. FlashFill", "ff"), ("vs. RegexReplace", "rr")):
        w, t, l = win_tie_lose(comparisons, key)
        rows.append(
            {
                "Baselines": label,
                "CLX Wins": f"{w} ({round(100 * w / n)}%)",
                "Tie": f"{t} ({round(100 * t / n)}%)",
                "CLX Loses": f"{l} ({round(100 * l / n)}%)",
            }
        )
    return rows


def expressivity_summary(comparisons: Sequence[CaseComparison]) -> Dict[str, str]:
    """§7.4 text numbers: perfect-transformation counts per system."""
    n = len(comparisons)
    clx = sum(1 for c in comparisons if c.clx.perfect)
    ff = sum(1 for c in comparisons if c.ff.perfect)
    rr = sum(1 for c in comparisons if c.rr.perfect)
    return {
        "CLX": f"{clx}/{n}",
        "FlashFill": f"{ff}/{n}",
        "RegexReplace": f"{rr}/{n}",
    }


def appendix_e_summary(comparisons: Sequence[CaseComparison]) -> Dict[str, float]:
    """Appendix E / Figure 16 numbers (as percentages)."""
    n = len(comparisons)
    perfect_le2 = sum(
        1 for c in comparisons if c.clx.perfect and c.clx.steps <= 2
    )
    one_selection = sum(1 for c in comparisons if c.clx.selections == 1)
    no_repair = sum(1 for c in comparisons if c.clx.repairs == 0)
    le1_repair = sum(1 for c in comparisons if c.clx.repairs <= 1)
    return {
        "pct_perfect_within_2_steps": round(100 * perfect_le2 / n, 1),
        "pct_single_target_selection": round(100 * one_selection / n, 1),
        "pct_no_repair": round(100 * no_repair / n, 1),
        "pct_at_most_1_repair": round(100 * le1_repair / n, 1),
    }


def speedup_rows(comparisons: Sequence[CaseComparison]) -> List[dict]:
    """Figure 15 data: per-case Step ratios (baseline / CLX)."""
    rows = []
    for c in comparisons:
        clx = max(1, c.clx.steps)
        rows.append(
            {
                "case": c.case,
                "clx_steps": c.clx.steps,
                "ff_steps": c.ff.steps,
                "rr_steps": c.rr.steps,
                "speedup_vs_ff": round(c.ff.steps / clx, 2),
                "speedup_vs_rr": round(c.rr.steps / clx, 2),
                "clx_perfect": c.clx.perfect,
                "ff_perfect": c.ff.perfect,
                "rr_perfect": c.rr.perfect,
            }
        )
    return rows


def full_evaluation() -> dict:
    """Run the whole §7.4 evaluation once; everything Tables 6–7 +
    Appendix E need."""
    cases = all_cases()
    comparisons = run_all(cases)
    return {
        "table6": table6_rows(cases),
        "table7": table7_rows(comparisons),
        "expressivity": expressivity_summary(comparisons),
        "appendix_e": appendix_e_summary(comparisons),
        "speedups": speedup_rows(comparisons),
        "comparisons": comparisons,
    }


def format_table(rows: Sequence[dict]) -> str:
    """Render rows as a fixed-width text table for job output."""
    if not rows:
        return "(empty)"
    cols = list(rows[0].keys())
    widths = {
        c: max(len(str(c)), *(len(str(r.get(c, ""))) for r in rows))
        for c in cols
    }
    line = " | ".join(str(c).ljust(widths[c]) for c in cols)
    sep = "-+-".join("-" * widths[c] for c in cols)
    body = [
        " | ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols)
        for r in rows
    ]
    return "\n".join([line, sep] + body)
