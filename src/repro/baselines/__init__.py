"""Baseline systems the paper compares against (§7.1).

- :mod:`repro.baselines.flashfill` — clean-room reimplementation of a
  FlashFill-style PBE synthesizer (Excel's FlashFill is closed-source;
  see DESIGN.md §4 for the substitution argument).
- :mod:`repro.baselines.regexreplace` — the Trifacta manual
  regexp-replace workflow, simulated exactly as in the paper's §7.4.
"""
