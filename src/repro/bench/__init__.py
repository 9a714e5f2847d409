"""Benchmark suite, simulated users, and table builders for the paper's
evaluation section (§7, Tables 3–7, Appendix E)."""
