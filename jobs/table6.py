"""Reproduce paper Table 6: benchmark test-case details per source.

Driver-only (dataset statistics); no Spark needed.
"""
from repro.bench.tables import format_table, table6_rows

if __name__ == "__main__":
    print("== Table 6: Benchmark test cases details ==")
    print(format_table(table6_rows()))
