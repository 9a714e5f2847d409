"""Reproduce paper Table 5: explainability test-case details.

Driver-only (dataset statistics); no Spark needed.
"""
from repro.bench.tables import format_table, table5_rows

if __name__ == "__main__":
    print("== Table 5: Explainability test cases details ==")
    print(format_table(table5_rows()))
