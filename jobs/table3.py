"""spark-submit entrypoint reproducing paper Table 3 (CPT billing codes).

Runs the full CLX pipeline on the paper's literal rows: cluster (Spark),
label (simulated user), synthesize, apply (Spark), verify at pattern
level, and print the before/after table plus the explained program.
"""
import sys

from pyspark.sql import SparkSession

from repro import synth_data as sd
from repro.bench.cases import TABLE3_EXPECTED, TABLE3_RAW
from repro.bench.simulate import simulate_clx
from repro.core import pipeline
from repro.core.cluster import build_hierarchy
from repro.core.explain import explain_program
from repro.core.patterns import parse
from repro.core.synthesis import synthesize


def run(spark: SparkSession) -> None:
    df = sd.strings_df(spark, TABLE3_RAW, col="raw")
    print("== input pattern clusters (Figure 3 view) ==")
    pipeline.cluster_counts(df, "raw").show(truncate=False)

    target = parse("'['<U>+'-'<D>+']'")
    res = simulate_clx((TABLE3_RAW, TABLE3_EXPECTED))
    print(f"steps={res.steps} selections={res.selections} "
          f"repairs={res.repairs} failures={res.failures}")

    h = build_hierarchy(TABLE3_RAW)
    prog = synthesize(h, target).program()
    out = pipeline.apply_program(df, "raw", prog, target=target)
    print("== Table 3: Raw data -> Transformed data ==")
    out.select("raw", "transformed").show(truncate=False)
    ok, summary = pipeline.verify_patterns(out, "transformed", target)
    print("pattern-level verification clean:", ok)
    print("== explained program (Figure 4 style) ==")
    for op in explain_program(prog):
        print(" ", op.display)
    got = [r["transformed"] for r in out.select("transformed").collect()]
    assert sorted(got) == sorted(TABLE3_EXPECTED), (got, TABLE3_EXPECTED)
    print("MATCHES PAPER TABLE 3")


if __name__ == "__main__":
    spark = SparkSession.builder.appName("table3").getOrCreate()
    try:
        run(spark)
    finally:
        spark.stop()
    sys.exit(0)
