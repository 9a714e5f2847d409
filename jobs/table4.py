"""spark-submit entrypoint reproducing paper Table 4 (employee names,
FlashFill "Example 9"). Uses the simulated lazy user's repaired program
and applies it through the Spark pipeline."""
import sys

from pyspark.sql import SparkSession

from repro import synth_data as sd
from repro.bench.cases import TABLE4_EXPECTED, TABLE4_RAW
from repro.bench.simulate import simulate_clx
from repro.core import pipeline
from repro.core.explain import explain_program


def run(spark: SparkSession) -> None:
    df = sd.strings_df(spark, TABLE4_RAW, col="raw")
    print("== input pattern clusters ==")
    pipeline.cluster_counts(df, "raw").show(truncate=False)

    res = simulate_clx((TABLE4_RAW, TABLE4_EXPECTED))
    print(f"steps={res.steps} selections={res.selections} "
          f"repairs={res.repairs} failures={res.failures}")
    tgt, synth = res.programs[0]
    prog = synth.program()
    out = pipeline.apply_program(df, "raw", prog, target=tgt)
    print("== Table 4: Raw data -> Transformed data ==")
    out.select("raw", "transformed").show(truncate=False)
    ok, _ = pipeline.verify_patterns(out, "transformed", tgt)
    print("pattern-level verification clean:", ok)
    print("== explained (repaired) program ==")
    for op in explain_program(prog):
        print(" ", op.display)
    got = [r["transformed"] for r in out.select("transformed").collect()]
    assert sorted(got) == sorted(TABLE4_EXPECTED), (got, TABLE4_EXPECTED)
    print("MATCHES PAPER TABLE 4")


if __name__ == "__main__":
    spark = SparkSession.builder.appName("table4").getOrCreate()
    try:
        run(spark)
    finally:
        spark.stop()
    sys.exit(0)
