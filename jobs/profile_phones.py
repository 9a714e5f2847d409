"""spark-submit entrypoint: the Figure 2/3 experience at scale.

Profiles a large messy phone column with the Spark pipeline, runs the
full CLX loop (cluster -> label -> synthesize -> transform -> verify)
and prints the pre-/post-transformation pattern cluster views.

Usage: spark-submit jobs/profile_phones.py [n_rows] [n_formats]
"""
import sys

from pyspark.sql import SparkSession

from repro import synth_data as sd
from repro.core import pipeline
from repro.core.patterns import pattern_of
from repro.core.synthesis import synthesize


def run(spark: SparkSession, n: int = 100_000, n_formats: int = 5) -> None:
    df = sd.phone_column(spark, n=n, n_formats=n_formats, seed=7)
    print(f"== pre-transformation clusters (n={n}) ==")
    pipeline.cluster_counts(df, "phone").show(truncate=False)

    h = pipeline.build_hierarchy_spark(df, "phone")
    target = pattern_of("734-645-8397")
    prog = synthesize(h, target).program()
    out = pipeline.apply_program(df, "phone", prog, target=target)
    ok, summary = pipeline.verify_patterns(out, "transformed", target)
    print("== post-transformation clusters (Figure 2 view) ==")
    summary.show(truncate=False)
    print("pattern-level verification clean:", ok)


if __name__ == "__main__":
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 100_000
    k = int(sys.argv[2]) if len(sys.argv) > 2 else 5
    spark = SparkSession.builder.appName("profile_phones").getOrCreate()
    try:
        run(spark, n, k)
    finally:
        spark.stop()
