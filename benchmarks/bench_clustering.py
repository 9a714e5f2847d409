"""Benchmarks for the Spark pattern-profiling pipeline (the Figure 3
experience at scale) — SF~0.1-equivalent string volumes (100k rows)."""
import pytest

from repro import synth_data as sd
from repro.core import pipeline

N = 100_000


@pytest.fixture(scope="module")
def phones_df(spark):
    df = sd.phone_column(spark, n=N, n_formats=5, seed=7).cache()
    df.count()  # materialize
    return df


def test_cluster_counts_100k(benchmark, phones_df):
    """groupBy-pattern cluster view over 100k messy phone numbers."""

    def run():
        return pipeline.cluster_counts(phones_df, "phone").collect()

    rows = benchmark(run)
    assert sum(r["n"] for r in rows) == N
    assert len(rows) == 5


def test_build_hierarchy_spark_100k(benchmark, phones_df):
    """Full hierarchy construction from the Spark aggregate."""

    def run():
        return pipeline.build_hierarchy_spark(phones_df, "phone")

    h = benchmark(run)
    assert sum(n.count for n in h.by_level[0]) == N


def test_profile_patterns_100k(benchmark, phones_df):
    """Raw per-record tokenization throughput (pandas UDF)."""

    def run():
        return pipeline.profile_patterns(phones_df, "phone").count()

    assert benchmark(run) == N
