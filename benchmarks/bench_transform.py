"""Benchmarks for applying a synthesized UniFi program and verifying at
the pattern level over 100k rows (the transform + verify halves of the
CLX loop)."""
import pytest

from repro import synth_data as sd
from repro.core import pipeline
from repro.core.cluster import build_hierarchy
from repro.core.patterns import matches, pattern_of
from repro.core.synthesis import synthesize

N = 100_000


@pytest.fixture(scope="module")
def setup(spark):
    df = sd.phone_column(spark, n=N, n_formats=5, seed=7).cache()
    df.count()
    sample = [r["phone"] for r in df.limit(2000).collect()]
    target = pattern_of("734-645-8397")
    prog = synthesize(build_hierarchy(sample), target).program()
    return df, target, prog


def test_apply_program_100k(benchmark, setup):
    df, target, prog = setup

    def run():
        out = pipeline.apply_program(df, "phone", prog, target=target)
        return out.filter("_clx_flagged").count()

    flagged = benchmark(run)
    assert flagged == 0


def test_apply_and_verify_100k(benchmark, setup):
    df, target, prog = setup

    def run():
        out = pipeline.apply_program(df, "phone", prog, target=target)
        ok, summary = pipeline.verify_patterns(out, "transformed", target)
        return ok, summary.collect()

    ok, rows = benchmark(run)
    assert ok
    assert sum(r["n"] for r in rows) == N


def test_driver_side_transform_10k(benchmark, setup):
    """Single-threaded evaluator baseline for the same program."""
    df, target, prog = setup
    vals = [r["phone"] for r in df.limit(10_000).collect()]

    def run():
        return [
            v if matches(target, v) else prog.transform(v)[0] for v in vals
        ]

    out = benchmark(run)
    assert all(matches(target, v) for v in out)
