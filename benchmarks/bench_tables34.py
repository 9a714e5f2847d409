"""Benchmarks regenerating Tables 3 and 4 end-to-end through the Spark
pipeline (cluster -> synthesize -> transform -> verify)."""
from repro import synth_data as sd
from repro.bench.cases import (
    TABLE3_EXPECTED,
    TABLE3_RAW,
    TABLE4_EXPECTED,
    TABLE4_RAW,
)
from repro.bench.simulate import simulate_clx
from repro.core import pipeline


def _roundtrip(spark, raw, expected):
    res = simulate_clx((raw, expected))
    tgt, synth = res.programs[0]
    prog = synth.program()
    df = sd.strings_df(spark, raw, col="raw")
    out = pipeline.apply_program(df, "raw", prog, target=tgt)
    got = {r["raw"]: r["transformed"] for r in out.collect()}
    return [got[r] for r in raw], res


def test_table3_cpt(benchmark, spark):
    def run():
        return _roundtrip(spark, TABLE3_RAW, TABLE3_EXPECTED)

    got, res = benchmark(run)
    assert got == TABLE3_EXPECTED
    assert res.perfect


def test_table4_names(benchmark, spark):
    def run():
        return _roundtrip(spark, TABLE4_RAW, TABLE4_EXPECTED)

    got, res = benchmark(run)
    assert got == TABLE4_EXPECTED
    assert res.perfect
