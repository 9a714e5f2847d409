"""Spark DataFrame pipeline tests (repro.core.pipeline) — pattern
profiling, program application, pattern-level verification, and the
DuckDB-oracle cross-check that the Spark-side UniFi evaluator equals the
regexp-replace explanation."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.core import pipeline
from repro.core.cluster import build_hierarchy, cluster_summary
from repro.core.explain import duckdb_case_sql, explain_program
from repro.core.patterns import parse, pattern_of, render
from repro.core.synthesis import synthesize
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def phones_df(spark):
    return sd.phone_column(spark, n=500, n_formats=4, seed=7).cache()


@pytest.fixture(scope="module")
def phone_values(phones_df):
    return [r["phone"] for r in phones_df.collect()]


@pytest.fixture(scope="module")
def phone_program(phone_values):
    target = pattern_of("734-645-8397")
    res = synthesize(build_hierarchy(phone_values), target)
    return target, res.program()


class TestProfilePatterns:
    def test_pattern_column_added(self, spark, phones_df):
        out = pipeline.profile_patterns(phones_df, "phone")
        assert "pattern" in out.columns
        row = out.filter(F.col("phone").rlike(r"^\d{3}-")).first()
        assert row["pattern"] == "<D>3'-'<D>3'-'<D>4"

    def test_matches_driver_side_tokenizer(self, phones_df, phone_values):
        spark_pats = {
            r["pattern"]
            for r in pipeline.profile_patterns(phones_df, "phone")
            .select("pattern")
            .distinct()
            .collect()
        }
        driver_pats = {render(pattern_of(v)) for v in phone_values}
        assert spark_pats == driver_pats

    def test_cluster_counts_equal_driver_summary(self, phones_df, phone_values):
        spark_counts = {
            r["pattern"]: r["n"]
            for r in pipeline.cluster_counts(phones_df, "phone").collect()
        }
        assert spark_counts == dict(cluster_summary(phone_values))

    def test_cluster_counts_oracle(self, spark, phones_df):
        """The Figure 3 aggregation is a plain groupBy — check it against
        DuckDB over the profiled column."""
        prof = pipeline.profile_patterns(phones_df, "phone")
        got = prof.groupBy("pattern").agg(F.count(F.lit(1)).alias("n"))
        assert_equivalent(
            got,
            "SELECT pattern, COUNT(*) AS n FROM prof GROUP BY pattern",
            prof=prof,
        )


class TestApplyProgram:
    def test_all_rows_transformed_or_clean(self, phones_df, phone_program):
        target, prog = phone_program
        out = pipeline.apply_program(phones_df, "phone", prog, target=target)
        assert out.filter(F.col("_clx_flagged")).count() == 0

    def test_transformed_values_match_target(self, phones_df, phone_program):
        target, prog = phone_program
        out = pipeline.apply_program(phones_df, "phone", prog, target=target)
        vals = [r["transformed"] for r in out.collect()]
        from repro.core.patterns import matches

        assert all(matches(target, v) for v in vals)

    def test_unmatched_rows_flagged(self, spark, phone_program):
        target, prog = phone_program
        df = sd.strings_df(spark, ["N/A", "734-645-8397"], col="phone")
        out = pipeline.apply_program(df, "phone", prog, target=target)
        rows = {r["phone"]: r for r in out.collect()}
        assert rows["N/A"]["_clx_flagged"] is True
        assert rows["N/A"]["transformed"] == "N/A"
        assert rows["734-645-8397"]["_clx_flagged"] is False

    def test_matches_driver_side_transform(self, phones_df, phone_values, phone_program):
        target, prog = phone_program
        out = pipeline.apply_program(phones_df, "phone", prog, target=target)
        got = {r["phone"]: r["transformed"] for r in out.collect()}
        from repro.core.patterns import matches

        for v in phone_values:
            want = v if matches(target, v) else prog.transform(v)[0]
            assert got[v] == want


class TestVerifyPatterns:
    def test_clean_after_transform(self, phones_df, phone_program):
        target, prog = phone_program
        out = pipeline.apply_program(phones_df, "phone", prog, target=target)
        ok, summary = pipeline.verify_patterns(out, "transformed", target)
        assert ok
        rows = summary.collect()
        assert len(rows) == 1 and rows[0]["is_target"]

    def test_detects_dirty_column(self, phones_df, phone_program):
        target, _ = phone_program
        dirty = phones_df.withColumn("transformed", F.col("phone")).withColumn(
            "_clx_flagged", F.lit(False)
        )
        ok, summary = pipeline.verify_patterns(dirty, "transformed", target)
        assert not ok
        assert summary.filter(~F.col("is_target")).count() >= 1

    def test_flagged_rows_excused(self, spark, phone_program):
        target, prog = phone_program
        df = sd.strings_df(spark, ["N/A", "734-645-8397"], col="phone")
        out = pipeline.apply_program(df, "phone", prog, target=target)
        ok, _ = pipeline.verify_patterns(out, "transformed", target)
        assert ok  # the N/A row is flagged, so verification passes


class TestOracleCrossCheck:
    """UniFi program (Spark pandas UDF) == regexp-replace explanation
    (DuckDB regexp_replace) on identical input — end-to-end equality via
    repro.oracle.assert_equivalent."""

    def test_phone_program(self, spark, phones_df, phone_program):
        target, prog = phone_program
        out = pipeline.apply_program(phones_df, "phone", prog, target=target)
        sql_expr = duckdb_case_sql(explain_program(prog), col="phone", out="transformed")
        assert_equivalent(
            out.select("phone", "transformed"),
            f"SELECT phone, {sql_expr} FROM t",
            t=phones_df,
        )

    def test_cpt_program(self, spark):
        from repro.bench.cases import TABLE3_RAW

        raw = TABLE3_RAW + ["[CPT-99999]", "CPT-1", "CPT9"]
        df = sd.strings_df(spark, raw, col="s")
        target = parse("'['<U>+'-'<D>+']'")
        prog = synthesize(build_hierarchy(raw), target).program()
        out = pipeline.apply_program(df, "s", prog, target=target)
        sql_expr = duckdb_case_sql(explain_program(prog), col="s", out="transformed")
        assert_equivalent(
            out.select("s", "transformed"),
            f"SELECT s, {sql_expr} FROM t",
            t=df,
        )


class TestBuildHierarchySpark:
    def test_counts_match_driver(self, phones_df, phone_values):
        hs = pipeline.build_hierarchy_spark(phones_df, "phone")
        hd = build_hierarchy(phone_values)
        assert {render(p): n.count for p, n in hs.leaves.items()} == {
            render(p): n.count for p, n in hd.leaves.items()
        }

    def test_level_counts_roll_up(self, phones_df):
        hs = pipeline.build_hierarchy_spark(phones_df, "phone")
        total = sum(n.count for n in hs.by_level[0])
        for lvl in (1, 2, 3):
            assert sum(n.count for n in hs.by_level[lvl]) == total
