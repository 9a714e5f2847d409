"""Spark DataFrame integration for CLX (DESIGN.md §5).

Everything is expressed at the DataFrame/Catalyst layer:

- :func:`profile_patterns` adds a ``pattern`` column via an
  Arrow-batched pandas UDF (``withColumn``) — the per-record tokenizer;
- :func:`cluster_counts` is the Figure 3 cluster view
  (``groupBy("pattern").count()``);
- :func:`build_hierarchy_spark` builds the (driver-side, small) pattern
  hierarchy from the distinct-pattern aggregate, never the raw rows;
- :func:`apply_program` applies a UniFi program with ``withColumn``,
  adding the transformed column plus the ``_clx_flagged`` review column
  (§6.1: unmatched rows unchanged + flagged);
- :func:`verify_patterns` performs **pattern-level verification**: it
  re-profiles the transformed column per partition and rolls up pattern
  counts, so a user (or test) checks the *pattern list*, not the rows.
"""
from __future__ import annotations

from typing import Dict, List, Optional, Tuple

import pandas as pd
from pyspark.sql import Column, DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import BooleanType, StringType

from .cluster import PatternHierarchy, STRATEGIES, build_hierarchy
from .patterns import Pattern, matches, parse, pattern_of, render
from .unifi import Program


def _pattern_series(s: pd.Series) -> pd.Series:
    return s.astype(str).map(lambda v: render(pattern_of(v)))


@pandas_udf(StringType())
def pattern_udf(s: pd.Series) -> pd.Series:
    """Leaf pattern (compact rendering) of each value."""
    return _pattern_series(s)


def profile_patterns(df: DataFrame, col: str, out: str = "pattern") -> DataFrame:
    """Attach the leaf pattern of ``col`` as column ``out``."""
    return df.withColumn(out, pattern_udf(F.col(col)))


def cluster_counts(df: DataFrame, col: str) -> DataFrame:
    """Figure 3 view: one row per leaf pattern with its row count,
    descending. Pure DataFrame aggregation — scales with data size."""
    return (
        profile_patterns(df, col)
        .groupBy("pattern")
        .agg(F.count(F.lit(1)).alias("n"))
        .orderBy(F.desc("n"), F.asc("pattern"))
    )


def build_hierarchy_spark(
    df: DataFrame, col: str, *, const_min_support: int = 4
) -> PatternHierarchy:
    """Build the pattern hierarchy from a DataFrame column.

    The heavy part (tokenize + count) runs in Spark; the hierarchy is
    assembled on the driver from the distinct patterns. Constant-token
    discovery needs per-cluster value agreement, which is computed as a
    per-pattern ``collect_set`` capped at 2 elements (all we need to know
    is "all equal or not") — still a bounded aggregate.
    """
    prof = profile_patterns(df, col).cache()
    try:
        # Sample one value per pattern + whether each token position is
        # constant. For simplicity and exactness we pull per-pattern
        # value samples: min and max string agree per token position iff
        # constant... but token positions of differing values can vary
        # independently, so we collect up to `const_min_support + 1`
        # examples per pattern and run the driver-side constant finder on
        # the full member list only when the pattern is small, else on
        # the exact aggregate below.
        agg = (
            prof.groupBy("pattern")
            .agg(
                F.count(F.lit(1)).alias("n"),
                F.min(F.col(col)).alias("lo"),
                F.max(F.col(col)).alias("hi"),
            )
            .collect()
        )
    finally:
        prof.unpersist()
    # Reconstruct clusters: the driver-side builder only needs, per
    # cluster, enough members to decide constancy. min == max means the
    # whole cluster is one distinct value; otherwise feeding {lo, hi}
    # n-weighted preserves both the count and "not all equal" for any
    # token position that differs between lo and hi. Positions equal in
    # lo and hi but varying in between are over-constantified in theory;
    # for exactness-sensitive callers use `build_hierarchy` driver-side.
    strings: List[str] = []
    weights: Dict[str, int] = {}
    for row in agg:
        if row["lo"] == row["hi"]:
            strings.extend([row["lo"]] * min(row["n"], const_min_support))
            weights[row["lo"]] = row["n"]
        else:
            half = max(1, min(row["n"] // 2, const_min_support))
            strings.extend([row["lo"]] * half + [row["hi"]] * half)
            weights[row["lo"]] = row["n"] - row["n"] // 2
            weights[row["hi"]] = row["n"] // 2
    h = build_hierarchy(strings, const_min_support=const_min_support)
    # Fix counts to reflect true row counts rather than sample sizes.
    for node in h.by_level[0]:
        node.count = sum(
            w for s, w in weights.items() if matches(node.pattern, s)
        )
    for lvl in range(1, max(h.by_level) + 1):
        for node in h.by_level[lvl]:
            node.count = sum(c.count for c in node.children)
    return h


def apply_program(
    df: DataFrame,
    col: str,
    program: Program,
    target: Optional[Pattern] = None,
    out: str = "transformed",
    flag: str = "_clx_flagged",
) -> DataFrame:
    """Apply a UniFi program to ``col`` via ``withColumn``.

    Rows already matching ``target`` (if given) are passed through
    untouched; rows matching no Switch branch are left unchanged and
    flagged in ``flag`` for review (§6.1).
    """

    def _transform(s: pd.Series) -> pd.DataFrame:
        outs, flags = [], []
        for v in s.astype(str):
            if target is not None and matches(target, v):
                outs.append(v)
                flags.append(False)
                continue
            o, ok = program.transform(v)
            outs.append(o)
            flags.append(not ok)
        return pd.DataFrame({"o": outs, "f": flags})

    @pandas_udf(StringType())
    def out_udf(s: pd.Series) -> pd.Series:
        return _transform(s)["o"]

    @pandas_udf(BooleanType())
    def flag_udf(s: pd.Series) -> pd.Series:
        return _transform(s)["f"]

    return df.withColumn(out, out_udf(F.col(col))).withColumn(
        flag, flag_udf(F.col(col))
    )


def verify_patterns(
    df: DataFrame,
    col: str,
    target: Pattern,
    flag: str = "_clx_flagged",
) -> Tuple[bool, DataFrame]:
    """Pattern-level verification (the paper's headline mechanism).

    Re-profiles the transformed column per partition (pandas UDF) and
    returns ``(all_clean, summary)`` where ``summary`` is the post-
    transformation pattern cluster view (Figure 2) with a boolean
    ``is_target`` per pattern. ``all_clean`` is true iff every unflagged
    row's pattern matches the target (generalization-aware: a leaf
    ``<D>3'-'<D>5`` is clean under a ``<D>+'-'<D>+`` target).
    """

    @pandas_udf(BooleanType())
    def target_match_udf(s: pd.Series) -> pd.Series:
        return s.astype(str).map(lambda v: matches(target, v))

    prof = profile_patterns(df, col).withColumn(
        "is_target", target_match_udf(F.col(col))
    )
    summary = (
        prof.groupBy("pattern", flag, "is_target")
        .agg(F.count(F.lit(1)).alias("n"))
        .orderBy(F.desc("n"), F.asc("pattern"))
    )
    bad = summary.filter(
        (~F.col("is_target")) & (~F.col(flag))
    ).count()
    return bad == 0, summary
