"""Tests for repro.core.explain — UniFi programs rendered as regexp
Replace operations, and the property that the explanation is the same
function as the UniFi evaluator."""
import re

from repro.core.cluster import build_hierarchy
from repro.core.explain import (
    apply_replaces,
    duckdb_case_sql,
    explain_branch,
    explain_program,
)
from repro.core.patterns import parse, pattern_of
from repro.core.synthesis import synthesize
from repro.core.unifi import Branch, ConstStr, Extract, Program


def _phone_program() -> Program:
    src = pattern_of("734.645.8397")
    plan = (Extract(1), ConstStr("-"), Extract(3), ConstStr("-"), Extract(5))
    return Program((Branch(src, plan),))


class TestExplainBranch:
    def test_regex_has_group_per_token(self):
        op = explain_branch(_phone_program().branches[0])
        assert op.pattern_regex.count("(") - op.pattern_regex.count("(?") == 5

    def test_replacement_refs(self):
        op = explain_branch(_phone_program().branches[0])
        assert op.replacement == "$1-$3-$5"

    def test_display_is_natural_language(self):
        op = explain_branch(_phone_program().branches[0])
        assert "{digit}3" in op.display and op.display.startswith("Replace(")

    def test_python_form_executes(self):
        op = explain_branch(_phone_program().branches[0])
        rx, repl = op.to_python()
        assert re.sub(rx, repl, "111.222.3333") == "111-222-3333"

    def test_dollar_in_const_escaped(self):
        b = Branch(pattern_of("12"), (ConstStr("$"), Extract(1)))
        op = explain_branch(b)
        rx, repl = op.to_python()
        assert re.sub(rx, repl, "99") == "$99"

    def test_merged_display_groups(self):
        b = Branch(pattern_of("(734) 645-8397"), (Extract(5, 7),))
        op = explain_branch(b)
        # one merged $[...] component for the sequential extract
        assert op.display.count("$[") == 1


class TestExplanationFaithful:
    """The regexp Replace explanation computes the same function as the
    UniFi program — the paper's verifiability claim depends on this."""

    CASES = [
        ["734-645-8397", "101-010-0001", "(734) 645-8397", "734.236.3466",
         "(101)010-0001", "N/A"],
        ["[CPT-00350", "CPT-00350", "[CPT-11536]", "CPT115"],
    ]
    TARGETS = ["<D>3'-'<D>3'-'<D>4", "'['<U>+'-'<D>+']'"]

    def test_replaces_equal_program(self):
        for strings, tgt in zip(self.CASES, self.TARGETS):
            target = parse(tgt)
            prog = synthesize(build_hierarchy(strings), target).program()
            ops = explain_program(prog)
            for s in strings:
                out_prog, _ = prog.transform(s)
                out_re = apply_replaces(s, ops)
                assert out_prog == out_re, (s, out_prog, out_re)

    def test_unmatched_left_alone(self):
        ops = explain_program(_phone_program())
        assert apply_replaces("hello", ops) == "hello"


class TestDuckDBSql:
    def test_case_expression_shape(self):
        sql = duckdb_case_sql(explain_program(_phone_program()), col="s")
        assert sql.startswith("CASE WHEN regexp_matches(s,")
        assert sql.endswith("ELSE s END AS out")

    def test_quotes_escaped(self):
        b = Branch(pattern_of("12"), (ConstStr("it's"), Extract(1)))
        sql = duckdb_case_sql([explain_branch(b)])
        assert "it''s" in sql

    def test_duckdb_executes_equivalently(self):
        import duckdb
        import pandas as pd

        prog = _phone_program()
        vals = ["111.222.3333", "999.888.7777", "not a phone"]
        sql = duckdb_case_sql(explain_program(prog), col="s")
        con = duckdb.connect()
        con.register("t", pd.DataFrame({"s": vals}))
        got = con.execute(f"SELECT {sql} FROM t").fetchdf()["out"].tolist()
        con.close()
        want = [prog.transform(v)[0] for v in vals]
        assert got == want
