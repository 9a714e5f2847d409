"""Micro-benchmarks for the core algorithms: tokenization, hierarchy
construction, alignment + plan enumeration, and full synthesis — the
interactive-latency budget the paper's UI depends on (§4: "real-time
clustering must be interactive")."""
import pytest

from repro.bench.scaling import phone_task
from repro.core.align import align
from repro.core.cluster import build_hierarchy
from repro.core.patterns import pattern_of
from repro.core.synthesis import enumerate_plans, rank_plans, synthesize
from repro.core.tokens import tokenize


@pytest.fixture(scope="module")
def phones300():
    ins, _ = phone_task(300, 6)
    return ins


def test_tokenize_throughput(benchmark, phones300):
    def run():
        return [tokenize(s) for s in phones300]

    out = benchmark(run)
    assert len(out) == 300


def test_build_hierarchy_300(benchmark, phones300):
    h = benchmark(lambda: build_hierarchy(phones300))
    assert len(h.leaves) == 6


def test_align_and_enumerate(benchmark):
    source = pattern_of("734.645.8397")
    target = pattern_of("(734) 645-8397")

    def run():
        dag = align(target, source)
        return rank_plans(enumerate_plans(dag), source, top_k=10)

    ranked = benchmark(run)
    assert ranked


def test_synthesize_300_6(benchmark, phones300):
    h = build_hierarchy(phones300)
    target = pattern_of("734-645-8397")

    def run():
        return synthesize(h, target)

    res = benchmark(run)
    assert res.solutions
