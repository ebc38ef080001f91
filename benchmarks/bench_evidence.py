"""Benchmarks for evidence-set construction (Figure 7's dominant cost).

Fast (Catalyst bit-packed) vs naive (AFASTDC-style UDF) builders, plus the
local numpy reference, on a mid-size dataset. The paper's shape: the naive
builder is the bottleneck and the bit-level builder wins by a wide margin.
"""
import pytest

from repro.core import (
    build_evidence_local,
    build_evidence_naive,
    build_evidence_spark,
    build_predicate_space,
    with_rid,
)
from repro.datasets import DATASETS

N = 150


@pytest.fixture(scope="module")
def ctx(spark):
    spec = DATASETS["tax"](N, seed=0)
    space = build_predicate_space(spec.pdf)
    df = with_rid(spark.createDataFrame(spec.pdf)).cache()
    df.count()
    return spec, space, df


@pytest.mark.benchmark(group="evidence-build")
def test_bench_evidence_fast_catalyst(benchmark, spark, ctx):
    spec, space, df = ctx
    ev = benchmark.pedantic(
        lambda: build_evidence_spark(spark, df, space), rounds=3, iterations=1
    )
    assert ev.total_pairs == N * (N - 1)


@pytest.mark.benchmark(group="evidence-build")
def test_bench_evidence_naive_udf(benchmark, spark, ctx):
    spec, space, df = ctx
    ev = benchmark.pedantic(
        lambda: build_evidence_naive(spark, df, space), rounds=1, iterations=1
    )
    assert ev.total_pairs == N * (N - 1)


@pytest.mark.benchmark(group="evidence-build")
def test_bench_evidence_local_reference(benchmark, ctx):
    spec, space, _ = ctx
    ev = benchmark.pedantic(
        lambda: build_evidence_local(spec.pdf, space), rounds=3, iterations=1
    )
    assert ev.total_pairs == N * (N - 1)
