"""Benchmarks for the sampling pipeline (Figures 11/12).

Full-data mining vs 40%-sample mining through the complete Spark pipeline:
the sample run must be substantially faster (quadratic evidence scan),
which is the paper's motivation for mining ADCs from samples.
"""
import pytest

from repro.core import F1, adc_miner, build_predicate_space, with_rid
from repro.datasets import DATASETS

N = 200
EPS = 0.005
K = 500


@pytest.fixture(scope="module")
def ctx(spark):
    spec = DATASETS["food"](N, seed=0)
    space = build_predicate_space(spec.pdf)
    df = with_rid(spark.createDataFrame(spec.pdf)).cache()
    df.count()
    return space, df


@pytest.mark.benchmark(group="fig12-sampling")
def test_bench_miner_full(benchmark, spark, ctx):
    space, df = ctx
    res = benchmark.pedantic(
        lambda: adc_miner(spark, df, F1(), EPS, space=space, max_results=K),
        rounds=2,
        iterations=1,
    )
    assert res.dcs


@pytest.mark.benchmark(group="fig12-sampling")
def test_bench_miner_sample40(benchmark, spark, ctx):
    space, df = ctx
    res = benchmark.pedantic(
        lambda: adc_miner(
            spark, df, F1(), EPS, space=space, sample_fraction=0.4, seed=1,
            max_results=K,
        ),
        rounds=2,
        iterations=1,
    )
    assert res.n_sampled < N
