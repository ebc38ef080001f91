"""Benchmarks for the enumeration stage (Figures 6, 8, 10).

All benchmarks share one evidence set (with vios) per dataset so only the
enumeration algorithm varies: ADCEnum vs SearchMC (Fig. 6), the three
approximation functions (Fig. 8), and the max/min pivot policies (Fig. 10).
"""
import pytest

from repro.core import (
    F1,
    F2,
    F3Greedy,
    adc_enum,
    build_evidence_local,
    build_predicate_space,
    search_mc,
)
from repro.datasets import DATASETS

N = 40
EPS = 0.005
#: food at n=40, ε=0.005 completes on both algorithms (~5.4k minimal ADCs)
#: — a full-enumeration comparison, the regime Figure 6 is about


@pytest.fixture(scope="module")
def ev():
    spec = DATASETS["food"](N, seed=0)
    space = build_predicate_space(spec.pdf)
    return build_evidence_local(spec.pdf, space, with_vios=True)


@pytest.mark.benchmark(group="fig6-enum-vs-searchmc")
def test_bench_adcenum_f1(benchmark, ev):
    res, _ = benchmark.pedantic(
        lambda: adc_enum(ev, F1(), EPS, timeout_s=120), rounds=2, iterations=1
    )
    assert res


@pytest.mark.benchmark(group="fig6-enum-vs-searchmc")
def test_bench_searchmc_f1(benchmark, ev):
    res, _ = benchmark.pedantic(
        lambda: search_mc(ev, F1(), EPS, timeout_s=120), rounds=2, iterations=1
    )
    assert res


@pytest.mark.benchmark(group="fig8-functions")
@pytest.mark.parametrize("fcls", [F1, F2, F3Greedy], ids=["f1", "f2", "f3"])
def test_bench_function(benchmark, ev, fcls):
    res, _ = benchmark.pedantic(
        lambda: adc_enum(ev, fcls(), EPS, timeout_s=120), rounds=2, iterations=1
    )
    assert res


@pytest.mark.benchmark(group="fig10-pivot-choice")
@pytest.mark.parametrize("choose", ["max", "min"])
def test_bench_pivot_choice(benchmark, ev, choose):
    res, _ = benchmark.pedantic(
        lambda: adc_enum(ev, F1(), EPS, choose=choose, timeout_s=120),
        rounds=2,
        iterations=1,
    )
    assert res
