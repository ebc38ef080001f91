"""SearchMC baseline: must agree with ADCEnum on every instance."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import F1, F2, F3Greedy, adc_enum, build_evidence_local, build_predicate_space, search_mc
from repro.datasets import DATASETS, running_example
from tests.test_enum import FracF1, instances, make_instance


class TestAgainstADCEnum:
    @settings(max_examples=80, deadline=None)
    @given(inst=instances())
    def test_generic_instances(self, inst):
        masks, counts, n_el, eps = inst
        ev = make_instance(masks, counts, n_el)
        expected, _ = adc_enum(ev, FracF1(), eps)
        got, _ = search_mc(ev, FracF1(), eps)
        assert set(got) == set(expected)

    @pytest.mark.parametrize("eps", [0.0, 0.01, 0.05])
    def test_running_example(self, eps):
        pdf = running_example()
        space = build_predicate_space(pdf, include_pairs=[("Income", "Tax")])
        ev = build_evidence_local(pdf, space)
        expected, _ = adc_enum(ev, F1(), eps)
        got, _ = search_mc(ev, F1(), eps)
        assert set(got) == set(expected)

    @pytest.mark.parametrize("eps", [0.02, 0.08])
    def test_running_example_more_thresholds(self, eps):
        pdf = running_example()
        space = build_predicate_space(pdf, include_pairs=[("Income", "Tax")])
        ev = build_evidence_local(pdf, space)
        expected, _ = adc_enum(ev, F1(), eps)
        got, _ = search_mc(ev, F1(), eps)
        assert set(got) == set(expected)

    @pytest.mark.parametrize("fcls", [F2, F3Greedy])
    def test_vios_functions_running_example(self, fcls):
        pdf = running_example()
        space = build_predicate_space(pdf, include_pairs=[("Income", "Tax")])
        ev = build_evidence_local(pdf, space, with_vios=True)
        expected, _ = adc_enum(ev, fcls(), 0.1)
        got, _ = search_mc(ev, fcls(), 0.1)
        assert set(got) == set(expected)


class TestLimits:
    def test_max_results(self):
        ev = make_instance([1 << i for i in range(6)], [1] * 6, 6)
        got, stats = search_mc(ev, FracF1(), 0.0, max_results=1)
        assert len(got) <= 1 and stats.truncated

    def test_stats(self):
        ev = make_instance([0b11], [1], 2)
        got, stats = search_mc(ev, FracF1(), 0.0)
        assert stats.outputs == len(got) and stats.nodes >= 1
