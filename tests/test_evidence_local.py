"""Local (numpy) evidence builder — the reference implementation."""
import numpy as np
import pandas as pd
import pytest

from repro.core import build_evidence_local, build_predicate_space
from repro.core.predicates import Op, Predicate
from repro.datasets import DATASETS, PHI1, PHI2, running_example


@pytest.fixture(scope="module")
def re_setup():
    pdf = running_example()
    space = build_predicate_space(pdf, include_pairs=[("Income", "Tax")])
    ev = build_evidence_local(pdf, space, with_vios=True)
    return pdf, space, ev


def _uncovered_for(ev, space, dc):
    bits = [space.id_of(p) for p in dc.predicates]
    return [i for i, m in enumerate(ev.masks) if all(m >> b & 1 for b in bits)]


class TestStructure:
    def test_bag_size_is_ordered_pairs(self, re_setup):
        _, _, ev = re_setup
        assert int(ev.counts.sum()) == 15 * 14 == ev.total_pairs

    def test_invariants(self, re_setup):
        _, _, ev = re_setup
        ev.check()

    def test_masks_distinct(self, re_setup):
        _, _, ev = re_setup
        assert len(set(ev.masks)) == len(ev.masks)

    def test_distinct_sets_far_fewer_than_pairs(self, re_setup):
        # the paper's §5/§8 observation that drives the vios data structure
        _, _, ev = re_setup
        assert ev.n_distinct < ev.total_pairs / 5

    def test_vios_total_is_twice_count(self, re_setup):
        # every pair contributes its mask to both of its tuples
        _, _, ev = re_setup
        for i in range(ev.n_distinct):
            assert sum(ev.vios[i].values()) == 2 * int(ev.counts[i])

    def test_vios_absent_without_flag(self):
        pdf = running_example()
        space = build_predicate_space(pdf)
        ev = build_evidence_local(pdf, space)
        assert ev.vios is None

    def test_rid_column_ignored(self, re_setup):
        pdf, space, ev = re_setup
        pdf2 = pdf.copy()
        pdf2["__rid"] = range(len(pdf2))
        ev2 = build_evidence_local(pdf2, space)
        assert sorted(ev2.masks) == sorted(ev.masks)


class TestAgainstDirectCounts:
    @pytest.mark.parametrize("dc,expected", [(PHI1, 2), (PHI2, 16)])
    def test_example_12_counts(self, re_setup, dc, expected):
        pdf, space, ev = re_setup
        unc = _uncovered_for(ev, space, dc)
        assert sum(int(ev.counts[i]) for i in unc) == expected

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_golden_dcs_have_zero_uncovered(self, name):
        spec = DATASETS[name](60, seed=7)
        space = build_predicate_space(spec.pdf)
        ev = build_evidence_local(spec.pdf, space)
        for dc in spec.golden:
            unc = _uncovered_for(ev, space, dc)
            assert not unc, f"{name}: {dc} has violations"

    @pytest.mark.parametrize("name", ["tax", "stock", "voter"])
    def test_evidence_counts_match_pairwise_recount(self, name):
        """Every arbitrary DC's violation count from the evidence bag must
        equal the O(n²) direct recount."""
        spec = DATASETS[name](40, seed=3)
        space = build_predicate_space(spec.pdf)
        ev = build_evidence_local(spec.pdf, space)
        rng = np.random.default_rng(0)
        for _ in range(10):
            k = int(rng.integers(1, 4))
            ids = rng.choice(len(space), size=k, replace=False)
            dc_preds = frozenset(space.predicates[int(i)] for i in ids)
            from repro.core.dc import DenialConstraint

            dc = DenialConstraint(dc_preds)
            if dc.is_trivial():
                continue
            unc = _uncovered_for(ev, space, dc)
            assert (
                sum(int(ev.counts[i]) for i in unc)
                == dc.violating_pairs_pandas(spec.pdf)
            )

    def test_two_row_frame(self):
        pdf = pd.DataFrame({"a": [1, 2]})
        space = build_predicate_space(pdf)
        ev = build_evidence_local(pdf, space, with_vios=True)
        assert ev.total_pairs == 2 and ev.n_distinct == 2
        lt = space.id_of(Predicate("a", Op.LT, "a"))
        masks_with_lt = [m for m in ev.masks if m >> lt & 1]
        assert len(masks_with_lt) == 1
