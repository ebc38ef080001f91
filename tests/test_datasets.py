"""Dataset generators (Table 4 stand-ins) and the §8.4 noise process."""
import numpy as np
import pandas as pd
import pytest

from repro.core import build_predicate_space
from repro.datasets import DATASETS, PHI1, PHI2, add_noise, running_example

#: (name, paper_tuples, paper_attrs, paper_golden) — Table 4 of the paper
TABLE4 = [
    ("tax", 1_000_000, 15, 9),
    ("stock", 123_000, 7, 6),
    ("hospital", 115_000, 19, 7),
    ("food", 200_000, 17, 10),
    ("airport", 55_000, 12, 9),
    ("adult", 32_000, 15, 3),
    ("flight", 582_000, 20, 13),
    ("voter", 950_000, 25, 12),
]


class TestRunningExample:
    def test_fifteen_tuples(self):
        assert len(running_example()) == 15

    def test_columns(self):
        assert list(running_example().columns) == ["Name", "State", "Zip", "Income", "Tax"]

    def test_sarah_shares_zip_with_wa(self):
        pdf = running_example()
        assert pdf.iloc[14]["Zip"] == pdf.iloc[5]["Zip"] == "98112"

    def test_phi1_phi2_shapes(self):
        assert len(PHI1) == 3 and len(PHI2) == 2


class TestTable4Registry:
    def test_all_eight_datasets(self):
        assert [n for n, *_ in TABLE4] == list(DATASETS)

    @pytest.mark.parametrize("name,pt,pa,pg", TABLE4)
    def test_paper_metadata(self, name, pt, pa, pg):
        spec = DATASETS[name](30, seed=0)
        assert spec.paper_tuples == pt
        assert spec.paper_attrs == pa
        assert spec.paper_golden == pg

    @pytest.mark.parametrize("name,pt,pa,pg", TABLE4)
    def test_attr_count_matches_paper(self, name, pt, pa, pg):
        spec = DATASETS[name](30, seed=0)
        assert spec.n_attrs == pa

    @pytest.mark.parametrize("name,pt,pa,pg", TABLE4)
    def test_golden_count_matches_paper(self, name, pt, pa, pg):
        spec = DATASETS[name](30, seed=0)
        assert len(spec.golden) == pg

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_requested_size(self, name):
        assert DATASETS[name](77, seed=1).n_tuples == 77

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_deterministic_in_seed(self, name):
        a = DATASETS[name](40, seed=9).pdf
        b = DATASETS[name](40, seed=9).pdf
        pd.testing.assert_frame_equal(a, b)

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_different_seeds_differ(self, name):
        a = DATASETS[name](40, seed=1).pdf
        b = DATASETS[name](40, seed=2).pdf
        assert not a.equals(b)

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_no_nulls(self, name):
        assert not DATASETS[name](50, seed=0).pdf.isna().any().any()


def _golden_cases():
    for name in DATASETS:
        spec = DATASETS[name](80, seed=13)
        for k, dc in enumerate(spec.golden):
            yield pytest.param(name, k, id=f"{name}-g{k}")


class TestGoldenDCs:
    @pytest.mark.parametrize("name,k", list(_golden_cases()))
    def test_golden_holds_exactly_on_clean_data(self, name, k):
        spec = DATASETS[name](80, seed=13)
        assert spec.golden[k].violating_pairs_pandas(spec.pdf) == 0

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_golden_predicates_in_space(self, name):
        spec = DATASETS[name](120, seed=13)
        space = build_predicate_space(spec.pdf)
        for dc in spec.golden:
            for p in dc.predicates:
                assert p in space.index, f"{name}: {p} not in space"

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_golden_proper_subsets_are_violated(self, name):
        """Golden DCs are minimal *valid* DCs: every one-predicate-removed
        generalization must be violated by the clean data (else the golden
        could never be mined as a minimal ADC)."""
        from repro.core.dc import DenialConstraint

        spec = DATASETS[name](120, seed=13)
        for dc in spec.golden:
            if len(dc) == 1:
                continue
            for p in dc.predicates:
                sub = DenialConstraint(dc.predicates - {p})
                assert sub.violating_pairs_pandas(spec.pdf) > 0, (
                    f"{name}: {sub} also valid — {dc} not minimal"
                )


class TestNoise:
    @pytest.fixture(scope="class")
    def clean(self):
        return DATASETS["tax"](300, seed=0).pdf

    def test_spread_rate(self, clean):
        dirty = add_noise(clean, rate=0.05, mode="spread", seed=1)
        changed = (dirty != clean).to_numpy().sum()
        total = clean.size
        assert 0.02 * total < changed < 0.1 * total

    def test_skewed_confines_errors_to_few_rows(self, clean):
        dirty = add_noise(clean, rate=0.01, mode="skewed", seed=1)
        changed_rows = (dirty != clean).any(axis=1).sum()
        assert 1 <= changed_rows <= max(3, int(0.011 * len(clean)) + 1)

    def test_skewed_changes_at_least_one_cell(self, clean):
        dirty = add_noise(clean, rate=0.001, mode="skewed", seed=2)
        assert (dirty != clean).to_numpy().any()

    def test_clean_copy_not_mutated(self, clean):
        before = clean.copy()
        add_noise(clean, rate=0.1, mode="spread", seed=3)
        pd.testing.assert_frame_equal(clean, before)

    def test_dtypes_preserved(self, clean):
        dirty = add_noise(clean, rate=0.2, mode="spread", seed=4)
        for c in clean.columns:
            assert dirty[c].dtype.kind == clean[c].dtype.kind, c

    def test_deterministic(self, clean):
        a = add_noise(clean, rate=0.05, mode="spread", seed=5)
        b = add_noise(clean, rate=0.05, mode="spread", seed=5)
        pd.testing.assert_frame_equal(a, b)

    def test_invalid_mode(self, clean):
        with pytest.raises(ValueError):
            add_noise(clean, mode="bogus")

    def test_noise_breaks_golden_dcs(self):
        """Planted errors actually violate some golden DC — the premise of
        the §8.4 G-recall experiment."""
        spec = DATASETS["tax"](300, seed=0)
        dirty = add_noise(spec.pdf, rate=0.02, mode="spread", seed=7)
        assert any(dc.violating_pairs_pandas(dirty) > 0 for dc in spec.golden)
