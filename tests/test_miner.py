"""End-to-end ADCMiner pipeline (Figure 1) — Spark and local variants."""
import pytest

from repro.core import F1, F2, F3Greedy, adc_miner, adc_miner_local, build_predicate_space
from repro.datasets import DATASETS, PHI1, add_noise, running_example
from repro.metrics import g_recall, prf


@pytest.fixture(scope="module")
def re_df(spark):
    return spark.createDataFrame(running_example()).cache()


@pytest.fixture(scope="module")
def re_space():
    return build_predicate_space(running_example(), include_pairs=[("Income", "Tax")])


class TestSparkPipeline:
    def test_finds_phi1(self, spark, re_df, re_space):
        res = adc_miner(spark, re_df, F1(), 0.01, space=re_space)
        assert PHI1.predicates in res.dc_set

    def test_matches_local_pipeline(self, spark, re_df, re_space):
        res_s = adc_miner(spark, re_df, F1(), 0.01, space=re_space)
        res_l = adc_miner_local(running_example(), F1(), 0.01, space=re_space)
        assert res_s.dc_set == res_l.dc_set

    def test_timings_recorded(self, spark, re_df, re_space):
        res = adc_miner(spark, re_df, F1(), 0.05, space=re_space)
        assert set(res.timings) == {
            "predicate_space", "sampling", "evidence", "enumeration", "total"
        }
        assert all(v >= 0 for v in res.timings.values())

    def test_space_inferred_when_missing(self, spark, re_df):
        res = adc_miner(spark, re_df, F1(), 0.05)
        assert len(res.space) > 0 and len(res.dcs) > 0

    def test_vios_functions(self, spark, re_df, re_space):
        res2 = adc_miner(spark, re_df, F2(), 0.2, space=re_space)
        res3 = adc_miner(spark, re_df, F3Greedy(), 0.1, space=re_space)
        assert res2.evidence.vios is not None
        assert res3.evidence.vios is not None
        assert res2.dcs and res3.dcs

    def test_searchmc_backend_agrees(self, spark, re_df, re_space):
        a = adc_miner(spark, re_df, F1(), 0.05, space=re_space)
        b = adc_miner(spark, re_df, F1(), 0.05, space=re_space, enumerator="searchmc")
        assert a.dc_set == b.dc_set

    def test_naive_builder_agrees(self, spark, re_df, re_space):
        a = adc_miner(spark, re_df, F1(), 0.05, space=re_space)
        b = adc_miner(spark, re_df, F1(), 0.05, space=re_space, builder="naive")
        assert a.dc_set == b.dc_set

    def test_sampling_reduces_input(self, spark, re_space):
        spec = DATASETS["tax"](200, seed=0)
        df = spark.createDataFrame(spec.pdf)
        space = build_predicate_space(spec.pdf)
        res = adc_miner(spark, df, F1(), 0.05, space=space, sample_fraction=0.3,
                        seed=1, max_results=300)
        assert 20 <= res.n_sampled <= 120
        assert res.evidence.n_tuples == res.n_sampled

    def test_alpha_switches_to_f1prime(self, spark, re_space):
        spec = DATASETS["airport"](60, seed=0)
        df = spark.createDataFrame(spec.pdf)
        space = build_predicate_space(spec.pdf)
        plain = adc_miner(
            spark, df, F1(), 0.01, space=space, sample_fraction=0.5, seed=2, timeout_s=60
        )
        strict = adc_miner(
            spark, df, F1(), 0.01, space=space, sample_fraction=0.5, seed=2,
            alpha=0.05, timeout_s=60,
        )
        # f1' is pointwise stricter: every DC mined under f1' satisfies the
        # plain f1 threshold on the same sample (minimal sets may differ —
        # an f1'-minimal ADC can be a strict superset of an f1-minimal one)
        assert strict.dcs
        ev = strict.evidence
        for hs in strict.hitting_sets:
            sm = 0
            for e in hs:
                sm |= 1 << e
            unc = [i for i, m in enumerate(ev.masks) if (m & sm) == 0]
            assert F1().passes(ev, unc, 0.01)
        assert plain.dcs  # the plain run is exercised too


class TestLocalPipeline:
    def test_golden_recovery_clean_airport(self):
        spec = DATASETS["airport"](40, seed=4)
        res = adc_miner_local(spec.pdf, F1(), 0.0, timeout_s=60)
        assert not res.enum_stats.truncated
        assert g_recall(res.dcs, spec.golden) == 1.0

    def test_golden_recovery_dirty_spread(self):
        spec = DATASETS["airport"](40, seed=4)
        dirty = add_noise(spec.pdf, rate=0.01, mode="spread", seed=1)
        valid = adc_miner_local(dirty, F1(), 0.0, timeout_s=60)
        approx = adc_miner_local(dirty, F1(), 0.02, timeout_s=60)
        # §8.4 headline: valid-DC mining loses golden DCs, ADC mining recovers
        assert g_recall(approx.dcs, spec.golden) >= g_recall(valid.dcs, spec.golden)
        assert g_recall(approx.dcs, spec.golden) >= 0.5

    def test_eps_zero_only_valid_dcs(self):
        spec = DATASETS["food"](40, seed=2)
        res = adc_miner_local(spec.pdf, F1(), 0.0, timeout_s=60)
        for dc in res.dcs:
            assert dc.violating_pairs_pandas(spec.pdf) == 0

    def test_outputs_satisfy_threshold(self):
        pdf = running_example()
        res = adc_miner_local(pdf, F1(), 0.02)
        n_pairs = len(pdf) * (len(pdf) - 1)
        for dc in res.dcs:
            assert dc.violating_pairs_pandas(pdf) / n_pairs <= 0.02 + 1e-9

    def test_outputs_are_minimal_wrt_threshold(self):
        from repro.core.dc import DenialConstraint

        pdf = running_example()
        res = adc_miner_local(pdf, F1(), 0.02)
        n_pairs = len(pdf) * (len(pdf) - 1)
        for dc in res.dcs:
            for p in dc.predicates:
                sub = DenialConstraint(dc.predicates - {p})
                if not sub.predicates:
                    continue
                assert (
                    sub.violating_pairs_pandas(pdf) / n_pairs > 0.02 - 1e-9
                ), f"{dc} not minimal: {sub} also passes"

    def test_sample_vs_full_prf(self):
        """§8.3 protocol at micro scale: mine a sample, score against full."""
        spec = DATASETS["food"](50, seed=5)
        full = adc_miner_local(spec.pdf, F1(), 0.0, timeout_s=60)
        import numpy as np

        rng = np.random.default_rng(0)
        idx = rng.choice(len(spec.pdf), size=35, replace=False)
        sub = spec.pdf.iloc[idx].reset_index(drop=True)
        space = full.space  # same predicate space on both sides
        sampled = adc_miner_local(sub, F1(), 0.0, space=space, timeout_s=60)
        r = prf(sampled.dcs, full.dcs)
        assert 0.0 <= r.f1 <= 1.0
        # exact (ε=0) DCs cannot reliably be mined from a sample — the
        # paper's very motivation for ADCs — so only expect partial recall
        assert r.recall > 0.15

    def test_larger_eps_more_general_dcs(self):
        """Higher thresholds produce shorter (more general) DCs on average —
        the §8.4 observation behind 'too general' DCs."""
        pdf = running_example()
        small = adc_miner_local(pdf, F1(), 0.001)
        large = adc_miner_local(pdf, F1(), 0.1)
        if small.dcs and large.dcs:
            avg_small = sum(map(len, small.dcs)) / len(small.dcs)
            avg_large = sum(map(len, large.dcs)) / len(large.dcs)
            assert avg_large <= avg_small
