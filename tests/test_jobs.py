"""Every experiment job runs at micro scale and emits well-formed tables."""
import sys

import pytest

sys.path.insert(0, ".")

from jobs import (  # noqa: E402
    fig6_enum_vs_searchmc,
    fig7_total_runtimes,
    fig8_functions_runtime,
    fig10_set_choice,
    fig11_sampling_quality,
    fig12_sampling_runtime,
    fig13_threshold_validation,
    fig14_grecall,
    table4_datasets,
    table5_adc_vs_valid,
)


class TestTableJobs:
    def test_table4(self, spark):
        out = table4_datasets.run(spark, n=60, seed=0)
        assert len(out) == 8
        assert (out["paper_attrs"] == out["our_attrs"]).all()
        assert (out["paper_golden"] == out["our_golden"]).all()
        assert out["golden_valid_on_clean"].all()

    def test_table5(self, spark):
        out = table5_adc_vs_valid.run(spark, n=80, seed=0, datasets=("airport",))
        assert len(out) == 9  # one row per airport golden DC
        assert set(out.columns) == {"dataset", "golden", "approximate_dc", "valid_dc"}
        # ADC mining recovers at least one golden that exists in the output
        assert (out["approximate_dc"] != "—").any()


class TestFigureJobs:
    def test_fig6(self, spark):
        out = fig6_enum_vs_searchmc.run(spark, n=60, seed=0, datasets=("airport", "adult"))
        assert len(out) == 2
        assert out["agree"].all()
        assert (out["adcenum_s"] > 0).all() and (out["searchmc_s"] > 0).all()

    def test_fig6_sample_mode(self, spark):
        out = fig6_enum_vs_searchmc.run(
            spark, n=80, seed=0, datasets=("airport",), sample_fractions=(0.5, 1.0)
        )
        assert len(out) == 2 and set(out["sample"]) == {0.5, 1.0}

    def test_fig7(self, spark):
        out = fig7_total_runtimes.run(spark, n=40, seed=0, datasets=("airport",))
        r = out.iloc[0]
        assert r["adcminer_total_s"] > 0
        # naive evidence must not be faster than the Catalyst builder
        assert r["afastdc_evidence_s"] >= r["dcfinder_evidence_s"] * 0.5

    def test_fig8(self, spark):
        out = fig8_functions_runtime.run(spark, n=50, seed=0, datasets=("airport",))
        r = out.iloc[0]
        for f in ("f1", "f2", "f3"):
            assert r[f"{f}_total_s"] > 0 and r[f"{f}_n_adcs"] > 0

    def test_fig10(self, spark):
        out = fig10_set_choice.run(spark, n=50, seed=0, datasets=("airport",))
        assert len(out) == 3  # three functions
        assert (out["max_nodes"] > 0).all() and (out["min_nodes"] > 0).all()

    def test_fig11(self, spark):
        out = fig11_sampling_quality.run(
            spark, n=80, seed=0, sample_fractions=(0.4,), thresholds=(0.05,),
            functions=("f1",), datasets=("airport",),
        )
        assert len(out) == 1
        assert 0.0 <= out.iloc[0]["f1_score"] <= 1.0

    def test_fig12(self, spark):
        out = fig12_sampling_runtime.run(
            spark, n=80, seed=0, sample_fractions=(0.4, 1.0), datasets=("airport",)
        )
        assert len(out) == 2
        full = out[out["sample"] == 1.0].iloc[0]
        assert full["pct_of_full"] == 100.0

    def test_fig13(self, spark):
        out = fig13_threshold_validation.run(
            spark, n=100, seed=0, sample_fractions=(0.3, 0.8), datasets=("airport",)
        )
        assert len(out) == 2
        # margin must shrink with the sample (monotone in n, §7 Inequality 2)
        small, big = out.iloc[0], out.iloc[1]
        assert small["n_pairs"] < big["n_pairs"]

    def test_fig14(self, spark):
        out = fig14_grecall.run(
            spark, n=80, seed=0, thresholds=(0.0, 0.01), functions=("f1",),
            datasets=("airport",),
        )
        assert len(out) == 4  # 2 noise modes × 2 thresholds
        assert out["g_recall"].between(0, 1).all()
