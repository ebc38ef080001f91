"""Figure 12 — ADCMiner total runtime for varying sample sizes (f1).

The paper's headline: the evidence-set scan is quadratic in the sample, so
a 40% sample cuts total time by 60–95%.
"""
import sys

import pandas as pd

sys.path.insert(0, ".")
from jobs.common import CORE_DATASETS, dataset_df, job_main  # noqa: E402


def run(spark, n: int = 300, seed: int = 0, eps: float = 0.005,
        sample_fractions=(0.2, 0.4, 0.6, 0.8, 1.0), datasets=None,
        max_results: int = 1000) -> pd.DataFrame:
    from repro.core import F1, adc_miner, build_predicate_space

    rows = []
    for name in datasets or CORE_DATASETS:
        spec, df = dataset_df(spark, name, n, seed)
        space = build_predicate_space(spec.pdf)
        base_total = None
        for frac in sample_fractions:
            res = adc_miner(
                spark, df, F1(), eps, space=space, timeout_s=120,
                max_results=max_results,
                sample_fraction=None if frac >= 1.0 else frac, seed=seed + 2,
            )
            if frac >= 1.0:
                base_total = res.timings["total"]
            rows.append(
                {
                    "dataset": name,
                    "sample": frac,
                    "n_sampled": res.n_sampled,
                    "evidence_s": round(res.timings["evidence"], 2),
                    "enum_s": round(res.timings["enumeration"], 2),
                    "total_s": round(res.timings["total"], 2),
                }
            )
        for r in rows:
            if r["dataset"] == name and base_total:
                # ratio of the *rounded* totals so the 100% row is exact
                r["pct_of_full"] = round(100 * r["total_s"] / round(base_total, 2), 1)
        df.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    sys.exit(job_main(run, "Figure 12: runtime vs sample size"))
