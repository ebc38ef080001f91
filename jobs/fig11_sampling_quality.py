"""Figure 11 — F1 score of sample-mined vs full-mined ADCs.

Sweeps sample sizes at fixed thresholds and thresholds at fixed sample
sizes, for f1/f2/f3, comparing the DC set mined from the sample against
the DC set mined from the full dataset (the paper's §8.3 protocol).
"""
import sys

import pandas as pd

sys.path.insert(0, ".")
from jobs.common import dataset_df, job_main  # noqa: E402


def run(spark, n: int = 150, seed: int = 0,
        sample_fractions=(0.1, 0.2, 0.4, 0.6, 0.8),
        thresholds=(0.005, 0.02),
        functions=("f1", "f2", "f3"),
        datasets=("tax", "hospital", "food", "airport"),
        max_results: int = 1500) -> pd.DataFrame:
    from repro.core import F1, F2, F3Greedy, adc_miner, build_predicate_space
    from repro.metrics import prf

    fmap = {"f1": F1, "f2": F2, "f3": F3Greedy}
    rows = []
    for name in datasets:
        spec, df = dataset_df(spark, name, n, seed)
        space = build_predicate_space(spec.pdf)
        for fname in functions:
            f = fmap[fname]()
            for eps in thresholds:
                full = adc_miner(spark, df, f, eps, space=space, timeout_s=90,
                                 max_results=max_results)
                for frac in sample_fractions:
                    sampled = adc_miner(
                        spark, df, f, eps, space=space, max_results=max_results,
                        sample_fraction=frac, seed=seed + 1, timeout_s=90,
                    )
                    r = prf(sampled.dcs, full.dcs)
                    rows.append(
                        {
                            "dataset": name,
                            "function": fname,
                            "eps": eps,
                            "sample": frac,
                            "n_sampled": sampled.n_sampled,
                            "precision": round(r.precision, 3),
                            "recall": round(r.recall, 3),
                            "f1_score": round(r.f1, 3),
                        }
                    )
        df.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    sys.exit(job_main(run, "Figure 11: sampling quality (F1 score)", n=300))
