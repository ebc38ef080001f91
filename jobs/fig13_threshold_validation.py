"""Figure 13 — average (ε − p̂) over mined ADCs vs sample size.

Validates the §7 analysis: the mined-ADC margin ε − p̂ shrinks as the
sample grows, asymptotically like 1/√n with n = |V_J|(|V_J|−1) — the job
reports the ratio (ε − p̂)·√n which should stay roughly flat.
"""
import math
import sys

import pandas as pd

sys.path.insert(0, ".")
from jobs.common import dataset_df, job_main  # noqa: E402


def run(spark, n: int = 300, seed: int = 0, eps: float = 0.02,
        sample_fractions=(0.1, 0.2, 0.4, 0.6, 0.8),
        datasets=("tax", "hospital", "food", "airport"),
        max_results: int = 1500) -> pd.DataFrame:
    from repro.core import F1, adc_miner, build_predicate_space, one_minus_f1

    rows = []
    for name in datasets:
        spec, df = dataset_df(spark, name, n, seed)
        space = build_predicate_space(spec.pdf)
        for frac in sample_fractions:
            res = adc_miner(
                spark, df, F1(), eps, space=space, max_results=max_results,
                sample_fraction=frac, seed=seed + 3, timeout_s=90,
            )
            ev = res.evidence
            margins = []
            for hs in res.hitting_sets:
                sm = 0
                for e in hs:
                    sm |= 1 << e
                unc = [i for i, m in enumerate(ev.masks) if (m & sm) == 0]
                margins.append(eps - one_minus_f1(ev, unc))
            n_pairs = ev.total_pairs
            avg = sum(margins) / len(margins) if margins else float("nan")
            rows.append(
                {
                    "dataset": name,
                    "sample": frac,
                    "n_pairs": n_pairs,
                    "n_adcs": len(margins),
                    "avg_eps_minus_phat": round(avg, 5),
                    "scaled_by_sqrt_n": round(avg * math.sqrt(max(n_pairs, 1)), 3),
                }
            )
        df.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    sys.exit(job_main(run, "Figure 13: eps - p_hat vs sample size"))
