"""Figure 7 — total runtimes: ADCMiner vs DCFinder-style vs AFASTDC-style.

Our stand-ins (DESIGN.md §2): ADCMiner = fast evidence builder + ADCEnum;
"DCFinder" = fast evidence builder + SearchMC (Pena et al. kept FASTDC's
enumeration); "AFASTDC" = naive per-pair-UDF evidence builder + SearchMC.
"""
import sys

import pandas as pd

sys.path.insert(0, ".")
from jobs.common import CORE_DATASETS, dataset_df, job_main  # noqa: E402


def run(spark, n: int = 150, seed: int = 0, eps: float = 0.01, datasets=None,
        max_results: int = 1000) -> pd.DataFrame:
    from repro.core import F1, adc_miner, build_predicate_space

    rows = []
    for name in datasets or CORE_DATASETS:
        spec, df = dataset_df(spark, name, n, seed)
        space = build_predicate_space(spec.pdf)
        variants = {
            "adcminer": dict(builder="fast", enumerator="adcenum"),
            "dcfinder": dict(builder="fast", enumerator="searchmc"),
            "afastdc": dict(builder="naive", enumerator="searchmc"),
        }
        row = {"dataset": name}
        for label, kw in variants.items():
            res = adc_miner(spark, df, F1(), eps, space=space, timeout_s=120,
                            max_results=max_results, **kw)
            row[f"{label}_total_s"] = round(res.timings["total"], 2)
            row[f"{label}_evidence_s"] = round(res.timings["evidence"], 2)
        rows.append(row)
        df.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    sys.exit(job_main(run, "Figure 7: total runtimes", n=250))
