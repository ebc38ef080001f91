"""Table 4 — datasets: #tuples, #attributes, #golden DCs.

Prints the paper's Table-4 row next to the generated stand-in's actual
shape so EXPERIMENTS.md can diff them (attribute and golden-DC counts must
match exactly; tuple counts are scaled, see DESIGN.md §2).
"""
import sys

import pandas as pd

sys.path.insert(0, ".")
from jobs.common import job_main, print_table  # noqa: E402


def run(spark, n: int = 400, seed: int = 0) -> pd.DataFrame:
    from repro.core import build_predicate_space
    from repro.datasets import DATASETS

    rows = []
    for name, gen in DATASETS.items():
        spec = gen(n, seed=seed)
        space = build_predicate_space(spec.pdf)
        ok = all(dc.violating_pairs_pandas(spec.pdf) == 0 for dc in spec.golden)
        rows.append(
            {
                "dataset": name,
                "paper_tuples": spec.paper_tuples,
                "our_tuples": spec.n_tuples,
                "paper_attrs": spec.paper_attrs,
                "our_attrs": spec.n_attrs,
                "paper_golden": spec.paper_golden,
                "our_golden": len(spec.golden),
                "predicates": len(space),
                "golden_valid_on_clean": ok,
            }
        )
    return pd.DataFrame(rows)


if __name__ == "__main__":
    sys.exit(job_main(run, "Table 4: datasets"))
