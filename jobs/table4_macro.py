#!/usr/bin/env python
"""Table 4 — macro-average P/R/F1 per algorithm (+ Nemenyi ranks of Fig. 2)."""
from _shared import main_table, print_table

from repro.experiments.tables import nemenyi, table4


def build(clean_results, **kw):
    for metric in ("f1", "precision", "recall"):
        res = nemenyi(clean_results, metric)
        print(
            f"[Friedman/Nemenyi {metric}] N={res.n} chi2={res.chi2:.1f} "
            f"reject={res.reject_null} CD={res.critical_distance:.2f} "
            f"mean ranks: "
            + ", ".join(f"{a}={r:.2f}" for a, r in res.mean_ranks.items())
        )
    return table4(clean_results)


if __name__ == "__main__":
    main_table("Table 4: macro-average effectiveness", build)
