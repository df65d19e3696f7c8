#!/usr/bin/env python
"""Table 6 — mean matcher run-time per algorithm, dataset and family."""
from _shared import main_table

from repro.experiments.tables import table6

if __name__ == "__main__":
    main_table(
        "Table 6: mean run-time (ms)",
        lambda clean_results, **kw: table6(clean_results),
    )
