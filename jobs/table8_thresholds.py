#!/usr/bin/env python
"""Table 8 — optimal-threshold distribution per algorithm and family."""
from _shared import main_table

from repro.experiments.tables import table8

if __name__ == "__main__":
    main_table(
        "Table 8: similarity-threshold distribution",
        lambda clean_results, **kw: table8(clean_results),
    )
