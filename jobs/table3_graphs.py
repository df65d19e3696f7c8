#!/usr/bin/env python
"""Table 3 — number and size of similarity graphs per dataset/family."""
from _shared import main_table

from repro.experiments.tables import table3

if __name__ == "__main__":
    main_table(
        "Table 3: similarity graphs per dataset and weight family",
        lambda clean_results, **kw: table3(clean_results),
    )
