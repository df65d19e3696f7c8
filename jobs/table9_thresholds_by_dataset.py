#!/usr/bin/env python
"""Table 9 — mean optimal threshold per algorithm, dataset and family."""
from _shared import main_table

from repro.experiments.tables import table9

if __name__ == "__main__":
    main_table(
        "Table 9: mean optimal threshold per dataset",
        lambda clean_results, **kw: table9(clean_results),
    )
