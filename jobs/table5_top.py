#!/usr/bin/env python
"""Table 5 — #Top1 / delta / #Top2 per algorithm, category and family."""
from _shared import main_table

from repro.experiments.tables import table5

if __name__ == "__main__":
    main_table(
        "Table 5: top performers per category",
        lambda clean_results, **kw: table5(clean_results),
    )
