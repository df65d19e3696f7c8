#!/usr/bin/env python
"""Table 2 — technical characteristics of the CCER dataset analogues."""
from _shared import main_table

from repro.experiments.tables import table2

if __name__ == "__main__":
    main_table("Table 2: dataset characteristics", lambda **kw: table2())
