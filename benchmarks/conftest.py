"""Shared fixtures for the table benchmarks.

A reduced but end-to-end pipeline run (two small dataset analogues,
every similarity-function family) is built once per session; each
bench then exercises the piece of the pipeline that regenerates its
table. The full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/run_all.py`` instead.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))

import pandas as pd  # noqa: E402
import pytest  # noqa: E402

from repro.datasets.generator import DatasetSpec  # noqa: E402
from repro.experiments.cleaning import clean  # noqa: E402
from repro.experiments.runner import run_sweep  # noqa: E402
from repro.simgraph.build import build_dataset_graphs  # noqa: E402

BENCH_SPECS = [
    DatasetSpec(
        name="B1", label="bench-scarce", domain="product", n1=90, n2=180,
        n_dups=40, category="SCR", attributes=("title",), seed=31,
    ),
    DatasetSpec(
        name="B2", label="bench-balanced", domain="bib", n1=120, n2=110,
        n_dups=100, category="BLC", attributes=("title",), seed=32,
        misplace=0.2,
    ),
]


@pytest.fixture(scope="session")
def bench_run(spark, tmp_path_factory):
    """(run_dir, manifest, results, clean_results) for the bench suite."""
    import repro.datasets.registry as registry

    for spec in BENCH_SPECS:  # normalized_size needs registry entries
        registry.SPECS[spec.name] = spec
    out = str(tmp_path_factory.mktemp("bench_run"))
    manifest = pd.concat(
        [build_dataset_graphs(spark, spec, out) for spec in BENCH_SPECS],
        ignore_index=True,
    )
    manifest.to_parquet(os.path.join(out, "manifest.parquet"))
    results = run_sweep(spark, manifest, out, timing_reps=1)
    return out, manifest, results, clean(results)
