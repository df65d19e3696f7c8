"""Table 3 bench: similarity-graph generation (the workload whose
output sizes Table 3 reports) + the table computation itself."""
import pandas as pd

from repro.datasets.generator import DatasetSpec
from repro.experiments.tables import table3
from repro.simgraph.build import build_dataset_graphs

SPEC = DatasetSpec(
    name="B3", label="bench-t3", domain="movie", n1=60, n2=90, n_dups=30,
    category="SCR", attributes=("title",), seed=33,
)


def test_bench_table3_graph_generation(benchmark, spark, tmp_path):
    # one full graph-factory pass over a small dataset (all families)
    counter = iter(range(1000))

    def run():
        out = str(tmp_path / f"g{next(counter)}")
        return build_dataset_graphs(spark, SPEC, out)

    manifest = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    assert len(manifest) > 40


def test_bench_table3_aggregation(benchmark, bench_run):
    _, _, _, clean_results = bench_run
    t = benchmark(table3, clean_results)
    assert "sb_syn_n_graphs" in t.columns
