"""Table 4 bench: the threshold-sweep workload behind the macro-average
effectiveness table, plus the aggregation + Nemenyi analysis."""
import pandas as pd

from repro.core.sweep import sweep_graph
from repro.experiments.tables import nemenyi, table4


def test_bench_table4_sweep_one_graph(benchmark, bench_run):
    out, manifest, _, _ = bench_run
    row = manifest.sort_values("n_edges", ascending=False).iloc[0]
    edges = pd.read_parquet(row["path"])
    gt = pd.read_parquet(f"{out}/{row['dataset']}__gt.parquet")
    truth = set(zip(gt["v1"].astype(int), gt["v2"].astype(int)))
    v1 = edges["v1"].to_numpy()
    v2 = edges["v2"].to_numpy()
    w = edges["w"].to_numpy()

    rows = benchmark.pedantic(
        lambda: sweep_graph(v1, v2, w, truth, timing_reps=1),
        rounds=1, iterations=1, warmup_rounds=0,
    )
    assert len(rows) == 8


def test_bench_table4_aggregation(benchmark, bench_run):
    _, _, _, clean_results = bench_run
    t = benchmark(table4, clean_results)
    assert len(t) == 8


def test_bench_table4_nemenyi(benchmark, bench_run):
    _, _, _, clean_results = bench_run
    res = benchmark(nemenyi, clean_results)
    assert res.k == 8
