"""Table 8 bench: threshold-distribution statistics per family."""
from repro.experiments.tables import table8


def test_bench_table8(benchmark, bench_run):
    _, _, _, clean_results = bench_run
    t = benchmark(table8, clean_results)
    assert {"q1", "q2", "q3", "pearson_size"} <= set(t.columns)
