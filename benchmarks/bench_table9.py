"""Table 9 bench: mean optimal threshold per dataset aggregation."""
from repro.experiments.tables import table9


def test_bench_table9(benchmark, bench_run):
    _, _, _, clean_results = bench_run
    t = benchmark(table9, clean_results)
    assert {"t_mu", "t_sigma"} <= set(t.columns)
