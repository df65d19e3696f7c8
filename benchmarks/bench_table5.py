"""Table 5 bench: #Top1 / delta / #Top2 aggregation per category."""
from repro.experiments.tables import table5


def test_bench_table5(benchmark, bench_run):
    _, _, _, clean_results = bench_run
    t = benchmark(table5, clean_results)
    assert {"top1", "delta_pp", "top2"} <= set(t.columns)
    assert set(t["category"]) <= {"BLC", "OSD", "SCR", "OVL"}
