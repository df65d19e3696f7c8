"""Table 2 bench: dataset-analogue generation + profile statistics."""
from repro.datasets.generator import generate_pandas, profile_stats
from repro.datasets.registry import SPECS


def test_bench_table2_generation(benchmark):
    def run():
        df1, df2, gt = generate_pandas(SPECS["D1"])
        return profile_stats(df1), profile_stats(df2), len(gt)

    s1, s2, dups = benchmark(run)
    assert s1["n_entities"] == SPECS["D1"].n1
    assert dups == SPECS["D1"].n_dups
