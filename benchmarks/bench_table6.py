"""Table 6 bench: the matcher run-time experiment itself — each
algorithm timed on a similarity graph at its optimal threshold (this
is exactly what the paper's Table 6 reports)."""
import pandas as pd
import pytest

from repro.core.matchers import ALGORITHM_ORDER, ALGORITHMS


@pytest.fixture(scope="module")
def graph_and_thresholds(bench_run):
    out, manifest, results, _ = bench_run
    row = manifest.sort_values("n_edges", ascending=False).iloc[0]
    edges = pd.read_parquet(row["path"])
    best_t = (
        results[results["graph_id"] == row["graph_id"]]
        .set_index("algorithm")["best_t"]
        .to_dict()
    )
    return (
        edges["v1"].to_numpy(),
        edges["v2"].to_numpy(),
        edges["w"].to_numpy(),
        best_t,
    )


@pytest.mark.parametrize("algo", ALGORITHM_ORDER)
def test_bench_table6_matcher_runtime(benchmark, graph_and_thresholds, algo):
    v1, v2, w, best_t = graph_and_thresholds
    t = best_t.get(algo, 0.5)
    kw = {"seed": 42} if algo == "BAH" else {}
    out = benchmark(lambda: ALGORITHMS[algo](v1, v2, w, t, **kw))
    assert out.shape[1] == 2
