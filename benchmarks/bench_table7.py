"""Table 7 bench: UMC + the ZeroER/DITTO stand-ins on one TF-IDF
cosine similarity graph."""
import pandas as pd
import pytest

from repro.core.sweep import sweep_graph
from repro.experiments.baselines import ditto_lite, zeroer_lite


@pytest.fixture(scope="module")
def tfidf_graph(bench_run):
    out, manifest, _, _ = bench_run
    row = manifest[
        (manifest["measure"] == "cosine_tfidf")
        & (manifest["model"].str.startswith("vector-"))
    ].iloc[0]
    edges = pd.read_parquet(row["path"])
    gt = pd.read_parquet(f"{out}/{row['dataset']}__gt.parquet")
    truth = set(zip(gt["v1"].astype(int), gt["v2"].astype(int)))
    return (
        edges["v1"].to_numpy(),
        edges["v2"].to_numpy(),
        edges["w"].to_numpy(),
        truth,
    )


def test_bench_table7_umc(benchmark, tfidf_graph):
    v1, v2, w, truth = tfidf_graph
    rows = benchmark(
        lambda: sweep_graph(v1, v2, w, truth, algorithms=["UMC"], timing_reps=1)
    )
    assert rows[0]["algorithm"] == "UMC"


def test_bench_table7_zeroer_lite(benchmark, tfidf_graph):
    v1, v2, w, truth = tfidf_graph
    r = benchmark(zeroer_lite, v1, v2, w, truth)
    assert 0.0 <= r.f1 <= 1.0


def test_bench_table7_ditto_lite(benchmark, tfidf_graph):
    v1, v2, w, truth = tfidf_graph
    r = benchmark(ditto_lite, v1, v2, w, truth)
    assert 0.0 <= r.f1 <= 1.0
