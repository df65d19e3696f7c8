"""Integration: graph factory + distributed sweep on a tiny dataset."""
import os

import numpy as np
import pandas as pd
import pytest

from repro.core.matchers import ALGORITHM_ORDER
from repro.datasets.generator import DatasetSpec
from repro.experiments.runner import run_sweep
from repro.simgraph.build import FAMILIES, build_dataset_graphs, minmax

TINY = DatasetSpec(
    name="TT", label="tiny", domain="restaurant", n1=30, n2=60, n_dups=15,
    category="SCR", attributes=("name",), seed=21,
)


@pytest.fixture(scope="module")
def built(spark, tmp_path_factory):
    out = str(tmp_path_factory.mktemp("graphs"))
    manifest = build_dataset_graphs(spark, TINY, out)
    return out, manifest


class TestMinMax:
    def test_normalises_to_unit_interval(self):
        raw = pd.DataFrame({"v1": [1, 2, 3], "v2": [1, 2, 3], "w": [2.0, 4.0, 6.0]})
        out = minmax(raw)
        assert out["w"].tolist() == [0.0, 0.5, 1.0]

    def test_drops_nonpositive_raw_weights(self):
        raw = pd.DataFrame({"v1": [1, 2], "v2": [1, 2], "w": [0.0, 3.0]})
        out = minmax(raw)
        assert len(out) == 1

    def test_degenerate_all_equal(self):
        raw = pd.DataFrame({"v1": [1, 2], "v2": [1, 2], "w": [3.0, 3.0]})
        assert (minmax(raw)["w"] == 1.0).all()

    def test_empty(self):
        raw = pd.DataFrame({"v1": [], "v2": [], "w": []})
        assert minmax(raw).empty


class TestBuild:
    def test_all_families_produced(self, built):
        _, manifest = built
        assert set(manifest["family"]) == set(FAMILIES)

    def test_graph_files_exist_and_normalised(self, built):
        out, manifest = built
        for _, row in manifest.sample(8, random_state=0).iterrows():
            edges = pd.read_parquet(row["path"])
            assert set(edges.columns) == {"v1", "v2", "w"}
            assert len(edges) == row["n_edges"]
            if len(edges):
                assert edges["w"].between(0, 1).all()
                assert edges["w"].max() == pytest.approx(1.0)

    def test_ground_truth_persisted(self, built):
        out, _ = built
        gt = pd.read_parquet(os.path.join(out, "TT__gt.parquet"))
        assert len(gt) == TINY.n_dups

    def test_gt_coverage_counted(self, built):
        _, manifest = built
        # the schema-based syntactic graphs must cover most duplicates
        sb = manifest[manifest["family"] == "sb_syn"]
        assert (sb["gt_covered"] > 0.5 * TINY.n_dups).any()

    def test_edges_reference_valid_ids(self, built):
        _, manifest = built
        row = manifest.iloc[0]
        edges = pd.read_parquet(row["path"])
        assert edges["v1"].between(0, TINY.n1 - 1).all()
        assert edges["v2"].between(0, TINY.n2 - 1).all()

    def test_semantic_graphs_are_dense(self, built):
        _, manifest = built
        sem = manifest[
            (manifest["family"] == "sa_sem") & (manifest["measure"] == "euclid_sim")
        ]
        # the paper's Table 3: semantic inputs cover ~100% of all pairs
        assert (sem["n_edges"] == TINY.n1 * TINY.n2).all()


class TestRunSweep:
    @pytest.fixture(scope="class")
    def swept(self, spark, built):
        out, manifest = built
        sub = manifest.head(6)  # keep the test fast: 6 graphs x 8 algos
        results = run_sweep(spark, sub, out, timing_reps=1)
        return sub, results

    def test_one_row_per_graph_algorithm(self, swept):
        sub, results = swept
        assert len(results) == len(sub) * len(ALGORITHM_ORDER)

    def test_metadata_joined(self, swept):
        _, results = swept
        assert {"dataset", "family", "category", "n_edges"} <= set(results.columns)
        assert (results["dataset"] == "TT").all()

    def test_metrics_in_range(self, swept):
        _, results = swept
        for col in ("precision", "recall", "f1"):
            assert results[col].between(0, 1).all()
        assert results["best_t"].between(0.05, 1.0).all()
        assert (results["runtime_ms"] > 0).all()

    def test_results_persisted(self, swept, built):
        out, _ = built
        assert os.path.exists(os.path.join(out, "results.parquet"))

    def test_sweep_consistent_with_local(self, swept, built):
        """A distributed task's row must equal a driver-side sweep."""
        from repro.core.sweep import sweep_graph

        out, _ = built
        sub, results = swept
        row = results[results["algorithm"] == "UMC"].iloc[0]
        edges = pd.read_parquet(
            sub[sub["graph_id"] == row["graph_id"]]["path"].iloc[0]
        )
        gt = pd.read_parquet(os.path.join(out, "TT__gt.parquet"))
        truth = set(zip(gt["v1"].astype(int), gt["v2"].astype(int)))
        (local,) = sweep_graph(
            edges["v1"].to_numpy(), edges["v2"].to_numpy(),
            edges["w"].to_numpy(), truth, algorithms=["UMC"], timing_reps=1,
        )
        assert local["f1"] == pytest.approx(row["f1"])
        assert local["best_t"] == pytest.approx(row["best_t"])
