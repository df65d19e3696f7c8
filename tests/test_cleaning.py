"""The paper's three result-cleaning rules (Sec. 5)."""
import pandas as pd
import pytest

from repro.experiments.cleaning import (
    clean,
    drop_duplicates,
    drop_noisy,
    drop_zero_coverage,
)


def make_results(rows):
    base = {
        "dataset": "D1", "category": "SCR", "family": "sb_syn",
        "model": "m", "measure": "x", "n_edges": 100, "gt_covered": 5,
        "n_gt": 10, "precision": 0.5, "recall": 0.5, "f1": 0.5,
        "best_t": 0.5, "runtime_ms": 1.0, "algorithm": "UMC",
    }
    return pd.DataFrame([{**base, **r} for r in rows])


class TestZeroCoverage:
    def test_drops_uncovered_graphs(self):
        res = make_results(
            [{"graph_id": "g1", "gt_covered": 0}, {"graph_id": "g2", "gt_covered": 3}]
        )
        out = drop_zero_coverage(res)
        assert set(out["graph_id"]) == {"g2"}


class TestNoisy:
    def test_drops_when_every_algorithm_below_threshold(self):
        res = make_results(
            [
                {"graph_id": "bad", "algorithm": "UMC", "f1": 0.1},
                {"graph_id": "bad", "algorithm": "CNC", "f1": 0.2},
                {"graph_id": "ok", "algorithm": "UMC", "f1": 0.1},
                {"graph_id": "ok", "algorithm": "CNC", "f1": 0.9},
            ]
        )
        out = drop_noisy(res)
        assert set(out["graph_id"]) == {"ok"}
        assert len(out) == 2  # the whole 'ok' graph survives

    def test_boundary_is_inclusive(self):
        res = make_results([{"graph_id": "edge", "f1": 0.25}])
        assert len(drop_noisy(res)) == 1


class TestDuplicates:
    def _dup_pair(self, f1_b=0.5, n_edges_b=100, t_b=0.5):
        rows = []
        for gid, f1, ne, t in (
            ("a", 0.5, 100, 0.5), ("b", f1_b, n_edges_b, t_b),
        ):
            for algo in ("UMC", "CNC"):
                rows.append(
                    {
                        "graph_id": gid, "algorithm": algo, "f1": f1,
                        "n_edges": ne, "best_t": t,
                    }
                )
        return make_results(rows)

    def test_identical_graphs_deduped(self):
        out = drop_duplicates(self._dup_pair())
        assert set(out["graph_id"]) == {"a"}

    def test_different_edge_count_not_deduped(self):
        out = drop_duplicates(self._dup_pair(n_edges_b=101))
        assert set(out["graph_id"]) == {"a", "b"}

    def test_different_threshold_not_deduped(self):
        out = drop_duplicates(self._dup_pair(t_b=0.6))
        assert set(out["graph_id"]) == {"a", "b"}

    def test_different_f1_not_deduped(self):
        out = drop_duplicates(self._dup_pair(f1_b=0.6))
        assert set(out["graph_id"]) == {"a", "b"}

    def test_different_dataset_not_deduped(self):
        res = self._dup_pair()
        res.loc[res["graph_id"] == "b", "dataset"] = "D2"
        out = drop_duplicates(res)
        assert set(out["graph_id"]) == {"a", "b"}


class TestCleanComposition:
    def test_all_rules_applied(self):
        res = make_results(
            [
                {"graph_id": "zero", "gt_covered": 0, "f1": 0.9},
                {"graph_id": "noisy", "f1": 0.05},
                {"graph_id": "keep", "f1": 0.9},
            ]
        )
        out = clean(res)
        assert set(out["graph_id"]) == {"keep"}
