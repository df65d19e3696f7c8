"""Table builders over synthetic sweep-result frames."""
import numpy as np
import pandas as pd
import pytest

from repro.core.matchers import ALGORITHM_ORDER
from repro.experiments.tables import (
    PAPER_TABLE7,
    nemenyi,
    table2,
    table3,
    table4,
    table5,
    table6,
    table8,
    table9,
)


def synthetic_results(n_graphs=12, seed=0):
    """Result rows mimicking a sweep: UMC engineered to dominate."""
    rng = np.random.default_rng(seed)
    rows = []
    fams = ["sb_syn", "sa_syn", "sb_sem", "sa_sem"]
    cats = {"D1": "SCR", "D2": "BLC", "D3": "OSD"}
    for g in range(n_graphs):
        ds = f"D{g % 3 + 1}"
        fam = fams[g % 4]
        for i, algo in enumerate(ALGORITHM_ORDER):
            bonus = 0.25 if algo == "UMC" else 0.0
            f1 = min(0.4 + 0.05 * i * rng.random() + bonus, 1.0)
            rows.append(
                {
                    "graph_id": f"g{g}", "dataset": ds, "category": cats[ds],
                    "family": fam, "model": "m", "measure": "x",
                    "n_edges": 100 + 10 * g, "gt_covered": 5, "n_gt": 10,
                    "algorithm": algo, "best_t": 0.05 * (g % 8 + 1),
                    "precision": f1, "recall": f1, "f1": f1,
                    "runtime_ms": 1.0 + i, "n_predicted": 10, "n_correct": 5,
                    "params": "{}",
                }
            )
    return pd.DataFrame(rows)


class TestTable2:
    def test_shape_and_columns(self):
        t = table2()
        assert len(t) == 10
        assert {"V1", "V2", "duplicates", "cartesian", "category"} <= set(t.columns)

    def test_cartesian_consistency(self):
        t = table2()
        assert (t["cartesian"] == t["V1"] * t["V2"]).all()

    def test_dataset_order(self):
        assert table2()["dataset"].tolist() == [f"D{i}" for i in range(1, 11)]


class TestTable3:
    def test_counts_graphs_once(self):
        res = synthetic_results()
        t = table3(res).set_index("dataset")
        # 12 graphs over 3 datasets x 4 families: one graph per cell
        assert t.loc["D1", "sb_syn_n_graphs"] == 1
        total = sum(
            t[f"{f}_n_graphs"].sum()
            for f in ("sb_syn", "sa_syn", "sb_sem", "sa_sem")
        )
        assert total == 12


class TestTable4:
    def test_umc_dominates_by_construction(self):
        t = table4(synthetic_results()).set_index("algorithm")
        assert t.loc["UMC", "f1_mu"] == t["f1_mu"].max()

    def test_all_algorithms_present(self):
        assert table4(synthetic_results())["algorithm"].tolist() == ALGORITHM_ORDER


class TestNemenyi:
    def test_umc_rank_one(self):
        res = nemenyi(synthetic_results(n_graphs=20))
        assert res.mean_ranks.index[0] == "UMC"
        assert res.k == 8


class TestTable5:
    def test_umc_top1_everywhere(self):
        t = table5(synthetic_results(n_graphs=20))
        umc = t[t["algorithm"] == "UMC"]
        others = t[t["algorithm"] != "UMC"]
        assert (umc["top1"] >= 1).any()
        assert umc["top1"].sum() > others.groupby("algorithm")["top1"].sum().max()

    def test_overall_row_sums_categories(self):
        t = table5(synthetic_results(n_graphs=20))
        fam = t[t["family"] == "sb_syn"]
        for algo in ALGORITHM_ORDER:
            per_cat = fam[(fam["category"] != "OVL") & (fam["algorithm"] == algo)][
                "top1"
            ].sum()
            ovl = fam[(fam["category"] == "OVL") & (fam["algorithm"] == algo)][
                "top1"
            ].iloc[0]
            assert per_cat == ovl


class TestTable6:
    def test_mean_runtime_grouping(self):
        t = table6(synthetic_results())
        row = t[(t["algorithm"] == "CNC")].iloc[0]
        assert row["runtime_ms_mu"] == pytest.approx(1.0)


class TestTable8:
    def test_quartiles_ordered(self):
        t = table8(synthetic_results(n_graphs=24))
        assert (t["q1"] <= t["q2"]).all() and (t["q2"] <= t["q3"]).all()
        assert (t["min"] <= t["q1"]).all() and (t["q3"] <= t["max"]).all()

    def test_all_family_algorithm_cells(self):
        t = table8(synthetic_results(n_graphs=24))
        assert len(t) == 4 * 8


class TestTable9:
    def test_mean_threshold_per_cell(self):
        t = table9(synthetic_results(n_graphs=24))
        assert {"t_mu", "t_sigma"} <= set(t.columns)
        assert t["t_mu"].between(0, 1).all()


class TestPaperReference:
    def test_paper_numbers_recorded(self):
        assert PAPER_TABLE7["D2"]["umc"] == 0.95
        assert set(PAPER_TABLE7) == {"D2", "D3", "D4", "D5"}
