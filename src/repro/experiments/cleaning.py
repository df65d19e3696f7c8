"""Result-cleaning rules of the paper (Sec. 5, "Generation Process").

Three rules, applied to the sweep results:
1. drop similarity graphs where all matching entities have zero edge
   weight (here: no ground-truth pair appears in the graph at all);
2. drop noisy graphs where *every* algorithm's best F-Measure < 0.25;
3. drop duplicate inputs: graphs of the same dataset with the same
   number of edges where at least two algorithms achieve their best
   performance with the same threshold and near-identical
   effectiveness (|dF1| < 0.2% and |dP| or |dR| < 0.2%).
"""
from __future__ import annotations

import pandas as pd

_EPS = 0.002  # the paper's 0.2%


def drop_zero_coverage(results: pd.DataFrame) -> pd.DataFrame:
    """Rule 1: ground truth entirely missing from the graph."""
    return results[results["gt_covered"] > 0]


def drop_noisy(results: pd.DataFrame, min_best_f1: float = 0.25) -> pd.DataFrame:
    """Rule 2: every algorithm below ``min_best_f1``."""
    best = results.groupby("graph_id")["f1"].transform("max")
    return results[best >= min_best_f1]


def _is_duplicate(a: pd.DataFrame, b: pd.DataFrame) -> bool:
    """Rule-3 predicate for two graphs' per-algorithm result frames."""
    m = a.merge(b, on="algorithm", suffixes=("_a", "_b"))
    same = (
        (m["best_t_a"] == m["best_t_b"])
        & ((m["f1_a"] - m["f1_b"]).abs() < _EPS)
        & (
            ((m["precision_a"] - m["precision_b"]).abs() < _EPS)
            | ((m["recall_a"] - m["recall_b"]).abs() < _EPS)
        )
    )
    return int(same.sum()) >= 2


def drop_duplicates(results: pd.DataFrame) -> pd.DataFrame:
    """Rule 3: near-identical graphs from the same dataset."""
    cols = ["algorithm", "best_t", "f1", "precision", "recall"]
    per_graph = {
        gid: g[cols] for gid, g in results.groupby("graph_id")
    }
    meta = (
        results[["graph_id", "dataset", "n_edges"]]
        .drop_duplicates()
        .sort_values("graph_id")
    )
    dropped: set[str] = set()
    for (_, _), grp in meta.groupby(["dataset", "n_edges"]):
        ids = list(grp["graph_id"])
        for i, gid_a in enumerate(ids):
            if gid_a in dropped:
                continue
            for gid_b in ids[i + 1 :]:
                if gid_b in dropped:
                    continue
                if _is_duplicate(per_graph[gid_a], per_graph[gid_b]):
                    dropped.add(gid_b)
    return results[~results["graph_id"].isin(dropped)]


def clean(results: pd.DataFrame) -> pd.DataFrame:
    """All three rules, in the paper's order."""
    return drop_duplicates(drop_noisy(drop_zero_coverage(results)))
