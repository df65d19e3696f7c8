"""End-to-end experiment pipeline (paper Sec. 5 "Generation Process").

Stage 1 — ``build_all_graphs``: every similarity function applied to
every dataset analogue, written as parquet edge lists + manifest.

Stage 2 — ``run_sweep``: the threshold-sweep protocol executed as a
*distributed parameter sweep*: one Spark task per (graph, algorithm),
scheduled with ``mapInPandas`` over the task list (largest graphs
first so stragglers start early). Each task loads its edge list,
sweeps t in {0.05..1.0}, picks the largest threshold with max F1 and
measures the matcher run-time at it.

Results are persisted to parquet so the table builders and jobs can
re-read them without recomputing.
"""
from __future__ import annotations

import json
import os
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.matchers import ALGORITHM_ORDER
from ..core.sweep import THRESHOLDS, sweep_graph
from ..datasets.registry import DATASET_ORDER, SPECS
from ..simgraph.build import FAMILIES, build_dataset_graphs

_RESULT_SCHEMA = (
    "graph_id string, algorithm string, best_t double, precision double, "
    "recall double, f1 double, n_predicted long, n_correct long, "
    "runtime_ms double, params string"
)


def build_all_graphs(
    spark: SparkSession,
    out_dir: str,
    datasets: list[str] = DATASET_ORDER,
    families: list[str] = FAMILIES,
) -> pd.DataFrame:
    """Stage 1: build every similarity graph; returns the manifest."""
    parts = []
    for name in datasets:
        parts.append(build_dataset_graphs(spark, SPECS[name], out_dir, families))
    manifest = pd.concat(parts, ignore_index=True)
    manifest.to_parquet(os.path.join(out_dir, "manifest.parquet"))
    return manifest


def run_sweep(
    spark: SparkSession,
    manifest: pd.DataFrame,
    out_dir: str,
    *,
    algorithms: list[str] = ALGORITHM_ORDER,
    thresholds=THRESHOLDS,
    timing_reps: int = 3,
    bah_max_moves: int = 10_000,
) -> pd.DataFrame:
    """Stage 2: the distributed (graph x algorithm) parameter sweep."""
    gt_paths = {
        ds: os.path.join(out_dir, f"{ds}__gt.parquet")
        for ds in manifest["dataset"].unique()
    }
    tasks = []
    # biggest graphs first: long tasks start before short ones
    ordered = manifest.sort_values("n_edges", ascending=False)
    for _, g in ordered.iterrows():
        for algo in algorithms:
            tasks.append(
                {
                    "graph_id": g["graph_id"],
                    "path": g["path"],
                    "gt_path": gt_paths[g["dataset"]],
                    "algorithm": algo,
                }
            )
    tasks_pdf = pd.DataFrame(tasks)
    n_slices = max(1, len(tasks_pdf))
    tdf = spark.createDataFrame(tasks_pdf).repartition(min(n_slices, 256))
    reps, grid, moves = timing_reps, [float(t) for t in thresholds], bah_max_moves

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            out = []
            for _, task in pdf.iterrows():
                edges = pd.read_parquet(task["path"])
                gt = pd.read_parquet(task["gt_path"])
                truth = set(zip(gt["v1"].astype(int), gt["v2"].astype(int)))
                rows = sweep_graph(
                    edges["v1"].to_numpy(),
                    edges["v2"].to_numpy(),
                    edges["w"].to_numpy(),
                    truth,
                    algorithms=[task["algorithm"]],
                    thresholds=grid,
                    timing_reps=reps,
                    bah_max_moves=moves,
                )
                for r in rows:
                    r["graph_id"] = task["graph_id"]
                    r["params"] = json.dumps(r["params"])
                    out.append(r)
            cols = [
                "graph_id", "algorithm", "best_t", "precision", "recall",
                "f1", "n_predicted", "n_correct", "runtime_ms", "params",
            ]
            yield pd.DataFrame(out)[cols] if out else pd.DataFrame(columns=cols)

    res = tdf.mapInPandas(kernel, schema=_RESULT_SCHEMA).toPandas()
    results = res.merge(
        manifest[
            ["graph_id", "dataset", "category", "family", "model", "measure",
             "n_edges", "gt_covered", "n_gt"]
        ],
        on="graph_id",
    )
    results.to_parquet(os.path.join(out_dir, "results.parquet"))
    return results


def run_all(
    spark: SparkSession,
    out_dir: str,
    datasets: list[str] = DATASET_ORDER,
    families: list[str] = FAMILIES,
    **sweep_kw,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Convenience: stage 1 + stage 2. Returns (manifest, results)."""
    manifest = build_all_graphs(spark, out_dir, datasets, families)
    results = run_sweep(spark, manifest, out_dir, **sweep_kw)
    return manifest, results


def load_results(out_dir: str) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Re-read a previous run's manifest and results."""
    return (
        pd.read_parquet(os.path.join(out_dir, "manifest.parquet")),
        pd.read_parquet(os.path.join(out_dir, "results.parquet")),
    )


def normalized_size(results: pd.DataFrame) -> pd.Series:
    """|E| / |V1 x V2| per row (threshold-correlation analyses)."""
    cross = {
        name: float(SPECS[name].n1 * SPECS[name].n2) for name in SPECS
    }
    return results["n_edges"] / results["dataset"].map(cross)
