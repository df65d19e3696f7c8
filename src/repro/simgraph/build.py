"""Similarity-graph factory: every (representation model, similarity
measure) combination of DESIGN.md applied to one dataset analogue.

The output mirrors the paper's generation process (Sec. 5): no
blocking — every pair with raw similarity > 0 becomes an edge — and
min-max normalisation of each graph's weights to [0, 1]. Graphs are
written as parquet edge lists plus a manifest row per graph carrying
the provenance needed by the tables (dataset, weight-type family,
model, measure, edge count, ground-truth coverage).

Weight-type families (paper Figure 6):
  sb_syn — schema-based syntactic  (char- and token-level measures)
  sa_syn — schema-agnostic syntactic (n-gram vector and graph models)
  sb_sem — schema-based semantic   (pseudo-embeddings over one attribute)
  sa_sem — schema-agnostic semantic (pseudo-embeddings over all values)
"""
from __future__ import annotations

import os
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..datasets.generator import DatasetSpec, generate_pandas
from .graph_model import GRAPH_MODELS, spark_graph_edges
from .ngrams import entity_text, normalize
from .semantic import SEMANTIC_MEASURES, SEMANTIC_MODELS, semantic_edges
from .strings import SCHEMA_BASED_MEASURES, schema_based_batch
from .vectors import VECTOR_MODELS, dense_vector_edges, spark_vector_edges

FAMILIES = ["sb_syn", "sa_syn", "sb_sem", "sa_sem"]


def _texts_schema_agnostic(df: pd.DataFrame) -> pd.DataFrame:
    return pd.DataFrame(
        {"id": df["id"], "text": [entity_text(r) for _, r in df.iterrows()]}
    )


def _texts_attribute(df: pd.DataFrame, attr: str) -> pd.DataFrame:
    return pd.DataFrame({"id": df["id"], "text": [normalize(v) for v in df[attr]]})


def minmax(raw: pd.DataFrame) -> pd.DataFrame:
    """Keep edges with raw weight > 0, min-max normalise to [0, 1]."""
    out = raw[raw["w"] > 0][["v1", "v2", "w"]].copy()
    if out.empty:
        return out
    lo, hi = out["w"].min(), out["w"].max()
    out["w"] = 1.0 if hi <= lo else (out["w"] - lo) / (hi - lo)
    return out.reset_index(drop=True)


def _emit(
    wide: pd.DataFrame, measures: list[str]
) -> Iterator[tuple[str, pd.DataFrame]]:
    """Split a wide (v1, v2, m1..mk) frame into per-measure edge lists."""
    for m in measures:
        yield m, minmax(wide[["v1", "v2", m]].rename(columns={m: "w"}))


def _schema_based_syntactic(
    spark: SparkSession, df1: pd.DataFrame, df2: pd.DataFrame, attr: str
) -> pd.DataFrame:
    """All 15 schema-based measures for all pairs, via mapInPandas."""
    p1 = spark.createDataFrame(
        pd.DataFrame({"v1": df1["id"], "val1": df1[attr].astype(object)})
    )
    p2 = spark.createDataFrame(
        pd.DataFrame({"v2": df2["id"], "val2": df2[attr].astype(object)})
    )
    pairs = p1.crossJoin(p2).repartition(64)
    schema = "v1 long, v2 long, " + ", ".join(
        f"{m} double" for m in SCHEMA_BASED_MEASURES
    )

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            sims = schema_based_batch(list(pdf["val1"]), list(pdf["val2"]))
            sims.insert(0, "v2", pdf["v2"].to_numpy())
            sims.insert(0, "v1", pdf["v1"].to_numpy())
            yield sims

    return pairs.mapInPandas(kernel, schema=schema).toPandas()


def _semantic(
    spark: SparkSession, texts1: pd.DataFrame, texts2: pd.DataFrame, model: str
) -> pd.DataFrame:
    """Distributed all-pairs semantic scoring: side-1 partitions x
    broadcast side-2."""
    t2 = texts2  # captured by the closure, broadcast with the task
    sdf1 = spark.createDataFrame(texts1).repartition(32)
    schema = "v1 long, v2 long, cosine double, euclid_sim double, wms double"

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            yield semantic_edges(pdf, t2, model)

    return sdf1.mapInPandas(kernel, schema=schema).toPandas()


def build_dataset_graphs(
    spark: SparkSession,
    spec: DatasetSpec,
    out_dir: str,
    families: list[str] = FAMILIES,
) -> pd.DataFrame:
    """Build and persist every similarity graph for one dataset.

    Returns the manifest frame (one row per graph) and writes each
    graph to ``{out_dir}/{dataset}__{family}__{model}__{measure}.parquet``
    plus the ground truth to ``{out_dir}/{dataset}__gt.parquet``.
    """
    os.makedirs(out_dir, exist_ok=True)
    df1, df2, gt = generate_pandas(spec)
    gt.to_parquet(os.path.join(out_dir, f"{spec.name}__gt.parquet"))
    gt_pairs = set(zip(gt["v1"], gt["v2"]))
    sa1, sa2 = _texts_schema_agnostic(df1), _texts_schema_agnostic(df2)
    attr = spec.primary_attribute
    sb1, sb2 = _texts_attribute(df1, attr), _texts_attribute(df2, attr)

    produced: list[tuple[str, str, str, pd.DataFrame]] = []

    if "sa_syn" in families:
        for kind, n in VECTOR_MODELS:
            model = f"vector-{kind}{n}"
            if kind == "char":  # small vocab, huge gram DF: dense matmul
                wide = dense_vector_edges(sa1, sa2, kind, n)
            else:  # big vocab, small gram DF: inverted-index join
                wide = spark_vector_edges(spark, sa1, sa2, kind, n).toPandas()
            for measure, edges in _emit(
                wide, [c for c in wide.columns if c not in ("v1", "v2")]
            ):
                produced.append(("sa_syn", model, measure, edges))
        for kind, n in GRAPH_MODELS:
            model = f"graph-{kind}{n}"
            wide = spark_graph_edges(spark, sa1, sa2, kind, n).toPandas()
            for measure, edges in _emit(
                wide, [c for c in wide.columns if c not in ("v1", "v2")]
            ):
                produced.append(("sa_syn", model, measure, edges))

    if "sb_syn" in families:
        wide = _schema_based_syntactic(spark, df1, df2, attr)
        for measure, edges in _emit(wide, SCHEMA_BASED_MEASURES):
            produced.append(("sb_syn", attr, measure, edges))

    for family, t1, t2 in (("sb_sem", sb1, sb2), ("sa_sem", sa1, sa2)):
        if family not in families:
            continue
        for model in SEMANTIC_MODELS:
            wide = _semantic(spark, t1, t2, model)
            for measure, edges in _emit(wide, SEMANTIC_MEASURES):
                produced.append((family, model, measure, edges))

    rows = []
    for family, model, measure, edges in produced:
        graph_id = f"{spec.name}__{family}__{model}__{measure}"
        path = os.path.join(out_dir, f"{graph_id}.parquet")
        edges.to_parquet(path)
        covered = sum(
            1 for p in zip(edges["v1"], edges["v2"]) if p in gt_pairs
        )
        rows.append(
            {
                "graph_id": graph_id,
                "dataset": spec.name,
                "category": spec.category,
                "family": family,
                "model": model,
                "measure": measure,
                "n_edges": int(len(edges)),
                "gt_covered": int(covered),
                "n_gt": int(len(gt_pairs)),
                "path": path,
            }
        )
    return pd.DataFrame(rows)
