"""N-gram graph model: entity-graph construction, hand-computed
similarities, python-reference vs Spark path, DuckDB-oracle check."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.simgraph.graph_model import (
    GRAPH_MEASURES,
    graph_edges_of_text,
    spark_graph_edges,
)


class TestEntityGraph:
    def test_token_window_one(self):
        g = graph_edges_of_text("a b c", "token", 1)
        assert g == {"a\x1fb": 1, "b\x1fc": 1}

    def test_window_two_connects_within_two_positions(self):
        # nodes are token 2-grams; window n=2 links grams <= 2 apart
        g = graph_edges_of_text("a b c d", "token", 2)
        assert g == {
            "a b\x1fb c": 1, "a b\x1fc d": 1, "b c\x1fc d": 1,
        }

    def test_cooccurrence_counts_accumulate(self):
        g = graph_edges_of_text("a b a b", "token", 1)
        assert g["a\x1fb"] == 3  # ab, ba (same undirected key), ab

    def test_undirected_key_sorted(self):
        g = graph_edges_of_text("b a", "token", 1)
        assert list(g) == ["a\x1fb"]

    def test_char_grams(self):
        g = graph_edges_of_text("abcd", "char", 3)
        # grams: abc, bcd -> one edge within window 3
        assert g == {"abc\x1fbcd": 1}

    def test_empty(self):
        assert graph_edges_of_text("", "token", 1) == {}


def ref_similarities(g1: dict, g2: dict) -> dict:
    common = set(g1) & set(g2)
    if not common:
        return None
    ratio = sum(min(g1[e], g2[e]) / max(g1[e], g2[e]) for e in common)
    cos = len(common) / min(len(g1), len(g2))
    vs = ratio / max(len(g1), len(g2))
    ns = ratio / min(len(g1), len(g2))
    return {
        "containment": cos, "value": vs, "nvalue": ns,
        "overall": (cos + vs + ns) / 3,
    }


T1 = pd.DataFrame(
    {"id": [0, 1], "text": ["red fast car goes", "blue slow boat sails away"]}
)
T2 = pd.DataFrame(
    {"id": [0, 1], "text": ["red fast car goes", "red fast cab goes far"]}
)


class TestSparkGraphSimilarities:
    def test_identical_text_scores_one(self, spark):
        e = (
            spark_graph_edges(spark, T1, T2, "token", 1, max_df_frac=None)
            .toPandas()
            .set_index(["v1", "v2"])
        )
        for m in GRAPH_MEASURES:
            assert e.loc[(0, 0), m] == pytest.approx(1.0), m

    def test_matches_python_reference(self, spark):
        got = (
            spark_graph_edges(spark, T1, T2, "char", 3, max_df_frac=None)
            .toPandas()
            .set_index(["v1", "v2"])
            .sort_index()
        )
        graphs1 = {i: graph_edges_of_text(t, "char", 3) for i, t in zip(T1["id"], T1["text"])}
        graphs2 = {j: graph_edges_of_text(t, "char", 3) for j, t in zip(T2["id"], T2["text"])}
        expected_keys = set()
        for i, g1 in graphs1.items():
            for j, g2 in graphs2.items():
                ref = ref_similarities(g1, g2)
                if ref is None:
                    continue
                expected_keys.add((i, j))
                for m in GRAPH_MEASURES:
                    assert got.loc[(i, j), m] == pytest.approx(ref[m]), (i, j, m)
        assert set(got.index) == expected_keys

    def test_df_cap_drops_ubiquitous_keys(self, spark):
        # every entity shares 'x y'; with a tight cap that key vanishes
        t1 = pd.DataFrame({"id": range(6), "text": ["x y"] * 6})
        t2 = pd.DataFrame({"id": range(6), "text": ["x y"] * 6})
        uncapped = spark_graph_edges(spark, t1, t2, "token", 1, max_df_frac=None)
        capped = spark_graph_edges(spark, t1, t2, "token", 1, max_df_frac=0.5)
        assert uncapped.count() == 36
        assert capped.count() == 0

    def test_join_aggregation_against_duckdb(self, spark):
        """The ratio-sum aggregation validated by the DuckDB oracle."""
        rows = []
        for side, texts in (("1", T1), ("2", T2)):
            for eid, text in zip(texts["id"], texts["text"]):
                for k, w in graph_edges_of_text(text, "token", 1).items():
                    rows.append({"side": side, "id": eid, "ekey": k, "w": w})
        posts = pd.DataFrame(rows)
        p1 = posts[posts["side"] == "1"].rename(columns={"id": "v1", "w": "w1"})[
            ["v1", "ekey", "w1"]
        ]
        p2 = posts[posts["side"] == "2"].rename(columns={"id": "v2", "w": "w2"})[
            ["v2", "ekey", "w2"]
        ]
        from pyspark.sql import functions as F

        s1, s2 = spark.createDataFrame(p1), spark.createDataFrame(p2)
        joined = (
            s1.join(s2, on="ekey")
            .groupBy("v1", "v2")
            .agg(
                F.sum(
                    F.least(F.col("w1"), F.col("w2"))
                    / F.greatest(F.col("w1"), F.col("w2"))
                ).alias("ratio_sum")
            )
        )
        assert_equivalent(
            joined,
            "SELECT v1, v2, sum(least(w1, w2) * 1.0 / greatest(w1, w2)) AS ratio_sum "
            "FROM p1 JOIN p2 USING (ekey) GROUP BY v1, v2",
            p1=p1,
            p2=p2,
        )
