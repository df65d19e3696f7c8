"""Vector-model similarities: dense path == Spark inverted-index path,
hand-computed values, and a DuckDB-oracle check of the join dataflow."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.simgraph.ngrams import grams
from repro.simgraph.vectors import (
    VECTOR_MEASURES,
    VECTOR_MODELS,
    dense_vector_edges,
    spark_vector_edges,
)

T1 = pd.DataFrame({"id": [0, 1, 2], "text": ["red fast car", "blue boat", "red car"]})
T2 = pd.DataFrame({"id": [0, 1], "text": ["red fast car", "green bike"]})


def canon(pdf: pd.DataFrame) -> pd.DataFrame:
    return (
        pdf.sort_values(["v1", "v2"]).reset_index(drop=True).round(9)
    )


class TestDenseBasics:
    def test_identical_text_perfect_scores(self):
        e = dense_vector_edges(T1, T2, "token", 1).set_index(["v1", "v2"])
        assert e.loc[(0, 0), "cosine_tf"] == pytest.approx(1.0)
        assert e.loc[(0, 0), "jaccard"] == pytest.approx(1.0)

    def test_jaccard_hand_computed(self):
        # {red, car} / {red, fast, car} for pair (2, 0)
        e = dense_vector_edges(T1, T2, "token", 1).set_index(["v1", "v2"])
        assert e.loc[(2, 0), "jaccard"] == pytest.approx(2 / 3)

    def test_disjoint_pairs_absent(self):
        e = dense_vector_edges(T1, T2, "token", 1)
        assert (1, 0) not in set(zip(e["v1"], e["v2"]))

    def test_cosine_tf_hand_computed(self):
        # pair (2,0): tf2 = (1/2, 1/2) over {red, car}; tf0 = 1/3 each
        # dot = 2 * (1/2 * 1/3); norms: sqrt(1/2), sqrt(3)/3
        e = dense_vector_edges(T1, T2, "token", 1).set_index(["v1", "v2"])
        expected = (2 * (0.5 * (1 / 3))) / (np.sqrt(0.5) * np.sqrt(3 * (1 / 3) ** 2))
        assert e.loc[(2, 0), "cosine_tf"] == pytest.approx(expected, rel=1e-5)

    def test_empty_collection(self):
        empty = pd.DataFrame({"id": [], "text": []})
        e = dense_vector_edges(empty, T2, "token", 1)
        assert len(e) == 0

    def test_arcs_positive_on_common_support(self):
        e = dense_vector_edges(T1, T2, "char", 3)
        assert (e["arcs"] > 0).all()


@pytest.mark.parametrize("kind,n", VECTOR_MODELS)
def test_spark_equals_dense(spark, kind, n):
    """Two independent implementations must agree on every measure."""
    dense = canon(dense_vector_edges(T1, T2, kind, n))
    dist = canon(spark_vector_edges(spark, T1, T2, kind, n).toPandas())
    pd.testing.assert_frame_equal(
        dense[["v1", "v2", *VECTOR_MEASURES]],
        dist[["v1", "v2", *VECTOR_MEASURES]],
        check_dtype=False,
        atol=1e-9,
    )


def test_inverted_index_join_against_duckdb(spark):
    """The core dataflow (explode -> join -> aggregate dot products)
    validated by the DuckDB oracle over the same posting tables."""
    kind, n = "token", 1
    postings = []
    for side, texts in (("1", T1), ("2", T2)):
        for eid, text in zip(texts["id"], texts["text"]):
            for g in grams(text, kind, n):
                postings.append({"side": side, "id": eid, "gram": g})
    posts = pd.DataFrame(postings)
    p = posts.groupby(["side", "id", "gram"], as_index=False).size()
    p1 = p[p["side"] == "1"].rename(columns={"id": "v1", "size": "c1"})[
        ["v1", "gram", "c1"]
    ]
    p2 = p[p["side"] == "2"].rename(columns={"id": "v2", "size": "c2"})[
        ["v2", "gram", "c2"]
    ]
    s1 = spark.createDataFrame(p1)
    s2 = spark.createDataFrame(p2)
    joined = (
        s1.join(s2, on="gram")
        .groupBy("v1", "v2")
        .agg({"*": "count"})
        .withColumnRenamed("count(1)", "n_common")
    )
    assert_equivalent(
        joined,
        "SELECT v1, v2, count(*) AS n_common FROM p1 JOIN p2 USING (gram) "
        "GROUP BY v1, v2",
        p1=p1,
        p2=p2,
    )


def test_spark_path_n_common_matches_duckdb_full_measure(spark):
    """End-to-end jaccard of the Spark path vs DuckDB-computed jaccard."""
    got = spark_vector_edges(spark, T1, T2, "token", 1).toPandas()
    rows = []
    for side, texts in (("1", T1), ("2", T2)):
        for eid, text in zip(texts["id"], texts["text"]):
            for g in set(grams(text, "token", 1)):
                rows.append({"side": side, "id": eid, "gram": g})
    posts = pd.DataFrame(rows)
    import duckdb

    con = duckdb.connect()
    con.register("posts", posts)
    expected = con.execute(
        """
        WITH p1 AS (SELECT id AS v1, gram FROM posts WHERE side='1'),
             p2 AS (SELECT id AS v2, gram FROM posts WHERE side='2'),
             d1 AS (SELECT v1, count(*) AS d1 FROM p1 GROUP BY v1),
             d2 AS (SELECT v2, count(*) AS d2 FROM p2 GROUP BY v2),
             c AS (SELECT v1, v2, count(*) AS nc FROM p1 JOIN p2 USING (gram)
                   GROUP BY v1, v2)
        SELECT v1, v2, nc * 1.0 / (d1 + d2 - nc) AS jaccard
        FROM c JOIN d1 USING (v1) JOIN d2 USING (v2)
        """
    ).fetchdf()
    con.close()
    merged = got.merge(expected, on=["v1", "v2"], suffixes=("", "_duck"))
    assert len(merged) == len(got) == len(expected)
    assert np.allclose(merged["jaccard"], merged["jaccard_duck"])
