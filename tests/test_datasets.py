"""Dataset analogue generators: determinism, ground-truth validity and
the structural fingerprints the paper's analysis conditions on."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import (
    CATEGORY_OF,
    DATASET_ORDER,
    SPECS,
    DatasetSpec,
    generate_pandas,
    profile_stats,
    vocab,
)

SMALL = DatasetSpec(
    name="T", label="t", domain="product", n1=50, n2=70, n_dups=30,
    category="SCR", attributes=("title",), seed=3,
)


class TestRegistry:
    def test_ten_datasets(self):
        assert DATASET_ORDER == [f"D{i}" for i in range(1, 11)]
        assert set(SPECS) >= set(DATASET_ORDER)

    @pytest.mark.parametrize("name", DATASET_ORDER)
    def test_spec_sanity(self, name):
        s = SPECS[name]
        assert s.n_dups <= min(s.n1, s.n2)
        assert s.category in ("BLC", "OSD", "SCR")
        assert s.primary_attribute in {"name", "title"}

    def test_categories_match_paper_grouping(self):
        # paper Sec. 6 QE(4): BLC = D2, D4, D10; OSD = D3, D9; SCR = rest
        assert {d for d, c in CATEGORY_OF.items() if c == "BLC"} >= {"D2", "D4", "D10"}
        assert {d for d, c in CATEGORY_OF.items() if c == "OSD"} >= {"D3", "D9"}
        for d in ("D1", "D5", "D6", "D7", "D8"):
            assert CATEGORY_OF[d] == "SCR"

    def test_balanced_means_most_entities_matched(self):
        for d in ("D2", "D4", "D10"):
            s = SPECS[d]
            assert s.n_dups / min(s.n1, s.n2) > 0.8

    def test_scarce_means_few_entities_matched(self):
        for d in ("D1", "D5", "D6", "D7", "D8"):
            s = SPECS[d]
            assert s.n_dups / min(s.n1, s.n2) < 0.5

    def test_one_sided(self):
        for d in ("D3", "D9"):
            s = SPECS[d]
            small, large = min(s.n1, s.n2), max(s.n1, s.n2)
            assert s.n_dups / small > 0.8 and s.n_dups / large < 0.5


class TestGenerator:
    def test_deterministic(self):
        a = generate_pandas(SMALL)
        b = generate_pandas(SMALL)
        for x, y in zip(a, b):
            pd.testing.assert_frame_equal(x, y)

    def test_sizes(self):
        df1, df2, gt = generate_pandas(SMALL)
        assert len(df1) == 50 and len(df2) == 70 and len(gt) == 30

    def test_ids_contiguous(self):
        df1, df2, _ = generate_pandas(SMALL)
        assert sorted(df1["id"]) == list(range(50))
        assert sorted(df2["id"]) == list(range(70))

    def test_ground_truth_is_one_to_one(self):
        _, _, gt = generate_pandas(SMALL)
        assert gt["v1"].is_unique and gt["v2"].is_unique

    def test_ground_truth_ids_exist(self):
        df1, df2, gt = generate_pandas(SMALL)
        assert gt["v1"].isin(df1["id"]).all()
        assert gt["v2"].isin(df2["id"]).all()

    def test_duplicates_share_content(self):
        """GT pairs come from the same base entity: their primary
        attribute should be far more similar than random pairs."""
        from repro.simgraph.strings import schema_based_batch

        df1, df2, gt = generate_pandas(SMALL)
        a = df1.set_index("id").loc[gt["v1"], "title"].tolist()
        b = df2.set_index("id").loc[gt["v2"], "title"].tolist()
        dup_sim = schema_based_batch(a, b)["tok_jaccard"].mean()
        rng = np.random.default_rng(0)
        ra = df1["title"].sample(30, random_state=1).tolist()
        rb = df2["title"].sample(30, random_state=2).tolist()
        rnd_sim = schema_based_batch(ra, rb)["tok_jaccard"].mean()
        assert dup_sim > rnd_sim + 0.2

    def test_dups_exceeding_small_side_rejected(self):
        bad = DatasetSpec(
            name="X", label="x", domain="bib", n1=10, n2=5, n_dups=8,
            category="BLC", attributes=("title",),
        )
        with pytest.raises(ValueError):
            generate_pandas(bad)

    def test_unknown_domain_rejected(self):
        bad = DatasetSpec(
            name="X", label="x", domain="geo", n1=5, n2=5, n_dups=2,
            category="BLC", attributes=("name",),
        )
        with pytest.raises(ValueError):
            generate_pandas(bad)

    @pytest.mark.parametrize("domain,attr", [
        ("restaurant", "name"), ("product", "title"),
        ("bib", "title"), ("movie", "title"),
    ])
    def test_domains_have_expected_attributes(self, domain, attr):
        spec = DatasetSpec(
            name="X", label="x", domain=domain, n1=8, n2=8, n_dups=4,
            category="BLC", attributes=(attr,), seed=1,
        )
        df1, _, _ = generate_pandas(spec)
        assert attr in df1.columns

    def test_missing_values_present(self):
        spec = DatasetSpec(
            name="X", label="x", domain="movie", n1=100, n2=100, n_dups=50,
            category="BLC", attributes=("title",), missing=0.4, seed=2,
        )
        df1, _, _ = generate_pandas(spec)
        frac = df1.drop(columns="id").isna().mean().mean()
        assert 0.2 < frac < 0.6

    def test_misplaced_values(self):
        spec = DatasetSpec(
            name="X", label="x", domain="bib", n1=200, n2=200, n_dups=100,
            category="BLC", attributes=("title",), misplace=1.0, seed=4,
        )
        clean = DatasetSpec(
            name="Y", label="y", domain="bib", n1=200, n2=200, n_dups=100,
            category="BLC", attributes=("title",), misplace=0.0, seed=4,
        )
        noisy_len = generate_pandas(spec)[0]["title"].str.len().mean()
        clean_len = generate_pandas(clean)[0]["title"].str.len().mean()
        assert noisy_len > clean_len  # leaked values lengthen attributes


class TestProfileStats:
    def test_counts_name_value_pairs(self):
        df = pd.DataFrame({"id": [0, 1], "a": ["x", None], "b": ["y", "z"]})
        s = profile_stats(df)
        assert s == {
            "n_entities": 2, "n_nvp": 3, "n_attributes": 2, "avg_profile": 1.5,
        }


class TestVocab:
    def test_singleton_and_deterministic(self):
        assert vocab() is vocab()
        assert vocab().nouns[:3] == vocab().nouns[:3]

    def test_pools_unique(self):
        v = vocab()
        assert len(set(v.nouns)) == len(v.nouns)
        assert len(set(v.last_names)) == len(v.last_names)
