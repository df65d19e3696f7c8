"""Token-level schema-based measures vs hand-computed values."""
import pytest

from repro.simgraph.strings import schema_based_batch


def row(a, b):
    return schema_based_batch([a], [b]).iloc[0]


class TestTokenMeasures:
    # a = {red, fast, car}, b = {red, car, cheap, cheap}
    A, B = "red fast car", "red car cheap cheap"

    def test_dice(self):
        # 2*|{red,car}| / (3 + 3)
        assert row(self.A, self.B)["tok_dice"] == pytest.approx(4 / 6)

    def test_jaccard(self):
        # |{red,car}| / |{red,fast,car,cheap}|
        assert row(self.A, self.B)["tok_jaccard"] == pytest.approx(2 / 4)

    def test_overlap(self):
        assert row(self.A, self.B)["tok_overlap"] == pytest.approx(2 / 3)

    def test_generalized_jaccard_uses_counts(self):
        # bags: min-sum = 2 (red, car), max-sum = 3 + 4 - 2 = 5
        assert row(self.A, self.B)["tok_genjaccard"] == pytest.approx(2 / 5)

    def test_cosine_bag(self):
        # dot = 1*1 + 1*1 = 2; |a| = sqrt(3), |b| = sqrt(1+1+4) = sqrt(6)
        assert row(self.A, self.B)["tok_cosine"] == pytest.approx(
            2 / (3**0.5 * 6**0.5)
        )

    def test_block(self):
        # L1 = |1-1| + 1(fast) + |1-1| + 2(cheap) = 3; totals 3 + 4
        assert row(self.A, self.B)["tok_block"] == pytest.approx(1 - 3 / 7)

    def test_euclid(self):
        # d = sqrt(0 + 1 + 0 + 4) = sqrt(5)
        assert row(self.A, self.B)["tok_euclid"] == pytest.approx(
            1 / (1 + 5**0.5)
        )

    def test_monge_elkan_identical(self):
        assert row("a b c", "a b c")["tok_monge_elkan"] == pytest.approx(1.0)

    def test_monge_elkan_asymmetric_direction(self):
        # averages max-Jaro from tokens of the *first* value
        r1 = row("red", "red extra tokens")["tok_monge_elkan"]
        r2 = row("red extra tokens", "red")["tok_monge_elkan"]
        assert r1 == pytest.approx(1.0)
        assert r2 < 1.0

    def test_disjoint_token_sets(self):
        r = row("aa bb", "cc dd")
        for m in ("tok_dice", "tok_jaccard", "tok_overlap", "tok_genjaccard",
                  "tok_cosine"):
            assert r[m] == 0.0

    def test_empty_side_zero(self):
        r = row("", "a b")
        assert r["tok_dice"] == 0.0 and r["tok_euclid"] == 0.0
