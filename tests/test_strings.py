"""Schema-based measure kernels vs independent pure-python references."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.simgraph.strings import (
    SCHEMA_BASED_MEASURES,
    jaro,
    schema_based_batch,
)

WORDS = st.text(alphabet="abcdef ", min_size=0, max_size=18)


# ---------------------------------------------------------------- references
def ref_levenshtein(a: str, b: str) -> int:
    dp = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        prev, dp[0] = dp[0], i
        for j, cb in enumerate(b, 1):
            prev, dp[j] = dp[j], min(dp[j] + 1, dp[j - 1] + 1, prev + (ca != cb))
    return dp[len(b)]


def ref_osa(a: str, b: str) -> int:
    rows = [[i + j if i * j == 0 else 0 for j in range(len(b) + 1)] for i in range(len(a) + 1)]
    for i in range(1, len(a) + 1):
        for j in range(1, len(b) + 1):
            cost = a[i - 1] != b[j - 1]
            rows[i][j] = min(
                rows[i - 1][j] + 1, rows[i][j - 1] + 1, rows[i - 1][j - 1] + cost
            )
            if i > 1 and j > 1 and a[i - 1] == b[j - 2] and a[i - 2] == b[j - 1]:
                rows[i][j] = min(rows[i][j], rows[i - 2][j - 2] + 1)
    return rows[len(a)][len(b)]


def ref_lcs_seq(a: str, b: str) -> int:
    dp = [[0] * (len(b) + 1) for _ in range(len(a) + 1)]
    for i in range(1, len(a) + 1):
        for j in range(1, len(b) + 1):
            dp[i][j] = (
                dp[i - 1][j - 1] + 1
                if a[i - 1] == b[j - 1]
                else max(dp[i - 1][j], dp[i][j - 1])
            )
    return dp[len(a)][len(b)]


def ref_lcs_str(a: str, b: str) -> int:
    best = 0
    for i in range(len(a)):
        for j in range(len(b)):
            k = 0
            while i + k < len(a) and j + k < len(b) and a[i + k] == b[j + k]:
                k += 1
            best = max(best, k)
    return best


def ref_nw(a: str, b: str) -> int:
    """match 0, mismatch -1, gap -2; maximisation."""
    dp = [[0] * (len(b) + 1) for _ in range(len(a) + 1)]
    for i in range(1, len(a) + 1):
        dp[i][0] = -2 * i
    for j in range(1, len(b) + 1):
        dp[0][j] = -2 * j
    for i in range(1, len(a) + 1):
        for j in range(1, len(b) + 1):
            dp[i][j] = max(
                dp[i - 1][j] - 2,
                dp[i][j - 1] - 2,
                dp[i - 1][j - 1] + (0 if a[i - 1] == b[j - 1] else -1),
            )
    return dp[len(a)][len(b)]


PAIRS = [
    ("kitten", "sitting"),
    ("abcdef", "abcdef"),
    ("ca", "abc"),
    ("", "abc"),
    ("martha", "marhta"),
    ("dixon", "dicksonx"),
    ("red fast car", "fast red car"),
    ("aa bb", "aa bb cc"),
]


@pytest.mark.parametrize("a,b", PAIRS)
class TestEditFamilyAgainstReferences:
    def _row(self, a, b):
        return schema_based_batch([a], [b]).iloc[0]

    def test_levenshtein(self, a, b):
        ml = max(len(a.lower().strip()), len(b.lower().strip()), 1)
        expected = 1 - ref_levenshtein(a.lower(), b.lower()) / ml
        assert self._row(a, b)["levenshtein"] == pytest.approx(max(expected, 0), abs=1e-6)

    def test_damerau(self, a, b):
        ml = max(len(a), len(b), 1)
        expected = 1 - ref_osa(a.lower(), b.lower()) / ml
        assert self._row(a, b)["damerau"] == pytest.approx(max(expected, 0), abs=1e-6)

    def test_lcs_seq(self, a, b):
        ml = max(len(a), len(b), 1)
        expected = ref_lcs_seq(a.lower(), b.lower()) / ml
        assert self._row(a, b)["lcs_seq"] == pytest.approx(expected, abs=1e-6)

    def test_lcs_str(self, a, b):
        ml = max(len(a), len(b), 1)
        expected = ref_lcs_str(a.lower(), b.lower()) / ml
        assert self._row(a, b)["lcs_str"] == pytest.approx(expected, abs=1e-6)

    def test_needleman_wunsch(self, a, b):
        ml = max(len(a), len(b), 1)
        expected = min(max(1 + ref_nw(a.lower(), b.lower()) / (2 * ml), 0.0), 1.0)
        if not a or not b:
            expected = 0.0 if (not a and not b) else expected
        assert self._row(a, b)["needleman_wunsch"] == pytest.approx(
            expected, abs=1e-6
        )


class TestJaro:
    def test_known_values(self):
        assert jaro("martha", "marhta") == pytest.approx(0.944444, abs=1e-4)
        assert jaro("dixon", "dicksonx") == pytest.approx(0.766667, abs=1e-4)
        assert jaro("same", "same") == 1.0
        assert jaro("", "x") == 0.0

    def test_symmetry(self):
        assert jaro("crate", "trace") == pytest.approx(jaro("trace", "crate"))


@given(a=WORDS, b=WORDS)
@settings(max_examples=60, deadline=None)
def test_batch_matches_reference_on_random_pairs(a, b):
    row = schema_based_batch([a], [b]).iloc[0]
    an, bn = " ".join(a.split()).lower(), " ".join(b.split()).lower()
    ml = max(len(an), len(bn), 1)
    if an or bn:
        assert row["levenshtein"] == pytest.approx(
            max(1 - ref_levenshtein(an, bn) / ml, 0), abs=1e-6
        )
        assert row["lcs_str"] == pytest.approx(ref_lcs_str(an, bn) / ml, abs=1e-6)
    else:
        assert row["levenshtein"] == 0.0


@given(a=WORDS, b=WORDS)
@settings(max_examples=40, deadline=None)
def test_all_measures_bounded(a, b):
    row = schema_based_batch([a], [b])
    for m in SCHEMA_BASED_MEASURES:
        v = float(row[m].iloc[0])
        assert 0.0 <= v <= 1.0 + 1e-9, m


def test_batch_handles_none_values():
    out = schema_based_batch([None, "abc"], ["abc", None])
    assert (out.iloc[0] == 0).all() and (out.iloc[1] == 0).all()


def test_identical_strings_score_one():
    row = schema_based_batch(["exact same value"], ["exact same value"]).iloc[0]
    for m in SCHEMA_BASED_MEASURES:
        assert row[m] == pytest.approx(1.0), m


def test_long_strings_truncated_consistently():
    long = "x" * 100
    row = schema_based_batch([long], [long]).iloc[0]
    assert row["levenshtein"] == 1.0
