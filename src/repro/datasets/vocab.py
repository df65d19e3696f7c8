"""Deterministic synthetic vocabulary for the CCER dataset analogues.

All pools derive from one master seed so every dataset draws from the
same language shape (shared tokens across entities create realistic
near-duplicate confusion). Words are syllable-composed; people, brands,
venues etc. are built on top.
"""
from __future__ import annotations

import numpy as np

_MASTER_SEED = 20220412  # EDBT 2022 vintage

_SYLLABLES = [
    "ba", "be", "bo", "ca", "ce", "co", "da", "de", "do", "fa", "fi",
    "ga", "go", "ha", "he", "ka", "ke", "la", "le", "li", "lo", "ma",
    "me", "mi", "mo", "na", "ne", "ni", "no", "pa", "pe", "po", "ra",
    "re", "ri", "ro", "sa", "se", "si", "so", "ta", "te", "ti", "to",
    "va", "ve", "vi", "za", "zo", "lu", "ru", "du", "tu", "ku", "nu",
]


def _word(rng: np.random.Generator, min_syl: int = 2, max_syl: int = 4) -> str:
    k = int(rng.integers(min_syl, max_syl + 1))
    return "".join(rng.choice(_SYLLABLES) for _ in range(k))


def _pool(rng: np.random.Generator, n: int, **kw) -> list[str]:
    seen: list[str] = []
    got: set[str] = set()
    while len(seen) < n:
        w = _word(rng, **kw)
        if w not in got:
            got.add(w)
            seen.append(w)
    return seen


class Vocab:
    """Lazily-built, deterministic word pools."""

    def __init__(self, seed: int = _MASTER_SEED):
        rng = np.random.default_rng(seed)
        self.nouns = _pool(rng, 600)
        self.adjectives = _pool(rng, 300)
        self.first_names = [w.capitalize() for w in _pool(rng, 250)]
        self.last_names = [w.capitalize() for w in _pool(rng, 400, min_syl=2, max_syl=3)]
        self.brands = [w.capitalize() for w in _pool(rng, 80)]
        self.cities = [w.capitalize() for w in _pool(rng, 120)]
        self.venues = [
            "Proc. " + w.upper()[:4] for w in _pool(rng, 60, min_syl=2, max_syl=2)
        ]
        self.cuisines = [w.capitalize() for w in _pool(rng, 25)]
        self.languages = [w.capitalize() for w in _pool(rng, 15)]

    def person(self, rng: np.random.Generator) -> str:
        return f"{rng.choice(self.first_names)} {rng.choice(self.last_names)}"

    def phrase(self, rng: np.random.Generator, n_words: int) -> str:
        words = []
        for _ in range(n_words):
            pool = self.adjectives if rng.random() < 0.35 else self.nouns
            words.append(str(rng.choice(pool)))
        return " ".join(words)


_VOCAB: Vocab | None = None


def vocab() -> Vocab:
    """The shared singleton vocabulary."""
    global _VOCAB
    if _VOCAB is None:
        _VOCAB = Vocab()
    return _VOCAB
