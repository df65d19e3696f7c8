"""N-gram extraction shared by all syntactic representation models.

Character n-grams keep (collapsed) spaces, as in the paper's example
("Joe Biden" -> 'Joe', 'oe ', 'e B', ...); token n-grams operate on
whitespace tokens. Everything is lowercased.
"""
from __future__ import annotations

import re

import pandas as pd

_WS = re.compile(r"\s+")


def normalize(text: str | None) -> str:
    """Lowercase and collapse whitespace; None -> empty string."""
    if text is None or (isinstance(text, float) and pd.isna(text)):
        return ""
    return _WS.sub(" ", str(text).strip().lower())


def char_ngrams(text: str, n: int) -> list[str]:
    """Overlapping character n-grams (a string shorter than n yields
    the string itself, so short values are still representable)."""
    s = normalize(text)
    if not s:
        return []
    if len(s) < n:
        return [s]
    return [s[i : i + n] for i in range(len(s) - n + 1)]


def tokens(text: str) -> list[str]:
    """Whitespace tokens of the normalized text."""
    s = normalize(text)
    return s.split(" ") if s else []


def token_ngrams(text: str, n: int) -> list[str]:
    """Token n-grams joined with a space (n=1 -> the tokens)."""
    toks = tokens(text)
    if not toks:
        return []
    if len(toks) < n:
        return [" ".join(toks)]
    return [" ".join(toks[i : i + n]) for i in range(len(toks) - n + 1)]


def grams(text: str, kind: str, n: int) -> list[str]:
    """Dispatch: ``kind`` in {'char', 'token'}."""
    if kind == "char":
        return char_ngrams(text, n)
    if kind == "token":
        return token_ngrams(text, n)
    raise ValueError(f"unknown n-gram kind {kind!r}")


def entity_text(row: pd.Series | dict, exclude: tuple[str, ...] = ("id",)) -> str:
    """Schema-agnostic representation: all attribute values, joined."""
    vals = []
    items = row.items() if hasattr(row, "items") else row
    for k, v in items:
        if k in exclude or v is None or (isinstance(v, float) and pd.isna(v)):
            continue
        vals.append(str(v))
    return normalize(" ".join(vals))
