"""Small text utilities shared by the pipeline and baselines.

LCS (paper §4, event tagging), TF-IDF bag-of-words vectors with cosine
similarity (phrase normalization §3.1, Eq. 11, document tagging), and
n-gram extraction (AutoPhrase-style baseline).
"""
from __future__ import annotations

import math
from collections import Counter


def lcs_length(a: list[str], b: list[str]) -> int:
    """Length of the longest common subsequence of token lists a, b."""
    if not a or not b:
        return 0
    prev = [0] * (len(b) + 1)
    for x in a:
        cur = [0] * (len(b) + 1)
        for j, y in enumerate(b, 1):
            cur[j] = prev[j - 1] + 1 if x == y else max(prev[j], cur[j - 1])
        prev = cur
    return prev[-1]


def contains_in_order(needle: list[str], haystack: list[str]) -> bool:
    """True if ``needle`` is a (not necessarily contiguous) subsequence."""
    it = iter(haystack)
    return all(any(tok == h for h in it) for tok in needle)


def tf_vector(tokens: list[str]) -> dict[str, float]:
    """Raw term-frequency vector of ``tokens``."""
    return dict(Counter(tokens))


def tfidf_vector(tokens: list[str], idf: dict[str, float], default_idf: float = 1.0) -> dict[str, float]:
    """TF-IDF vector of ``tokens`` given an idf table."""
    return {t: c * idf.get(t, default_idf) for t, c in Counter(tokens).items()}


def cosine(u: dict[str, float], v: dict[str, float]) -> float:
    """Cosine similarity between sparse vectors (0.0 if either is empty)."""
    if not u or not v:
        return 0.0
    dot = sum(w * v[t] for t, w in u.items() if t in v)
    nu = math.sqrt(sum(w * w for w in u.values()))
    nv = math.sqrt(sum(w * w for w in v.values()))
    if nu == 0.0 or nv == 0.0:
        return 0.0
    return dot / (nu * nv)


def idf_table(docs: list[list[str]]) -> dict[str, float]:
    """Smoothed idf over tokenized documents: log((1+N)/(1+df)) + 1."""
    n = len(docs)
    df: Counter[str] = Counter()
    for d in docs:
        df.update(set(d))
    return {t: math.log((1 + n) / (1 + c)) + 1.0 for t, c in df.items()}


def ngrams(tokens: list[str], n_min: int = 2, n_max: int = 4) -> list[tuple[str, ...]]:
    """All n-grams of ``tokens`` for n in [n_min, n_max]."""
    out: list[tuple[str, ...]] = []
    for n in range(n_min, n_max + 1):
        out.extend(tuple(tokens[i : i + n]) for i in range(len(tokens) - n + 1))
    return out
