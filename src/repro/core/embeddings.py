"""Distributional word vectors: PPMI + SVD over the synthetic corpus.

Substitute for the paper's BERT phrase encodings (Eq. 9) and
directional skip-gram word vectors (Eq. 10): story-tree formation only
consumes *relative* similarities, which any reasonable distributional
embedding supplies (DESIGN.md §2). Co-occurrence counting is a Spark
aggregation; the (small, vocab²) PPMI matrix is factorized on the
driver with numpy SVD.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.nlp.tokenize import is_stop, tokenize


def cooccurrence_pairs(
    spark: SparkSession, texts: DataFrame, *, window: int = 3
) -> DataFrame:
    """(a, b, n) symmetric co-occurrence counts over a ``text`` column.

    Content tokens within ``window`` positions co-occur. Computed as
    DataFrame ETL: tokenize + posexplode, self-join on (text_id, offset
    band), aggregate.
    """
    toks = texts.select(
        F.monotonically_increasing_id().alias("tid"), "text"
    ).select(
        "tid", F.posexplode(F.split(F.col("text"), " ")).alias("pos", "tok")
    )
    toks = toks.where(F.length("tok") > 0)
    a = toks.select("tid", F.col("pos").alias("pa"), F.col("tok").alias("a"))
    b = toks.select("tid", F.col("pos").alias("pb"), F.col("tok").alias("b"))
    return (
        a.join(b, "tid")
        .where(
            (F.col("pb") > F.col("pa")) & (F.col("pb") - F.col("pa") <= window)
        )
        .groupBy("a", "b")
        .agg(F.count("*").alias("n"))
    )


class WordVectors:
    """PPMI-SVD embeddings with cosine lookups."""

    def __init__(self, vocab: list[str], mat: np.ndarray) -> None:
        self.vocab = vocab
        self.index = {w: i for i, w in enumerate(vocab)}
        norms = np.linalg.norm(mat, axis=1, keepdims=True)
        self.mat = mat / np.maximum(norms, 1e-12)

    def __contains__(self, w: str) -> bool:
        return w in self.index

    def vector(self, w: str) -> np.ndarray | None:
        i = self.index.get(w)
        return self.mat[i] if i is not None else None

    def phrase_vector(self, phrase: str) -> np.ndarray:
        """Mean of content-token vectors (zero vector if all OOV)."""
        vecs = [
            self.mat[self.index[t]]
            for t in tokenize(phrase)
            if not is_stop(t) and t in self.index
        ]
        if not vecs:
            return np.zeros(self.mat.shape[1])
        v = np.mean(vecs, axis=0)
        n = np.linalg.norm(v)
        return v / n if n > 0 else v

    def similarity(self, a: str, b: str) -> float:
        """Cosine similarity of phrase vectors."""
        return float(self.phrase_vector(a) @ self.phrase_vector(b))


def train_word_vectors(
    spark: SparkSession,
    texts: DataFrame,
    *,
    dim: int = 32,
    window: int = 3,
    min_count: int = 2,
) -> WordVectors:
    """PPMI-SVD vectors from a DataFrame with a ``text`` column."""
    pairs = cooccurrence_pairs(spark, texts, window=window).toPandas()
    # Symmetrize and drop stop words / punctuation.
    rows = []
    for _, r in pairs.iterrows():
        if is_stop(r.a) or is_stop(r.b):
            continue
        rows.append((r.a, r.b, r.n))
        if r.a != r.b:
            rows.append((r.b, r.a, r.n))
    if not rows:
        return WordVectors([], np.zeros((0, dim)))
    df = pd.DataFrame(rows, columns=["a", "b", "n"])
    counts = df.groupby("a")["n"].sum()
    vocab = sorted(counts[counts >= min_count].index)
    idx = {w: i for i, w in enumerate(vocab)}
    n_total = float(df.n.sum())
    m = np.zeros((len(vocab), len(vocab)))
    row_sum = df.groupby("a")["n"].sum()
    for _, r in df.iterrows():
        i, j = idx.get(r.a), idx.get(r.b)
        if i is None or j is None:
            continue
        pmi = np.log(
            (r.n / n_total)
            / ((row_sum[r.a] / n_total) * (row_sum[r.b] / n_total))
        )
        m[i, j] = max(0.0, pmi)
    u, s, _ = np.linalg.svd(m, full_matrices=False)
    k = min(dim, len(s))
    mat = u[:, :k] * np.sqrt(s[:k])
    return WordVectors(vocab, mat)
