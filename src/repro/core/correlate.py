"""Entity correlate edges via co-occurrence embeddings (paper §3.2).

High-frequency co-occurring entity pairs (same query or same document
body sentence) are positives; negative pairs are sampled uniformly.
Entity embeddings are trained with a hinge loss so correlated entities
sit close in Euclidean space; pairs under a distance threshold become
``correlate`` edges. Co-occurrence counting is Spark ETL over the
mention table; embedding training is driver-side numpy.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def cooccurring_entity_pairs(mentions: DataFrame) -> DataFrame:
    """(ea, eb, n) counts of entity co-mentions in one body sentence."""
    a = mentions.select("doc_id", "sent_idx", F.col("entity_phrase").alias("ea"))
    b = mentions.select("doc_id", "sent_idx", F.col("entity_phrase").alias("eb"))
    return (
        a.join(b, ["doc_id", "sent_idx"])
        .where(F.col("ea") < F.col("eb"))
        .groupBy("ea", "eb")
        .agg(F.count("*").alias("n"))
    )


class EntityEmbeddings:
    """Hinge-loss entity embeddings over positive/negative pairs."""

    def __init__(self, entities: list[str], *, dim: int = 16, seed: int = 0) -> None:
        self.entities = sorted(set(entities))
        self.index = {e: i for i, e in enumerate(self.entities)}
        rng = np.random.default_rng(seed)
        # Wide init: entities that never co-occur keep a large mutual
        # distance (E||x-y|| ≈ sqrt(2·dim) ≫ tau); only trained-together
        # pairs end up close. A narrow init would leave every untrained
        # pair near the origin and flood the threshold with false edges.
        self.emb = rng.normal(0, 1.0, (len(self.entities), dim))

    def fit(
        self,
        positives: list[tuple[str, str]],
        *,
        margin: float = 2.0,
        lr: float = 0.05,
        epochs: int = 60,
        neg_per_pos: int = 2,
        seed: int = 1,
    ) -> "EntityEmbeddings":
        """Pull positive pairs together (d² loss) and push sampled
        negatives apart (max(0, margin - d)² loss)."""
        rng = np.random.default_rng(seed)
        pos = [
            (self.index[a], self.index[b])
            for a, b in positives
            if a in self.index and b in self.index and a != b
        ]
        if not pos:
            return self
        pos_set = {(min(a, b), max(a, b)) for a, b in pos}
        n = len(self.entities)
        for _ in range(epochs):
            order = rng.permutation(len(pos))
            for k in order:
                i, j = pos[k]
                diff = self.emb[i] - self.emb[j]
                # d(pos)^2 gradient: 2*diff
                self.emb[i] -= lr * diff
                self.emb[j] += lr * diff
                for _neg in range(neg_per_pos):
                    m = int(rng.integers(n))
                    if m == i or (min(i, m), max(i, m)) in pos_set:
                        continue
                    diff_n = self.emb[i] - self.emb[m]
                    d = np.linalg.norm(diff_n)
                    if d < margin and d > 1e-9:
                        # max(0, margin-d)^2 gradient pushes apart
                        g = -(margin - d) / d
                        self.emb[i] -= lr * g * diff_n
                        self.emb[m] += lr * g * diff_n
        return self

    def distance(self, a: str, b: str) -> float:
        ia, ib = self.index.get(a), self.index.get(b)
        if ia is None or ib is None:
            return float("inf")
        return float(np.linalg.norm(self.emb[ia] - self.emb[ib]))

    def pairs_within(self, tau: float) -> pd.DataFrame:
        """All entity pairs with Euclidean distance < tau (vectorized)."""
        if len(self.entities) < 2:
            return pd.DataFrame(columns=["ea", "eb", "distance"])
        sq = (self.emb**2).sum(axis=1)
        d2 = sq[:, None] + sq[None, :] - 2 * self.emb @ self.emb.T
        d2 = np.maximum(d2, 0.0)
        rows = []
        n = len(self.entities)
        for i in range(n):
            for j in range(i + 1, n):
                d = float(np.sqrt(d2[i, j]))
                if d < tau:
                    rows.append(
                        {"ea": self.entities[i], "eb": self.entities[j], "distance": d}
                    )
        return pd.DataFrame(rows, columns=["ea", "eb", "distance"])


def correlate_edges(
    mentions: DataFrame,
    queries: DataFrame,
    entity_phrases: list[str],
    *,
    min_count: int = 1,
    tau: float = 0.7,
    dim: int = 16,
    seed: int = 0,
) -> pd.DataFrame:
    """Full correlate pipeline: count -> embed -> threshold.

    ``queries`` supplies extra co-occurrence: two entity phrases inside
    one query text (rare but high-precision).
    """
    pairs = cooccurring_entity_pairs(mentions).where(F.col("n") >= min_count).toPandas()
    positives = [(r.ea, r.eb) for r in pairs.itertuples()]
    inventory = sorted(set(entity_phrases))
    q = queries.select("text").toPandas()
    for text in q.text:
        padded = f" {text} "
        present = [e for e in inventory if f" {e} " in padded]
        for i in range(len(present)):
            for j in range(i + 1, len(present)):
                positives.append((present[i], present[j]))
    emb = EntityEmbeddings(inventory, dim=dim, seed=seed).fit(positives)
    return emb.pairs_within(tau)
