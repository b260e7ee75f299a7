"""Attention linking (paper §3.2): isA / involve edge construction.

- Attention -> category: click co-occurrence. P(g|p) is the fraction of
  the attention's clicks that land on documents of category g; an isA
  edge appears when P(g|p) > δ_q (= 0.3). Pure DataFrame ETL.
- Concept -> entity isA: a logistic-regression classifier over features
  mined from the click graph, trained on an *automatically constructed*
  dataset (paper Fig. 4): positives are concept-entity pairs that occur
  as consecutive queries in one session AND where the entity is
  mentioned in a document clicked for the concept; negatives are
  same-category entities inserted into random document positions. The
  paper suggests "a classifier such as GBDT based on manual features";
  our numpy LR plays that role (DESIGN.md §2).
- Entity mentions in document bodies are found distributed
  (mapInPandas with the entity inventory broadcast).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

DELTA_Q = 0.3


# --------------------------------------------------------------------------
# Attention -> category
# --------------------------------------------------------------------------
def category_edges(
    members: DataFrame, clicks: DataFrame, docs: DataFrame, *, delta_q: float = DELTA_Q
) -> DataFrame:
    """isA edges between categories and attention nodes.

    ``members``: (node_phrase, qid) — the queries whose clusters merged
    into each node. P(g|p) aggregates those queries' clicks by target
    document category; rows above ``delta_q`` survive.
    """
    joined = (
        members.join(clicks, "qid")
        .join(docs.select("doc_id", "category"), "doc_id")
        .groupBy("node_phrase", "category")
        .agg(F.sum("count").alias("n_g"))
    )
    totals = joined.groupBy("node_phrase").agg(F.sum("n_g").alias("n_p"))
    return (
        joined.join(totals, "node_phrase")
        .select(
            "node_phrase",
            "category",
            (F.col("n_g") / F.col("n_p")).alias("p_g_given_p"),
        )
        .where(F.col("p_g_given_p") > delta_q)
    )


# --------------------------------------------------------------------------
# Entity mentions
# --------------------------------------------------------------------------
_MENTION_SCHEMA = T.StructType(
    [
        T.StructField("doc_id", T.LongType()),
        T.StructField("entity_phrase", T.StringType()),
        T.StructField("sent_idx", T.IntegerType()),
    ]
)


def entity_mentions(docs: DataFrame, entity_phrases: list[str]) -> DataFrame:
    """(doc_id, entity_phrase, sent_idx) for every body mention.

    Scans distributed with the inventory shipped in the task closure
    (the paper's deployment similarly matches a known entity
    vocabulary against documents).
    """
    inventory = sorted(set(entity_phrases))

    def scan(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            rows = []
            for doc_id, body in zip(pdf["doc_id"], pdf["body"]):
                sentences = [s.strip() for s in str(body).split(".")]
                for si, sent in enumerate(sentences):
                    padded = f" {sent} "
                    for e in inventory:
                        if f" {e} " in padded:
                            rows.append(
                                {
                                    "doc_id": int(doc_id),
                                    "entity_phrase": e,
                                    "sent_idx": si,
                                }
                            )
            yield pd.DataFrame(rows, columns=["doc_id", "entity_phrase", "sent_idx"])

    return docs.select("doc_id", "body").mapInPandas(scan, schema=_MENTION_SCHEMA)


# --------------------------------------------------------------------------
# Concept-entity isA classifier (paper Fig. 4)
# --------------------------------------------------------------------------
def candidate_pairs(
    members: DataFrame, clicks: DataFrame, mentions: DataFrame, *, min_clicks: int = 2
) -> DataFrame:
    """(node_phrase, entity_phrase, n_docs, click_mass) candidates: the
    entity is mentioned in a document clicked for the concept with at
    least ``min_clicks`` total clicks (single stray clicks — the noise
    edges of any real click log — do not create candidates)."""
    concept_docs = (
        members.join(clicks, "qid")
        .groupBy("node_phrase", "doc_id")
        .agg(F.sum("count").alias("clicks"))
        .where(F.col("clicks") >= min_clicks)
    )
    return (
        concept_docs.join(mentions.select("doc_id", "entity_phrase").distinct(), "doc_id")
        .groupBy("node_phrase", "entity_phrase")
        .agg(
            F.countDistinct("doc_id").alias("n_docs"),
            F.sum("clicks").alias("click_mass"),
        )
    )


def session_pairs(
    sessions: DataFrame, queries: DataFrame, members: DataFrame
) -> DataFrame:
    """(node_phrase, entity_phrase, n_sessions): consecutive-query
    evidence — a concept query immediately followed by an entity query
    in the same session (Fig. 4's positive criterion i)."""
    q = queries.select("qid", "text")
    step0 = (
        sessions.where(F.col("step") == 0)
        .join(members, "qid")
        .select("session_id", "node_phrase")
    )
    step1 = (
        sessions.where(F.col("step") == 1)
        .join(q, "qid")
        .select("session_id", F.col("text").alias("entity_phrase"))
    )
    return (
        step0.join(step1, "session_id")
        .groupBy("node_phrase", "entity_phrase")
        .agg(F.count("*").alias("n_sessions"))
    )


def _isa_sentence_hit(body: str, entity: str, suffix: str) -> bool:
    """Does a body sentence assert '<entity> is a/are ... <suffix>'?"""
    for sent in str(body).split("."):
        padded = f" {sent.strip()} "
        if f" {entity} " in padded and f" {suffix} " in padded and (
            " is " in padded or " are " in padded
        ):
            return True
    return False


def pair_features(
    pairs: pd.DataFrame,
    doc_bodies: dict[int, str],
    concept_docs: dict[str, list[int]],
) -> np.ndarray:
    """Feature matrix for concept-entity pairs.

    Columns: log(1+n_docs), log(1+click_mass), log(1+n_sessions),
    is-a-sentence hit (full concept phrase — the bare suffix would also
    match sibling concepts' docs), multi-doc support indicator.
    """
    feats = np.zeros((len(pairs), 5))
    for i, r in enumerate(pairs.itertuples()):
        feats[i, 0] = np.log1p(r.n_docs)
        feats[i, 1] = np.log1p(r.click_mass)
        feats[i, 2] = np.log1p(getattr(r, "n_sessions", 0.0) or 0.0)
        hit = 0.0
        for d in concept_docs.get(r.node_phrase, []):
            if _isa_sentence_hit(doc_bodies.get(d, ""), r.entity_phrase, r.node_phrase):
                hit = 1.0
                break
        feats[i, 3] = hit
        feats[i, 4] = 1.0 if r.n_docs >= 2 else 0.0
    return feats


class LogisticRegression:
    """Minimal numpy LR with L2, full-batch gradient descent."""

    def __init__(self, *, lr: float = 0.5, epochs: int = 300, l2: float = 1e-3, seed: int = 0):
        self.lr = lr
        self.epochs = epochs
        self.l2 = l2
        self.seed = seed
        self.w: np.ndarray | None = None
        self.b: float = 0.0

    def fit(self, x: np.ndarray, y: np.ndarray) -> "LogisticRegression":
        rng = np.random.default_rng(self.seed)
        self.w = rng.normal(0, 0.01, x.shape[1])
        self.b = 0.0
        for _ in range(self.epochs):
            p = self.predict_proba(x)
            g = p - y
            self.w -= self.lr * (x.T @ g / len(y) + self.l2 * self.w)
            self.b -= self.lr * float(g.mean())
        return self

    def predict_proba(self, x: np.ndarray) -> np.ndarray:
        z = x @ self.w + self.b
        return 1.0 / (1.0 + np.exp(-np.clip(z, -30, 30)))


def build_training_pairs(
    cands: pd.DataFrame,
    doc_bodies: dict[int, str],
    concept_docs: dict[str, list[int]],
    entity_category: dict[str, str],
    concept_category: dict[str, str],
    *,
    seed: int = 0,
) -> tuple[pd.DataFrame, np.ndarray]:
    """Auto-labeled training set per paper Fig. 4.

    Positives: candidates with session evidence AND a mention. Negatives:
    for each positive, a same-category entity *inserted* into the
    concept's docs context — realized as a candidate row whose mention
    evidence is synthetic (n_docs of the donor pair, no session, no
    is-a sentence).
    """
    rng = np.random.default_rng(seed)
    pos = cands[(cands.get("n_sessions", 0) > 0) & (cands.n_docs > 0)].copy()
    pos["label"] = 1
    neg_rows = []
    by_cat: dict[str, list[str]] = {}
    for e, c in entity_category.items():
        by_cat.setdefault(c, []).append(e)
    for _, r in pos.iterrows():
        cat = concept_category.get(r.node_phrase)
        pool = [
            e
            for e in by_cat.get(cat, [])
            if e != r.entity_phrase
        ]
        if not pool:
            continue
        fake = sorted(pool)[int(rng.integers(len(pool)))]
        neg_rows.append(
            {
                "node_phrase": r.node_phrase,
                "entity_phrase": fake,
                "n_docs": r.n_docs,
                "click_mass": 0.0,
                "n_sessions": 0.0,
                "label": 0,
            }
        )
    train = pd.concat([pos, pd.DataFrame(neg_rows)], ignore_index=True)
    feats = pair_features(train, doc_bodies, concept_docs)
    return train, feats


def concept_entity_edges(
    cands: pd.DataFrame,
    doc_bodies: dict[int, str],
    concept_docs: dict[str, list[int]],
    entity_category: dict[str, str],
    concept_category: dict[str, str],
    *,
    threshold: float = 0.5,
    seed: int = 0,
) -> pd.DataFrame:
    """Train the Fig.-4 classifier and score all candidate pairs.

    Returns (node_phrase, entity_phrase, score) rows above threshold.
    """
    train, train_x = build_training_pairs(
        cands, doc_bodies, concept_docs, entity_category, concept_category, seed=seed
    )
    if train.empty or train.label.nunique() < 2:
        return pd.DataFrame(columns=["node_phrase", "entity_phrase", "score"])
    clf = LogisticRegression(seed=seed).fit(train_x, train.label.to_numpy())
    all_x = pair_features(cands, doc_bodies, concept_docs)
    scores = clf.predict_proba(all_x)
    out = cands[["node_phrase", "entity_phrase"]].copy()
    out["score"] = scores
    return out[out.score >= threshold].reset_index(drop=True)
