"""Document tagging (paper §4 + §5.3).

Concept tagging combines a matching-based route — key entities of the
document looked up through mined concept-entity isA edges, scored by
TF-IDF coherence between the document title and the concept's
context-enriched representation — with the probabilistic inference of
Eq. 12-14 when the ontology has no parent concept for the entities.

Event tagging gates on two matchers, per the paper: an LCS-based
textual match between the event phrase and (title + first body
sentence), AND a learned semantic matcher. The paper uses the Duet
network; ours is a numpy logistic regression over overlap features,
trained on automatically constructed positives (event phrase vs its
clicked docs) and sampled negatives (DESIGN.md §2).

Tagging is distributed: documents stream through ``mapInPandas`` with
the (small) ontology tables in the closure.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.linking import LogisticRegression
from repro.nlp.textutil import cosine, idf_table, lcs_length, tfidf_vector
from repro.nlp.tokenize import content_tokens, is_stop, tokenize


# --------------------------------------------------------------------------
# Concept tagging
# --------------------------------------------------------------------------
def concept_context_reps(
    members: pd.DataFrame, merged: pd.DataFrame
) -> dict[str, list[str]]:
    """Concept -> context-enriched representation tokens (phrase + its
    clusters' top clicked titles), from the mining byproducts."""
    reps: dict[str, list[str]] = {}
    for _, r in merged.iterrows():
        toks = reps.setdefault(r.node_phrase, tokenize(r.node_phrase))
        for t in list(r.titles)[:5]:
            toks.extend(tokenize(t))
    return reps


def eq_12_14_scores(
    body: str,
    key_entities: list[str],
    concepts: list[str],
) -> dict[str, float]:
    """P(concept|doc) by Eq. 12-14 over the entities' context words.

    P(p|d) = Σ_i P(p|e_i) P(e_i|d);   P(p|e_i) = Σ_j P(p|x_j) P(x_j|e_i);
    P(p|x_j) = 1/|P_xj| when x_j is a substring of p. Context words are
    tokens sharing a sentence with the entity.
    """
    sentences = [tokenize(s) for s in str(body).split(".") if s.strip()]
    body_toks = [t for s in sentences for t in s]
    if not body_toks or not key_entities or not concepts:
        return {}
    n_body = len(body_toks)
    concept_toks = {p: set(tokenize(p)) for p in concepts}
    scores: dict[str, float] = {}
    for ent in key_entities:
        ent_first = ent.split()[0]
        p_e_d = body_toks.count(ent_first) / n_body  # document frequency
        if p_e_d == 0:
            continue
        ctx: list[str] = []
        for s in sentences:
            if ent_first in s:
                ctx.extend(t for t in s if not is_stop(t) and t != ent_first)
        if not ctx:
            continue
        n_ctx = len(ctx)
        for x in set(ctx):
            p_x_e = ctx.count(x) / n_ctx
            holders = [p for p, toks in concept_toks.items() if x in toks]
            if not holders:
                continue
            for p in holders:
                scores[p] = scores.get(p, 0.0) + (1.0 / len(holders)) * p_x_e * p_e_d
    return scores


def tag_concepts(
    docs: DataFrame,
    mentions: DataFrame,
    concept_entity: pd.DataFrame,   # node_phrase, entity_phrase
    context_reps: dict[str, list[str]],
    *,
    min_coherence: float = 0.1,
    max_tags: int = 3,
) -> DataFrame:
    """(doc_id, tag, score) concept tags for every document."""
    parents: dict[str, list[str]] = {}
    for _, r in concept_entity.iterrows():
        parents.setdefault(r.entity_phrase, []).append(r.node_phrase)
    idf = idf_table(list(context_reps.values()) or [[]])
    rep_vecs = {p: tfidf_vector(toks, idf) for p, toks in context_reps.items()}
    all_concepts = sorted(context_reps)

    doc_entities = (
        mentions.groupBy("doc_id")
        .agg(F.collect_set("entity_phrase").alias("entities"))
    )
    enriched = docs.select("doc_id", "title", "body").join(
        doc_entities, "doc_id", "left"
    )

    schema = T.StructType(
        [
            T.StructField("doc_id", T.LongType()),
            T.StructField("tag", T.StringType()),
            T.StructField("score", T.DoubleType()),
        ]
    )

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            rows = []
            for doc_id, title, body, ents in zip(
                pdf["doc_id"], pdf["title"], pdf["body"], pdf["entities"]
            ):
                ents = list(ents) if ents is not None else []
                title_vec = tfidf_vector(tokenize(title), idf)
                cands = sorted({p for e in ents for p in parents.get(e, [])})
                scored: list[tuple[str, float]] = []
                for p in cands:
                    coh = cosine(title_vec, rep_vecs.get(p, {}))
                    if coh >= min_coherence:
                        scored.append((p, coh))
                if not scored and ents:
                    # Eq. 12-14 fallback over context words.
                    inferred = eq_12_14_scores(body, ents, all_concepts)
                    scored = [
                        (p, s) for p, s in inferred.items() if s > 0
                    ]
                scored.sort(key=lambda x: (-x[1], x[0]))
                for p, s in scored[:max_tags]:
                    rows.append({"doc_id": int(doc_id), "tag": p, "score": float(s)})
            yield pd.DataFrame(rows, columns=["doc_id", "tag", "score"])

    return enriched.mapInPandas(run, schema=schema)


# --------------------------------------------------------------------------
# Event tagging (LCS + learned semantic matcher)
# --------------------------------------------------------------------------
def _overlap_features(phrase_toks: list[str], text_toks: list[str]) -> np.ndarray:
    content = [t for t in phrase_toks if not is_stop(t)]
    lcs = lcs_length(phrase_toks, text_toks)
    inter = len(set(content) & set(text_toks))
    return np.array(
        [
            lcs / max(1, len(phrase_toks)),
            inter / max(1, len(content)),
            inter / max(1, len(set(text_toks))),
            1.0 if content and content[0] in text_toks else 0.0,
        ]
    )


class EventMatcher:
    """Duet-substitute: LR over overlap features of (phrase, doc-text)."""

    def __init__(self, *, seed: int = 0) -> None:
        self.clf = LogisticRegression(seed=seed, epochs=400)

    def fit(
        self,
        positives: list[tuple[str, str]],
        negatives: list[tuple[str, str]],
    ) -> "EventMatcher":
        x = np.array(
            [
                _overlap_features(tokenize(p), tokenize(t))
                for p, t in positives + negatives
            ]
        )
        y = np.array([1] * len(positives) + [0] * len(negatives))
        if len(np.unique(y)) == 2:
            self.clf.fit(x, y)
        return self

    def match(self, phrase: str, text: str) -> float:
        if self.clf.w is None:
            return 0.0
        x = _overlap_features(tokenize(phrase), tokenize(text))[None, :]
        return float(self.clf.predict_proba(x)[0])


def build_event_matcher(
    event_members: pd.DataFrame, docs_pdf: pd.DataFrame, *, seed: int = 0
) -> EventMatcher:
    """Auto-construct matcher training data from the click graph:
    positives pair an event phrase with titles of its clicked docs,
    negatives with random other docs."""
    rng = np.random.default_rng(seed)
    titles = list(docs_pdf.title)
    positives, negatives = [], []
    for _, r in event_members.iterrows():
        for t in list(r.titles)[:3]:
            positives.append((r.node_phrase, t))
        for _ in range(3):
            negatives.append(
                (r.node_phrase, titles[int(rng.integers(len(titles)))])
            )
    # Drop accidental positives from the negative pool.
    pos_set = set(positives)
    negatives = [n for n in negatives if n not in pos_set]
    return EventMatcher(seed=seed).fit(positives, negatives)


def tag_events(
    docs: DataFrame,
    event_phrases: list[str],
    matcher: EventMatcher,
    *,
    min_lcs: float = 0.6,
    min_match: float = 0.5,
) -> DataFrame:
    """(doc_id, tag, score) event tags.

    A phrase tags a document iff LCS(phrase, title + first sentence) /
    len(phrase) >= min_lcs AND the semantic matcher fires (paper's
    two-gate rule).
    """
    phrases = sorted(set(event_phrases))
    schema = T.StructType(
        [
            T.StructField("doc_id", T.LongType()),
            T.StructField("tag", T.StringType()),
            T.StructField("score", T.DoubleType()),
        ]
    )

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            rows = []
            for doc_id, title, body in zip(pdf["doc_id"], pdf["title"], pdf["body"]):
                first_sent = str(body).split(".")[0]
                text = f"{title} {first_sent}"
                text_toks = tokenize(text)
                for p in phrases:
                    p_toks = tokenize(p)
                    lcs = lcs_length(p_toks, text_toks) / max(1, len(p_toks))
                    if lcs < min_lcs:
                        continue
                    m = matcher.match(p, text)
                    if m >= min_match:
                        rows.append(
                            {"doc_id": int(doc_id), "tag": p, "score": float(m * lcs)}
                        )
            yield pd.DataFrame(rows, columns=["doc_id", "tag", "score"])

    return docs.select("doc_id", "title", "body").mapInPandas(run, schema=schema)


def tagging_precision(
    tags: pd.DataFrame, docs_pdf: pd.DataFrame, gold_phrase_of: dict[int, str], kind: str
) -> float:
    """§5.3-style precision: a tag is correct when the document's gold
    attention phrase shares >= half of the tag's content tokens (for
    concepts) or most tokens (events)."""
    if tags.empty:
        return float("nan")
    gold_kind = dict(zip(docs_pdf.doc_id, docs_pdf.gold_kind))
    thr = 0.5 if kind == "concept" else 0.7
    ok = total = 0
    for _, r in tags.iterrows():
        gk = gold_kind.get(r.doc_id)
        gold = gold_phrase_of.get(int(r.doc_id))
        if gk is None or gold is None:
            total += 1  # tagged a noise doc: counts against precision
            continue
        tag_toks = set(content_tokens(tokenize(r.tag)))
        gold_toks = set(tokenize(gold))
        total += 1
        if tag_toks and len(tag_toks & gold_toks) / len(tag_toks) >= thr:
            ok += 1
    return ok / total if total else float("nan")
