"""Story tree formation (paper §4, Eq. 8-11).

Given a seed event, retrieve correlated events (shared involved entity
or shared trigger), score pairwise similarity as the sum of phrase-
embedding cosine (Eq. 9; PPMI-SVD stands in for BERT), trigger-vector
cosine (Eq. 10) and entity-set TF-IDF similarity (Eq. 11), cluster
agglomeratively, then order each cluster's events by time into the
branches of a tree rooted at the earliest event.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.embeddings import WordVectors
from repro.nlp.textutil import cosine as sparse_cosine
from repro.nlp.textutil import idf_table, tfidf_vector


@dataclass
class EventRecord:
    """One event node with its recognized elements and time."""

    phrase: str
    entities: list[str]
    trigger: str | None
    time: str  # ISO date, sortable lexicographically


@dataclass
class StoryTree:
    """Tree edges (parent -> child phrases) + per-branch clusters."""

    root: str
    edges: list[tuple[str, str]] = field(default_factory=list)
    clusters: list[list[str]] = field(default_factory=list)


def retrieve_correlated(
    seed: EventRecord, pool: list[EventRecord]
) -> list[EventRecord]:
    """Events sharing >= 1 involved entity or the same trigger."""
    seed_ents = set(seed.entities)
    out = []
    for ev in pool:
        if ev.phrase == seed.phrase:
            continue
        if (seed_ents & set(ev.entities)) or (
            seed.trigger is not None and ev.trigger == seed.trigger
        ):
            out.append(ev)
    return out


def similarity_matrix(
    events: list[EventRecord], vectors: WordVectors
) -> np.ndarray:
    """Pairwise s(p1, p2) = f_m + f_g + f_e (Eq. 8)."""
    n = len(events)
    idf = idf_table([ev.entities for ev in events])
    ent_vecs = [tfidf_vector(ev.entities, idf) for ev in events]
    s = np.zeros((n, n))
    for i in range(n):
        for j in range(i, n):
            f_m = vectors.similarity(events[i].phrase, events[j].phrase)
            f_g = (
                vectors.similarity(events[i].trigger, events[j].trigger)
                if events[i].trigger and events[j].trigger
                else 0.0
            )
            f_e = sparse_cosine(ent_vecs[i], ent_vecs[j])
            s[i, j] = s[j, i] = f_m + f_g + f_e
    return s


def hierarchical_clusters(
    sim: np.ndarray, *, threshold: float = 1.5
) -> list[list[int]]:
    """Average-linkage agglomerative clustering; merge while the best
    pair's average similarity clears ``threshold``."""
    clusters: list[list[int]] = [[i] for i in range(sim.shape[0])]
    while len(clusters) > 1:
        best, bi, bj = -np.inf, -1, -1
        for i in range(len(clusters)):
            for j in range(i + 1, len(clusters)):
                vals = [sim[a, b] for a in clusters[i] for b in clusters[j]]
                avg = float(np.mean(vals))
                if avg > best:
                    best, bi, bj = avg, i, j
        if best < threshold:
            break
        clusters[bi] = clusters[bi] + clusters[bj]
        del clusters[bj]
    return [sorted(c) for c in clusters]


def form_story_tree(
    seed: EventRecord,
    pool: list[EventRecord],
    vectors: WordVectors,
    *,
    threshold: float = 1.5,
) -> StoryTree:
    """Retrieve -> similarity -> cluster -> time-ordered tree."""
    related = retrieve_correlated(seed, pool)
    events = [seed] + related
    events.sort(key=lambda e: (e.time, e.phrase))
    sim = similarity_matrix(events, vectors)
    clusters = hierarchical_clusters(sim, threshold=threshold)
    root = events[0].phrase
    tree = StoryTree(root=root)
    tree.clusters = [[events[i].phrase for i in c] for c in clusters]
    for cluster in clusters:
        ordered = sorted(cluster)  # events[] already time-sorted by index
        # First event of the branch hangs off the root; the rest chain.
        prev = None
        for i in ordered:
            p = events[i].phrase
            if p == root:
                prev = p
                continue
            tree.edges.append((prev if prev else root, p))
            prev = p
    return tree
