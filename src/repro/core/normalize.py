"""Attention phrase normalization (paper §3.1).

Two mined phrases denote the same attention when (i) their non-stop
tokens coincide (the paper also allows synonyms; our closed vocabulary
has none) and (ii) the TF-IDF similarity of their *context-enriched
representations* — the phrase concatenated with the top clicked titles
of its cluster — clears δ_m. Merging is a union-find over qualifying
pairs; each surviving group becomes one attention node whose canonical
phrase is the most frequent (then lexicographically first) member.
"""
from __future__ import annotations

import pandas as pd

from repro.nlp.textutil import cosine, idf_table, tfidf_vector
from repro.nlp.tokenize import content_tokens, tokenize


class _UnionFind:
    def __init__(self, n: int) -> None:
        self.p = list(range(n))

    def find(self, x: int) -> int:
        while self.p[x] != x:
            self.p[x] = self.p[self.p[x]]
            x = self.p[x]
        return x

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            self.p[max(ra, rb)] = min(ra, rb)


def context_representation(phrase: str, titles: list[str], top_k: int = 5) -> list[str]:
    """Tokens of the phrase + its top-k clicked titles (paper's rep)."""
    toks = tokenize(phrase)
    for t in titles[:top_k]:
        toks.extend(tokenize(t))
    return toks


def merge_phrases(
    mined: pd.DataFrame, *, delta_m: float = 0.3
) -> pd.DataFrame:
    """Merge near-duplicate mined phrases into attention nodes.

    ``mined`` columns: ``seed_qid``, ``phrase``, ``kind``, ``titles``
    (list[str], the cluster's clicked titles). Returns one row per
    (seed_qid) with an assigned ``node_phrase`` — the canonical phrase
    of its merged group — preserving ``kind``.
    """
    mined = mined.reset_index(drop=True)
    reps = [
        context_representation(r.phrase, list(r.titles)) for r in mined.itertuples()
    ]
    idf = idf_table(reps)
    vecs = [tfidf_vector(toks, idf) for toks in reps]
    keys = [tuple(sorted(set(content_tokens(tokenize(p))))) for p in mined.phrase]

    # Candidate pairs: same non-stop token multiset (criterion i). A
    # dict bucket keeps this linear in the number of phrases.
    buckets: dict[tuple[str, ...], list[int]] = {}
    for i, k in enumerate(keys):
        buckets.setdefault(k, []).append(i)

    uf = _UnionFind(len(mined))
    for members in buckets.values():
        for i in members[1:]:
            # criterion ii: context TF-IDF similarity above delta_m
            if cosine(vecs[members[0]], vecs[i]) >= delta_m:
                uf.union(members[0], i)

    groups: dict[int, list[int]] = {}
    for i in range(len(mined)):
        groups.setdefault(uf.find(i), []).append(i)
    canon: dict[int, str] = {}
    for root, members in groups.items():
        phrases = [mined.phrase.iloc[i] for i in members]
        counts = pd.Series(phrases).value_counts()
        best = sorted(counts[counts == counts.max()].index)[0]
        for i in members:
            canon[i] = best
    out = mined.copy()
    out["node_phrase"] = [canon[i] for i in range(len(mined))]
    return out


def node_table(merged: pd.DataFrame) -> pd.DataFrame:
    """One row per attention node: node_phrase, kind, seed qids, sizes."""
    rows = []
    for (phrase, kind), grp in merged.groupby(["node_phrase", "kind"]):
        rows.append(
            {
                "node_phrase": phrase,
                "kind": kind,
                "seed_qids": sorted(grp.seed_qid),
                "n_clusters": len(grp),
            }
        )
    return pd.DataFrame(rows).sort_values(["kind", "node_phrase"]).reset_index(drop=True)
