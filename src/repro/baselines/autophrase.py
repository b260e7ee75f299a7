"""AutoPhrase-style quality phrase mining baseline (Shang et al. 2018).

The real AutoPhrase is an external C++ tool using POS-guided
segmentation plus knowledge-base distant supervision. Our stand-in
(DESIGN.md §2) keeps its essential character: phrase quality is a
*corpus-level* statistic (frequency + PMI-style concordance +
POS-shaped candidacy), computed once over the whole click-log corpus
with Spark, then applied per example by selecting the top-5 quality
phrases present in the inputs and concatenating them in appearance
order (the paper's evaluation protocol for this baseline). Being blind
to the query-title structure of a specific cluster, it posts low EM /
mid F1, as in Table 5.
"""
from __future__ import annotations

import math
from collections import Counter

from repro.nlp.tagger import pos_tag
from repro.nlp.tokenize import is_stop, tokenize

#: A candidate phrase must match noun-phrase shape: optional ADJ/PROPN/
#: NUM prefix tokens followed by a NOUN/PROPN head at the end.
_GOOD_TAIL = {"NOUN", "PROPN", "NUM"}
_GOOD_BODY = {"ADJ", "NOUN", "PROPN", "NUM", "VERB"}


class AutoPhraseMiner:
    """Corpus-statistics quality-phrase table + per-example extraction."""

    def __init__(self, min_count: int = 3, n_max: int = 5) -> None:
        self.min_count = min_count
        self.n_max = n_max
        self.quality: dict[tuple[str, ...], float] = {}

    def fit(self, corpus_texts: list[str]) -> "AutoPhraseMiner":
        """Score candidate n-grams over the whole corpus."""
        uni: Counter[str] = Counter()
        grams: Counter[tuple[str, ...]] = Counter()
        total = 0
        for text in corpus_texts:
            toks = [t for t in tokenize(text) if not is_stop(t)]
            uni.update(toks)
            total += len(toks)
            for n in range(2, self.n_max + 1):
                for i in range(len(toks) - n + 1):
                    grams[tuple(toks[i : i + n])] += 1
        total = max(total, 1)
        for g, c in grams.items():
            if c < self.min_count:
                continue
            tags = pos_tag(list(g))
            if tags[-1] not in _GOOD_TAIL or not all(t in _GOOD_BODY for t in tags):
                continue
            # Pointwise-mutual-information-style concordance: how much
            # more often the tokens appear together than independence
            # predicts, normalized by length.
            p_g = c / total
            p_ind = 1.0
            for t in g:
                p_ind *= uni[t] / total
            pmi = math.log(p_g / max(p_ind, 1e-300))
            self.quality[g] = pmi / len(g) * math.log1p(c)
        return self

    def extract(self, queries: list[str], titles: list[str], top_k: int = 5) -> str:
        """Top-k corpus-quality phrases present in the inputs, ordered by
        first appearance, deduped by token (nested grams collapse)."""
        texts = list(queries) + list(titles)
        joined: list[str] = []
        for text in texts:
            joined.extend(tokenize(text))
        present: dict[tuple[str, ...], int] = {}
        for n in range(2, self.n_max + 1):
            for i in range(len(joined) - n + 1):
                g = tuple(joined[i : i + n])
                if g in self.quality and g not in present:
                    present[g] = i
        best = sorted(present, key=lambda g: (-self.quality[g], present[g]))[:top_k]
        best.sort(key=lambda g: present[g])
        out: list[str] = []
        seen: set[str] = set()
        for g in best:
            for t in g:
                if t not in seen:
                    seen.add(t)
                    out.append(t)
        return " ".join(out)
