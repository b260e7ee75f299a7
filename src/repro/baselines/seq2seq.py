"""TextSummary substitute: a generative bigram-LM decoder.

The paper's TextSummary baseline is a seq2seq encoder-decoder with
attention that must *generate* the gold phrase token by token; it
scores near-zero EM (0.0047) because free generation almost never
reproduces an exact multi-token phrase. Our substitute keeps that
failure mode with the simplest possible generative model: a bigram
language model over training gold phrases, seeded by the input
cluster's most frequent content token, decoded greedily. Like the
original it produces fluent but rarely exact phrases (DESIGN.md §2).
"""
from __future__ import annotations

from collections import Counter, defaultdict

from repro.nlp.tokenize import is_stop, tokenize

BOS, EOS_TOK = "<s>", "</s>"


class BigramGenerator:
    """Bigram LM over gold phrases + greedy decoding from a seed token."""

    def __init__(self, max_len: int = 8) -> None:
        self.max_len = max_len
        self.bigrams: dict[str, Counter[str]] = defaultdict(Counter)
        self.unigrams: Counter[str] = Counter()

    def fit(self, gold_phrases: list[str]) -> "BigramGenerator":
        for phrase in gold_phrases:
            toks = [BOS] + phrase.split() + [EOS_TOK]
            for a, b in zip(toks, toks[1:]):
                self.bigrams[a][b] += 1
            self.unigrams.update(phrase.split())
        return self

    def _next(self, prev: str, used: set[str]) -> str | None:
        cands = [
            (c, t) for t, c in self.bigrams[prev].items() if t not in used
        ]
        if not cands:
            return None
        c, t = max(cands, key=lambda x: (x[0], x[1]))
        return t

    def generate(self, queries: list[str], titles: list[str]) -> str:
        """Seed with the cluster's dominant content token, continue by
        greedy bigram transitions until </s> or max length."""
        counts: Counter[str] = Counter()
        for text in list(queries) + list(titles):
            counts.update(t for t in tokenize(text) if not is_stop(t))
        seed = None
        for t, _ in counts.most_common():
            if t in self.unigrams:
                seed = t
                break
        if seed is None:
            seed = self._next(BOS, set())
        if seed is None:
            return ""
        out = [seed]
        used = {seed}
        while len(out) < self.max_len:
            nxt = self._next(out[-1], used)
            if nxt is None or nxt == EOS_TOK:
                break
            out.append(nxt)
            used.add(nxt)
        return " ".join(out)
