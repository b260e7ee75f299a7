"""Match / Align / MatchAlign concept-mining baselines (paper §3.1, §5.2).

*Match* is pattern bootstrapping (pattern-concept duality, Brin 1998 /
Liu et al. 2019): seed query patterns extract concepts; queries that
contain a known concept with other affixes yield new patterns; repeat.
At evaluation time the learned patterns are applied to an example's
queries — COV is low because most cluster queries carry no affix at
all (the stop-word-heavy "what are the X" forms are filtered out of
clusters by the majority-content rule).

*Align* is query-title alignment: find a chunk of a clicked title that
contains the query's content tokens in order, possibly with extra
tokens inside the span; the whole chunk is the candidate concept —
which is exactly why an insertion inside the span breaks EM while
keeping F1 high.

*MatchAlign* pools both candidate sets and picks the most frequent.
"""
from __future__ import annotations

from collections import Counter

from repro.nlp.tokenize import is_stop, tokenize

Pattern = tuple[tuple[str, ...], tuple[str, ...]]  # (prefix, suffix)

SEED_PATTERNS: list[Pattern] = [
    (("what", "are", "the"), ()),
    (("top",), ()),
]


def apply_pattern(tokens: list[str], pat: Pattern) -> list[str] | None:
    """Extract the slot tokens if ``tokens`` matches prefix/suffix."""
    pre, suf = pat
    if len(tokens) <= len(pre) + len(suf):
        return None
    if tuple(tokens[: len(pre)]) != pre:
        return None
    if suf and tuple(tokens[-len(suf):]) != suf:
        return None
    slot = tokens[len(pre): len(tokens) - len(suf)]
    if not slot or all(is_stop(t) for t in slot):
        return None
    return slot


class Bootstrapper:
    """Pattern-concept duality bootstrapping over a query corpus."""

    def __init__(self, min_pattern_support: int = 3, max_rounds: int = 3) -> None:
        self.min_support = min_pattern_support
        self.max_rounds = max_rounds
        self.patterns: set[Pattern] = set(SEED_PATTERNS)
        self.concepts: set[tuple[str, ...]] = set()

    def fit(self, corpus_queries: list[str]) -> "Bootstrapper":
        toks_list = [tokenize(q) for q in corpus_queries]
        for _ in range(self.max_rounds):
            grew = False
            # patterns -> concepts
            for toks in toks_list:
                for pat in list(self.patterns):
                    slot = apply_pattern(toks, pat)
                    if slot and tuple(slot) not in self.concepts:
                        self.concepts.add(tuple(slot))
                        grew = True
            # concepts -> new patterns (affix contexts around known concepts)
            cand: Counter[Pattern] = Counter()
            for toks in toks_list:
                for c in self.concepts:
                    n = len(c)
                    for i in range(len(toks) - n + 1):
                        if tuple(toks[i : i + n]) == c:
                            pre = tuple(toks[:i])
                            suf = tuple(toks[i + n :])
                            if (pre or suf) and len(pre) <= 3 and len(suf) <= 2:
                                cand[(pre, suf)] += 1
            for pat, cnt in cand.items():
                if cnt >= self.min_support and pat not in self.patterns:
                    self.patterns.add(pat)
                    grew = True
            if not grew:
                break
        return self


def match_extract(boot: Bootstrapper, queries: list[str]) -> str:
    """Match baseline: learned patterns over the example's queries;
    most frequent extraction wins, empty string if nothing matches."""
    found: Counter[tuple[str, ...]] = Counter()
    for q in queries:
        toks = tokenize(q)
        for pat in boot.patterns:
            slot = apply_pattern(toks, pat)
            if slot:
                found[tuple(slot)] += 1
    if not found:
        return ""
    best = min(found, key=lambda c: (-found[c], c))
    return " ".join(best)


def align_chunk(query_tokens: list[str], title_tokens: list[str]) -> list[str] | None:
    """The title chunk containing the query's content tokens in order.

    Returns the span from the first to the last matched title position
    (inclusive) — extra title tokens inside the span are kept, which is
    the paper's 'possibly in a more detailed manner'.
    """
    content = [t for t in query_tokens if not is_stop(t)]
    if not content:
        return None
    pos = 0
    first = last = -1
    for tok in content:
        while pos < len(title_tokens) and title_tokens[pos] != tok:
            pos += 1
        if pos == len(title_tokens):
            return None
        if first < 0:
            first = pos
        last = pos
        pos += 1
    return title_tokens[first : last + 1]


def align_extract(queries: list[str], titles: list[str]) -> str:
    """Align baseline: first successful (query, title) chunk in rank order."""
    for q in queries:
        q_toks = tokenize(q)
        for t in titles:
            chunk = align_chunk(q_toks, tokenize(t))
            if chunk:
                return " ".join(chunk)
    return ""


def match_align_extract(
    boot: Bootstrapper, queries: list[str], titles: list[str]
) -> str:
    """MatchAlign: pool Match and all Align candidates, pick most frequent."""
    found: Counter[tuple[str, ...]] = Counter()
    for q in queries:
        toks = tokenize(q)
        for pat in boot.patterns:
            slot = apply_pattern(toks, pat)
            if slot:
                found[tuple(slot)] += 1
        for t in titles:
            chunk = align_chunk(toks, tokenize(t))
            if chunk:
                found[tuple(chunk)] += 1
    if not found:
        return ""
    best = min(found, key=lambda c: (-found[c], c))
    return " ".join(best)
