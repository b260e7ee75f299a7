"""Lexicon-based POS and NER taggers.

The paper's deployment runs trained Chinese word-segmentation / POS /
NER models before building query-title interaction graphs. Our
substrate replaces them with deterministic lexicon lookups built from
``repro.world.vocab`` — the generator and the tagger share a closed
vocabulary, exactly as a well-trained tagger shares the distribution of
its corpus. Unknown tokens back off to NOUN / O, the same back-off a
real tagger effectively applies to OOV web tokens.

POS tagset: NOUN, ADJ, VERB, PROPN, NUM, FUNC (stop word), PUNCT.
NER tagset: ENT (entity mention), LOC, TIME, O.

Coverage is deliberately *partial* for emerging-entity tokens: a real
NER model misses entities that appeared after its training data was
collected — the very entities a click-log miner is supposed to
discover. We cover ~40% of entity first-name tokens and ~60% of
location tokens (deterministic by token hash); the rest back off to
NOUN / O. This keeps lexicon features from trivially solving the
key-element task (Table 7), just as in the paper's setting.
"""
from __future__ import annotations

import hashlib
from functools import lru_cache

from repro.nlp.tokenize import PUNCT, STOPWORDS
from repro.world import vocab

POS_TAGS: tuple[str, ...] = ("NOUN", "ADJ", "VERB", "PROPN", "NUM", "FUNC", "PUNCT")
NER_TAGS: tuple[str, ...] = ("O", "ENT", "LOC", "TIME")

ENTITY_LEXICON_COVERAGE = 0.4
LOCATION_LEXICON_COVERAGE = 0.6


def lexicon_covers(token: str, coverage: float) -> bool:
    """Deterministic pseudo-random inclusion of ``token`` in a lexicon."""
    h = int(hashlib.md5(f"lex:{token}".encode()).hexdigest(), 16) % 1000
    return h < coverage * 1000


@lru_cache(maxsize=1)
def _pos_lexicon() -> dict[str, str]:
    lex: dict[str, str] = {}
    for w in vocab.ALL_HEADS | vocab.ALL_OBJECTS | set(vocab.FILLERS):
        lex[w] = "NOUN"
    for w in vocab.MODIFIERS + vocab.SUFFIX_MODIFIERS + vocab.ADVERBS:
        lex[w] = "ADJ"
    for w in vocab.TRIGGERS + vocab.REACT_VERBS:
        lex[w] = "VERB"
    for w in vocab.LOCATIONS:
        lex[w] = "PROPN"
    for i in range(vocab.max_entities()):
        a, b = vocab.entity_name(i)
        # First tokens are one-per-entity: known only when the lexicon
        # covers them. Surnames recur across many entities, so a trained
        # tagger would know them all.
        if lexicon_covers(a, ENTITY_LEXICON_COVERAGE):
            lex[a] = "PROPN"
        lex[b] = "PROPN"
    for w in vocab.YEARS:
        lex[w] = "NUM"
    # Function words override content readings ("in", "top" etc.).
    for w in STOPWORDS:
        lex[w] = "FUNC"
    for w in PUNCT:
        lex[w] = "PUNCT"
    return lex


@lru_cache(maxsize=1)
def _ner_lexicon() -> dict[str, str]:
    lex: dict[str, str] = {}
    for i in range(vocab.max_entities()):
        a, _b = vocab.entity_name(i)
        if lexicon_covers(a, ENTITY_LEXICON_COVERAGE):
            lex[a] = "ENT"
    for w in vocab._SURNAME:
        lex.setdefault(w, "ENT")
    for w in vocab.LOCATIONS:
        if lexicon_covers(w, LOCATION_LEXICON_COVERAGE):
            lex[w] = "LOC"
    for w in vocab.YEARS:
        lex[w] = "TIME"
    return lex


def pos_tag(tokens: list[str]) -> list[str]:
    """POS tag per token; OOV tokens tag as NOUN (web-text back-off)."""
    lex = _pos_lexicon()
    out = []
    for t in tokens:
        if t.isdigit():
            out.append("NUM")
        else:
            out.append(lex.get(t, "NOUN"))
    return out


def ner_tag(tokens: list[str]) -> list[str]:
    """NER tag per token; OOV tokens tag as O."""
    lex = _ner_lexicon()
    out = []
    for t in tokens:
        if t.isdigit():
            out.append("TIME")
        else:
            out.append(lex.get(t, "O"))
    return out
