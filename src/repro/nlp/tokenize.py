"""Tokenization and stop words for the synthetic web corpus.

The synthetic world emits space-separated lowercase tokens, so
tokenization is whitespace splitting with punctuation isolation. The
stop-word list is the substrate equivalent of the Chinese stop-word
list the paper's deployment used: it contains the function words the
query generator uses as fillers ("what are the ...") plus generic
determiners/prepositions.
"""
from __future__ import annotations

STOPWORDS: frozenset[str] = frozenset(
    """
    the a an of in on at to for and or with by is are was were be been
    what which who how why when where this that these those it its do
    does did done find me show us you your their his her about from as
    into over under very really just also more most much many some any
    """.split()
)

# Punctuation tokens used by the title generator to split subtitles.
PUNCT: frozenset[str] = frozenset({";", ",", ".", ":", "!", "?", "-", "|"})


def tokenize(text: str) -> list[str]:
    """Split ``text`` into lowercase tokens, isolating punctuation.

    ``"breaking: zorvex prime launches"`` -> ``["breaking", ":", "zorvex",
    "prime", "launches"]``. Idempotent on already-tokenized strings.
    """
    out: list[str] = []
    for raw in text.lower().split():
        # peel punctuation off both ends so "news." -> "news", "."
        start, end = 0, len(raw)
        lead: list[str] = []
        trail: list[str] = []
        while start < end and raw[start] in PUNCT:
            lead.append(raw[start])
            start += 1
        while end > start and raw[end - 1] in PUNCT:
            trail.append(raw[end - 1])
            end -= 1
        out.extend(lead)
        if end > start:
            out.append(raw[start:end])
        out.extend(reversed(trail))
    return out


def is_stop(token: str) -> bool:
    """True if ``token`` is a stop word or punctuation."""
    return token in STOPWORDS or token in PUNCT


def content_tokens(tokens: list[str]) -> list[str]:
    """The non-stop, non-punctuation tokens of ``tokens``, order kept."""
    return [t for t in tokens if not is_stop(t)]
