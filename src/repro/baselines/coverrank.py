"""CoverRank event-mining baseline (paper §3.1 / §5.2).

Splits document titles into subtitles at punctuation, scores each
candidate (queries included) by the number of unique non-stop query
tokens it covers, filters by length, and returns the top-ranked
candidate. Ties break by click rank (titles arrive weight-sorted, the
proxy for click-through rate in our clusters).
"""
from __future__ import annotations

from repro.nlp.tokenize import PUNCT, is_stop, tokenize

#: Candidate subtitles must have 3..8 tokens — the analogue of the
#: paper's 6..20 *character* window on unsegmented Chinese titles.
LEN_MIN, LEN_MAX = 3, 8


def split_subtitles(title: str) -> list[list[str]]:
    """Subtitle token lists, split at punctuation tokens."""
    out: list[list[str]] = []
    cur: list[str] = []
    for tok in tokenize(title):
        if tok in PUNCT:
            if cur:
                out.append(cur)
            cur = []
        else:
            cur.append(tok)
    if cur:
        out.append(cur)
    return out


def query_content_tokens(queries: list[str]) -> set[str]:
    """Unique non-stop tokens over all the cluster's queries."""
    out: set[str] = set()
    for q in queries:
        out.update(t for t in tokenize(q) if not is_stop(t))
    return out


def ranked_candidates(
    queries: list[str], titles: list[str]
) -> list[tuple[int, int, list[str]]]:
    """(score, rank, tokens) candidates sorted best-first.

    Candidates are the queries and every length-admissible subtitle.
    ``rank`` is the candidate's click position (lower = more clicked),
    used as tie-break.
    """
    qtoks = query_content_tokens(queries)
    cands: list[tuple[int, int, list[str]]] = []
    rank = 0
    for q in queries:
        toks = tokenize(q)
        if LEN_MIN <= len(toks) <= LEN_MAX:
            score = len(qtoks & {t for t in toks if not is_stop(t)})
            cands.append((score, rank, toks))
        rank += 1
    for t in titles:
        for sub in split_subtitles(t):
            if LEN_MIN <= len(sub) <= LEN_MAX:
                score = len(qtoks & {x for x in sub if not is_stop(x)})
                cands.append((score, rank, sub))
        rank += 1
    return sorted(cands, key=lambda c: (-c[0], c[1]))


def extract(queries: list[str], titles: list[str]) -> str:
    """Top-ranked candidate phrase, '' if nothing is admissible."""
    cands = ranked_candidates(queries, titles)
    return " ".join(cands[0][2]) if cands else ""


def top_candidates(queries: list[str], titles: list[str], k: int = 4) -> list[str]:
    """Top-k candidate strings (TextRank's event re-ranking pool)."""
    return [" ".join(c[2]) for c in ranked_candidates(queries, titles)[:k]]
