"""Heuristic dependency parser.

QTIG construction (paper Algorithm 2) needs typed dependency arcs
between non-adjacent tokens. The paper's deployment used a trained
Chinese parser; our substrate applies deterministic head-finding rules
over the lexicon POS tags, which yields the same *kind* of arcs (amod,
compound, nsubj, dobj, nmod, case) with the same directionality.

Arcs are (head_index, dependent_index, label). Rules:

- ADJ attaches to the nearest following NOUN/PROPN        -> amod
- PROPN followed by PROPN                                  -> compound
- NOUN followed by NOUN (noun-noun compound)               -> compound
- VERB takes the nearest preceding PROPN/NOUN as subject   -> nsubj
- VERB takes the nearest following NOUN as object          -> dobj
- NUM / LOC-PROPN attach to the nearest preceding VERB,
  else the nearest NOUN                                    -> nmod
- FUNC attaches to the nearest following content token     -> case
"""
from __future__ import annotations

from repro.nlp.tagger import ner_tag, pos_tag

DEP_LABELS: tuple[str, ...] = ("amod", "compound", "nsubj", "dobj", "nmod", "case")

_CONTENT = {"NOUN", "ADJ", "VERB", "PROPN", "NUM"}


def _next_with(tags: list[str], start: int, want: set[str]) -> int | None:
    for j in range(start + 1, len(tags)):
        if tags[j] in want:
            return j
    return None


def _prev_with(tags: list[str], start: int, want: set[str]) -> int | None:
    for j in range(start - 1, -1, -1):
        if tags[j] in want:
            return j
    return None


def parse(tokens: list[str]) -> list[tuple[int, int, str]]:
    """Dependency arcs for ``tokens`` as (head, dependent, label) triples.

    Indices are positions in ``tokens``. A token gets at most one head;
    the output is sorted by dependent index for determinism.
    """
    pos = pos_tag(tokens)
    ner = ner_tag(tokens)
    arcs: dict[int, tuple[int, str]] = {}  # dependent -> (head, label)

    for i, p in enumerate(pos):
        if i in arcs:
            continue
        if p == "ADJ":
            h = _next_with(pos, i, {"NOUN", "PROPN"})
            if h is not None:
                arcs[i] = (h, "amod")
        elif p == "PROPN" and ner[i] != "LOC":
            if i + 1 < len(pos) and pos[i + 1] == "PROPN" and ner[i + 1] != "LOC":
                arcs[i] = (i + 1, "compound")
        elif p == "NOUN":
            if i + 1 < len(pos) and pos[i + 1] == "NOUN":
                arcs[i] = (i + 1, "compound")
        elif p == "FUNC":
            h = _next_with(pos, i, _CONTENT)
            if h is not None:
                arcs[i] = (h, "case")

    for i, p in enumerate(pos):
        if p == "VERB":
            s = _prev_with(pos, i, {"PROPN", "NOUN"})
            if s is not None and s not in arcs:
                arcs[s] = (i, "nsubj")
            o = _next_with(pos, i, {"NOUN"})
            if o is not None and o not in arcs:
                arcs[o] = (i, "dobj")
        elif p == "NUM" or (p == "PROPN" and ner[i] == "LOC"):
            h = _prev_with(pos, i, {"VERB"})
            if h is None:
                h = _prev_with(pos, i, {"NOUN"}) or _next_with(pos, i, {"NOUN"})
            if h is not None and i not in arcs:
                arcs[i] = (h, "nmod")

    return sorted((h, d, lbl) for d, (h, lbl) in arcs.items())
