"""Query-Title Interaction Graph (paper Algorithm 2).

A QTIG merges the tokens of a cluster's queries and titles into one
graph: each unique token is a node (plus ``sos``/``eos``); adjacent
tokens in any input are joined by a bi-directional ``seq`` edge;
non-adjacent token pairs with a syntactic dependency are joined by a
typed bi-directional dependency edge. First edge constructed between a
token pair wins (inputs are read in weight order), so a pair carries
either the seq relation or the highest-weighted dependency — never
both, matching the paper's dedup rule.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.nlp.depparse import DEP_LABELS, parse
from repro.nlp.tagger import ner_tag, pos_tag
from repro.nlp.tokenize import is_stop, tokenize

SOS = "<sos>"
EOS = "<eos>"

#: Relation vocabulary for R-GCN: forward and backward variants of seq
#: and of each dependency label. Index = position in this tuple.
RELATIONS: tuple[str, ...] = tuple(
    f"{name}_{d}" for name in ("seq",) + DEP_LABELS for d in ("f", "b")
)
REL_INDEX: dict[str, int] = {r: i for i, r in enumerate(RELATIONS)}


@dataclass
class QTIG:
    """A built query-title interaction graph.

    ``tokens[i]`` is node i's surface token (node 0 = sos, 1 = eos).
    ``edges`` are (src, dst, relation-index) with both directions
    materialized. ``sequences`` holds each input text as its node-id
    path (sos ... eos), queries first, in weight order — ATSP decoding
    and feature extraction both need it.
    """

    tokens: list[str]
    edges: list[tuple[int, int, int]]
    sequences: list[list[int]]
    pos: list[str] = field(default_factory=list)
    ner: list[str] = field(default_factory=list)

    @property
    def n_nodes(self) -> int:
        return len(self.tokens)

    def node_of(self, token: str) -> int | None:
        try:
            return self.tokens.index(token)
        except ValueError:
            return None


def build_qtig(queries: list[str], titles: list[str]) -> QTIG:
    """Algorithm 2 over ``queries`` + ``titles`` (already weight-sorted)."""
    tokens: list[str] = [SOS, EOS]
    node_of: dict[str, int] = {SOS: 0, EOS: 1}
    edges: list[tuple[int, int, int]] = []
    linked: set[tuple[int, int]] = set()  # unordered pairs with an edge
    sequences: list[list[int]] = []
    token_lists: list[list[str]] = []

    def node(tok: str) -> int:
        if tok not in node_of:
            node_of[tok] = len(tokens)
            tokens.append(tok)
        return node_of[tok]

    def add_edge(a: int, b: int, rel: str) -> None:
        key = (min(a, b), max(a, b))
        if key in linked or a == b:
            return
        linked.add(key)
        fwd = REL_INDEX[f"{rel}_f"]
        bwd = REL_INDEX[f"{rel}_b"]
        edges.append((a, b, fwd))
        edges.append((b, a, bwd))

    # Pass 1: nodes + seq edges, inputs in weight order (queries first).
    for text in list(queries) + list(titles):
        toks = [SOS] + tokenize(text) + [EOS]
        ids = [node(t) for t in toks]
        sequences.append(ids)
        token_lists.append(toks)
        for a, b in zip(ids, ids[1:]):
            add_edge(a, b, "seq")

    # Pass 2: dependency edges between non-adjacent pairs (the dedup in
    # add_edge drops pairs already linked by seq or an earlier dep).
    for toks, ids in zip(token_lists, sequences):
        inner = toks[1:-1]
        for h, d, label in parse(inner):
            add_edge(ids[1 + h], ids[1 + d], label)

    g = QTIG(tokens=tokens, edges=edges, sequences=sequences)
    body = g.tokens[2:]
    pos = pos_tag(body)
    ner = ner_tag(body)
    g.pos = ["FUNC", "FUNC"] + pos
    g.ner = ["O", "O"] + ner
    return g


def node_labels(g: QTIG, gold_phrase: str) -> list[int]:
    """Binary per-node labels: 1 if the token is in the gold phrase."""
    gold = set(tokenize(gold_phrase))
    return [1 if t in gold else 0 for t in g.tokens]


def element_labels(
    g: QTIG, entity_tokens: set[str], trigger_tokens: set[str], location_tokens: set[str]
) -> list[int]:
    """4-class labels for key-element recognition.

    0 = other, 1 = entity, 2 = trigger, 3 = location.
    """
    out = []
    for t in g.tokens:
        if t in entity_tokens:
            out.append(1)
        elif t in trigger_tokens:
            out.append(2)
        elif t in location_tokens:
            out.append(3)
        else:
            out.append(0)
    return out


def positive_rate(g: QTIG, labels: list[int]) -> float:
    """Fraction of non-special nodes labeled positive (diagnostics)."""
    body = labels[2:]
    return sum(1 for x in body if x) / max(1, len(body))


def is_stop_node(g: QTIG, i: int) -> bool:
    """Stop-word feature for node i (sos/eos count as stops)."""
    return i < 2 or is_stop(g.tokens[i])
