"""TextRank baseline (Mihalcea & Tarau 2004), paper §5.2.

Graph-based keyword extraction: content tokens are nodes, co-occurrence
within a sliding window adds edges, PageRank scores nodes. Following
the paper's protocol, we take the top-5 keywords and "concatenate them
in the same order with the query/title" — i.e. ordered by first
appearance in the concatenated inputs.
"""
from __future__ import annotations

from repro.nlp.tokenize import is_stop, tokenize


def pagerank(adj: dict[str, dict[str, float]], *, damping: float = 0.85, iters: int = 30) -> dict[str, float]:
    """Weighted PageRank by power iteration over a token graph."""
    nodes = list(adj)
    if not nodes:
        return {}
    score = {v: 1.0 / len(nodes) for v in nodes}
    out_w = {v: sum(adj[v].values()) for v in nodes}
    for _ in range(iters):
        nxt = {}
        for v in nodes:
            s = 0.0
            for u, nbrs in adj.items():
                if v in nbrs and out_w[u] > 0:
                    s += score[u] * nbrs[v] / out_w[u]
            nxt[v] = (1 - damping) / len(nodes) + damping * s
        score = nxt
    return score


def build_cooccurrence(texts: list[str], window: int = 2) -> dict[str, dict[str, float]]:
    """Undirected weighted co-occurrence graph over content tokens."""
    adj: dict[str, dict[str, float]] = {}
    for text in texts:
        toks = [t for t in tokenize(text) if not is_stop(t)]
        for i, a in enumerate(toks):
            adj.setdefault(a, {})
            for j in range(i + 1, min(i + 1 + window, len(toks))):
                b = toks[j]
                if a == b:
                    continue
                adj.setdefault(b, {})
                adj[a][b] = adj[a].get(b, 0.0) + 1.0
                adj[b][a] = adj[b].get(a, 0.0) + 1.0
    return adj


def extract(queries: list[str], titles: list[str], top_k: int = 5) -> str:
    """Top-k TextRank keywords, ordered by first appearance."""
    texts = list(queries) + list(titles)
    adj = build_cooccurrence(texts)
    scores = pagerank(adj)
    top = sorted(scores, key=lambda t: (-scores[t], t))[:top_k]
    first_pos: dict[str, int] = {}
    pos = 0
    for text in texts:
        for t in tokenize(text):
            first_pos.setdefault(t, pos)
            pos += 1
    ordered = sorted(top, key=lambda t: first_pos.get(t, 1 << 30))
    return " ".join(ordered)
