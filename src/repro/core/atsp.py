"""ATSP decoding: order the predicted phrase tokens (paper §3.1).

The modified QTIG keeps only *unidirectional* seq edges (following
input order), plus sos -> first-positive-token-of-each-input and
last-positive-token-of-each-input -> eos. Pairwise distance = shortest
path length in that digraph; the phrase is the cheapest route
sos -> (all positive nodes) -> eos.

The paper solves this with the Lin-Kernighan heuristic (LKH). Phrase
node sets are small, so we solve exactly with Held-Karp DP up to 12
nodes and fall back to nearest-neighbour + 2-opt/Or-opt local search
(the core moves of Lin-Kernighan) above that — near-exact at these
sizes, and dependency-free (see DESIGN.md §2).
"""
from __future__ import annotations

from collections import deque

from repro.core.qtig import QTIG

INF = 1.0e6


def decode_digraph(g: QTIG, positive: set[int]) -> dict[int, set[int]]:
    """Adjacency of the modified QTIG used for decoding distances."""
    adj: dict[int, set[int]] = {i: set() for i in range(g.n_nodes)}
    for seq in g.sequences:
        body = seq[1:-1]
        for a, b in zip(body, body[1:]):
            if a != b:
                adj[a].add(b)
        inner = [i for i in body if i in positive]
        if inner:
            adj[0].add(inner[0])   # sos -> first positive in this input
            adj[inner[-1]].add(1)  # last positive in this input -> eos
    return adj


def _bfs_dists(adj: dict[int, set[int]], src: int, targets: set[int]) -> dict[int, float]:
    dist = {src: 0.0}
    dq = deque([src])
    remaining = set(targets)
    remaining.discard(src)
    while dq and remaining:
        u = dq.popleft()
        for v in adj[u]:
            if v not in dist:
                dist[v] = dist[u] + 1.0
                remaining.discard(v)
                dq.append(v)
    return {t: dist.get(t, INF) for t in targets}


def pairwise_distances(g: QTIG, positive: set[int]) -> dict[tuple[int, int], float]:
    """Shortest-path distances between {sos} ∪ positive ∪ {eos}."""
    adj = decode_digraph(g, positive)
    nodes = {0, 1} | positive
    out: dict[tuple[int, int], float] = {}
    for s in nodes:
        d = _bfs_dists(adj, s, nodes)
        for t, v in d.items():
            out[(s, t)] = v
    return out


def _held_karp(nodes: list[int], d: dict[tuple[int, int], float]) -> list[int]:
    """Exact shortest sos->...->eos path over ``nodes`` (≤ 12)."""
    n = len(nodes)
    if n == 0:
        return []
    full = (1 << n) - 1
    # dp[(mask, j)] = (cost, parent_state) of reaching node j having
    # visited `mask`, starting from sos (node id 0).
    dp: dict[tuple[int, int], tuple[float, tuple[int, int] | None]] = {}
    for j in range(n):
        dp[(1 << j, j)] = (d[(0, nodes[j])], None)
    for mask in range(1, full + 1):
        for j in range(n):
            if not mask & (1 << j) or (mask, j) not in dp:
                continue
            cost_j = dp[(mask, j)][0]
            if cost_j >= INF:
                continue
            for k in range(n):
                if mask & (1 << k):
                    continue
                nm = mask | (1 << k)
                nc = cost_j + d[(nodes[j], nodes[k])]
                if (nm, k) not in dp or nc < dp[(nm, k)][0]:
                    dp[(nm, k)] = (nc, (mask, j))
    best, best_state = INF * (len(nodes) + 2), None
    for j in range(n):
        if (full, j) in dp:
            c = dp[(full, j)][0] + d[(nodes[j], 1)]
            if c < best:
                best, best_state = c, (full, j)
    if best_state is None:
        return nodes[:]  # fully disconnected; keep discovery order
    order: list[int] = []
    st: tuple[int, int] | None = best_state
    while st is not None:
        order.append(nodes[st[1]])
        st = dp[st][1]
    return order[::-1]


def _tour_cost(order: list[int], d: dict[tuple[int, int], float]) -> float:
    path = [0] + order + [1]
    return sum(d[(a, b)] for a, b in zip(path, path[1:]))


def _local_search(nodes: list[int], d: dict[tuple[int, int], float]) -> list[int]:
    """Nearest-neighbour construction + 2-opt/Or-opt improvement."""
    unvisited = set(nodes)
    order: list[int] = []
    cur = 0
    while unvisited:
        nxt = min(unvisited, key=lambda v: (d[(cur, v)], v))
        order.append(nxt)
        unvisited.discard(nxt)
        cur = nxt
    improved = True
    while improved:
        improved = False
        best = _tour_cost(order, d)
        # 2-opt (segment reversal is asymmetric-unsafe, so re-evaluate cost).
        for i in range(len(order) - 1):
            for j in range(i + 1, len(order)):
                cand = order[:i] + order[i : j + 1][::-1] + order[j + 1 :]
                c = _tour_cost(cand, d)
                if c < best - 1e-9:
                    order, best, improved = cand, c, True
        # Or-opt: move one node elsewhere.
        for i in range(len(order)):
            for j in range(len(order)):
                if i == j:
                    continue
                cand = order[:i] + order[i + 1 :]
                cand.insert(j, order[i])
                c = _tour_cost(cand, d)
                if c < best - 1e-9:
                    order, best, improved = cand, c, True
    return order


def atsp_decode(g: QTIG, positive: set[int]) -> list[str]:
    """Order the positive nodes into a phrase (token list)."""
    positive = {p for p in positive if p not in (0, 1)}
    if not positive:
        return []
    d = pairwise_distances(g, positive)
    nodes = sorted(positive)
    if len(nodes) <= 12:
        order = _held_karp(nodes, d)
    else:
        order = _local_search(nodes, d)
    return [g.tokens[i] for i in order]
