"""ATSP decoding tests: modified digraph, distances, exact + heuristic."""
from repro.core.atsp import (
    INF,
    _held_karp,
    _local_search,
    _tour_cost,
    atsp_decode,
    decode_digraph,
    pairwise_distances,
)
from repro.core.qtig import build_qtig


def test_decode_digraph_unidirectional():
    g = build_qtig(["famous film"], [])
    pos = {g.node_of("famous"), g.node_of("film")}
    adj = decode_digraph(g, pos)
    assert g.node_of("film") in adj[g.node_of("famous")]
    assert g.node_of("famous") not in adj[g.node_of("film")]


def test_decode_digraph_sos_eos_wiring():
    g = build_qtig(["review famous film"], [])
    pos = {g.node_of("famous"), g.node_of("film")}
    adj = decode_digraph(g, pos)
    # sos connects to first positive ("famous"), not to "review".
    assert g.node_of("famous") in adj[0]
    assert g.node_of("review") not in adj[0]
    # last positive connects to eos.
    assert 1 in adj[g.node_of("film")]


def test_pairwise_distances_reachable():
    g = build_qtig(["famous animated film"], [])
    pos = {g.node_of(t) for t in ["famous", "animated", "film"]}
    d = pairwise_distances(g, pos)
    assert d[(g.node_of("famous"), g.node_of("animated"))] == 1.0
    assert d[(g.node_of("famous"), g.node_of("film"))] == 2.0
    # backwards is unreachable in the unidirectional graph
    assert d[(g.node_of("film"), g.node_of("famous"))] >= INF


def test_atsp_orders_simple_phrase():
    g = build_qtig(["what are the famous animated film"], ["review famous animated film"])
    pos = {g.node_of(t) for t in ["famous", "animated", "film"]}
    assert atsp_decode(g, pos) == ["famous", "animated", "film"]


def test_atsp_orders_across_inputs():
    # Tokens split across query and title; title provides the ordering.
    g = build_qtig(["animated film"], ["famous animated film"])
    pos = {g.node_of(t) for t in ["famous", "animated", "film"]}
    assert atsp_decode(g, pos) == ["famous", "animated", "film"]


def test_atsp_handles_reordered_inputs():
    # Different inputs give conflicting orders; decode still yields a
    # Hamiltonian-ish route containing each token once.
    g = build_qtig(["film famous"], ["famous film"])
    pos = {g.node_of("famous"), g.node_of("film")}
    out = atsp_decode(g, pos)
    assert sorted(out) == ["famous", "film"]


def test_atsp_empty_positive():
    g = build_qtig(["famous film"], [])
    assert atsp_decode(g, set()) == []


def test_atsp_excludes_sos_eos():
    g = build_qtig(["famous film"], [])
    out = atsp_decode(g, {0, 1, g.node_of("film")})
    assert out == ["film"]


def test_atsp_event_phrase_order():
    g = build_qtig(
        ["zorba prime launches premiere", "launches premiere 2018"],
        ["zorba prime launches premiere paris 2018 ; report news"],
    )
    pos = {g.node_of(t) for t in ["zorba", "prime", "launches", "premiere", "paris", "2018"]}
    assert atsp_decode(g, pos) == ["zorba", "prime", "launches", "premiere", "paris", "2018"]


def test_held_karp_matches_bruteforce():
    import itertools

    nodes = [2, 3, 4]
    d = {}
    vals = {(0, 2): 1, (0, 3): 5, (0, 4): 9, (2, 3): 1, (3, 2): 4,
            (2, 4): 7, (4, 2): 2, (3, 4): 1, (4, 3): 6,
            (2, 1): 9, (3, 1): 2, (4, 1): 1}
    for s in [0, 1, 2, 3, 4]:
        for t in [0, 1, 2, 3, 4]:
            d[(s, t)] = float(vals.get((s, t), 50))
    best_perm = min(
        itertools.permutations(nodes),
        key=lambda p: _tour_cost(list(p), d),
    )
    hk = _held_karp(nodes, d)
    assert _tour_cost(hk, d) == _tour_cost(list(best_perm), d)


def test_local_search_not_worse_than_greedy_start():
    import numpy as np

    rng = np.random.default_rng(0)
    nodes = list(range(2, 16))
    d = {}
    for s in [0, 1] + nodes:
        for t in [0, 1] + nodes:
            d[(s, t)] = float(rng.integers(1, 30))
    out = _local_search(nodes, d)
    assert sorted(out) == sorted(nodes)
    hk_cost = _tour_cost(_held_karp(nodes[:8], d), d)  # sanity on subset
    assert hk_cost > 0
