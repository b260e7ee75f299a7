"""Tests for Query-Title Interaction Graph construction (Algorithm 2)."""
from repro.core.qtig import (
    EOS,
    RELATIONS,
    REL_INDEX,
    SOS,
    build_qtig,
    element_labels,
    node_labels,
)


def _pairs(g, rel_prefix=None):
    out = set()
    for a, b, r in g.edges:
        if rel_prefix is None or RELATIONS[r].startswith(rel_prefix):
            out.add((a, b, RELATIONS[r]))
    return out


def test_sos_eos_are_first_nodes():
    g = build_qtig(["famous film"], [])
    assert g.tokens[0] == SOS and g.tokens[1] == EOS


def test_tokens_merged_across_inputs():
    g = build_qtig(["famous film"], ["review famous film"])
    assert g.tokens.count("famous") == 1
    assert g.tokens.count("film") == 1


def test_seq_edges_bidirectional():
    g = build_qtig(["famous film"], [])
    f = g.node_of("famous")
    m = g.node_of("film")
    rels = _pairs(g)
    assert (f, m, "seq_f") in rels
    assert (m, f, "seq_b") in rels


def test_sequences_are_sos_padded():
    g = build_qtig(["famous film"], ["film guide"])
    assert len(g.sequences) == 2
    for seq in g.sequences:
        assert seq[0] == 0 and seq[-1] == 1


def test_first_edge_wins_no_duplicate_pair():
    # "famous film" gives seq(famous,film); a later dependency between
    # the same pair must not add a second edge.
    g = build_qtig(["famous film", "famous animated film"], [])
    seen = set()
    for a, b, _ in g.edges:
        key = (min(a, b), max(a, b))
        assert key not in seen or True  # pairs appear twice (f+b) only
    # stronger: unordered pair count equals edges/2
    pairs = {(min(a, b), max(a, b)) for a, b, _ in g.edges}
    assert len(g.edges) == 2 * len(pairs)


def test_dependency_edge_between_nonadjacent():
    # In "famous animated film", famous->film is non-adjacent: dep edge.
    g = build_qtig(["famous animated film"], [])
    f, m = g.node_of("famous"), g.node_of("film")
    rels = _pairs(g)
    assert (f, m, "amod_f") in rels or (m, f, "amod_f") in rels


def test_adjacent_pair_keeps_seq_not_dep():
    g = build_qtig(["famous film"], [])
    f, m = g.node_of("famous"), g.node_of("film")
    labels = {RELATIONS[r] for a, b, r in g.edges if {a, b} == {f, m}}
    assert labels == {"seq_f", "seq_b"}


def test_edge_rel_indices_valid():
    g = build_qtig(["famous animated film"], ["the famous film ranked"])
    for _, _, r in g.edges:
        assert 0 <= r < len(RELATIONS)


def test_pos_ner_aligned_with_tokens():
    g = build_qtig(["zorba prime launches premiere tokyo 2018"], [])
    assert len(g.pos) == len(g.tokens) == len(g.ner)
    assert g.pos[0] == "FUNC"  # sos
    i = g.node_of("tokyo")  # tokyo is inside the 60% location lexicon
    assert g.ner[i] == "LOC"


def test_node_labels_binary():
    g = build_qtig(["what are the famous animated film"], ["review famous animated film"])
    y = node_labels(g, "famous animated film")
    assert set(y) <= {0, 1}
    assert y[g.node_of("famous")] == 1
    assert y[g.node_of("review")] == 0
    assert y[0] == 0 and y[1] == 0


def test_element_labels_classes():
    g = build_qtig(["zorba prime launches premiere paris 2018"], [])
    y = element_labels(g, {"zorba", "prime"}, {"launches"}, {"paris"})
    assert y[g.node_of("zorba")] == 1
    assert y[g.node_of("launches")] == 2
    assert y[g.node_of("paris")] == 3
    assert y[g.node_of("2018")] == 0


def test_rel_index_consistent():
    for i, r in enumerate(RELATIONS):
        assert REL_INDEX[r] == i


def test_queries_read_before_titles():
    # Node order = discovery order; query tokens get smaller ids.
    g = build_qtig(["alpha beta"], ["gamma delta"])
    assert g.node_of("alpha") < g.node_of("gamma")
