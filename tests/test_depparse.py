"""Unit tests for the heuristic dependency parser."""
from repro.nlp.depparse import DEP_LABELS, parse
from repro.world import vocab


def _arcs(tokens):
    return {(h, d): lbl for h, d, lbl in parse(tokens)}


def test_adj_attaches_to_next_noun():
    arcs = _arcs(["famous", "film"])
    assert arcs[(1, 0)] == "amod"


def test_adj_skips_other_adj():
    arcs = _arcs(["famous", "animated", "film"])
    assert arcs[(2, 0)] == "amod"
    assert arcs[(2, 1)] == "amod"


def test_propn_compound():
    a, b = vocab.entity_name(2)  # lexicon-covered first token
    arcs = _arcs([a, b])
    assert arcs[(1, 0)] == "compound"


def test_noun_noun_compound():
    arcs = _arcs(["film", "guide"])
    assert arcs[(1, 0)] == "compound"


def test_verb_subject_and_object():
    a, b = vocab.entity_name(0)
    arcs = _arcs([a, b, "launches", "premiere"])
    # surname (index 1) is subject of verb (index 2); object attaches too
    assert arcs[(2, 1)] == "nsubj"
    assert arcs[(2, 3)] == "dobj"


def test_num_attaches_to_verb():
    # our rule: NUM is the dependent, head is the verb
    arcs = _arcs(["zorba", "prime", "launches", "premiere", "2018"])
    assert arcs[(2, 4)] == "nmod"


def test_location_attaches_to_verb():
    arcs = _arcs(["zorba", "prime", "launches", "premiere", "tokyo"])
    assert arcs[(2, 4)] == "nmod"


def test_func_case_attachment():
    arcs = _arcs(["the", "film"])
    assert arcs[(1, 0)] == "case"


def test_labels_within_vocabulary():
    arcs = parse(["the", "famous", "zorba", "prime", "launches", "premiere", "paris", "2018"])
    assert all(lbl in DEP_LABELS for _, _, lbl in arcs)


def test_dependent_has_single_head():
    arcs = parse(["famous", "film", "guide", "launches", "premiere"])
    deps = [d for _, d, _ in arcs]
    assert len(deps) == len(set(deps))


def test_empty_and_single():
    assert parse([]) == []
    assert parse(["film"]) == []


def test_indices_in_range():
    toks = ["famous", "film", "launches", "premiere"]
    for h, d, _ in parse(toks):
        assert 0 <= h < len(toks) and 0 <= d < len(toks) and h != d
