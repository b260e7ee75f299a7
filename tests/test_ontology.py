"""Integration tests: the full Attention Ontology over the tiny world."""
import pandas as pd
import pytest

from repro.core.ontology import (
    _event_object,
    classify_kind,
    evaluate_ontology,
)


def test_classify_kind():
    assert classify_kind("zorba prime launches premiere") == "event"
    assert classify_kind("rapid film") == "concept"


def test_event_object_after_trigger():
    obj = _event_object(
        "zorba prime launches premiere 2018",
        {"entity": ["zorba", "prime"], "trigger": ["launches"], "location": []},
    )
    assert obj == "premiere"


def test_event_object_fallback():
    obj = _event_object(
        "zorba prime premiere",
        {"entity": ["zorba", "prime"], "trigger": [], "location": []},
    )
    assert obj == "premiere"


def test_nodes_cover_all_five_kinds(tiny_ontology):
    assert set(tiny_ontology.nodes.kind) == {
        "category", "concept", "entity", "event", "topic",
    }


def test_node_counts_shape(tiny_ontology, tiny_world):
    counts = dict(
        zip(tiny_ontology.node_counts().kind, tiny_ontology.node_counts()["count"])
    )
    o = tiny_world.ontology
    # Table 1 shape: entities dominate, concepts > events > topics > categories
    assert counts["entity"] > counts["concept"] > counts["topic"]
    assert counts["event"] > counts["topic"]
    # recovered counts are in the right ballpark vs gold
    assert counts["concept"] >= len(o.concepts) * 0.8
    assert counts["event"] >= len(o.events) * 0.7


def test_edge_types_present(tiny_ontology):
    assert set(tiny_ontology.edges.type) == {"isA", "involve", "correlate"}


def test_edge_accuracy_meets_paper_shape(tiny_ontology, tiny_world):
    acc = evaluate_ontology(tiny_ontology, tiny_world).set_index("type")
    # Paper Table 2: isA 95%+, correlate 95%+, involve 99%+.
    assert acc.loc["isA"].accuracy >= 0.9
    assert acc.loc["correlate"].accuracy >= 0.9
    assert acc.loc["involve"].accuracy >= 0.95


def test_isa_includes_category_and_concept_entity(tiny_ontology):
    isa = tiny_ontology.edges[tiny_ontology.edges.type == "isA"]
    kinds = set(zip(isa.src_kind, isa.dst_kind))
    assert ("category", "concept") in kinds
    assert ("concept", "entity") in kinds
    assert ("concept", "concept") in kinds  # CSD parents
    assert ("topic", "event") in kinds      # CPD


def test_involve_edges_point_at_elements(tiny_ontology):
    inv = tiny_ontology.edges[tiny_ontology.edges.type == "involve"]
    assert set(inv.dst_kind) <= {"entity", "trigger", "location", "concept"}
    assert (inv.src_kind.isin(["event", "topic"])).all()


def test_correlate_edges_between_entities(tiny_ontology):
    corr = tiny_ontology.edges[tiny_ontology.edges.type == "correlate"]
    assert (corr.src_kind == "entity").all()
    assert (corr.dst_kind == "entity").all()


def test_no_duplicate_edges(tiny_ontology):
    e = tiny_ontology.edges
    assert not e.duplicated(subset=["src_kind", "src", "dst_kind", "dst", "type"]).any()


def test_members_map_back_to_nodes(tiny_ontology):
    mined_phrases = set(tiny_ontology.members.node_phrase)
    node_phrases = set(tiny_ontology.nodes.phrase)
    assert mined_phrases <= node_phrases


def test_mined_concepts_recover_gold_phrases(tiny_ontology, tiny_world):
    gold = set(tiny_world.ontology.concepts.phrase)
    mined = set(
        tiny_ontology.nodes[tiny_ontology.nodes.kind == "concept"].phrase
    )
    assert len(gold & mined) >= 0.8 * len(gold)


def test_derived_topics_match_gold(tiny_ontology, tiny_world):
    gold = set(tiny_world.ontology.topics.phrase)
    mined = set(tiny_ontology.nodes[tiny_ontology.nodes.kind == "topic"].phrase)
    assert len(gold & mined) >= 1


def test_showcase_tables(tiny_ontology):
    """Tables 3-4 shape: concepts/events joined to their relations."""
    isa = tiny_ontology.edges[tiny_ontology.edges.type == "isA"]
    ce = isa[(isa.src_kind == "concept") & (isa.dst_kind == "entity")]
    cat = isa[isa.src_kind == "category"]
    showcase = ce.merge(
        cat.rename(columns={"src": "category", "dst": "concept"})[
            ["category", "concept"]
        ],
        left_on="src",
        right_on="concept",
        how="inner",
    )
    # at least some concepts have both a category and instance entities
    assert len(showcase) > 0
