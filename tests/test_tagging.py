"""Tests for document tagging (concepts via ontology, events via LCS+matcher)."""
import pandas as pd
import pytest

from repro.core import linking, tagging
from repro.core.ontology import mine_attention_nodes


@pytest.fixture(scope="module")
def tagged(spark, tiny_world, world_frames, tiny_ontology, phrase_model):
    """Concept + event tags over the tiny world's documents."""
    nodes, merged = mine_attention_nodes(spark, world_frames, phrase_model)
    mentions = linking.entity_mentions(
        world_frames["docs"], list(tiny_world.ontology.entities.phrase)
    ).cache()
    ce = tiny_ontology.edges[
        (tiny_ontology.edges.type == "isA")
        & (tiny_ontology.edges.src_kind == "concept")
        & (tiny_ontology.edges.dst_kind == "entity")
    ].rename(columns={"src": "node_phrase", "dst": "entity_phrase"})
    reps = tagging.concept_context_reps(
        tiny_ontology.members, merged[merged.kind == "concept"]
    )
    concept_tags = tagging.tag_concepts(
        world_frames["docs"], mentions, ce, reps
    ).toPandas()
    ev_members = (
        merged[merged.kind == "event"]
        .groupby("node_phrase")
        .first()
        .reset_index()[["node_phrase", "titles"]]
    )
    matcher = tagging.build_event_matcher(ev_members, tiny_world.docs)
    event_tags = tagging.tag_events(
        world_frames["docs"], list(ev_members.node_phrase), matcher
    ).toPandas()
    return concept_tags, event_tags, matcher


def _gold_phrase_map(world):
    o = world.ontology
    cmap = dict(zip(o.concepts.concept_id, o.concepts.phrase))
    emap = dict(zip(o.events.event_id, o.events.phrase))
    out = {}
    for _, d in world.docs.iterrows():
        if d.gold_kind == "concept":
            out[int(d.doc_id)] = cmap[int(d.gold_id)]
        elif d.gold_kind == "event":
            out[int(d.doc_id)] = emap[int(d.gold_id)]
    return out


def test_concept_tags_nonempty(tagged):
    concept_tags, _, _ = tagged
    assert len(concept_tags) > 0
    assert {"doc_id", "tag", "score"} <= set(concept_tags.columns)


def test_concept_tagging_precision(tagged, tiny_world):
    concept_tags, _, _ = tagged
    p = tagging.tagging_precision(
        concept_tags, tiny_world.docs, _gold_phrase_map(tiny_world), "concept"
    )
    assert p >= 0.75  # paper §5.3: 88% overall


def test_event_tagging_precision(tagged, tiny_world):
    _, event_tags, _ = tagged
    p = tagging.tagging_precision(
        event_tags, tiny_world.docs, _gold_phrase_map(tiny_world), "event"
    )
    assert p >= 0.85  # paper §5.3: 96%


def test_event_tags_require_both_gates(tagged):
    _, _, matcher = tagged
    # A phrase with zero overlap never clears the LCS gate.
    assert matcher.match("totally unrelated phrase", "zorba prime launches") < 1.0


def test_max_tags_cap(tagged):
    concept_tags, _, _ = tagged
    assert concept_tags.groupby("doc_id").size().max() <= 3


def test_eq_12_14_substring_inference():
    scores = tagging.eq_12_14_scores(
        "zorba prime premiered the rapid film . zorba prime is rapid .",
        ["zorba prime"],
        ["rapid film", "luxury suv"],
    )
    assert scores.get("rapid film", 0) > scores.get("luxury suv", 0)


def test_eq_12_14_empty_inputs():
    assert tagging.eq_12_14_scores("", [], ["x"]) == {}


def test_overlap_features_shape():
    f = tagging._overlap_features(["a", "b"], ["a", "b", "c"])
    assert f.shape == (4,)
    assert f[0] == 1.0  # full LCS


def test_event_matcher_separates(tagged, tiny_world):
    _, event_tags, matcher = tagged
    ev = tiny_world.ontology.events.iloc[0]
    pos = matcher.match(ev.phrase, ev.phrase + " ; report news")
    neg = matcher.match(ev.phrase, "completely different text about nothing")
    assert pos > neg


def test_tagging_precision_counts_noise_docs_against(tiny_world):
    tags = pd.DataFrame([{"doc_id": 10**9, "tag": "rapid film", "score": 1.0}])
    p = tagging.tagging_precision(tags, tiny_world.docs, {}, "concept")
    assert p == 0.0
