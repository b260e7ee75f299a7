"""Tests for CSD (parent concepts) and CPD (topics)."""
import pandas as pd

from repro.core.derive import (
    _is_noun_phrase,
    common_pattern_discovery,
    common_suffix_discovery,
)


def test_is_noun_phrase_adj_noun():
    assert _is_noun_phrase(["animated", "film"])


def test_is_noun_phrase_bare_noun():
    assert _is_noun_phrase(["film"])


def test_is_noun_phrase_rejects_verb():
    assert not _is_noun_phrase(["launches", "film"])


def test_is_noun_phrase_rejects_verb_tail():
    assert not _is_noun_phrase(["film", "launches"])


def test_csd_finds_common_suffix(spark):
    parents, edges = common_suffix_discovery(
        spark,
        ["rapid animated film", "classic animated film", "famous animated film"],
    )
    assert "animated film" in set(parents.phrase)
    assert len(edges) == 3
    assert set(edges.child) == {
        "rapid animated film", "classic animated film", "famous animated film",
    }


def test_csd_most_specific_suffix_wins(spark):
    # both "animated film" and "film" are shared; children link to the
    # longest qualifying suffix
    parents, edges = common_suffix_discovery(
        spark,
        ["rapid animated film", "classic animated film", "vintage film", "retro film"],
    )
    got = dict(zip(edges.child, edges.parent))
    assert got["rapid animated film"] == "animated film"
    assert got["vintage film"] == "film"


def test_csd_min_count(spark):
    parents, edges = common_suffix_discovery(
        spark, ["rapid film", "lonely suv"], min_count=2
    )
    assert "film" not in set(parents.phrase)


def test_csd_empty_input(spark):
    parents, edges = common_suffix_discovery(spark, [])
    assert parents.empty and edges.empty


def test_cpd_groups_by_pattern():
    events = pd.DataFrame(
        [
            {"phrase": "zorba prime launches premiere 2018", "entity_phrase": "zorba prime",
             "trigger": "launches", "object": "premiere"},
            {"phrase": "vexba nova launches premiere 2019", "entity_phrase": "vexba nova",
             "trigger": "launches", "object": "premiere"},
        ]
    )
    cmap = {"zorba prime": "rapid film", "vexba nova": "rapid film"}
    topics, isa, involve = common_pattern_discovery(events, cmap)
    assert list(topics.phrase) == ["rapid film launches premiere"]
    assert len(isa) == 2
    assert list(involve.concept) == ["rapid film"]


def test_cpd_requires_min_events():
    events = pd.DataFrame(
        [
            {"phrase": "zorba prime launches premiere 2018", "entity_phrase": "zorba prime",
             "trigger": "launches", "object": "premiere"},
        ]
    )
    topics, isa, involve = common_pattern_discovery(
        events, {"zorba prime": "rapid film"}
    )
    assert topics.empty


def test_cpd_requires_shared_concept():
    events = pd.DataFrame(
        [
            {"phrase": "a b launches premiere 1", "entity_phrase": "a b",
             "trigger": "launches", "object": "premiere"},
            {"phrase": "c d launches premiere 2", "entity_phrase": "c d",
             "trigger": "launches", "object": "premiere"},
        ]
    )
    topics, _, _ = common_pattern_discovery(
        events, {"a b": "rapid film", "c d": "luxury suv"}
    )
    assert topics.empty  # different concepts -> different (empty) patterns


def test_cpd_unknown_entity_skipped():
    events = pd.DataFrame(
        [
            {"phrase": "x y launches premiere 1", "entity_phrase": "x y",
             "trigger": "launches", "object": "premiere"},
        ]
    )
    topics, isa, involve = common_pattern_discovery(events, {})
    assert topics.empty and isa.empty and involve.empty
