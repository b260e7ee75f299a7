"""Tests for attention phrase normalization."""
import pandas as pd

from repro.core.normalize import (
    context_representation,
    merge_phrases,
    node_table,
)


def _mined(rows):
    return pd.DataFrame(rows, columns=["seed_qid", "phrase", "kind", "titles"])


def test_context_representation_includes_phrase_and_titles():
    rep = context_representation("rapid film", ["review rapid film", "rapid film ranked"])
    assert "rapid" in rep and "review" in rep and "ranked" in rep


def test_context_representation_caps_titles():
    rep = context_representation("x", [f"title {i}" for i in range(10)], top_k=2)
    assert "0" in rep and "2" not in rep


def test_merge_identical_content_same_context():
    mined = _mined(
        [
            (1, "rapid film", "concept", ["review rapid film", "the rapid film ranked"]),
            (2, "rapid film", "concept", ["review rapid film", "rapid film guide"]),
        ]
    )
    out = merge_phrases(mined)
    assert out.node_phrase.nunique() == 1


def test_merge_respects_different_content():
    mined = _mined(
        [
            (1, "rapid film", "concept", ["review rapid film"]),
            (2, "luxury suv", "concept", ["luxury suv guide"]),
        ]
    )
    out = merge_phrases(mined)
    assert out.node_phrase.nunique() == 2


def test_merge_variant_orderings_same_tokens():
    # Same non-stop token set, shared context -> merged; canonical phrase
    # is the most frequent member.
    mined = _mined(
        [
            (1, "rapid film", "concept", ["review rapid film"]),
            (2, "rapid film", "concept", ["review rapid film"]),
            (3, "film rapid", "concept", ["review rapid film"]),
        ]
    )
    out = merge_phrases(mined)
    assert out.node_phrase.nunique() == 1
    assert set(out.node_phrase) == {"rapid film"}


def test_merge_same_tokens_unrelated_context_kept_separate():
    mined = _mined(
        [
            (1, "rapid film", "concept", ["alpha beta gamma delta"]),
            (2, "film rapid", "concept", ["epsilon zeta eta theta"]),
        ]
    )
    out = merge_phrases(mined, delta_m=0.9)
    assert out.node_phrase.nunique() == 2


def test_node_table_aggregates_seeds():
    mined = _mined(
        [
            (1, "rapid film", "concept", ["review rapid film"]),
            (2, "rapid film", "concept", ["review rapid film"]),
        ]
    )
    nodes = node_table(merge_phrases(mined))
    assert len(nodes) == 1
    assert nodes.iloc[0].seed_qids == [1, 2]
    assert nodes.iloc[0].n_clusters == 2


def test_node_table_keeps_kinds_separate():
    mined = _mined(
        [
            (1, "rapid film", "concept", ["t"]),
            (2, "zorba prime launches premiere", "event", ["t2"]),
        ]
    )
    nodes = node_table(merge_phrases(mined))
    assert set(nodes.kind) == {"concept", "event"}
