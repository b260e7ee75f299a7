"""Tests for story tree formation (Eq. 8-11)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.embeddings import train_word_vectors
from repro.core.story_tree import (
    EventRecord,
    form_story_tree,
    hierarchical_clusters,
    retrieve_correlated,
    similarity_matrix,
)


@pytest.fixture(scope="module")
def vectors(spark):
    texts = pd.DataFrame(
        {
            "text": [
                "zorba prime launches premiere",
                "zorba prime launches sequel",
                "vexba nova wins award",
                "vexba nova wins trophy",
                "zorba prime premiere tonight",
                "vexba nova award ceremony",
            ]
            * 4
        }
    )
    return train_word_vectors(spark, spark.createDataFrame(texts), dim=8)


def _events():
    return [
        EventRecord("zorba prime launches premiere 2018", ["zorba prime"], "launches", "2018-01-01"),
        EventRecord("zorba prime launches sequel 2019", ["zorba prime"], "launches", "2019-02-01"),
        EventRecord("vexba nova wins award 2018", ["vexba nova"], "wins", "2018-05-01"),
        EventRecord("vexba nova wins trophy 2019", ["vexba nova"], "wins", "2019-06-01"),
    ]


def test_retrieve_correlated_by_entity():
    evs = _events()
    out = retrieve_correlated(evs[0], evs)
    assert evs[1] in out
    assert evs[2] not in out


def test_retrieve_correlated_by_trigger():
    evs = _events()
    seed = EventRecord("x y launches thing", ["x y"], "launches", "2020-01-01")
    out = retrieve_correlated(seed, evs)
    assert evs[0] in out and evs[1] in out


def test_similarity_matrix_symmetric(vectors):
    evs = _events()
    s = similarity_matrix(evs, vectors)
    assert np.allclose(s, s.T)


def test_similarity_same_entity_higher(vectors):
    evs = _events()
    s = similarity_matrix(evs, vectors)
    assert s[0, 1] > s[0, 2]


def test_hierarchical_clusters_merge_similar():
    sim = np.array(
        [
            [3.0, 2.5, 0.1],
            [2.5, 3.0, 0.1],
            [0.1, 0.1, 3.0],
        ]
    )
    clusters = hierarchical_clusters(sim, threshold=1.0)
    assert sorted(map(sorted, clusters)) == [[0, 1], [2]]


def test_hierarchical_clusters_threshold_blocks_merge():
    sim = np.array([[3.0, 0.2], [0.2, 3.0]])
    assert len(hierarchical_clusters(sim, threshold=1.0)) == 2


def test_form_story_tree_root_is_earliest(vectors):
    evs = _events()
    tree = form_story_tree(evs[1], evs, vectors)
    assert tree.root == "zorba prime launches premiere 2018"


def test_form_story_tree_edges_cover_all_events(vectors):
    evs = _events()
    tree = form_story_tree(evs[0], evs[:2], vectors)
    nodes = {tree.root} | {b for _, b in tree.edges}
    assert nodes == {evs[0].phrase, evs[1].phrase}


def test_form_story_tree_branches_time_ordered(vectors):
    evs = _events()
    tree = form_story_tree(evs[0], evs, vectors)
    times = {e.phrase: e.time for e in evs}
    for a, b in tree.edges:
        if a in times and b in times:
            assert times[a] <= times[b]


def test_form_story_tree_single_event(vectors):
    ev = _events()[0]
    tree = form_story_tree(ev, [ev], vectors)
    assert tree.root == ev.phrase
    assert tree.edges == []
