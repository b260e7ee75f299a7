"""Tests for entity co-occurrence embeddings and correlate edges."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import linking
from repro.core.correlate import (
    EntityEmbeddings,
    cooccurring_entity_pairs,
    correlate_edges,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def mention_frames(spark):
    pdf = pd.DataFrame(
        {
            "doc_id": [1, 1, 1, 2, 2, 3],
            "entity_phrase": ["a x", "b y", "c z", "a x", "b y", "c z"],
            "sent_idx": [0, 0, 1, 0, 0, 0],
        }
    )
    return spark.createDataFrame(pdf), pdf


def test_cooccurring_pairs_counts(mention_frames):
    df, _ = mention_frames
    out = {(r.ea, r.eb): r.n for r in cooccurring_entity_pairs(df).collect()}
    assert out[("a x", "b y")] == 2
    assert ("a x", "c z") not in out  # different sentence


def test_cooccurring_pairs_oracle(mention_frames):
    df, pdf = mention_frames
    sql = """
        SELECT a.entity_phrase AS ea, b.entity_phrase AS eb, COUNT(*) AS n
        FROM mentions a JOIN mentions b
          ON a.doc_id = b.doc_id AND a.sent_idx = b.sent_idx
        WHERE a.entity_phrase < b.entity_phrase
        GROUP BY a.entity_phrase, b.entity_phrase
    """
    assert_equivalent(cooccurring_entity_pairs(df), sql, mentions=pdf)


def test_embeddings_pull_positives_together():
    ents = [f"e{i}" for i in range(10)]
    emb = EntityEmbeddings(ents, dim=8, seed=0).fit(
        [("e0", "e1")] * 4, epochs=80
    )
    d_pos = emb.distance("e0", "e1")
    d_neg = emb.distance("e0", "e5")
    assert d_pos < d_neg


def test_embeddings_untrained_pairs_far():
    ents = [f"e{i}" for i in range(12)]
    emb = EntityEmbeddings(ents, dim=8, seed=0).fit([("e0", "e1")], epochs=40)
    # wide init keeps never-co-occurring entities apart
    assert emb.distance("e5", "e7") > 1.0


def test_embeddings_unknown_entity_inf():
    emb = EntityEmbeddings(["a"], dim=4)
    assert emb.distance("a", "zzz") == float("inf")


def test_pairs_within_threshold():
    ents = ["a", "b", "c"]
    emb = EntityEmbeddings(ents, dim=4, seed=0).fit([("a", "b")] * 5, epochs=80)
    close = emb.pairs_within(emb.distance("a", "b") + 1e-6)
    got = {(r.ea, r.eb) for _, r in close.iterrows()}
    assert ("a", "b") in got


def test_correlate_edges_end_to_end(spark, mention_frames):
    df, _ = mention_frames
    queries = spark.createDataFrame(pd.DataFrame({"text": ["a x and b y"]}))
    out = correlate_edges(df, queries, ["a x", "b y", "c z"], tau=1.5)
    got = {(r.ea, r.eb) for _, r in out.iterrows()}
    assert ("a x", "b y") in got


def test_correlate_edges_precision_on_world(tiny_world, world_frames):
    mentions = linking.entity_mentions(
        world_frames["docs"], list(tiny_world.ontology.entities.phrase)
    )
    out = correlate_edges(
        mentions,
        world_frames["queries"],
        list(tiny_world.ontology.entities.phrase),
        tau=1.0,
    )
    ids = dict(
        zip(tiny_world.ontology.entities.phrase, tiny_world.ontology.entities.entity_id)
    )
    gold = tiny_world.ontology.gold_correlate_pairs()
    assert len(out) > 0
    ok = sum(
        (min(ids[r.ea], ids[r.eb]), max(ids[r.ea], ids[r.eb])) in gold
        for _, r in out.iterrows()
    )
    assert ok / len(out) > 0.8
