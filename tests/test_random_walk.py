"""Random-walk clustering tests, with DuckDB oracle on the walk math."""
import pytest
from pyspark.sql import functions as F

from repro.core.random_walk import query_doc_clusters, walk_scores
from repro.oracle import assert_equivalent

_TRANSPORT = """
    WITH t AS (
        SELECT qid, doc_id,
               count * 1.0 / SUM(count) OVER (PARTITION BY qid)    AS pdq,
               count * 1.0 / SUM(count) OVER (PARTITION BY doc_id) AS pqd
        FROM clicks
    )
"""

_QUERY_SCORES_SQL = _TRANSPORT + """
    , p2 AS (
        SELECT a.qid AS seed_qid, b.qid AS qid, SUM(a.pdq * b.pqd) AS p
        FROM t a JOIN t b ON a.doc_id = b.doc_id
        GROUP BY a.qid, b.qid
    )
    SELECT seed_qid, qid,
           SUM(s) AS score
    FROM (
        SELECT seed_qid, qid, p * 0.5 AS s FROM p2
        UNION ALL
        SELECT DISTINCT qid AS seed_qid, qid, 0.5 AS s FROM clicks
    )
    GROUP BY seed_qid, qid
"""

_DOC_SCORES_SQL = _TRANSPORT + """
    , p2 AS (
        SELECT a.qid AS seed_qid, b.qid AS qid, SUM(a.pdq * b.pqd) AS p
        FROM t a JOIN t b ON a.doc_id = b.doc_id
        GROUP BY a.qid, b.qid
    ), p3 AS (
        SELECT p2.seed_qid, t.doc_id, SUM(p2.p * t.pdq) AS p
        FROM p2 JOIN t ON p2.qid = t.qid
        GROUP BY p2.seed_qid, t.doc_id
    )
    SELECT seed_qid, doc_id, SUM(s) AS score
    FROM (
        SELECT qid AS seed_qid, doc_id, pdq * 0.5 AS s FROM t
        UNION ALL
        SELECT seed_qid, doc_id, p * 0.5 AS s FROM p3
    )
    GROUP BY seed_qid, doc_id
"""


def test_oracle_query_scores(world_frames, tiny_world):
    _, qs = walk_scores(world_frames["clicks"])
    assert_equivalent(qs, _QUERY_SCORES_SQL, clicks=tiny_world.clicks)


def test_oracle_doc_scores(world_frames, tiny_world):
    ds, _ = walk_scores(world_frames["clicks"])
    assert_equivalent(ds, _DOC_SCORES_SQL, clicks=tiny_world.clicks)


def test_query_scores_mass_bounded(world_frames):
    _, qs = walk_scores(world_frames["clicks"])
    mass = qs.groupBy("seed_qid").agg(F.sum("score").alias("m")).collect()
    for r in mass:
        assert r.m <= 1.0 + 1e-9


@pytest.fixture(scope="module")
def clusters(world_frames):
    return query_doc_clusters(
        world_frames["clicks"], world_frames["queries"], world_frames["docs"]
    ).cache()


def test_every_cluster_has_seed_query_first(clusters, tiny_world):
    q_text = tiny_world.queries.set_index("qid").text
    for row in clusters.collect():
        # The seed query carries self-weight 0.5, so it must rank first
        # whenever it passes the majority-content filter.
        seed_text = q_text[row.seed_qid]
        if row.queries and seed_text in list(row.queries):
            assert row.queries[0] == seed_text


def test_cluster_members_capped(clusters):
    for row in clusters.collect():
        assert len(row.queries) <= 5
        assert len(row.titles) <= 6


def test_concept_cluster_recovers_gold_docs(clusters, tiny_world):
    """The cluster seeded by a concept's top query must contain that
    concept's own doc titles (the random walk stays on-topic)."""
    c0 = tiny_world.ontology.concepts.iloc[0]
    q = tiny_world.queries
    seed_qid = q[(q.gold_kind == "concept") & (q.gold_id == c0.concept_id)].iloc[0].qid
    row = clusters.where(F.col("seed_qid") == int(seed_qid)).collect()[0]
    gold_titles = set(
        tiny_world.docs[
            (tiny_world.docs.gold_kind == "concept")
            & (tiny_world.docs.gold_id == c0.concept_id)
        ].title
    )
    assert gold_titles & set(row.titles)


def test_stopword_heavy_queries_filtered(clusters, tiny_world):
    """'what are the X' style queries (stop-majority) never appear as
    cluster members."""
    for row in clusters.limit(40).collect():
        for qtext in row.queries:
            toks = qtext.split()
            from repro.nlp.tokenize import is_stop

            content = sum(0 if is_stop(t) else 1 for t in toks)
            assert content * 2 > len(toks)
