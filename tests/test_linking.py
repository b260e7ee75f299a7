"""Tests for edge linking: category isA, mentions, Fig.-4 classifier."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import linking
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def link_frames(spark):
    members = pd.DataFrame(
        {"node_phrase": ["rapid film", "rapid film", "luxury suv"], "qid": [1, 2, 3]}
    )
    clicks = pd.DataFrame(
        {"qid": [1, 2, 3, 3], "doc_id": [10, 11, 12, 13], "count": [8, 2, 5, 5]}
    )
    docs = pd.DataFrame(
        {
            "doc_id": [10, 11, 12, 13],
            "category": ["film", "film", "cars", "travel"],
            "body": [
                "zorba prime is a film . vexba nova and zorba prime are rapid film .",
                "quaba ultra is a rapid film .",
                "nimba neo is a luxury suv .",
                "totally unrelated text .",
            ],
        }
    )
    return {
        "members": spark.createDataFrame(members),
        "clicks": spark.createDataFrame(clicks),
        "docs": spark.createDataFrame(docs),
        "pdf": {"members": members, "clicks": clicks, "docs": docs},
    }


def test_category_edges_threshold(link_frames):
    out = linking.category_edges(
        link_frames["members"], link_frames["clicks"], link_frames["docs"]
    ).toPandas()
    got = {(r.node_phrase, r.category) for _, r in out.iterrows()}
    assert ("rapid film", "film") in got  # 10/10 clicks on film docs
    assert ("luxury suv", "cars") in got  # 5/10 > 0.3
    assert ("luxury suv", "travel") in got  # 5/10 > 0.3


def test_category_edges_oracle(link_frames):
    sql = """
        WITH j AS (
            SELECT m.node_phrase, d.category, SUM(c.count) AS n_g
            FROM members m JOIN clicks c ON m.qid = c.qid
            JOIN docs d ON c.doc_id = d.doc_id
            GROUP BY m.node_phrase, d.category
        ), t AS (
            SELECT node_phrase, SUM(n_g) AS n_p FROM j GROUP BY node_phrase
        )
        SELECT j.node_phrase, j.category, j.n_g * 1.0 / t.n_p AS p_g_given_p
        FROM j JOIN t ON j.node_phrase = t.node_phrase
        WHERE j.n_g * 1.0 / t.n_p > 0.3
    """
    out = linking.category_edges(
        link_frames["members"], link_frames["clicks"], link_frames["docs"]
    )
    assert_equivalent(
        out,
        sql,
        members=link_frames["pdf"]["members"],
        clicks=link_frames["pdf"]["clicks"],
        docs=link_frames["pdf"]["docs"],
    )


def test_entity_mentions_found(link_frames):
    out = linking.entity_mentions(
        link_frames["docs"], ["zorba prime", "vexba nova", "missing one"]
    ).toPandas()
    zorba = out[out.entity_phrase == "zorba prime"]
    assert set(zorba.doc_id) == {10}
    assert len(zorba) == 2  # two sentences mention it
    assert "missing one" not in set(out.entity_phrase)


def test_entity_mentions_sentence_indices(link_frames):
    out = linking.entity_mentions(link_frames["docs"], ["vexba nova"]).toPandas()
    assert list(out.sent_idx) == [1]


def test_candidate_pairs(spark, link_frames):
    mentions = linking.entity_mentions(
        link_frames["docs"], ["zorba prime", "nimba neo"]
    )
    cands = linking.candidate_pairs(
        link_frames["members"], link_frames["clicks"], mentions
    ).toPandas()
    got = {(r.node_phrase, r.entity_phrase) for _, r in cands.iterrows()}
    assert ("rapid film", "zorba prime") in got
    assert ("luxury suv", "nimba neo") in got
    assert ("rapid film", "nimba neo") not in got


def test_session_pairs(spark, link_frames):
    sessions = spark.createDataFrame(
        pd.DataFrame(
            {
                "user_id": [0, 0, 1, 1],
                "session_id": [100, 100, 101, 101],
                "step": [0, 1, 0, 1],
                "qid": [1, 50, 3, 51],
            }
        )
    )
    queries = spark.createDataFrame(
        pd.DataFrame(
            {"qid": [1, 3, 50, 51], "text": ["rapid film", "luxury suv", "zorba prime", "nimba neo"]}
        )
    )
    out = linking.session_pairs(sessions, queries, link_frames["members"]).toPandas()
    got = {(r.node_phrase, r.entity_phrase): r.n_sessions for _, r in out.iterrows()}
    assert got[("rapid film", "zorba prime")] == 1
    assert got[("luxury suv", "nimba neo")] == 1


def test_isa_sentence_hit():
    body = "zorba prime is a rapid film . other text ."
    assert linking._isa_sentence_hit(body, "zorba prime", "rapid film")
    assert not linking._isa_sentence_hit(body, "vexba nova", "rapid film")


def test_logistic_regression_learns_separable():
    rng = np.random.default_rng(0)
    x = rng.normal(size=(200, 2))
    y = (x[:, 0] > 0).astype(int)
    clf = linking.LogisticRegression().fit(x, y)
    acc = ((clf.predict_proba(x) > 0.5) == y).mean()
    assert acc > 0.95


def test_concept_entity_edges_end_to_end(spark, link_frames):
    mentions = linking.entity_mentions(
        link_frames["docs"], ["zorba prime", "vexba nova", "quaba ultra", "nimba neo"]
    )
    cands = linking.candidate_pairs(
        link_frames["members"], link_frames["clicks"], mentions
    )
    sessions = spark.createDataFrame(
        pd.DataFrame(
            {
                "user_id": [0, 0],
                "session_id": [1, 1],
                "step": [0, 1],
                "qid": [1, 60],
            }
        )
    )
    queries = spark.createDataFrame(
        pd.DataFrame({"qid": [1, 60], "text": ["rapid film", "zorba prime"]})
    )
    sess = linking.session_pairs(sessions, queries, link_frames["members"])
    cands_pdf = (
        cands.join(sess, ["node_phrase", "entity_phrase"], "left")
        .fillna({"n_sessions": 0})
        .toPandas()
    )
    docs_pdf = link_frames["pdf"]["docs"]
    doc_bodies = dict(zip(docs_pdf.doc_id, docs_pdf.body))
    concept_docs = {"rapid film": [10, 11], "luxury suv": [12, 13]}
    out = linking.concept_entity_edges(
        cands_pdf,
        doc_bodies,
        concept_docs,
        {"zorba prime": "film", "vexba nova": "film", "quaba ultra": "film", "nimba neo": "cars"},
        {"rapid film": "film", "luxury suv": "cars"},
    )
    got = {(r.node_phrase, r.entity_phrase) for _, r in out.iterrows()}
    assert ("rapid film", "zorba prime") in got
