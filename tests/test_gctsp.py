"""GCTSP-Net tests: features, both heads, and distributed inference."""
import numpy as np
import pytest

from repro.core.gctsp import (
    D_IN,
    ELEMENT_CLASSES,
    node_features,
    predict_elements,
    predict_elements_spark,
    predict_phrase,
    predict_phrases_spark,
    predict_token_classes,
    to_graph,
)
from repro.core.qtig import RELATIONS, build_qtig
from repro.evalsets import concept_examples, event_examples
from repro.metrics import phrase_metrics


def test_feature_matrix_shape():
    g = build_qtig(["famous animated film"], ["review famous animated film"])
    x = node_features(g)
    assert x.shape == (g.n_nodes, D_IN)


def test_feature_blocks():
    g = build_qtig(["the famous film"], [])
    x = node_features(g)
    i = g.node_of("the")
    base = D_IN - 5
    assert x[i, base] == 1.0          # stopword flag
    assert x[0, base + 3] == 1.0      # sos marker
    assert x[1, base + 4] == 1.0      # eos marker
    assert x[0, base] == 0.0          # sos itself not flagged as stop token


def test_feature_char_count_scaled():
    g = build_qtig(["ab abcdefghijklmno"], [])
    x = node_features(g)
    assert x[g.node_of("ab"), D_IN - 4] == pytest.approx(2 / 12)
    assert x[g.node_of("abcdefghijklmno"), D_IN - 4] == 1.0


def test_to_graph_relation_count():
    g = build_qtig(["famous film"], [])
    gr = to_graph(g)
    assert len(gr.adj) == len(RELATIONS)


def test_phrase_model_on_concepts(phrase_model, examples):
    cmd = concept_examples(examples)
    preds = [
        predict_phrase(phrase_model, list(r["queries"]), list(r["titles"]))
        for _, r in cmd.iterrows()
    ]
    m = phrase_metrics(preds, list(cmd.gold))
    assert m["F1"] > 0.9
    assert m["COV"] > 0.9


def test_phrase_model_on_events(phrase_model, examples):
    emd = event_examples(examples)
    preds = [
        predict_phrase(phrase_model, list(r["queries"]), list(r["titles"]))
        for _, r in emd.iterrows()
    ]
    m = phrase_metrics(preds, list(emd.gold))
    assert m["F1"] > 0.8


def test_phrase_prediction_unique_tokens(phrase_model, examples):
    r = examples.iloc[0]
    pred = predict_phrase(phrase_model, list(r["queries"]), list(r["titles"]))
    toks = pred.split()
    assert len(toks) == len(set(toks))  # ATSP visits each node once


def test_element_model_classes(element_model, examples):
    emd = event_examples(examples)
    r = emd.iloc[0]
    out = predict_elements(element_model, list(r["queries"]), list(r["titles"]))
    assert set(out) == {"entity", "trigger", "location"}


def test_element_model_accuracy(element_model, examples):
    emd = event_examples(examples)
    hits = total = 0
    for _, r in emd.iterrows():
        out = predict_elements(element_model, list(r["queries"]), list(r["titles"]))
        hits += set(out["entity"]) == set(r["entity_toks"])
        hits += set(out["trigger"]) == set(r["trigger_toks"])
        total += 2
    assert hits / total > 0.8


def test_predict_token_classes_labels(element_model, examples):
    emd = event_examples(examples)
    r = emd.iloc[0]
    out = predict_token_classes(element_model, list(r["queries"]), list(r["titles"]))
    assert all(c in ELEMENT_CLASSES for _, c in out)
    assert len(out) > 0


def test_spark_phrase_inference_matches_local(spark, phrase_model, examples):
    sub = examples.head(6)[["example_id", "queries", "titles"]]
    sdf = spark.createDataFrame(sub)
    got = {
        r.example_id: r.prediction
        for r in predict_phrases_spark(sdf, phrase_model).collect()
    }
    for _, r in sub.iterrows():
        local = predict_phrase(phrase_model, list(r["queries"]), list(r["titles"]))
        assert got[r["example_id"]] == local


def test_spark_element_inference_matches_local(spark, element_model, examples):
    emd = event_examples(examples).head(4)[["example_id", "queries", "titles"]]
    sdf = spark.createDataFrame(emd)
    got = {
        r.example_id: (r.entity_pred, r.trigger_pred, r.location_pred)
        for r in predict_elements_spark(sdf, element_model).collect()
    }
    for _, r in emd.iterrows():
        local = predict_elements(element_model, list(r["queries"]), list(r["titles"]))
        e, t, l = got[r["example_id"]]
        assert list(e) == local["entity"]
        assert list(t) == local["trigger"]
        assert list(l) == local["location"]


def test_model_state_preserves_predictions(phrase_model, examples):
    from repro.core.rgcn import RGCN

    r = examples.iloc[0]
    clone = RGCN.from_state(phrase_model.state())
    a = predict_phrase(phrase_model, list(r["queries"]), list(r["titles"]))
    b = predict_phrase(clone, list(r["queries"]), list(r["titles"]))
    assert a == b


def test_empty_prediction_possible():
    """A freshly initialized model may predict no positives; the phrase
    is then empty (COV < 1 cases in Table 6)."""
    from repro.core.rgcn import RGCN

    m = RGCN(D_IN, len(RELATIONS), 2, d_hidden=8, n_layers=2, n_bases=2, seed=0)
    out = predict_phrase(m, ["famous film"], [])
    assert isinstance(out, str)
