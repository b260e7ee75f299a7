"""Table harnesses for the evaluation section (Tables 5-7).

Each ``run_*`` function takes the example sets, trains every method on
the train split, evaluates on the test split, and returns a pandas
table shaped like the paper's. GCTSP-Net inference goes through Spark
(``predict_phrases_spark``) when a SparkSession is supplied; baselines
are driver-side (they are cheap and not the paper's contribution).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines import autophrase as ap
from repro.baselines import coverrank as cr
from repro.baselines import crf_tagger as ct
from repro.baselines import match_align as ma
from repro.baselines import seq2seq as s2s
from repro.baselines import textrank as tr
from repro.core.gctsp import (
    predict_phrase,
    predict_phrases_spark,
    predict_token_classes,
    train_element_model,
    train_phrase_model,
)
from repro.core.qtig import build_qtig
from repro.evalsets import split
from repro.metrics import multiclass_f1, phrase_metrics
from repro.nlp.tokenize import tokenize

ELEMENT_IDX = {c: i for i, c in enumerate(ct.ELEMENT_TAGS)}


def _gctsp_predictions(
    model, test: pd.DataFrame, spark: SparkSession | None
) -> list[str]:
    if spark is None:
        return [
            predict_phrase(model, list(r["queries"]), list(r["titles"]))
            for _, r in test.iterrows()
        ]
    sdf = spark.createDataFrame(test[["example_id", "queries", "titles"]])
    got = {
        r.example_id: r.prediction
        for r in predict_phrases_spark(sdf, model).collect()
    }
    return [got[i] for i in test.example_id]


def run_concept_table(
    cmd: pd.DataFrame,
    all_examples: pd.DataFrame,
    corpus_texts: list[str],
    corpus_queries: list[str],
    *,
    spark: SparkSession | None = None,
    epochs: int = 10,
    seed: int = 0,
    eval_split: str = "test",
) -> pd.DataFrame:
    """Table 5: concept mining EM/F1/COV for all eight methods.

    ``cmd``: concept examples (with ``split``). ``all_examples``: both
    kinds, used to train the multi-task GCTSP-Net as in the paper.
    ``corpus_texts`` / ``corpus_queries``: whole-corpus inputs for the
    corpus-statistic baselines (AutoPhrase, Match bootstrapping).
    ``eval_split``: "test" (default) or "all" — tiny worlds have too few
    held-out examples for stable shape checks.
    """
    train_all = split(all_examples, "train")
    train = split(cmd, "train")
    test = cmd if eval_split == "all" else split(cmd, eval_split)

    miner = ap.AutoPhraseMiner().fit(corpus_texts)
    boot = ma.Bootstrapper().fit(corpus_queries)
    q_tagger = ct.train_query_tagger(train, field="queries")
    t_tagger = ct.train_query_tagger(train, field="titles")
    gctsp = train_phrase_model(train_all, epochs=epochs, seed=seed)

    methods: dict[str, callable] = {
        "TextRank": lambda r: tr.extract(r["queries"], r["titles"]),
        "AutoPhrase": lambda r: miner.extract(r["queries"], r["titles"]),
        "Match": lambda r: ma.match_extract(boot, r["queries"]),
        "Align": lambda r: ma.align_extract(r["queries"], r["titles"]),
        "MatchAlign": lambda r: ma.match_align_extract(boot, r["queries"], r["titles"]),
        "Q-LSTM-CRF": lambda r: ct.tag_phrase(q_tagger, r["queries"][0]),
        "T-LSTM-CRF": lambda r: ct.tag_phrase(t_tagger, r["titles"][0]),
    }
    rows = []
    golds = list(test.gold)
    for name, fn in methods.items():
        preds = [fn(r) for _, r in test.iterrows()]
        rows.append({"Method": name, **phrase_metrics(preds, golds)})
    preds = _gctsp_predictions(gctsp, test, spark)
    rows.append({"Method": "GCTSP-Net", **phrase_metrics(preds, golds)})
    return pd.DataFrame(rows)


def run_event_table(
    emd: pd.DataFrame,
    all_examples: pd.DataFrame,
    *,
    spark: SparkSession | None = None,
    epochs: int = 10,
    seed: int = 0,
    eval_split: str = "test",
) -> pd.DataFrame:
    """Table 6: event mining EM/F1/COV for the five methods."""
    train_all = split(all_examples, "train")
    train = split(emd, "train")
    test = emd if eval_split == "all" else split(emd, eval_split)

    lm = s2s.BigramGenerator().fit(list(train.gold))
    title_tagger = ct.train_title_tagger_all(train)
    gctsp = train_phrase_model(train_all, epochs=epochs, seed=seed)

    methods: dict[str, callable] = {
        # Paper protocol: TextRank re-ranks CoverRank's top queries/subtitles.
        "TextRank": lambda r: tr.extract(
            cr.top_candidates(r["queries"], r["titles"], k=4), []
        ),
        "CoverRank": lambda r: cr.extract(r["queries"], r["titles"]),
        "TextSummary": lambda r: lm.generate(r["queries"], r["titles"]),
        "LSTM-CRF": lambda r: ct.extract_event_lstm_crf(title_tagger, r["titles"]),
    }
    rows = []
    golds = list(test.gold)
    for name, fn in methods.items():
        preds = [fn(r) for _, r in test.iterrows()]
        rows.append({"Method": name, **phrase_metrics(preds, golds)})
    preds = _gctsp_predictions(gctsp, test, spark)
    rows.append({"Method": "GCTSP-Net", **phrase_metrics(preds, golds)})
    return pd.DataFrame(rows)


def _element_gold_and_pred(test: pd.DataFrame, predict_fn) -> tuple[list[int], list[int]]:
    """Flatten per-token (gold, pred) class ids over the test set.

    Evaluation tokens are the QTIG nodes of each example (the unit the
    paper classifies); taggers that operate on the top title only are
    scored on the tokens they see, with unseen tokens falling to
    'other' — the same penalty an incomplete extraction gets.
    """
    y_true: list[int] = []
    y_pred: list[int] = []
    for _, r in test.iterrows():
        g = build_qtig(list(r["queries"]), list(r["titles"]))
        pred_map = predict_fn(r)  # token -> class name
        for tok in g.tokens[2:]:
            y_true.append(ELEMENT_IDX[ct.element_label_of(tok, r)])
            y_pred.append(ELEMENT_IDX[pred_map.get(tok, "other")])
    return y_true, y_pred


def run_elements_table(
    emd: pd.DataFrame,
    *,
    epochs: int = 12,
    seed: int = 0,
    eval_split: str = "test",
) -> pd.DataFrame:
    """Table 7: event key-element recognition (LSTM, LSTM-CRF, GCTSP-Net)."""
    train = split(emd, "train")
    test = emd if eval_split == "all" else split(emd, eval_split)

    lstm = ct.train_element_tagger(train, use_transitions=False)
    lstm_crf = ct.train_element_tagger(train, use_transitions=True)
    gctsp = train_element_model(train, epochs=epochs, seed=seed)

    def tagger_fn(tagger):
        def fn(r):
            # Tag every query and title individually (the paper feeds
            # sequences one at a time) and merge per token by majority
            # vote, earliest-sequence tie-break.
            votes: dict[str, dict[str, int]] = {}
            order: dict[str, int] = {}
            pos = 0
            for text in list(r["queries"]) + list(r["titles"]):
                toks = tokenize(text)
                for tok, tag in zip(toks, tagger.predict(toks)):
                    votes.setdefault(tok, {}).setdefault(tag, 0)
                    votes[tok][tag] += 1
                    order.setdefault(tok, pos)
                    pos += 1
            return {
                tok: max(v, key=lambda tg: (v[tg], tg)) for tok, v in votes.items()
            }

        return fn

    def gctsp_fn(r):
        return dict(predict_token_classes(gctsp, list(r["queries"]), list(r["titles"])))

    rows = []
    for name, fn in [
        ("LSTM", tagger_fn(lstm)),
        ("LSTM-CRF", tagger_fn(lstm_crf)),
        ("GCTSP-Net", gctsp_fn),
    ]:
        y_true, y_pred = _element_gold_and_pred(test, fn)
        rows.append(
            {"Method": name, **multiclass_f1(y_true, y_pred, len(ct.ELEMENT_TAGS))}
        )
    return pd.DataFrame(rows)


def corpus_inputs(world) -> tuple[list[str], list[str]]:
    """(all query+title texts, all query texts) for corpus baselines."""
    texts = list(world.queries.text) + list(world.docs.title)
    return texts, list(world.queries.text)
