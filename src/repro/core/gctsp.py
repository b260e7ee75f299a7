"""GCTSP-Net: QTIG features + R-GCN node classification + ATSP decoding.

Two heads share the architecture (paper §3.1 / §3.2):

- *phrase head* (2-class): is this token part of the attention phrase?
  Positive nodes are then ordered by ATSP decoding into the phrase.
- *element head* (4-class): other / entity / trigger / location, used to
  build ``involve`` edges for events and topics (no ATSP step).

Training runs on the driver over the (small) training split; inference
runs distributed via ``mapInPandas`` with the weights broadcast — the
classic "train small, score wide" Spark pattern.

Node features follow the paper: embeddings of the token's NER tag, POS
tag, stop-word flag, character count, and the sequential id of node
insertion — realized as one-hot / scaled-scalar blocks (16 dims).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.atsp import atsp_decode
from repro.core.qtig import QTIG, RELATIONS, build_qtig, element_labels, node_labels
from repro.core.rgcn import RGCN, Graph, build_graph
from repro.nlp.tagger import NER_TAGS, POS_TAGS
from repro.nlp.tokenize import is_stop

D_IN = len(POS_TAGS) + len(NER_TAGS) + 1 + 1 + 1 + 2
ELEMENT_CLASSES: tuple[str, ...] = ("other", "entity", "trigger", "location")

_POS_IDX = {p: i for i, p in enumerate(POS_TAGS)}
_NER_IDX = {n: i for i, n in enumerate(NER_TAGS)}


def node_features(g: QTIG) -> np.ndarray:
    """(n, D_IN) feature matrix for a QTIG."""
    n = g.n_nodes
    x = np.zeros((n, D_IN))
    for i in range(n):
        tok = g.tokens[i]
        x[i, _POS_IDX.get(g.pos[i], 0)] = 1.0
        x[i, len(POS_TAGS) + _NER_IDX.get(g.ner[i], 0)] = 1.0
        base = len(POS_TAGS) + len(NER_TAGS)
        x[i, base] = 1.0 if (i >= 2 and is_stop(tok)) else 0.0
        x[i, base + 1] = min(len(tok), 12) / 12.0
        x[i, base + 2] = i / max(1, n - 1)
        x[i, base + 3] = 1.0 if i == 0 else 0.0
        x[i, base + 4] = 1.0 if i == 1 else 0.0
    return x


def to_graph(g: QTIG) -> Graph:
    """Model input (features + per-relation adjacency) for a QTIG."""
    return build_graph(node_features(g), g.edges, len(RELATIONS))


# --------------------------------------------------------------------------
# Phrase head
# --------------------------------------------------------------------------
def train_phrase_model(
    examples: pd.DataFrame,
    *,
    epochs: int = 8,
    d_hidden: int = 32,
    n_layers: int = 5,
    n_bases: int = 5,
    lr: float = 5e-3,
    seed: int = 0,
) -> RGCN:
    """Train the 2-class head on (queries, titles, gold) examples.

    ``examples`` columns: ``queries`` (list[str]), ``titles`` (list[str]),
    ``gold`` (str). Architecture defaults follow the paper (5-layer,
    hidden 32, B=5 basis decomposition).
    """
    graphs, labels = [], []
    for _, row in examples.iterrows():
        g = build_qtig(list(row["queries"]), list(row["titles"]))
        graphs.append(to_graph(g))
        labels.append(np.asarray(node_labels(g, row["gold"])))
    model = RGCN(
        D_IN, len(RELATIONS), 2,
        d_hidden=d_hidden, n_layers=n_layers, n_bases=n_bases, seed=seed,
    )
    model.fit(graphs, labels, epochs=epochs, lr=lr, positive_weight=2.0, seed=seed)
    return model


def predict_phrase(model: RGCN, queries: list[str], titles: list[str]) -> str:
    """Extract one attention phrase from a query-title cluster."""
    g = build_qtig(queries, titles)
    probs = model.predict(to_graph(g))
    positive = {i for i in range(2, g.n_nodes) if probs[i, 1] > 0.5}
    return " ".join(atsp_decode(g, positive))


# --------------------------------------------------------------------------
# Element head (4-class)
# --------------------------------------------------------------------------
def train_element_model(
    examples: pd.DataFrame,
    *,
    epochs: int = 10,
    d_hidden: int = 32,
    n_layers: int = 5,
    n_bases: int = 5,
    lr: float = 5e-3,
    seed: int = 0,
) -> RGCN:
    """Train the 4-class key-element head.

    ``examples`` columns: ``queries``, ``titles``, and gold element token
    sets ``entity_toks``, ``trigger_toks``, ``location_toks`` (list[str]).
    """
    graphs, labels = [], []
    for _, row in examples.iterrows():
        g = build_qtig(list(row["queries"]), list(row["titles"]))
        graphs.append(to_graph(g))
        labels.append(
            np.asarray(
                element_labels(
                    g,
                    set(row["entity_toks"]),
                    set(row["trigger_toks"]),
                    set(row["location_toks"]),
                )
            )
        )
    model = RGCN(
        D_IN, len(RELATIONS), len(ELEMENT_CLASSES),
        d_hidden=d_hidden, n_layers=n_layers, n_bases=n_bases, seed=seed,
    )
    model.fit(graphs, labels, epochs=epochs, lr=lr, positive_weight=3.0, seed=seed)
    return model


def predict_elements(
    model: RGCN, queries: list[str], titles: list[str]
) -> dict[str, list[str]]:
    """Predicted element tokens by class name (entity/trigger/location)."""
    g = build_qtig(queries, titles)
    probs = model.predict(to_graph(g))
    out: dict[str, list[str]] = {c: [] for c in ELEMENT_CLASSES[1:]}
    for i in range(2, g.n_nodes):
        c = int(np.argmax(probs[i]))
        if c > 0:
            out[ELEMENT_CLASSES[c]].append(g.tokens[i])
    return out


def predict_token_classes(
    model: RGCN, queries: list[str], titles: list[str]
) -> list[tuple[str, str]]:
    """(token, predicted class) for every non-special QTIG node."""
    g = build_qtig(queries, titles)
    probs = model.predict(to_graph(g))
    return [
        (g.tokens[i], ELEMENT_CLASSES[int(np.argmax(probs[i]))])
        for i in range(2, g.n_nodes)
    ]


# --------------------------------------------------------------------------
# Distributed inference
# --------------------------------------------------------------------------
_PRED_SCHEMA = T.StructType(
    [
        T.StructField("example_id", T.LongType()),
        T.StructField("prediction", T.StringType()),
    ]
)


def predict_phrases_spark(examples: DataFrame, model: RGCN) -> DataFrame:
    """Distributed phrase extraction.

    ``examples`` needs ``example_id`` (long), ``queries`` (array<string>),
    ``titles`` (array<string>). Weights travel via closure broadcast;
    each partition rebuilds the model once.
    """
    state = model.state()

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        local = RGCN.from_state(state)
        for pdf in batches:
            preds = [
                predict_phrase(local, list(q), list(t))
                for q, t in zip(pdf["queries"], pdf["titles"])
            ]
            yield pd.DataFrame(
                {"example_id": pdf["example_id"], "prediction": preds}
            )

    return examples.select("example_id", "queries", "titles").mapInPandas(
        run, schema=_PRED_SCHEMA
    )


_ELEM_SCHEMA = T.StructType(
    [
        T.StructField("example_id", T.LongType()),
        T.StructField("entity_pred", T.ArrayType(T.StringType())),
        T.StructField("trigger_pred", T.ArrayType(T.StringType())),
        T.StructField("location_pred", T.ArrayType(T.StringType())),
    ]
)


def predict_elements_spark(examples: DataFrame, model: RGCN) -> DataFrame:
    """Distributed key-element recognition over event/topic clusters."""
    state = model.state()

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        local = RGCN.from_state(state)
        for pdf in batches:
            rows = []
            for eid, q, t in zip(pdf["example_id"], pdf["queries"], pdf["titles"]):
                e = predict_elements(local, list(q), list(t))
                rows.append(
                    {
                        "example_id": eid,
                        "entity_pred": e["entity"],
                        "trigger_pred": e["trigger"],
                        "location_pred": e["location"],
                    }
                )
            yield pd.DataFrame(rows)

    return examples.select("example_id", "queries", "titles").mapInPandas(
        run, schema=_ELEM_SCHEMA
    )
