"""Attention derivation (paper §3.1): CSD and CPD.

Common Suffix Discovery lifts leaf concepts to parent concepts: any
suffix shared by enough concept phrases that forms a noun phrase
becomes a new (parent) concept node with isA edges to its children.
Implemented as Spark DataFrame ETL: explode every proper suffix of
every concept, filter to noun-phrase shape, count, threshold.

Common Pattern Discovery lifts events to topics: events sharing a
(trigger, object) pattern whose entities share a concept ancestor
produce a topic phrase = concept tokens + trigger + object, with isA
edges topic -> event and an involve edge topic -> concept.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.nlp.tagger import pos_tag


def _is_noun_phrase(tokens: list[str]) -> bool:
    """ADJ* NOUN+ shape ending in a noun (paper: 'forms a noun phrase')."""
    tags = pos_tag(tokens)
    if tags[-1] not in ("NOUN", "PROPN"):
        return False
    return all(t in ("ADJ", "NOUN", "PROPN") for t in tags)


_SUFFIX_SCHEMA = T.StructType(
    [
        T.StructField("phrase", T.StringType()),
        T.StructField("suffix", T.StringType()),
    ]
)


def _explode_suffixes(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
    for pdf in batches:
        rows = []
        for phrase in pdf["phrase"]:
            toks = phrase.split()
            for k in range(1, len(toks)):
                suf = toks[k:]
                if _is_noun_phrase(suf):
                    rows.append({"phrase": phrase, "suffix": " ".join(suf)})
        yield pd.DataFrame(rows, columns=["phrase", "suffix"])


def common_suffix_discovery(
    spark: SparkSession, concept_phrases: list[str], *, min_count: int = 2
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """CSD over mined concept phrases.

    Returns (parents, edges): ``parents`` has one ``phrase`` per derived
    parent concept; ``edges`` has (parent, child) isA rows. Only the
    *longest* qualifying suffix of each child links to a parent (the
    most specific ancestor), and a parent identical to the child is
    ignored.
    """
    if not concept_phrases:
        empty = pd.DataFrame(columns=["phrase"])
        return empty, pd.DataFrame(columns=["parent", "child"])
    df = spark.createDataFrame(
        pd.DataFrame({"phrase": sorted(set(concept_phrases))})
    )
    sufs = df.mapInPandas(_explode_suffixes, schema=_SUFFIX_SCHEMA)
    counts = (
        sufs.groupBy("suffix")
        .agg(F.countDistinct("phrase").alias("n"))
        .where(F.col("n") >= min_count)
    )
    kept = sufs.join(counts, "suffix").toPandas()
    if kept.empty:
        return pd.DataFrame(columns=["phrase"]), pd.DataFrame(columns=["parent", "child"])
    # Most specific ancestor: longest qualifying suffix per child.
    kept["suffix_len"] = kept.suffix.str.split().str.len()
    best = (
        kept.sort_values(["phrase", "suffix_len"], ascending=[True, False])
        .groupby("phrase", as_index=False)
        .first()
    )
    edges = best.rename(columns={"suffix": "parent", "phrase": "child"})[
        ["parent", "child"]
    ]
    edges = edges[edges.parent != edges.child].reset_index(drop=True)
    parents = (
        pd.DataFrame({"phrase": sorted(edges.parent.unique())})
        if len(edges)
        else pd.DataFrame(columns=["phrase"])
    )
    return parents, edges


def common_pattern_discovery(
    events: pd.DataFrame,
    concept_of_entity: dict[str, str],
    *,
    min_events: int = 2,
) -> tuple[pd.DataFrame, pd.DataFrame, pd.DataFrame]:
    """CPD over mined events.

    ``events`` columns: ``phrase``, ``entity_phrase`` (recognized key
    entity), ``trigger``, ``object``. ``concept_of_entity`` maps an
    entity surface phrase to its most fine-grained mined concept.

    Returns (topics, isa_edges, involve_edges):
      topics: ``phrase``, ``trigger``, ``object``, ``concept``
      isa_edges: (topic, event) — the event isA instance of the topic
      involve_edges: (topic, concept)
    """
    rows = []
    for _, ev in events.iterrows():
        concept = concept_of_entity.get(ev.entity_phrase)
        if concept is None:
            continue
        rows.append(
            {
                "concept": concept,
                "trigger": ev.trigger,
                "object": ev["object"],
                "event_phrase": ev.phrase,
            }
        )
    if not rows:
        empty = pd.DataFrame()
        return (
            pd.DataFrame(columns=["phrase", "trigger", "object", "concept"]),
            pd.DataFrame(columns=["topic", "event"]),
            pd.DataFrame(columns=["topic", "concept"]),
        )
    df = pd.DataFrame(rows)
    grouped = df.groupby(["concept", "trigger", "object"])
    topic_rows, isa_rows, inv_rows = [], [], []
    for (concept, trig, obj), grp in grouped:
        # The paper filters derived topics by user search support; ours
        # requires the pattern to cover >= min_events distinct events.
        if grp.event_phrase.nunique() < min_events:
            continue
        phrase = f"{concept} {trig} {obj}"
        topic_rows.append(
            {"phrase": phrase, "trigger": trig, "object": obj, "concept": concept}
        )
        for ev_phrase in sorted(grp.event_phrase.unique()):
            isa_rows.append({"topic": phrase, "event": ev_phrase})
        inv_rows.append({"topic": phrase, "concept": concept})
    return (
        pd.DataFrame(topic_rows, columns=["phrase", "trigger", "object", "concept"]),
        pd.DataFrame(isa_rows, columns=["topic", "event"]),
        pd.DataFrame(inv_rows, columns=["topic", "concept"]),
    )
