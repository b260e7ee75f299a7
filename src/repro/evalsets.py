"""CMD/EMD-lite dataset construction (paper §5.2, "Datasets").

The paper's Concept Mining Dataset and Event Mining Dataset pair each
query-doc cluster with a manually labeled gold phrase (plus triggers /
key entities / locations for events). Our clusters come from the
distributed random walk over the synthetic click graph; gold labels
come from the generator's ground truth instead of human annotators
(DESIGN.md §2). Splits are hash-based 80/10/10 so they are stable
across runs and world sizes.
"""
from __future__ import annotations

import hashlib

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.random_walk import query_doc_clusters
from repro.world.clicklog_gen import World, to_spark


def _split_of(key: int) -> str:
    h = int(hashlib.md5(f"ex{key}".encode()).hexdigest(), 16) % 10
    if h < 8:
        return "train"
    return "dev" if h == 8 else "test"


def build_clusters(spark: SparkSession, world: World, **walk_kwargs) -> DataFrame:
    """Query-doc clusters for every seed query in the world's click log."""
    frames = to_spark(spark, world)
    return query_doc_clusters(
        frames["clicks"], frames["queries"], frames["docs"], **walk_kwargs
    )


def build_examples(
    spark: SparkSession, world: World, **walk_kwargs
) -> pd.DataFrame:
    """All labeled examples, one per attention-seeded cluster.

    Columns: example_id, kind ('concept'|'event'), queries (list[str]),
    titles (list[str]), gold (str), entity_toks / trigger_toks /
    location_toks (list[str], events only), split. One example per gold
    attention: the cluster seeded by the attention's top query (the
    paper likewise built one labeled example per query-doc cluster).
    """
    clusters = build_clusters(spark, world, **walk_kwargs)
    qmeta = spark.createDataFrame(
        world.queries[["qid", "gold_kind", "gold_id"]]
    ).withColumnRenamed("qid", "seed_qid")
    joined = (
        clusters.join(qmeta, "seed_qid")
        .where(F.col("gold_kind").isin("concept", "event"))
        .toPandas()
    )
    # One example per attention: keep the lowest seed_qid (= the
    # attention's primary, highest-typicality query).
    joined = (
        joined.sort_values("seed_qid")
        .groupby(["gold_kind", "gold_id"], as_index=False)
        .first()
    )

    onto = world.ontology
    concepts = onto.concepts.set_index("concept_id")
    events = onto.events.set_index("event_id")
    rows = []
    for _, r in joined.iterrows():
        kind, gid = r.gold_kind, int(r.gold_id)
        if kind == "concept":
            if gid not in concepts.index:
                continue
            gold = concepts.loc[gid].phrase
            ent_toks: list[str] = []
            trig_toks: list[str] = []
            loc_toks: list[str] = []
        else:
            if gid not in events.index:
                continue
            ev = events.loc[gid]
            gold = ev.phrase
            ent_phrase = onto.entities[
                onto.entities.entity_id == ev.entity_id
            ].iloc[0].phrase
            ent_toks = ent_phrase.split()
            trig_toks = [ev.trigger]
            loc_toks = [ev.location] if ev.location else []
        rows.append(
            {
                "example_id": int(r.seed_qid),
                "kind": kind,
                "queries": list(r.queries),
                "titles": list(r.titles),
                "gold": gold,
                "entity_toks": ent_toks,
                "trigger_toks": trig_toks,
                "location_toks": loc_toks,
                "split": _split_of(int(gid) * 2 + (kind == "event")),
            }
        )
    return pd.DataFrame(rows)


def concept_examples(examples: pd.DataFrame) -> pd.DataFrame:
    """The CMD-lite slice."""
    return examples[examples.kind == "concept"].reset_index(drop=True)


def event_examples(examples: pd.DataFrame) -> pd.DataFrame:
    """The EMD-lite slice."""
    return examples[examples.kind == "event"].reset_index(drop=True)


def split(examples: pd.DataFrame, name: str) -> pd.DataFrame:
    """train / dev / test slice."""
    return examples[examples.split == name].reset_index(drop=True)
