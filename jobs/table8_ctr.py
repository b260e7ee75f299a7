"""§5.3-§5.4 aggregates: document tagging precision and simulated CTR.

Paper numbers for reference:
  §5.3 document tagging precision: concepts 88% overall, events 96%.
  §5.4 (Fig. 6): average CTR 12.47% -> 13.02% with attention tags.
  §5.4 (Fig. 7): per-tag CTR topic 16.18% > event 14.78% > entity
  12.93% > concept 11.82% > category 9.04%.
"""
import pandas as pd
from _common import print_table, setup

from repro.core import linking, tagging
from repro.core.ontology import build_ontology, mine_attention_nodes
from repro.recsim.recommend import assemble_doc_tags, run_simulation


def main() -> None:
    spark, world, frames, examples, pm, em = setup("table8_ctr")
    ao = build_ontology(
        spark,
        frames,
        list(world.ontology.entities.phrase),
        list(world.ontology.categories.name),
        pm,
        em,
    )
    nodes, merged = mine_attention_nodes(spark, frames, pm)
    mentions = linking.entity_mentions(
        frames["docs"], list(world.ontology.entities.phrase)
    ).cache()
    ce = ao.edges[
        (ao.edges.type == "isA")
        & (ao.edges.src_kind == "concept")
        & (ao.edges.dst_kind == "entity")
    ].rename(columns={"src": "node_phrase", "dst": "entity_phrase"})
    reps = tagging.concept_context_reps(ao.members, merged[merged.kind == "concept"])
    concept_tags = tagging.tag_concepts(frames["docs"], mentions, ce, reps).toPandas()
    ev_members = (
        merged[merged.kind == "event"]
        .groupby("node_phrase")
        .first()
        .reset_index()[["node_phrase", "titles"]]
    )
    matcher = tagging.build_event_matcher(ev_members, world.docs)
    event_tags = tagging.tag_events(
        frames["docs"], list(ev_members.node_phrase), matcher
    ).toPandas()

    # §5.3 — tagging volume and precision
    o = world.ontology
    cmap = dict(zip(o.concepts.concept_id, o.concepts.phrase))
    emap = dict(zip(o.events.event_id, o.events.phrase))
    gold_phrase = {}
    for _, d in world.docs.iterrows():
        if d.gold_kind == "concept":
            gold_phrase[int(d.doc_id)] = cmap[int(d.gold_id)]
        elif d.gold_kind == "event":
            gold_phrase[int(d.doc_id)] = emap[int(d.gold_id)]
    n_docs = len(world.docs)
    summary = pd.DataFrame(
        [
            {
                "metric": "docs with >=1 concept tag",
                "value": concept_tags.doc_id.nunique() / n_docs,
                "paper": 0.35,
            },
            {
                "metric": "docs with >=1 event tag",
                "value": event_tags.doc_id.nunique() / n_docs,
                "paper": 0.04,
            },
            {
                "metric": "concept tagging precision",
                "value": tagging.tagging_precision(
                    concept_tags, world.docs, gold_phrase, "concept"
                ),
                "paper": 0.88,
            },
            {
                "metric": "event tagging precision",
                "value": tagging.tagging_precision(
                    event_tags, world.docs, gold_phrase, "event"
                ),
                "paper": 0.96,
            },
        ]
    )
    print_table("§5.3 — document tagging", summary)

    # §5.4 — CTR simulation
    doc_tags = assemble_doc_tags(world, concept_tags, event_tags, ao.edges)
    strat, per_tag = run_simulation(world, doc_tags, n_users=300, per_user=8)
    print_table("Fig. 6 aggregate — CTR with/without attention tags", strat)
    print_table("Fig. 7 aggregate — CTR per tag type", per_tag)
    spark.stop()


if __name__ == "__main__":
    main()
