"""Table 4: showcases of events with categories, topics, and entities.

Qualitative table reproducing rows like "Music | Singers win music
awards | Jay Chou won the Golden Melody Awards ... | Jay Chou, ...":
each mined topic with its member events (topic->event isA) and the
entities those events involve.
"""
import pandas as pd
from _common import print_table, setup

from repro.core.ontology import build_ontology


def main() -> None:
    spark, world, frames, examples, pm, em = setup("table4_events")
    ao = build_ontology(
        spark,
        frames,
        list(world.ontology.entities.phrase),
        list(world.ontology.categories.name),
        pm,
        em,
    )
    isa = ao.edges[ao.edges.type == "isA"]
    inv = ao.edges[ao.edges.type == "involve"]
    topic_events = isa[(isa.src_kind == "topic") & (isa.dst_kind == "event")]
    cat_event = isa[(isa.src_kind == "category") & (isa.dst_kind == "event")]
    ev_entities = inv[(inv.src_kind == "event") & (inv.dst_kind == "entity")]
    rows = []
    for topic, grp in topic_events.groupby("src"):
        events = sorted(grp.dst)
        cats = sorted({c for e in events for c in cat_event[cat_event.dst == e].src})
        ents = sorted({x for e in events for x in ev_entities[ev_entities.src == e].dst})
        rows.append(
            {
                "Category": ", ".join(cats) if cats else "-",
                "Topic": topic,
                "Events": "; ".join(events[:2]),
                "Entities": ", ".join(ents[:4]),
            }
        )
    table = pd.DataFrame(rows).sort_values(["Category", "Topic"]).head(12)
    print_table("Table 4 — event/topic showcases", table)
    spark.stop()


if __name__ == "__main__":
    main()
