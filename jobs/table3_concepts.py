"""Table 3: showcases of concepts with their categories and instances.

Qualitative table: for a sample of mined concepts, print the linked
category (isA) and instance entities (concept->entity isA edges) — the
reproduction of rows like "Sports | Famous long-distance runner |
Dennis Kipruto Kimetto, ...".
"""
from _common import print_table, setup

from repro.core.ontology import build_ontology


def main() -> None:
    spark, world, frames, examples, pm, em = setup("table3_concepts")
    ao = build_ontology(
        spark,
        frames,
        list(world.ontology.entities.phrase),
        list(world.ontology.categories.name),
        pm,
        em,
    )
    isa = ao.edges[ao.edges.type == "isA"]
    cat = isa[(isa.src_kind == "category") & (isa.dst_kind == "concept")]
    ce = isa[(isa.src_kind == "concept") & (isa.dst_kind == "entity")]
    rows = []
    for concept, grp in ce.groupby("src"):
        cats = sorted(cat[cat.dst == concept].src)
        rows.append(
            {
                "Category": ", ".join(cats) if cats else "-",
                "Concept": concept,
                "Instances": ", ".join(sorted(grp.dst)[:4]),
            }
        )
    import pandas as pd

    table = pd.DataFrame(rows).sort_values(["Category", "Concept"]).head(15)
    print_table("Table 3 — concept showcases", table)
    spark.stop()


if __name__ == "__main__":
    main()
