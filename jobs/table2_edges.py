"""Table 2: edges in the Attention Ontology — counts and accuracy.

Paper numbers: isA 490,741 @ 95%+, correlate 1,080,344 @ 95%+, involve
160,485 @ 99%+ (accuracy judged by three humans). Ours is scored
mechanically against the generator's gold relations; the shape to hold
is all three types well above 90% with involve the most precise.
"""
import pandas as pd
from _common import print_table, setup

from repro.core.ontology import build_ontology, evaluate_ontology


def main() -> None:
    spark, world, frames, examples, pm, em = setup("table2_edges")
    ao = build_ontology(
        spark,
        frames,
        list(world.ontology.entities.phrase),
        list(world.ontology.categories.name),
        pm,
        em,
    )
    acc = evaluate_ontology(ao, world)
    paper = pd.DataFrame(
        {
            "type": ["isA", "correlate", "involve"],
            "paper_count": [490741, 1080344, 160485],
            "paper_accuracy": ["95%+", "95%+", "99%+"],
        }
    )
    print_table(
        "Table 2 — edges in the attention ontology",
        acc.merge(paper, on="type"),
    )
    spark.stop()


if __name__ == "__main__":
    main()
