"""Table 5: concept mining — EM / F1 / COV for eight methods on CMD-lite.

Paper numbers for reference:
    TextRank   0.1941 / 0.7356 / 1.0      Align      0.7016 / 0.8895 / 0.9611
    AutoPhrase 0.0725 / 0.4839 / 0.9353   MatchAlign 0.6462 / 0.8814 / 0.9700
    Match      0.1494 / 0.3054 / 0.3639   Q-LSTM-CRF 0.7171 / 0.8828 / 0.9731
    T-LSTM-CRF 0.3106 / 0.6333 / 0.9062   GCTSP-Net  0.7830 / 0.9576 / 1.0
"""
from _common import print_table, setup

from repro.evalsets import concept_examples
from repro.experiments import corpus_inputs, run_concept_table


def main() -> None:
    spark, world, frames, examples, pm, em = setup("table5_concept_mining")
    texts, queries = corpus_inputs(world)
    table = run_concept_table(
        concept_examples(examples), examples, texts, queries, spark=spark
    )
    print_table("Table 5 — concept mining (test split)", table)
    spark.stop()


if __name__ == "__main__":
    main()
