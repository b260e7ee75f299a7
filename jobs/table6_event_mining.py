"""Table 6: event mining — EM / F1 / COV for five methods on EMD-lite.

Paper numbers for reference:
    TextRank    0.3968 / 0.8102 / 1.0
    CoverRank   0.4663 / 0.8169 / 1.0
    TextSummary 0.0047 / 0.1064 / 1.0
    LSTM-CRF    0.4597 / 0.8469 / 1.0
    GCTSP-Net   0.5164 / 0.8562 / 0.9972
"""
from _common import print_table, setup

from repro.evalsets import event_examples
from repro.experiments import run_event_table


def main() -> None:
    spark, world, frames, examples, pm, em = setup("table6_event_mining")
    table = run_event_table(event_examples(examples), examples, spark=spark)
    print_table("Table 6 — event mining (test split)", table)
    spark.stop()


if __name__ == "__main__":
    main()
