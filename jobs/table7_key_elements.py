"""Table 7: event key-element recognition — F1-macro/micro/weighted.

Paper numbers for reference:
    LSTM      0.2108 / 0.5532 / 0.6563
    LSTM-CRF  0.2610 / 0.6468 / 0.7238
    GCTSP-Net 0.6291 / 0.9438 / 0.9331
"""
from _common import print_table, setup

from repro.evalsets import event_examples
from repro.experiments import run_elements_table


def main() -> None:
    spark, world, frames, examples, pm, em = setup("table7_key_elements")
    table = run_elements_table(event_examples(examples))
    print_table("Table 7 — event key element recognition (test split)", table)
    spark.stop()


if __name__ == "__main__":
    main()
