"""Shared setup for table jobs: session, world, models, ontology.

Each ``jobs/tableN_*.py`` is a spark-submit entrypoint reproducing one
table of the paper's evaluation section. They all need the same
prefix — synthesize the benchmark world, train GCTSP-Net, run the
pipeline — which lives here so a table job is just "setup + print".

Run any job as:
    spark-submit jobs/table5_concept_mining.py [--scale tiny|bench]
or  python jobs/table5_concept_mining.py      (local[*] session)
"""
from __future__ import annotations

import argparse
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402

from repro.core.gctsp import train_element_model, train_phrase_model  # noqa: E402
from repro.evalsets import build_examples, event_examples, split  # noqa: E402
from repro.world import BENCH_CONFIG, WorldConfig, generate_world, to_spark  # noqa: E402

TINY_CONFIG = WorldConfig(
    n_categories=3,
    n_suffixes_per_cat=2,
    concepts_per_suffix=2,
    entities_per_concept=3,
    topics_per_cat=1,
    events_per_topic=2,
    extra_events_per_cat=2,
    n_noise_docs=8,
    n_users=20,
    seed=7,
)


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def parse_scale() -> WorldConfig:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["tiny", "bench"], default="bench")
    args, _ = ap.parse_known_args()
    return TINY_CONFIG if args.scale == "tiny" else BENCH_CONFIG


def setup(app: str, cfg: WorldConfig | None = None, *, epochs: int = 10):
    """(spark, world, frames, examples, phrase_model, element_model)."""
    spark = get_spark(app)
    spark.sparkContext.setLogLevel("ERROR")
    cfg = cfg or parse_scale()
    world = generate_world(cfg)
    frames = to_spark(spark, world)
    examples = build_examples(spark, world)
    phrase_model = train_phrase_model(split(examples, "train"), epochs=epochs)
    element_model = train_element_model(
        event_examples(split(examples, "train")), epochs=epochs + 2
    )
    return spark, world, frames, examples, phrase_model, element_model


def print_table(title: str, df) -> None:
    print(f"\n=== {title} ===")
    print(df.to_string(index=False))
