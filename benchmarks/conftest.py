"""Benchmark fixtures: a medium-scale world (~SF 0.1 analogue) and
models trained once per session, so each bench measures one pipeline
stage rather than the shared setup."""
import pytest

from repro.core.gctsp import train_element_model, train_phrase_model
from repro.evalsets import build_examples, event_examples, split
from repro.world import WorldConfig, generate_world, to_spark

#: Medium world: big enough to exercise shuffle paths, small enough for
#: a benchmark suite (~2k queries, ~1.1k docs, ~6k click edges).
MEDIUM = WorldConfig(
    n_categories=8,
    n_suffixes_per_cat=3,
    concepts_per_suffix=4,
    entities_per_concept=4,
    topics_per_cat=2,
    events_per_topic=3,
    extra_events_per_cat=4,
    n_noise_docs=80,
    n_users=150,
    seed=13,
)


@pytest.fixture(scope="session")
def bench_world():
    return generate_world(MEDIUM)


@pytest.fixture(scope="session")
def bench_frames(spark, bench_world):
    frames = to_spark(spark, bench_world)
    for df in frames.values():
        df.cache().count()
    return frames


@pytest.fixture(scope="session")
def bench_examples(spark, bench_world):
    return build_examples(spark, bench_world)


@pytest.fixture(scope="session")
def bench_phrase_model(bench_examples):
    return train_phrase_model(split(bench_examples, "train"), epochs=10)


@pytest.fixture(scope="session")
def bench_element_model(bench_examples):
    return train_element_model(
        event_examples(split(bench_examples, "train")), epochs=12
    )
