"""Shared fixtures: a tiny synthetic world and its Spark frames.

Session-scoped because world generation + clustering is the expensive
common prefix of most integration tests.
"""
import pytest

from repro.core.gctsp import train_element_model, train_phrase_model
from repro.evalsets import build_examples, event_examples
from repro.world import WorldConfig, generate_world, to_spark

TINY = WorldConfig(
    n_categories=3,
    n_suffixes_per_cat=2,
    concepts_per_suffix=2,
    entities_per_concept=3,
    topics_per_cat=1,
    events_per_topic=2,
    extra_events_per_cat=2,
    n_noise_docs=8,
    n_users=20,
    sessions_per_user=3,
    seed=7,
)


@pytest.fixture(scope="session")
def tiny_world():
    return generate_world(TINY)


@pytest.fixture(scope="session")
def world_frames(spark, tiny_world):
    return to_spark(spark, tiny_world)


@pytest.fixture(scope="session")
def examples(spark, tiny_world):
    return build_examples(spark, tiny_world)


@pytest.fixture(scope="session")
def phrase_model(examples):
    """GCTSP-Net phrase head trained jointly on concepts + events."""
    return train_phrase_model(examples, epochs=10)


@pytest.fixture(scope="session")
def element_model(examples):
    """GCTSP-Net 4-class key-element head trained on event examples."""
    return train_element_model(event_examples(examples), epochs=12)


@pytest.fixture(scope="session")
def tiny_ontology(spark, tiny_world, world_frames, phrase_model, element_model):
    """The full Attention Ontology built over the tiny world."""
    from repro.core.ontology import build_ontology

    return build_ontology(
        spark,
        world_frames,
        list(tiny_world.ontology.entities.phrase),
        list(tiny_world.ontology.categories.name),
        phrase_model,
        element_model,
    )
