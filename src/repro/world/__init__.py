"""Synthetic web world: gold ontology + click-log generator (DESIGN.md §2)."""
from repro.world.clicklog_gen import World, generate_world, to_spark
from repro.world.ontology_gen import BENCH_CONFIG, Ontology, WorldConfig, generate_ontology

__all__ = [
    "World",
    "WorldConfig",
    "BENCH_CONFIG",
    "Ontology",
    "generate_ontology",
    "generate_world",
    "to_spark",
]
