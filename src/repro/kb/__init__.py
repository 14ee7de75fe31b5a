"""Knowledge-base substrate: ontologies, synthetic worlds, seed KBs."""
from repro.kb.schema import ONTOLOGIES, Ontology
from repro.kb.generator import Entity, KBData, World, build_world, world_to_kb

__all__ = [
    "ONTOLOGIES",
    "Ontology",
    "Entity",
    "KBData",
    "World",
    "build_world",
    "world_to_kb",
]
